package repro.core

import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil

/** Tests for the pruning cost model and plan enumeration (Alg. 4, §VI-C/D). */
class PruneOptimizerSpec extends AnyFunSuite {

  private def index(seed: Int, dims: Int = 3, rows: Int = 80): FactIndex =
    FactGen.build(TestUtil.randomRelation(new Random(seed), dims, 3, rows), 2)

  test("erf approximation matches known values") {
    assert(math.abs(Gaussian.erf(0.0)) < 1e-7)
    assert(math.abs(Gaussian.erf(1.0) - 0.8427008) < 1e-5)
    assert(math.abs(Gaussian.erf(-1.0) + 0.8427008) < 1e-5)
    assert(Gaussian.erf(5.0) > 0.999999)
  }

  test("phi is a CDF: monotone, 0.5 at zero, symmetric") {
    assert(math.abs(Gaussian.phi(0.0) - 0.5) < 1e-9)
    assert(Gaussian.phi(-3) < Gaussian.phi(-1))
    assert(Gaussian.phi(1) < Gaussian.phi(3))
    assert(math.abs(Gaussian.phi(1.5) + Gaussian.phi(-1.5) - 1.0) < 1e-6)
  }

  test("prSourceBeatsTarget is 0.5 for equal group sizes") {
    val idx = index(1)
    val cm = new CostModel(idx)
    val g = PruneOptimizer.groupsByFactCount(idx)
    val sameSize = g.groupBy(idx.groupSize).values.find(_.size >= 2)
    sameSize.foreach { gs =>
      assert(math.abs(cm.prSourceBeatsTarget(gs(0), gs(1)) - 0.5) < 1e-9)
    }
  }

  test("smaller source groups are likelier to dominate (§VI-C)") {
    val idx = index(2, dims = 3, rows = 200)
    val cm = new CostModel(idx)
    val ordered = PruneOptimizer.groupsByFactCount(idx)
    val small = ordered.head
    val large = ordered.last
    if (idx.groupSize(small) < idx.groupSize(large))
      assert(cm.prSourceBeatsTarget(small, large) >
        cm.prSourceBeatsTarget(large, small))
  }

  test("prPruned grows with more sources") {
    val idx = index(3)
    val cm = new CostModel(idx)
    val ordered = PruneOptimizer.groupsByFactCount(idx)
    val t = ordered.last
    val p1 = cm.prPruned(t, ordered.take(1))
    val p2 = cm.prPruned(t, ordered.take(3))
    assert(p2 >= p1 - 1e-12)
  }

  test("prPruned lies in [0, 1]") {
    val idx = index(4)
    val cm = new CostModel(idx)
    val ordered = PruneOptimizer.groupsByFactCount(idx)
    ordered.foreach { t =>
      val p = cm.prPruned(t, ordered.take(2))
      assert(p >= 0.0 && p <= 1.0)
    }
  }

  test("groupsByFactCount is sorted by M(g) ascending") {
    val idx = index(5)
    val ms = PruneOptimizer.groupsByFactCount(idx).map(idx.groupSize)
    assert(ms == ms.sorted)
  }

  test("target sequence covers all non-source groups via specialization") {
    val idx = index(6)
    val cm = new CostModel(idx)
    val sources = PruneOptimizer.groupsByFactCount(idx).take(1)
    val seq = PruneOptimizer.targetSequence(cm, idx, sources)
    val covered = idx.patterns.indices.filterNot(sources.contains(_)).forall { g =>
      seq.exists(t => idx.isSpecialization(t, g))
    }
    assert(covered)
  }

  test("target sequence has no duplicate targets") {
    val idx = index(7)
    val cm = new CostModel(idx)
    val sources = PruneOptimizer.groupsByFactCount(idx).take(2)
    val seq = PruneOptimizer.targetSequence(cm, idx, sources)
    assert(seq.distinct.length == seq.length)
  }

  test("Alg. 4 admits only M-ascending-prefix source sets") {
    val idx = index(8)
    val cm = new CostModel(idx)
    val ordered = PruneOptimizer.groupsByFactCount(idx)
    PruneOptimizer.candidatePlans(cm, idx).foreach { plan =>
      if (plan.targets.nonEmpty) { // Alg. 4 candidates (not the no-prune plan)
        val maxSrc = plan.sources.map(idx.groupSize).max
        val outside = idx.patterns.indices.filterNot(plan.sources.contains(_))
        assert(outside.forall(g => idx.groupSize(g) >= maxSrc ||
          ordered.indexOf(g) >= plan.sources.length))
      }
    }
  }

  test("candidate plans include the no-pruning fallback") {
    val idx = index(9)
    val cm = new CostModel(idx)
    val plans = PruneOptimizer.candidatePlans(cm, idx)
    assert(plans.exists(p => p.targets.isEmpty &&
      p.sources.length == idx.numPatterns))
  }

  test("optimalPlan returns the min-cost candidate") {
    val idx = index(10)
    val cm = new CostModel(idx)
    val plans = PruneOptimizer.candidatePlans(cm, idx)
    val opt = PruneOptimizer.optimalPlan(cm, idx)
    assert(plans.map(cm.planCost).min == cm.planCost(opt))
  }

  test("plan cost is positive and bounded by join-everything cost plus bounds") {
    val idx = index(11)
    val cm = new CostModel(idx)
    PruneOptimizer.candidatePlans(cm, idx).foreach { p =>
      val c = cm.planCost(p)
      val allJoin = idx.patterns.indices.map(cm.costU).sum
      val allBounds = p.targets.map(cm.costD).sum
      assert(c > 0.0)
      assert(c <= allJoin + allBounds + 1e-6)
    }
  }

  test("no-prune plan cost equals the exhaustive join cost") {
    val idx = index(12)
    val cm = new CostModel(idx)
    val noPrune = PrunePlan(idx.patterns.indices.toIndexedSeq, IndexedSeq.empty)
    val expected = idx.patterns.indices.map(cm.costU).sum
    assert(math.abs(cm.planCost(noPrune) - expected) < 1e-9)
  }

  test("targetValue is zero when the target specializes nothing left") {
    val idx = index(13)
    val cm = new CostModel(idx)
    val full = idx.patterns.indices.maxBy(pi => idx.patterns(pi).length)
    // A widest pattern only specializes itself.
    val v = PruneOptimizer.targetValue(cm, idx, full, Seq(0), Seq.empty)
    assert(v == 0.0)
  }
}
