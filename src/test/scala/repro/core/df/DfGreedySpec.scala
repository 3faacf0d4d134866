package repro.core.df

import scala.util.Random
import repro.{SparkSpec, TestUtil}
import repro.core.{FactGen, GreedySummarizer}

/** DataFrame greedy (Catalyst pipeline) vs. the local greedy solver. */
class DfGreedySpec extends SparkSpec {

  test("grid with zero prior reaches utility 42.5 at m=2") {
    val df = TestUtil.toDf(spark, TestUtil.paperGrid)
    val res = DfGreedy.summarize(df, Seq("season", "region"), "t", 2, 2, Some(0.0))
    assert(math.abs(res.utility - 42.5) < 1e-9)
  }

  test("grid base error is 50 under zero prior") {
    val df = TestUtil.toDf(spark, TestUtil.paperGrid)
    val res = DfGreedy.summarize(df, Seq("season", "region"), "t", 1, 2, Some(0.0))
    assert(res.baseError == 50.0)
  }

  test("first pick on the grid is the overall fact (gain 35)") {
    val df = TestUtil.toDf(spark, TestUtil.paperGrid)
    val res = DfGreedy.summarize(df, Seq("season", "region"), "t", 1, 2, Some(0.0))
    assert(res.facts.head.scope.isEmpty)
    assert(math.abs(res.facts.head.gain - 35.0) < 1e-9)
  }

  test("matches local greedy utility on random relations (continuous targets)") {
    (0 until 8).foreach { seed =>
      val rel = TestUtil.randomRelationCont(new Random(seed), 3, 3, 40)
      val df = TestUtil.toDf(spark, rel)
      val prior = rel.targetMean
      val local = GreedySummarizer.summarize(FactGen.build(rel, 2), 3, prior)
      val dist = DfGreedy.summarize(df, rel.dimNames, "t", 3, 2, Some(prior))
      assert(math.abs(local.speech.utility - dist.utility) < 1e-6,
        s"seed=$seed local=${local.speech.utility} df=${dist.utility}")
    }
  }

  test("selected scopes match local greedy on continuous targets") {
    val rel = TestUtil.randomRelationCont(new Random(77), 2, 3, 30)
    val df = TestUtil.toDf(spark, rel)
    val prior = rel.targetMean
    val local = GreedySummarizer.summarize(FactGen.build(rel, 2), 2, prior)
    val dist = DfGreedy.summarize(df, rel.dimNames, "t", 2, 2, Some(prior))
    val localScopes = local.speech.facts.map(f =>
      f.dims.indices.map(i =>
        rel.dimNames(f.dims(i)) -> rel.dimValues(f.dims(i))(f.values(i))).toMap).toSet
    assert(dist.facts.map(_.scope).toSet == localScopes)
  }

  test("default prior is the relation mean") {
    val rel = TestUtil.paperGrid
    val df = TestUtil.toDf(spark, rel)
    val explicit = DfGreedy.summarize(df, rel.dimNames, "t", 2, 2, Some(12.5))
    val default = DfGreedy.summarize(df, rel.dimNames, "t", 2, 2, None)
    assert(math.abs(explicit.utility - default.utility) < 1e-9)
  }

  test("stops early on constant data") {
    val flat = TestUtil.grid(Map(
      ("A", "N") -> Seq(5.0), ("A", "S") -> Seq(5.0),
      ("B", "N") -> Seq(5.0), ("B", "S") -> Seq(5.0)))
    val df = TestUtil.toDf(spark, flat)
    val res = DfGreedy.summarize(df, flat.dimNames, "t", 3, 2)
    assert(res.facts.isEmpty && res.utility == 0.0)
  }

  test("per-fact gains are non-increasing") {
    val rel = TestUtil.randomRelationCont(new Random(5), 3, 3, 50)
    val df = TestUtil.toDf(spark, rel)
    val res = DfGreedy.summarize(df, rel.dimNames, "t", 3, 2)
    res.facts.map(_.gain).sliding(2).foreach {
      case Seq(a, b) => assert(a >= b - 1e-9)
      case _ =>
    }
  }
}
