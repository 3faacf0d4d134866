package repro.core

import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil

/** Property tests for Theorem 1: utility, as a set function of the speech
  * facts, is non-negative, monotone and submodular. Runs many seeded random
  * instances per property (deterministic, reproducible failures).
  */
class SubmodularitySpec extends AnyFunSuite {

  private def instance(seed: Int): (EncodedRelation, IndexedSeq[Fact], Double) = {
    val rnd = new Random(seed)
    val rel = TestUtil.randomRelation(rnd, 1 + rnd.nextInt(3), 3, 10 + rnd.nextInt(40))
    val index = FactGen.build(rel, math.min(2, rel.numDims))
    val prior = if (rnd.nextBoolean()) rel.targetMean else rnd.nextInt(100).toDouble
    (rel, index.facts, prior)
  }

  private def randomSubset[A](rnd: Random, xs: IndexedSeq[A], max: Int): IndexedSeq[A] =
    rnd.shuffle(xs.indices.toList).take(rnd.nextInt(max + 1)).map(xs).toIndexedSeq

  test("utility is non-negative (100 random instances)") {
    (0 until 100).foreach { seed =>
      val (rel, facts, prior) = instance(seed)
      val rnd = new Random(seed + 1000)
      val speech = randomSubset(rnd, facts, 4)
      assert(Eval.utility(rel, speech, prior) >= -1e-9, s"seed=$seed")
    }
  }

  test("utility is monotone: adding facts never hurts (100 random instances)") {
    (0 until 100).foreach { seed =>
      val (rel, facts, prior) = instance(seed)
      val rnd = new Random(seed + 2000)
      val small = randomSubset(rnd, facts, 3)
      val extra = randomSubset(rnd, facts, 2)
      val u1 = Eval.utility(rel, small, prior)
      val u2 = Eval.utility(rel, small ++ extra, prior)
      assert(u2 >= u1 - 1e-9, s"seed=$seed")
    }
  }

  test("utility is submodular: diminishing returns (200 random instances, Thm 1)") {
    (0 until 200).foreach { seed =>
      val (rel, facts, prior) = instance(seed)
      val rnd = new Random(seed + 3000)
      val f1 = randomSubset(rnd, facts, 3)
      val f2 = f1 ++ randomSubset(rnd, facts, 2)
      val s = facts(rnd.nextInt(facts.length))
      val gain1 = Eval.utility(rel, f1 :+ s, prior) - Eval.utility(rel, f1, prior)
      val gain2 = Eval.utility(rel, f2 :+ s, prior) - Eval.utility(rel, f2, prior)
      assert(gain1 >= gain2 - 1e-9, s"seed=$seed gain1=$gain1 gain2=$gain2")
    }
  }

  test("single-fact utility upper-bounds the gain of adding that fact (Lemma 2)") {
    (0 until 200).foreach { seed =>
      val (rel, facts, prior) = instance(seed)
      val rnd = new Random(seed + 4000)
      val base = randomSubset(rnd, facts, 3)
      val s = facts(rnd.nextInt(facts.length))
      val u1 = Eval.utility(rel, IndexedSeq(s), prior)
      val gain = Eval.utility(rel, base :+ s, prior) - Eval.utility(rel, base, prior)
      assert(u1 >= gain - 1e-9, s"seed=$seed")
    }
  }

  test("deviation is non-increasing in the fact set") {
    (0 until 100).foreach { seed =>
      val (rel, facts, prior) = instance(seed)
      val rnd = new Random(seed + 5000)
      val small = randomSubset(rnd, facts, 3)
      val s = facts(rnd.nextInt(facts.length))
      assert(Eval.deviation(rel, small :+ s, prior) <=
        Eval.deviation(rel, small, prior) + 1e-9, s"seed=$seed")
    }
  }

  test("utility equals base error minus deviation by definition") {
    (0 until 50).foreach { seed =>
      val (rel, facts, prior) = instance(seed)
      val rnd = new Random(seed + 6000)
      val speech = randomSubset(rnd, facts, 3)
      val lhs = Eval.utility(rel, speech, prior)
      val rhs = Eval.deviation(rel, Nil, prior) - Eval.deviation(rel, speech, prior)
      assert(math.abs(lhs - rhs) < 1e-9, s"seed=$seed")
    }
  }

  test("duplicate facts do not change utility (set semantics)") {
    (0 until 50).foreach { seed =>
      val (rel, facts, prior) = instance(seed)
      val rnd = new Random(seed + 7000)
      val speech = randomSubset(rnd, facts, 3)
      if (speech.nonEmpty) {
        val dup = speech :+ speech.head
        assert(math.abs(Eval.utility(rel, speech, prior) -
          Eval.utility(rel, dup, prior)) < 1e-12, s"seed=$seed")
      }
    }
  }

  test("utility is order-independent (§IV-B rule 1 premise)") {
    (0 until 50).foreach { seed =>
      val (rel, facts, prior) = instance(seed)
      val rnd = new Random(seed + 8000)
      val speech = randomSubset(rnd, facts, 4)
      val shuffled = rnd.shuffle(speech.toList).toIndexedSeq
      assert(math.abs(Eval.utility(rel, speech, prior) -
        Eval.utility(rel, shuffled, prior)) < 1e-12, s"seed=$seed")
    }
  }
}
