package repro.core.df

import scala.util.Random
import repro.{SparkSpec, TestUtil}
import repro.core.{ExactSummarizer, FactGen, GreedySummarizer}

/** DataFrame exact algorithm (Alg. 1 as relational operators) vs. the local
  * exact solver. Tiny instances — the frontier is materialized per level.
  */
class DfExactSpec extends SparkSpec {

  test("grid optimum 42.5 at m=2 with zero prior") {
    val df = TestUtil.toDf(spark, TestUtil.paperGrid)
    val res = DfExact.summarize(df, Seq("season", "region"), "t", 2, 2, Some(0.0))
    assert(math.abs(res.utility - 42.5) < 1e-9)
    assert(res.factKeys.length == 2)
  }

  test("matches local exact on random relations") {
    (0 until 5).foreach { seed =>
      val rel = TestUtil.randomRelationCont(new Random(seed + 40), 2, 2, 15)
      val df = TestUtil.toDf(spark, rel)
      val prior = rel.targetMean
      val index = FactGen.build(rel, 2)
      val greedy = GreedySummarizer.summarize(index, 2, prior)
      val local = ExactSummarizer.summarize(index, 2, prior, Some(greedy.speech))
      val dist = DfExact.summarize(df, rel.dimNames, "t", 2, 2, Some(prior))
      assert(math.abs(local.speech.utility - dist.utility) < 1e-6,
        s"seed=$seed local=${local.speech.utility} df=${dist.utility}")
    }
  }

  test("exact utility is at least DataFrame-greedy utility") {
    val rel = TestUtil.randomRelationCont(new Random(50), 2, 3, 20)
    val df = TestUtil.toDf(spark, rel)
    val g = DfGreedy.summarize(df, rel.dimNames, "t", 2, 2)
    val e = DfExact.summarize(df, rel.dimNames, "t", 2, 2)
    assert(e.utility >= g.utility - 1e-9)
  }

  test("m=1 returns the single best fact") {
    val rel = TestUtil.paperGrid
    val df = TestUtil.toDf(spark, rel)
    val res = DfExact.summarize(df, rel.dimNames, "t", 1, 2, Some(0.0))
    assert(math.abs(res.utility - 35.0) < 1e-9)
    assert(res.factKeys == Seq("")) // overall fact has an empty key
  }

  test("reports base error D(∅)") {
    val df = TestUtil.toDf(spark, TestUtil.paperGrid)
    val res = DfExact.summarize(df, Seq("season", "region"), "t", 1, 2, Some(0.0))
    assert(res.baseError == 50.0)
  }
}
