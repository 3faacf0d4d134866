package repro.system

import repro.{SparkSpec, TestUtil}
import repro.core.{FactGen, GreedySummarizer}
import repro.data.VoiceData

/** Tests for the distributed batch pre-processing job. */
class PreprocessorSpec extends SparkSpec {

  private lazy val rel = TestUtil.paperGrid
  private lazy val df = TestUtil.toDf(spark, rel)
  private lazy val table = Encoding.fromDataFrame(df, Seq("season", "region"), Seq("t"))
  private val spec = VoiceData.DatasetSpec("grid", Seq("season", "region"),
    Seq("t"), 4, (_, _, _) => null)
  private val config = SummarizationConfig(spec, speechLength = 2)

  test("solve produces a summary with positive utility on varied data") {
    val s = Preprocessor.solve(table, Problem("t", Nil), 2, 2, "gb").get
    assert(s.utility > 0)
    assert(s.facts.nonEmpty)
    assert(s.speech.nonEmpty)
  }

  test("solve on an empty subset returns None") {
    assert(Preprocessor.solve(table, Problem("t", Seq("season" -> "Nope")),
      2, 2, "gb").isEmpty)
  }

  test("solve matches a direct greedy run") {
    val p = Problem("t", Seq("season" -> "Summer"))
    val s = Preprocessor.solve(table, p, 2, 2, "gb").get
    val sub = table.relationFor("t", p.predicates)
    val direct = GreedySummarizer.summarize(
      FactGen.build(sub, math.min(2, sub.numDims)), 2, sub.targetMean)
    assert(math.abs(s.utility - direct.speech.utility) < 1e-9)
  }

  test("solve supports all four algorithms") {
    val p = Problem("t", Nil)
    val utils = Seq("gb", "gp", "go", "exact").map(a =>
      Preprocessor.solve(table, p, 2, 2, a).get.utility)
    // gb = gp = go, exact ≥ greedy.
    assert(math.abs(utils(0) - utils(1)) < 1e-9)
    assert(math.abs(utils(0) - utils(2)) < 1e-9)
    assert(utils(3) >= utils(0) - 1e-9)
  }

  test("solve rejects unknown algorithm names") {
    intercept[IllegalArgumentException] {
      Preprocessor.solve(table, Problem("t", Nil), 2, 2, "bogus")
    }
  }

  test("fact scopes in summaries are relative to the queried subset") {
    val p = Problem("t", Seq("season" -> "Summer"))
    val s = Preprocessor.solve(table, p, 2, 2, "gb").get
    s.facts.foreach(f => assert(!f.scope.contains("season")))
  }

  test("batch run answers every non-empty problem") {
    val (summaries, stats) = Preprocessor.run(spark, table, config, "gb")
    val collected = summaries.collect()
    assert(stats.numProblems == 9)
    assert(collected.length == 9) // full grid: every subset non-empty
    assert(collected.map(_.key).distinct.length == 9)
    summaries.unpersist()
  }

  test("batch results match per-problem solves") {
    val (summaries, _) = Preprocessor.run(spark, table, config, "gb")
    val byKey = summaries.collect().map(s => s.key -> s).toMap
    ProblemGenerator.problems(table, config).foreach { p =>
      val direct = Preprocessor.solve(table, p, 2, 2, "gb").get
      assert(math.abs(byKey(p.key).utility - direct.utility) < 1e-9, p.key)
    }
    summaries.unpersist()
  }

  test("summaries round-trip through Parquet") {
    import spark.implicits._
    val (summaries, _) = Preprocessor.run(spark, table, config, "gb")
    val dir = java.nio.file.Files.createTempDirectory("summaries").toString
    summaries.write.mode("overwrite").parquet(dir)
    val back = spark.read.parquet(dir).as[Summary].collect()
    assert(back.map(_.key).sorted.toSeq ==
      summaries.collect().map(_.key).sorted.toSeq)
    summaries.unpersist()
  }

  test("batch run works on a real synthetic dataset") {
    val acs = VoiceData.AcsNY
    val t = Encoding.fromDataFrame(acs.df(spark, 0.005), acs.dims, acs.targets)
    val cfg = SummarizationConfig(acs, maxQueryLen = 1, speechLength = 2)
    val (summaries, stats) = Preprocessor.run(spark, t, cfg, "go")
    assert(stats.numProblems == summaries.collect().length)
    assert(summaries.collect().forall(_.utility >= 0))
    summaries.unpersist()
  }

  test("per-problem stats are consistent") {
    val stats = PreprocessStats(10, 5_000_000_000L)
    assert(math.abs(stats.perProblemMillis - 500.0) < 1e-9)
    assert(PreprocessStats(0, 100).perProblemMillis == 0.0)
  }
}
