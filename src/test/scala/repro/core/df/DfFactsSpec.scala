package repro.core.df

import scala.util.Random
import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestUtil}
import repro.core.FactGen

/** DataFrame fact generation vs. the local fact index and the DuckDB oracle. */
class DfFactsSpec extends SparkSpec {

  private lazy val rel = TestUtil.paperGrid
  private lazy val df = TestUtil.toDf(spark, rel)
  private val dims = Seq("season", "region")

  test("facts DF has one row per local fact") {
    val facts = DfFacts.facts(df, dims, "t", 2)
    assert(facts.count() == FactGen.build(rel, 2).numFacts)
  }

  test("facts DF typical values match the local index") {
    val facts = DfFacts.facts(df, dims, "t", 2).collect()
    val index = FactGen.build(rel, 2)
    val local = index.facts.map(f =>
      f.describeScope(rel).replace(" ∧ ", "∧") match {
        case "overall" => "" -> f.typical
        case s => s -> f.typical
      }).toMap
    facts.foreach { r =>
      val key = r.getAs[String]("fact_key")
      assert(local.contains(key), s"unexpected fact $key")
      assert(math.abs(local(key) - r.getAs[Double]("typical")) < 1e-9)
    }
  }

  test("single-dim group-by averages agree with DuckDB") {
    val sparkRes = df.groupBy("season")
      .agg(avg("t").as("typical"), count(lit(1)).as("support"))
    Oracle.assertEquivalent(sparkRes,
      "SELECT season, avg(CAST(t AS DOUBLE)) AS typical, count(*) AS support " +
        "FROM rel GROUP BY season",
      "rel" -> df)
  }

  test("two-dim group-by averages agree with DuckDB") {
    val sparkRes = df.groupBy("season", "region")
      .agg(avg("t").as("typical"), count(lit(1)).as("support"))
    Oracle.assertEquivalent(sparkRes,
      "SELECT season, region, avg(CAST(t AS DOUBLE)) AS typical, " +
        "count(*) AS support FROM rel GROUP BY season, region",
      "rel" -> df)
  }

  test("overall average agrees with DuckDB") {
    val sparkRes = df.agg(avg("t").as("typical"))
    Oracle.assertEquivalent(sparkRes,
      "SELECT avg(CAST(t AS DOUBLE)) AS typical FROM rel", "rel" -> df)
  }

  test("single-fact utility join agrees with DuckDB (Alg. 1 line 6)") {
    val prior = 0.0
    val facts = DfFacts.facts(df, dims, "t", 2)
      .where(col("f_season").isNotNull && col("f_region").isNull)
    val joined = df.join(facts, DfFacts.matchCond(facts, df, dims))
    val sparkRes = joined.groupBy("fact_key")
      .agg(sum(greatest(lit(0.0), abs(col("t") - lit(prior)) -
        abs(col("typical") - col("t")))).as("u1"))
      .select(col("fact_key").as("season_val"), col("u1"))
      .withColumn("season_val", regexp_replace(col("season_val"), "season=", ""))
    Oracle.assertEquivalent(sparkRes,
      """WITH facts AS (
        |  SELECT season, avg(CAST(t AS DOUBLE)) AS typical FROM rel GROUP BY season)
        |SELECT f.season AS season_val,
        |       SUM(GREATEST(0, ABS(CAST(r.t AS DOUBLE) - 0.0) -
        |                       ABS(f.typical - CAST(r.t AS DOUBLE)))) AS u1
        |FROM rel r JOIN facts f ON r.season = f.season
        |GROUP BY f.season""".stripMargin,
      "rel" -> df)
  }

  test("matchCond pairs each row with facts covering it") {
    val facts = DfFacts.facts(df, dims, "t", 2)
    val joined = df.join(facts, DfFacts.matchCond(facts, df, dims))
    // Every row matches: 1 overall + 1 season + 1 region + 1 cell = 4 facts.
    assert(joined.count() == rel.numRows * 4)
  }

  test("facts on random relation match local index") {
    val rrel = TestUtil.randomRelation(new Random(21), 3, 3, 60)
    val rdf = TestUtil.toDf(spark, rrel)
    val dfFacts = DfFacts.facts(rdf, rrel.dimNames, "t", 2).collect()
    val index = FactGen.build(rrel, 2)
    assert(dfFacts.length == index.numFacts)
    val localTyp = index.facts.map { f =>
      val scope = f.dims.indices.map(i =>
        s"${rrel.dimNames(f.dims(i))}=${rrel.dimValues(f.dims(i))(f.values(i))}")
      scope.mkString("∧") -> f.typical
    }.toMap
    dfFacts.foreach { r =>
      val key = r.getAs[String]("fact_key")
      assert(math.abs(localTyp(key) - r.getAs[Double]("typical")) < 1e-9, key)
    }
  }

  test("scopeCond selects exactly the scope rows") {
    val cnt = df.where(DfFacts.scopeCond(df,
      Seq("season" -> "Winter"), dims)).count()
    assert(cnt == 2)
  }

  test("normalize casts dims to string and target to double") {
    val schema = DfFacts.normalize(df, dims, "t").schema
    assert(schema("season").dataType.typeName == "string")
    assert(schema("t").dataType.typeName == "double")
  }

  test("filtered subset aggregation agrees with DuckDB (query predicate path)") {
    val sub = df.where(col("season") === "Winter")
      .groupBy("region").agg(avg("t").as("typical"))
    Oracle.assertEquivalent(sub,
      "SELECT region, avg(CAST(t AS DOUBLE)) AS typical FROM rel " +
        "WHERE season = 'Winter' GROUP BY region",
      "rel" -> df)
  }
}
