package repro.core.df

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

final case class DfExactResult(factKeys: Seq[String], utility: Double, baseError: Double)

/** Exact speech optimization (Alg. 1) as relational operators on Catalyst.
  *
  * Speeches are rows carrying an array of fact keys; expansion is the
  * Cartesian product `S × F` filtered by the pruning condition P (canonical
  * rank order + utility-bound vs. the greedy lower bound b), and the final
  * utility computation is the join `R ⋈_M S` with per-row minimum deviation.
  * Intended for small fact sets — the frontier is materialized per level,
  * mirroring the paper's per-iteration SQL statements.
  */
object DfExact {

  def summarize(rel: DataFrame, dims: Seq[String], target: String,
                m: Int, maxFactDims: Int,
                priorOpt: Option[Double] = None): DfExactResult = {
    val spark = rel.sparkSession
    import spark.implicits._

    val rel2 = DfFacts.normalize(rel, dims, target)
    val prior = priorOpt.getOrElse(rel2.agg(avg(target)).collect()(0).getDouble(0))
    val relDev = rel2
      .withColumn("rid", monotonically_increasing_id())
      .withColumn("dev0", abs(col(target) - lit(prior)))
      .cache()
    val baseError = relDev.agg(sum("dev0")).collect()(0).getDouble(0)

    val factsDf = DfFacts.facts(rel2, dims, target, maxFactDims).cache()

    // Greedy lower bound b (Alg. 1 input) — the cheaper heuristic.
    val greedy = DfGreedy.summarize(rel2, dims, target, m, maxFactDims, Some(prior))
    val b = greedy.utility

    // Line 6: single-fact utilities, then canonical ranks.
    val singles = relDev.join(factsDf, DfFacts.matchCond(factsDf, relDev, dims))
      .groupBy("fact_key")
      .agg(sum(greatest(lit(0.0), col("dev0") - abs(col("typical") - col(target))))
        .as("u1"))
    val ranked = factsDf.select("fact_key").distinct()
      .join(singles, Seq("fact_key"), "left")
      .na.fill(0.0, Seq("u1"))
      .withColumn("rank", row_number().over(Window.orderBy(desc("u1"), asc("fact_key"))))
      .cache()
    val k = ranked.count().toInt
    val targetLen = math.min(m, k)

    // Length-1 frontier with the level-1 bound m·u1 ≥ b.
    var frontier = ranked
      .where(col("u1") * m >= b)
      .select(array(col("fact_key")).as("ids"), col("rank").as("last_rank"),
        col("u1").as("ubound"))
      .cache()

    for (i <- 2 to targetLen) {
      val nf = ranked.select(col("fact_key").as("nf_key"), col("rank").as("nf_rank"),
        col("u1").as("nf_u1"))
      val next = frontier.crossJoin(nf)
        .where(col("nf_rank") > col("last_rank") &&
          col("ubound") + lit((m - i + 1).toDouble) * col("nf_u1") >= b)
        .select(concat(col("ids"), array(col("nf_key"))).as("ids"),
          col("nf_rank").as("last_rank"),
          (col("ubound") + col("nf_u1")).as("ubound"))
        .cache()
      next.count()
      frontier.unpersist()
      frontier = next
    }

    // Line 13: exact utility of surviving speeches via R ⋈_M S.
    val exploded = frontier
      .select(col("ids"), explode(col("ids")).as("fact_key"))
      .join(factsDf, Seq("fact_key"))
    val perRow = relDev.join(exploded, DfFacts.matchCond(exploded, relDev, dims))
      .groupBy(col("ids"), col("rid"))
      .agg(min(abs(col("typical") - col(target))).as("min_dev"),
        first(col("dev0")).as("d0"))
    val utilities = perRow.groupBy("ids")
      .agg(sum(greatest(lit(0.0), col("d0") - col("min_dev"))).as("utility"))
    val top = utilities.orderBy(desc("utility")).limit(1).collect()

    frontier.unpersist(); ranked.unpersist(); factsDf.unpersist(); relDev.unpersist()

    if (top.isEmpty || top(0).getAs[Double]("utility") < b)
      DfExactResult(greedy.facts.map(f => scopeKey(f.scope, dims)), b, baseError)
    else
      DfExactResult(top(0).getSeq[String](0), top(0).getAs[Double]("utility"), baseError)
  }

  private def scopeKey(scope: Map[String, String], dims: Seq[String]): String =
    dims.flatMap(d => scope.get(d).map(v => s"$d=$v")).mkString("∧")
}
