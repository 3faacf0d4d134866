package repro.core.df

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.core.FactGen

/** Relational fact-candidate generation: one grouping per scope pattern
  * (subset of ≤ `maxFactDims` dimensions), unioned into a single fact table
  * with nullable dimension columns — null meaning "unrestricted", exactly
  * the representation Alg. 1/2 join against via the match condition M.
  */
object DfFacts {

  /** Normalize a relation: dimensions as strings, target as double. */
  def normalize(rel: DataFrame, dims: Seq[String], target: String): DataFrame =
    rel.select(dims.map(d => col(d).cast("string").as(d)) :+
      col(target).cast("double").as(target): _*)

  /** The fact table: columns `f_<dim>` (nullable), `typical`, `support`,
    * `fact_key` (canonical scope description, the deterministic fact id).
    */
  def facts(rel: DataFrame, dims: Seq[String], target: String, maxFactDims: Int): DataFrame = {
    val rel2 = normalize(rel, dims, target)
    val pats = FactGen.patterns(dims.length, maxFactDims)
    val parts = pats.map { p =>
      val pcols = p.map(dims(_)).toSeq
      val grouped =
        if (pcols.isEmpty)
          rel2.agg(avg(target).as("typical"), count(lit(1)).as("support"))
        else
          rel2.groupBy(pcols.map(col): _*)
            .agg(avg(target).as("typical"), count(lit(1)).as("support"))
      grouped.select(dims.map { d =>
        (if (pcols.contains(d)) col(d) else lit(null).cast("string")).as(s"f_$d")
      } ++ Seq(col("typical"), col("support")): _*)
    }
    parts.reduce(_.unionByName(_))
      .withColumn("fact_key",
        concat_ws("∧", dims.map(d =>
          when(col(s"f_$d").isNotNull, concat(lit(s"$d="), col(s"f_$d")))): _*))
  }

  /** The match condition M (§IV-A): a row is within a fact's scope iff every
    * restricted dimension agrees — `F.d IS NULL OR F.d = R.d` per dimension.
    */
  def matchCond(factDf: DataFrame, relDf: DataFrame, dims: Seq[String]): Column =
    dims.map(d => factDf(s"f_$d").isNull || factDf(s"f_$d") === relDf(d))
      .reduce(_ && _)

  /** Scope condition of one concrete fact against relation rows. */
  def scopeCond(relDf: DataFrame, scope: Seq[(String, String)], dims: Seq[String]): Column =
    if (scope.isEmpty) lit(true)
    else scope.map { case (d, v) => relDf(d) === lit(v) }.reduce(_ && _)
}
