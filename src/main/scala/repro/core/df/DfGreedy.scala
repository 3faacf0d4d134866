package repro.core.df

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import scala.collection.mutable

/** One selected fact in DataFrame form: the restricted `(dim → value)` scope
  * plus its typical value and the utility gain realized when it was added.
  */
final case class DfFact(scope: Map[String, String], typical: Double, gain: Double)

final case class DfGreedyResult(facts: IndexedSeq[DfFact], utility: Double, baseError: Double)

/** Greedy speech construction (Alg. 2) as a series of relational operators
  * on Catalyst — the paper's SQL-on-Postgres pipeline expressed with the
  * DataFrame API. Each iteration is the join `R ⋈_M F` followed by
  * `Γ_{ΣU, F}` (utility gain per fact), an argmax, and the expectation
  * re-projection `Π_{E,R}` realized as a `when/least` column update.
  */
object DfGreedy {

  def summarize(rel: DataFrame, dims: Seq[String], target: String,
                m: Int, maxFactDims: Int,
                priorOpt: Option[Double] = None): DfGreedyResult = {
    val rel2 = DfFacts.normalize(rel, dims, target)
    val prior = priorOpt.getOrElse(
      rel2.agg(avg(target)).collect()(0).getDouble(0))
    val factsDf = DfFacts.facts(rel2, dims, target, maxFactDims).cache()

    var state = rel2.withColumn("dev", abs(col(target) - lit(prior))).cache()
    val baseError = state.agg(sum("dev")).collect()(0).getDouble(0)

    val picked = mutable.ArrayBuffer.empty[DfFact]
    var done = false
    var i = 0
    while (i < m && !done) {
      val joined = state.join(factsDf, DfFacts.matchCond(factsDf, state, dims))
      val gains = joined
        .groupBy(col("fact_key") +: col("typical") +: dims.map(d => col(s"f_$d")): _*)
        .agg(sum(greatest(lit(0.0), col("dev") - abs(col("typical") - col(target))))
          .as("gain"))
      val top = gains.orderBy(desc("gain"), asc("fact_key")).limit(1).collect()
      // Epsilon cutoff: aggregation round-off can turn a zero gain into
      // ~1e-13, which would select a useless fact the local solver skips.
      if (top.isEmpty || top(0).getAs[Double]("gain") <= 1e-9) done = true
      else {
        val row = top(0)
        val typical = row.getAs[Double]("typical")
        val scope = dims.flatMap { d =>
          Option(row.getAs[String](s"f_$d")).map(v => d -> v)
        }
        picked += DfFact(scope.toMap, typical, row.getAs[Double]("gain"))
        val cond = DfFacts.scopeCond(state, scope, dims)
        val prev = state
        state = state.withColumn("dev",
          when(cond, least(col("dev"), abs(lit(typical) - col(target))))
            .otherwise(col("dev"))).cache()
        state.count() // materialize before dropping the parent from cache
        prev.unpersist()
        i += 1
      }
    }
    val finalDev = state.agg(sum("dev")).collect()(0).getDouble(0)
    state.unpersist(); factsDf.unpersist()
    DfGreedyResult(picked.toIndexedSeq, baseError - finalDev, baseError)
  }
}
