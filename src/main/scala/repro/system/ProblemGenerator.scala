package repro.system

import org.apache.spark.sql.DataFrame
import repro.core.FactGen

/** The paper's Problem Generator (§III): one summarization problem per
  * combination of a target column and a set of up to `maxQueryLen` equality
  * predicates on distinct dimensions, considering every value combination
  * that appears in the data (Thm 10 bounds the count).
  */
object ProblemGenerator {

  /** Enumerate problems via distinct-combination queries on the DataFrame —
    * one `distinct` per dimension subset, executed on Spark.
    */
  def problems(df: DataFrame, config: SummarizationConfig): Seq[Problem] = {
    val dims = config.dataset.dims
    val subsets = FactGen.patterns(dims.length, config.maxQueryLen)
    val combosPerSubset: Seq[Seq[Seq[(String, String)]]] = subsets.map { p =>
      if (p.isEmpty) Seq(Seq.empty)
      else {
        val cols = p.toSeq.map(dims(_))
        df.select(cols.head, cols.tail: _*).distinct().collect().toSeq
          .map(r => cols.zipWithIndex.map { case (c, i) => c -> r.get(i).toString })
          .sortBy(_.map(_._2).mkString("|"))
      }
    }
    for {
      target <- config.dataset.targets
      combos <- combosPerSubset
      preds <- combos
    } yield Problem(target, preds)
  }

  /** Same enumeration against an already-encoded table (no Spark jobs). */
  def problems(table: EncodedTable, config: SummarizationConfig): Seq[Problem] = {
    val d = table.dimNames.length
    val subsets = FactGen.patterns(d, config.maxQueryLen)
    val combosPerSubset = subsets.map { p =>
      if (p.isEmpty) Seq(Seq.empty[(String, String)])
      else {
        val seen = scala.collection.mutable.LinkedHashSet.empty[Seq[Int]]
        table.dimRows.foreach(dr => seen += p.toSeq.map(dr(_)))
        seen.toSeq.sorted(Ordering.Implicits.seqOrdering[Seq, Int])
          .map(vs => p.toSeq.zip(vs).map { case (di, vi) =>
            table.dimNames(di) -> table.dimValues(di)(vi)
          })
      }
    }
    for {
      target <- config.dataset.targets
      combos <- combosPerSubset
      preds <- combos
    } yield Problem(target, preds)
  }
}
