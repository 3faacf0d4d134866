package repro.system

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.{EncodedRelation, EncodedRow}

/** A multi-target table encoded for the batch pre-processing job: dimension
  * dictionaries shared across problems, every target column carried per row.
  * Compact enough to broadcast (ints + doubles only), so each executor task
  * can solve its summarization problems against local arrays.
  */
final case class EncodedTable(
    dimNames: IndexedSeq[String],
    dimValues: IndexedSeq[IndexedSeq[String]],
    targetNames: IndexedSeq[String],
    dimRows: Array[Array[Int]],
    targetRows: Array[Array[Double]]) {

  def numRows: Int = dimRows.length

  private def dimIdx(name: String): Int = {
    val i = dimNames.indexOf(name)
    require(i >= 0, s"unknown dimension $name")
    i
  }

  def valueIdx(dim: String, value: String): Option[Int] = {
    val vi = dimValues(dimIdx(dim)).indexOf(value)
    if (vi >= 0) Some(vi) else None
  }

  /** The single-target relation for `target`, filtered to rows satisfying
    * `predicates` and projected to the dimensions NOT bound by a predicate —
    * facts within a query's subset only restrict additional dimensions
    * (§III: query predicates plus up to `maxExtraFactDims` more).
    */
  def relationFor(target: String, predicates: Seq[(String, String)]): EncodedRelation = {
    val ti = targetNames.indexOf(target)
    require(ti >= 0, s"unknown target $target")
    val preds = predicates.map { case (d, v) =>
      val di = dimIdx(d)
      (di, dimValues(di).indexOf(v))
    }
    val freeDims = dimNames.indices.filterNot(i => preds.exists(_._1 == i)).toIndexedSeq
    val rows = Array.newBuilder[EncodedRow]
    var ri = 0
    while (ri < numRows) {
      val dr = dimRows(ri)
      if (preds.forall { case (d, v) => dr(d) == v }) {
        val proj = new Array[Int](freeDims.length)
        var j = 0
        while (j < freeDims.length) { proj(j) = dr(freeDims(j)); j += 1 }
        rows += EncodedRow(proj, targetRows(ri)(ti))
      }
      ri += 1
    }
    EncodedRelation(
      freeDims.map(dimNames), freeDims.map(dimValues), rows.result())
  }
}

object Encoding {

  /** Dictionary-encode a DataFrame. Dictionaries are collected per dimension
    * (distinct + sort, one Spark job) so encoding is deterministic; the row
    * payload is collected once — the table must fit the driver, which holds
    * for all bench scale factors (ints + doubles only).
    */
  def fromDataFrame(df: DataFrame, dims: Seq[String], targets: Seq[String]): EncodedTable = {
    val norm = df.select(
      dims.map(d => col(d).cast("string").as(d)) ++
        targets.map(t => col(t).cast("double").as(t)): _*)
    val dicts = dims.map { d =>
      norm.select(d).distinct().collect().map(_.getString(0)).sorted.toIndexedSeq
    }.toIndexedSeq
    val lookup = dicts.map(vs => vs.zipWithIndex.toMap)
    val rows = norm.collect()
    val dimRows = new Array[Array[Int]](rows.length)
    val targetRows = new Array[Array[Double]](rows.length)
    var i = 0
    while (i < rows.length) {
      val r = rows(i)
      dimRows(i) = Array.tabulate(dims.length)(j => lookup(j)(r.getString(j)))
      targetRows(i) = Array.tabulate(targets.length)(j => r.getDouble(dims.length + j))
      i += 1
    }
    EncodedTable(dims.toIndexedSeq, dicts, targets.toIndexedSeq, dimRows, targetRows)
  }
}
