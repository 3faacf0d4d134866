package repro

import scala.util.Random
import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import repro.core.{EncodedRelation, EncodedRow}

/** Shared helpers for building small relations in tests. */
object TestUtil {

  /** The hand-checked running example used across core tests, modelled on
    * the paper's Fig. 1 grid: 2 seasons × 2 regions, one row per cell.
    *
    * Cell targets: (Summer,North)=10, (Summer,South)=20, (Winter,North)=10,
    * (Winter,South)=10. With prior 0: D(∅)=50; the optimal 2-fact speech is
    * {overall-avg(12.5), (Summer,South)=20} with utility 42.5.
    */
  def paperGrid: EncodedRelation = grid(Map(
    ("Summer", "North") -> Seq(10.0),
    ("Summer", "South") -> Seq(20.0),
    ("Winter", "North") -> Seq(10.0),
    ("Winter", "South") -> Seq(10.0)))

  /** Build a 2-dim (season, region) relation from per-cell target lists. */
  def grid(cells: Map[(String, String), Seq[Double]]): EncodedRelation = {
    val raw = cells.toSeq.sortBy(_._1).flatMap { case ((s, r), ts) =>
      ts.map(t => (IndexedSeq(s, r), t))
    }
    EncodedRelation.encode(IndexedSeq("season", "region"), raw)
  }

  /** Random relation: `numDims` dimensions with cardinality ≤ maxCard,
    * integer-ish targets (ties likely — good for tie-handling coverage).
    */
  def randomRelation(rnd: Random, numDims: Int, maxCard: Int, rows: Int): EncodedRelation = {
    val cards = IndexedSeq.fill(numDims)(1 + rnd.nextInt(maxCard))
    val dimNames = (0 until numDims).map(i => s"d$i")
    val dimValues = cards.zipWithIndex.map { case (c, i) =>
      (0 until c).map(v => s"v${i}_$v")
    }
    val rs = Array.fill(rows)(EncodedRow(
      Array.tabulate(numDims)(i => rnd.nextInt(cards(i))),
      rnd.nextInt(100).toDouble))
    EncodedRelation(dimNames, dimValues, rs)
  }

  /** Like randomRelation but with continuous targets (ties improbable) —
    * used when comparing solvers whose tie-breaking may differ.
    */
  def randomRelationCont(rnd: Random, numDims: Int, maxCard: Int, rows: Int): EncodedRelation = {
    val base = randomRelation(rnd, numDims, maxCard, rows)
    base.copy(rows = base.rows.map(r => r.copy(target = rnd.nextDouble() * 100)))
  }

  /** Decode an EncodedRelation back into a Spark DataFrame (dims as strings,
    * target as double) so DataFrame solvers can be compared to local ones.
    */
  def toDf(spark: SparkSession, rel: EncodedRelation, target: String = "t"): DataFrame = {
    val schema = StructType(
      rel.dimNames.map(d => StructField(d, StringType, nullable = false)) :+
        StructField(target, DoubleType, nullable = false))
    val rows = rel.rows.toIndexedSeq.map { r =>
      Row.fromSeq(r.dims.toIndexedSeq.zipWithIndex.map { case (v, i) =>
        rel.dimValues(i)(v)
      } :+ r.target)
    }
    spark.createDataFrame(
      new java.util.ArrayList[Row](scala.jdk.CollectionConverters.SeqHasAsJava(rows).asJava),
      schema)
  }
}
