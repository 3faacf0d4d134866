package repro.system

import repro.{SparkSpec, TestUtil}
import repro.data.VoiceData

/** Tests for the multi-target table encoding used by the batch job. */
class EncodingSpec extends SparkSpec {

  private lazy val rel = TestUtil.paperGrid
  private lazy val df = TestUtil.toDf(spark, rel)
  private lazy val table = Encoding.fromDataFrame(df, Seq("season", "region"), Seq("t"))

  test("encoding preserves row count") {
    assert(table.numRows == 4)
  }

  test("dictionaries are sorted and complete") {
    assert(table.dimValues(0) == IndexedSeq("Summer", "Winter"))
    assert(table.dimValues(1) == IndexedSeq("North", "South"))
  }

  test("relationFor with no predicates reproduces the full relation") {
    val r = table.relationFor("t", Nil)
    assert(r.numRows == 4)
    assert(r.numDims == 2)
    assert(r.rows.map(_.target).sorted.toSeq == Seq(10.0, 10.0, 10.0, 20.0))
  }

  test("relationFor filters by predicates and projects them away") {
    val r = table.relationFor("t", Seq("season" -> "Winter"))
    assert(r.numRows == 2)
    assert(r.dimNames == IndexedSeq("region"))
    assert(r.rows.forall(_.target == 10.0))
  }

  test("relationFor with two predicates leaves no free dims") {
    val r = table.relationFor("t", Seq("season" -> "Summer", "region" -> "South"))
    assert(r.numRows == 1 && r.numDims == 0)
    assert(r.rows(0).target == 20.0)
  }

  test("relationFor on a value absent from the data yields empty") {
    val r = table.relationFor("t", Seq("season" -> "Monsoon"))
    assert(r.numRows == 0)
  }

  test("unknown target is rejected") {
    intercept[IllegalArgumentException] {
      table.relationFor("nope", Nil)
    }
  }

  test("valueIdx resolves known values and rejects unknown ones") {
    assert(table.valueIdx("season", "Winter").contains(1))
    assert(table.valueIdx("season", "Monsoon").isEmpty)
  }

  test("multi-target tables carry every target per row") {
    val spec = VoiceData.AcsNY
    val t = Encoding.fromDataFrame(spec.df(spark, 0.01), spec.dims, spec.targets)
    assert(t.targetNames == spec.targets.toIndexedSeq)
    assert(t.targetRows.forall(_.length == spec.targets.length))
    val visual = t.relationFor("visual", Nil)
    val hearing = t.relationFor("hearing", Nil)
    assert(visual.numRows == hearing.numRows)
  }

  test("relation means match DataFrame aggregates") {
    val spec = VoiceData.AcsNY
    val df2 = spec.df(spark, 0.01).cache()
    val t = Encoding.fromDataFrame(df2, spec.dims, spec.targets)
    val sparkMean = df2.agg(org.apache.spark.sql.functions.avg("visual"))
      .collect()(0).getDouble(0)
    assert(math.abs(t.relationFor("visual", Nil).targetMean - sparkMean) < 1e-9)
  }
}
