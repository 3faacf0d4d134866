package repro.bench

import repro.SparkSpec
import repro.exp.TableI

/** Table I: data set overview (size, #dims, #targets) at bench scale.
  *
  * Paper: ACS NY 2 MB/3/6 · Stack Overflow 197 MB/7/6 · Flights 565 MB/6/1 ·
  * Primaries 6 MB/5/1. Absolute sizes differ (synthetic stand-ins, SF=0.1);
  * the contract is dims/targets and the size ordering.
  */
class TableIBench extends SparkSpec {

  private lazy val rows = TableI.compute(spark, sf = 0.1)

  test("Table I: print dataset overview") {
    println("== Table I (SF=0.1) ==")
    println(TableI.render(rows))
    assert(rows.length == 4)
  }

  test("Table I: dims and targets match the paper exactly") {
    val byName = rows.map(r => r.name -> r).toMap
    TableI.paper.foreach { case (name, (_, dims, targets)) =>
      val r = byName(name)
      assert(r.dims == dims, s"$name dims")
      // Flights: the paper's Table I says 1 target but Fig. 3 evaluates both
      // cancellation (F-C) and delay (F-D); we materialize both.
      if (name == "Flights") assert(r.targets >= targets)
      else assert(r.targets == targets, s"$name targets")
    }
  }

  test("Table I: size ordering matches the paper (Flights ≫ SO ≫ Primaries > ACS)") {
    val size = rows.map(r => r.name -> r.sizeMB).toMap
    assert(size("Flights") > size("Stack Overflow"))
    assert(size("Stack Overflow") > size("Primaries"))
    assert(size("Primaries") > size("ACS NY"))
  }
}
