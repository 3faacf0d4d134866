package repro.bench

import repro.SparkSpec
import repro.exp.Fig4

/** Fig. 4 analog: scaling in speech length and fact dimensions (G-B vs G-O).
  *
  * Paper shape: time grows gracefully in the speech length but sharply in
  * the number of dimensions per fact; G-O stays at or below G-B.
  */
class Fig4ScalingBench extends SparkSpec {

  private lazy val points = Fig4.run(spark)

  test("Fig 4: print scaling sweep") {
    println("== Fig 4 analog (flights, 1-predicate queries) ==")
    println(Fig4.render(points))
    assert(points.nonEmpty)
  }

  test("Fig 4: cost grows with speech length") {
    val byM = points.filter(_.param == "speechLength").sortBy(_.value)
    assert(byM.length == 5)
    assert(byM.last.gbSec >= byM.head.gbSec * 0.8) // monotone up to noise
  }

  test("Fig 4: fact-dimension scaling is steeper than speech-length scaling") {
    val byM = points.filter(_.param == "speechLength").sortBy(_.value)
    val byD = points.filter(_.param == "factDims").sortBy(_.value)
    val mGrowth = byM.last.gbSec / math.max(1e-9, byM.head.gbSec) / (byM.last.value.toDouble / byM.head.value)
    val dGrowth = byD.last.gbSec / math.max(1e-9, byD.head.gbSec) / (byD.last.value.toDouble / byD.head.value)
    println(f"normalized growth: speechLength ${mGrowth}%.2f vs factDims ${dGrowth}%.2f")
    assert(dGrowth > mGrowth * 0.8,
      f"expected dims scaling ($dGrowth%.2f) to be at least as steep as m scaling ($mGrowth%.2f)")
  }

  test("Fig 4: G-O stays within G-B overall") {
    val gb = points.map(_.gbSec).sum
    val go = points.map(_.goSec).sum
    assert(go <= gb * 1.2, f"G-O $go%.1f vs G-B $gb%.1f")
  }
}
