package repro.bench

import repro.SparkSpec
import repro.exp.Fig3

/** Fig. 3 analog: exact (E) vs greedy base (G-B) vs naive pruning (G-P) vs
  * optimized pruning (G-O) across the paper's eight scenario-targets.
  *
  * Paper shape: greedy is orders of magnitude faster than exact per problem;
  * greedy quality ≥ 98 % of exact; G-O cuts total time vs G-B while G-P
  * barely improves; exact struggles most where facts-per-subset are largest
  * (the Stack Overflow scenario).
  */
class Fig3AlgoCompareBench extends SparkSpec {

  private lazy val results = Fig3.run(spark, Fig3.scenarios(),
    exactSample = 6, exactDeadlineMs = 8000)

  test("Fig 3: print algorithm comparison") {
    println("== Fig 3 analog (times in s; E over a problem sample) ==")
    println(Fig3.render(results))
    assert(results.length == 8)
  }

  test("Fig 3: greedy quality is ≥ 98% of exact wherever exact finished (paper: ≥98%)") {
    results.filter(r => !r.greedyAvgScaled.isNaN).foreach { r =>
      assert(r.greedyAvgScaled >= 0.98, s"${r.label}: ${r.greedyAvgScaled}")
      assert(r.greedyMinScaled >= 1.0 - 1.0 / math.E - 1e-9, s"${r.label} below bound")
    }
  }

  test("Fig 3: exact without its greedy seed is orders of magnitude slower (Thm 5)") {
    // The paper's measured exact runs take hours; our bounded exact is much
    // tighter (greedy seed b ≈ OPT collapses the frontier — see DESIGN.md),
    // so the magnitude gap is demonstrated on the unbounded configuration:
    // per problem, it must be ≥ 20× the greedy per-problem cost or time out.
    val slower = results.filter { r =>
      val gbPer = r.gbSec / math.max(1, r.numProblems)
      r.exactNbTimedOut || r.exactNbSec > gbPer * 20
    }
    assert(slower.size >= results.size - 2,
      results.map(r => f"${r.label}:Enb=${r.exactNbSec}%.2f(TO=${r.exactNbTimedOut}) gbPer=${r.gbSec / math.max(1, r.numProblems)}%.4f").mkString(", "))
  }

  test("Fig 3: bounded exact still costs more than greedy on the same problems") {
    val slower = results.filter(r => r.exactSec > r.greedySampleSec)
    assert(slower.size >= results.size / 2,
      results.map(r => f"${r.label}:E=${r.exactSec}%.2f G=${r.greedySampleSec}%.2f").mkString(", "))
  }

  test("Fig 3: the Stack Overflow scenario is the hardest for exact (paper: times out)") {
    val so = results.filter(_.label.startsWith("S-"))
    assert(so.nonEmpty)
    assert(so.forall(r => r.exactNbTimedOut ||
      r.exactNbSec > r.gbSec / math.max(1, r.numProblems) * 20))
  }

  test("Fig 3: facts-per-subset order SO > Flights > ACS drives exact difficulty") {
    val byLabel = results.map(r => r.label -> r).toMap
    assert(byLabel("S-C").factsFullSubset > byLabel("F-C").factsFullSubset)
    assert(byLabel("F-C").factsFullSubset > byLabel("A-H").factsFullSubset)
  }

  test("Fig 3: optimized pruning does not lose to the base greedy overall") {
    val gbTotal = results.map(_.gbSec).sum
    val goTotal = results.map(_.goSec).sum
    println(f"G-B total ${gbTotal}%.1f s · G-P total ${results.map(_.gpSec).sum}%.1f s · G-O total ${goTotal}%.1f s")
    assert(goTotal <= gbTotal * 1.15,
      f"G-O $goTotal%.1f s vs G-B $gbTotal%.1f s")
  }
}
