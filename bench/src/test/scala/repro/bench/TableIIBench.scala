package repro.bench

import repro.SparkSpec
import repro.exp.TableII

/** Table II: best vs. worst of 100 randomly generated three-fact speeches
  * for ACS visual-impairment prevalence, ranked by the §II quality model.
  *
  * Paper shape: the best speech leads with age-group facts (prevalence is
  * age-dominated); the worst cites borough-level facts only; model rank
  * separates them sharply.
  */
class TableIIBench extends SparkSpec {

  private lazy val result = TableII.compute(spark, sf = 0.1)

  test("Table II: print ranked speeches") {
    println("== Table II (ACS visual impairment, SF=0.1) ==")
    println(TableII.render(result))
    assert(result.numCandidates > 10)
  }

  test("Table II: ranking separates best and worst clearly") {
    assert(result.best.utility > result.worst.utility)
    assert(result.best.utility >= result.median.utility)
    assert(result.median.utility >= result.worst.utility)
    // The spread must be substantial, as in the paper's Fig. 5/6 contrast.
    assert(result.best.scaled - result.worst.scaled > 0.2,
      s"best=${result.best.scaled} worst=${result.worst.scaled}")
  }

  test("Table II: the greedy speech dominates all random speeches") {
    assert(result.greedy.utility >= result.best.utility - 1e-9)
    assert(math.abs(result.greedy.scaled - 1.0) < 1e-9)
  }

  test("Table II: the best speech references the age dimension (paper structure)") {
    assert(result.greedy.speech.contains("elder") ||
      result.greedy.speech.contains("adult") || result.greedy.speech.contains("teen"))
  }
}
