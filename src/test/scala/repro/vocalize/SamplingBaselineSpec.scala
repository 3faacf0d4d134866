package repro.vocalize

import scala.util.Random
import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.GreedySummarizer

/** Tests for the sampling-based vocalization baseline (§VIII-E). */
class SamplingBaselineSpec extends AnyFunSuite {

  private val rel = TestUtil.randomRelation(new Random(1), 3, 3, 500)

  test("produces the requested number of range facts") {
    val res = SamplingBaseline.summarize(rel, 2, 3, 100, seed = 5)
    assert(res.facts.length == 3)
  }

  test("ranges are well-formed (lo ≤ mid ≤ hi)") {
    val res = SamplingBaseline.summarize(rel, 2, 3, 100, seed = 5)
    res.facts.foreach { rf =>
      assert(rf.lo <= rf.mid + 1e-9 && rf.mid <= rf.hi + 1e-9)
    }
  }

  test("latency is at most total processing time") {
    val res = SamplingBaseline.summarize(rel, 2, 3, 100, seed = 5)
    assert(res.latencyNanos > 0)
    assert(res.latencyNanos <= res.totalNanos)
  }

  test("is deterministic per seed") {
    val a = SamplingBaseline.summarize(rel, 2, 3, 100, seed = 8)
    val b = SamplingBaseline.summarize(rel, 2, 3, 100, seed = 8)
    assert(a.facts.map(_.mid) == b.facts.map(_.mid))
  }

  test("utility with midpoints is non-negative and bounded by the base error") {
    // Note: sample-mean midpoints may legitimately beat exact-mean greedy
    // facts (the deviation-optimal typical value is the scope *median*), so
    // greedy utility is not an upper bound here — D(∅) is.
    val prior = rel.targetMean
    val res = SamplingBaseline.summarize(rel, 2, 3, 200, seed = 5)
    val u = res.utility(rel, prior)
    val baseError = repro.core.Eval.deviation(rel, Nil, prior)
    assert(u >= -1e-9)
    assert(u <= baseError + 1e-9)
    assert(GreedySummarizer.summarizeRelation(rel, 2, 3).speech.utility <= baseError)
  }

  test("larger samples tighten the confidence intervals on average") {
    val small = SamplingBaseline.summarize(rel, 2, 3, 30, seed = 9)
    val large = SamplingBaseline.summarize(rel, 2, 3, 400, seed = 9)
    def width(r: BaselineResult): Double =
      r.facts.map(f => f.hi - f.lo).sum / r.facts.length
    assert(width(large) <= width(small) + 1e-9)
  }

  test("rejects empty relations") {
    intercept[IllegalArgumentException] {
      SamplingBaseline.summarize(rel.copy(rows = Array.empty), 2, 3, 10, 1)
    }
  }

  test("works on a zero-dimension relation (single scope)") {
    val sub = rel.copy(dimNames = IndexedSeq.empty,
      dimValues = IndexedSeq.empty,
      rows = rel.rows.map(r => r.copy(dims = Array.empty)))
    val res = SamplingBaseline.summarize(sub, 0, 2, 50, seed = 2)
    assert(res.facts.nonEmpty)
  }
}
