package repro.system

import org.scalatest.funsuite.AnyFunSuite
import repro.vocalize.SummaryFact

/** Tests for run-time lookup with most-specific-subset fallback (§III). */
class QueryEngineSpec extends AnyFunSuite {

  private def summary(target: String, preds: Map[String, String]): Summary =
    Summary(target, preds, Seq(SummaryFact(Map.empty, 1.0, 1L)), 1.0, 2.0,
      s"speech for $target ${preds.toSeq.sorted}")

  private val engine = new QueryEngine(Seq(
    summary("delay", Map.empty),
    summary("delay", Map("season" -> "Winter")),
    summary("delay", Map("region" -> "East")),
    summary("delay", Map("season" -> "Winter", "region" -> "East")),
    summary("cancelled", Map.empty)))

  test("exact lookup hits the precise subset") {
    val s = engine.lookup("delay", Map("season" -> "Winter")).get
    assert(s.predicates == Map("season" -> "Winter"))
  }

  test("exact lookup is predicate-order insensitive") {
    val s = engine.lookup("delay",
      Map("region" -> "East", "season" -> "Winter")).get
    assert(s.predicates.size == 2)
  }

  test("fallback selects the most specific containing subset") {
    // No speech for {season=Winter, region=West}: fall back to {season=Winter}.
    val s = engine.lookup("delay",
      Map("season" -> "Winter", "region" -> "West")).get
    assert(s.predicates == Map("season" -> "Winter"))
  }

  test("fallback to the overall speech when no predicate matches") {
    val s = engine.lookup("delay", Map("airline" -> "AA")).get
    assert(s.predicates.isEmpty)
  }

  test("fallback respects the target column") {
    val s = engine.lookup("cancelled", Map("season" -> "Winter")).get
    assert(s.target == "cancelled" && s.predicates.isEmpty)
  }

  test("unknown target yields no answer") {
    assert(engine.lookup("nope", Map.empty).isEmpty)
  }

  test("exact() does not fall back") {
    assert(engine.exact("delay", Map("season" -> "Winter", "region" -> "West")).isEmpty)
  }

  test("fallback prefers larger predicate subsets") {
    // Query {Winter, East, extra} → the 2-predicate speech wins over 1-pred.
    val s = engine.lookup("delay",
      Map("season" -> "Winter", "region" -> "East", "airline" -> "AA")).get
    assert(s.predicates.size == 2)
  }

  test("engine size reflects the summary count") {
    assert(engine.size == 5)
  }

  test("deterministic tie-break among equally specific speeches") {
    val e = new QueryEngine(Seq(
      summary("t", Map("a" -> "1")), summary("t", Map("b" -> "2"))))
    val s1 = e.lookup("t", Map("a" -> "1", "b" -> "2")).get
    val s2 = e.lookup("t", Map("a" -> "1", "b" -> "2")).get
    assert(s1.key == s2.key)
  }
}
