package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.TableIII
import repro.system.RequestType

/** Table III: classification of the last 50 voice requests per deployment.
  *
  * The deployment logs are synthesized with the paper's observed mixture and
  * classified by the real run-time classifier; the bench checks the counts
  * it recovers against the paper's numbers.
  */
class TableIIIBench extends AnyFunSuite {

  private lazy val result = TableIII.compute()

  test("Table III: print request classification") {
    println("== Table III (synthetic logs, paper mixture) ==")
    println(TableIII.render(result))
    assert(result.counts.size == 3)
  }

  test("Table III: per-deployment totals are 50") {
    result.counts.foreach { case (name, byCat) =>
      assert(byCat.values.sum == 50, name)
    }
  }

  test("Table III: classified counts track the paper within a small margin") {
    result.counts.foreach { case (name, byCat) =>
      RequestType.all.foreach { cat =>
        val got = byCat(cat)
        val want = TableIII.paper(name)(cat)
        assert(math.abs(got - want) <= 4, s"$name/${cat.label}: got $got want $want")
      }
    }
  }

  test("Table III: supported queries dominate unsupported for Primaries and Flights") {
    assert(result.counts("Primaries")(RequestType.SQuery) >
      result.counts("Primaries")(RequestType.UQuery))
    assert(result.counts("Flights")(RequestType.SQuery) >
      result.counts("Flights")(RequestType.UQuery))
  }
}
