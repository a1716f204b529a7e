package repro.er

import org.scalatest.funsuite.AnyFunSuite

class SynonymDictSpec extends AnyFunSuite {

  private val d = SynonymDict.default

  test("country variants canonicalize to 'United States'") {
    assert(d.canonical("USA") == "United States")
    assert(d.canonical("United States of America") == "United States")
    assert(d.canonical("us") == "United States")
  }

  test("vaccine variants canonicalize to 'J&J'") {
    assert(d.canonical("JnJ") == "J&J")
    assert(d.canonical("Johnson & Johnson") == "J&J")
    assert(d.canonical("Janssen") == "J&J")
  }

  test("unknown values pass through trimmed") {
    assert(d.canonical("  Pfizer ") == "Pfizer")
    assert(d.canonical("Berlin") == "Berlin")
  }

  test("equivalence is symmetric and case/punctuation-insensitive") {
    assert(d.equivalent("JnJ", "J&J"))
    assert(d.equivalent("J&J", "JnJ"))
    assert(d.equivalent("usa", "UNITED STATES"))
    assert(!d.equivalent("Pfizer", "Moderna"))
  }

  test("nulls are never equivalent") {
    assert(!d.equivalent(null, "USA"))
    assert(!d.equivalent("USA", null))
    assert(!d.equivalent(null, null))
  }

  test("user extensions are honored") {
    val custom = new SynonymDict(Map("NYC" -> "New York", "new york city" -> "New York"))
    assert(custom.equivalent("NYC", "New York City"))
    assert(custom.canonical("nyc") == "New York")
  }
}
