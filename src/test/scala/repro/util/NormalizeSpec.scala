package repro.util

import org.scalatest.funsuite.AnyFunSuite

class NormalizeSpec extends AnyFunSuite {
  test("lowercases") { assert(Normalize("Spike Lee") == "spike lee") }
  test("collapses whitespace") { assert(Normalize("  Do  the\tRight  Thing ") == "do the right thing") }
  test("strips punctuation") { assert(Normalize("O'Brien, Conan.") == "o brien conan") }
  test("folds accents") { assert(Normalize("Almodóvar") == "almodovar") }
  test("keeps digits") { assert(Normalize("PG-13") == "pg 13") }
  test("isbn normalises") { assert(Normalize("978-0-12345-678-9") == "978 0 12345 678 9") }
  test("empty input") { assert(Normalize("") == "") }
  test("only punctuation becomes empty") { assert(Normalize("!!!") == "") }
  test("idempotent") {
    val s = Normalize("The Crimson Harbor")
    assert(Normalize(s) == s)
  }
  test("danish flavoured letters fold") { assert(Normalize("Høst ångström") == Normalize("Host angstrom")) }

  test("lowInformation: empty") { assert(Normalize.lowInformation("")) }
  test("lowInformation: bare year") { assert(Normalize.lowInformation("1994")) }
  test("lowInformation: single digit") { assert(Normalize.lowInformation("7")) }
  test("lowInformation: two chars") { assert(Normalize.lowInformation("ab")) }
  test("lowInformation: number with spaces") { assert(Normalize.lowInformation("6-7")) }
  test("lowInformation: names pass") { assert(!Normalize.lowInformation("Spike Lee")) }
  test("lowInformation: titles pass") { assert(!Normalize.lowInformation("Do the Right Thing")) }
}
