package repro.util

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

class LevSpec extends AnyFunSuite {
  test("identical strings") { assert(Lev.distance("abc", "abc") == 0) }
  test("empty vs nonempty") { assert(Lev.distance("", "abc") == 3) }
  test("nonempty vs empty") { assert(Lev.distance("abc", "") == 3) }
  test("single substitution") { assert(Lev.distance("kitten", "sitten") == 1) }
  test("classic kitten/sitting") { assert(Lev.distance("kitten", "sitting") == 3) }
  test("insertion") { assert(Lev.distance("abc", "abxc") == 1) }
  test("deletion") { assert(Lev.distance("abxc", "abc") == 1) }
  test("xpath index difference is small") {
    val a = "/html[1]/body[1]/div[2]/ul[1]/li[3]"
    val b = "/html[1]/body[1]/div[2]/ul[1]/li[11]"
    assert(Lev.distance(a, b) <= 2)
  }
  test("different sections are further apart than list positions") {
    val list1a = "/html[1]/body[1]/div[2]/div[3]/ul[1]/li[1]"
    val list1b = "/html[1]/body[1]/div[2]/div[3]/ul[1]/li[9]"
    val other  = "/html[1]/body[1]/div[3]/div[1]/span[2]"
    assert(Lev.distance(list1a, list1b) < Lev.distance(list1a, other))
  }

  private val smallStr: Gen[String] =
    Gen.choose(0, 25).flatMap(n => Gen.listOfN(n, Gen.alphaNumChar).map(_.mkString))

  private def check(prop: Prop): Unit =
    assert(SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(200), prop).passed)

  test("property: symmetry") {
    check(Prop.forAll(smallStr, smallStr)((a, b) => Lev.distance(a, b) == Lev.distance(b, a)))
  }
  test("property: identity") {
    check(Prop.forAll(smallStr)(a => Lev.distance(a, a) == 0))
  }
  test("property: bounded by max length") {
    check(Prop.forAll(smallStr, smallStr)((a, b) => Lev.distance(a, b) <= math.max(a.length, b.length)))
  }
  test("property: triangle inequality") {
    check(Prop.forAll(smallStr, smallStr, smallStr)((a, b, c) =>
      Lev.distance(a, c) <= Lev.distance(a, b) + Lev.distance(b, c)))
  }
}
