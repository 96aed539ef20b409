package repro.web

import scala.util.Random

import org.scalatest.funsuite.AnyFunSuite

class NameGenSpec extends AnyFunSuite {
  test("deterministic for a fixed seed") {
    val a = new NameGen(new Random(1)).person()
    val b = new NameGen(new Random(1)).person()
    assert(a == b)
  }
  test("person names have two words") {
    val g = new NameGen(new Random(2))
    (1 to 20).foreach(_ => assert(g.person().split(" ").length == 2))
  }
  test("film titles are non-empty and capitalised") {
    val g = new NameGen(new Random(3))
    (1 to 20).foreach { _ =>
      val t = g.filmTitle()
      assert(t.nonEmpty && t.head.isUpper)
    }
  }
  test("flavoured generators differ from english") {
    val en = new NameGen(new Random(4), "en").person()
    val zh = new NameGen(new Random(4), "zh").person()
    assert(en != zh)
  }
  test("all flavours produce names") {
    Seq("en", "it", "da", "cs", "ko", "zh", "is").foreach { f =>
      assert(new NameGen(new Random(5), f).person().nonEmpty)
    }
  }
  test("dates are ISO-shaped and in range") {
    val g = new NameGen(new Random(6))
    (1 to 50).foreach { _ =>
      val d = g.date(1990, 2000)
      assert(d.matches("\\d{4}-\\d{2}-\\d{2}"))
      assert(d.take(4).toInt >= 1990 && d.take(4).toInt <= 2000)
    }
  }
  test("isbn13 shape") {
    assert(new NameGen(new Random(7)).isbn13().matches("978-\\d-\\d{5}-\\d{3}-\\d"))
  }
  test("phone shape") {
    assert(new NameGen(new Random(8)).phone().matches("\\(\\d{3}\\) \\d{3}-\\d{4}"))
  }
  test("names have reasonable uniqueness") {
    val g = new NameGen(new Random(9))
    val names = Vector.fill(300)(g.person())
    assert(names.distinct.size > 280)
  }
}
