package repro.exp

import java.util.concurrent.atomic.AtomicInteger

import org.scalatest.funsuite.AnyFunSuite

class ParSpec extends AnyFunSuite {
  test("preserves input order") {
    assert(Par.map((1 to 20).toVector)(_ * 2) == (1 to 20).toVector.map(_ * 2))
  }
  test("runs work concurrently up to the bound") {
    val peak = new AtomicInteger(0)
    val cur  = new AtomicInteger(0)
    Par.map((1 to 8).toVector, parallelism = 4) { _ =>
      val c = cur.incrementAndGet()
      peak.accumulateAndGet(c, math.max)
      Thread.sleep(50)
      cur.decrementAndGet()
    }
    assert(peak.get() > 1 && peak.get() <= 4, s"peak=${peak.get()}")
  }
  test("empty input") { assert(Par.map(Vector.empty[Int])(identity).isEmpty) }
  test("propagates failures") {
    intercept[RuntimeException] {
      Par.map(Vector(1, 2, 3))(i => if (i == 2) throw new RuntimeException("boom") else i)
    }
  }
}
