package repro.exp

import org.scalatest.funsuite.AnyFunSuite

import repro.core.Metrics

class TableFmtSpec extends AnyFunSuite {
  test("render pads columns and includes separator") {
    val out = TableFmt.render("T", Vector("a", "bbb"), Vector(Vector("xx", "y")))
    val lines = out.split("\n")
    assert(lines(0) == "== T ==")
    assert(lines(1).contains("| a  | bbb |"))
    assert(lines(2).startsWith("|-"))
    assert(lines(3).contains("| xx | y   |"))
  }
  test("f2 formats two decimals") { assert(TableFmt.f2(0.8351) == "0.84") }
  test("f2 renders NaN as NA") { assert(TableFmt.f2(Double.NaN) == "NA") }
  test("prfRow appends P/R/F1") {
    assert(TableFmt.prfRow(Vector("x"), Metrics.PRF("x", 1, 1, 0)) == Vector("x", "0.50", "1.00", "0.67"))
  }
}
