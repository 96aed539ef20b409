package repro.dom

import org.scalatest.funsuite.AnyFunSuite

class XPathsSpec extends AnyFunSuite {
  test("template strips all indices") {
    assert(XPaths.template("/html[1]/body[1]/div[12]/span[3]") == "/html/body/div/span")
  }
  test("template of index-free path is identity") {
    assert(XPaths.template("/html/body") == "/html/body")
  }
  test("indices extraction") {
    assert(XPaths.indices("/html[1]/body[1]/div[12]/span[3]") == Vector(1, 1, 12, 3))
  }
  test("indices of empty") { assert(XPaths.indices("") == Vector.empty) }
  test("sameTemplate true for index-shifts") {
    assert(XPaths.sameTemplate("/html[1]/div[2]/li[5]", "/html[1]/div[3]/li[1]"))
  }
  test("sameTemplate false across tags") {
    assert(!XPaths.sameTemplate("/html[1]/div[2]", "/html[1]/span[2]"))
  }
  test("differingIndexPositions finds the varying segments") {
    assert(XPaths.differingIndexPositions("/a[1]/b[2]/c[3]", "/a[1]/b[5]/c[3]") == Vector(1))
  }
  test("differingIndexPositions empty for identical paths") {
    assert(XPaths.differingIndexPositions("/a[1]/b[2]", "/a[1]/b[2]").isEmpty)
  }
  test("differingIndexPositions rejects different templates") {
    intercept[IllegalArgumentException] {
      XPaths.differingIndexPositions("/a[1]", "/b[1]")
    }
  }
  test("figure-2 style paths share a template") {
    val winfrey  = "/html[1]/body[1]/div[2]/div[4]/div[3]/div[62]"
    val mckellen = "/html[1]/body[1]/div[2]/div[4]/div[2]/div[33]"
    assert(XPaths.sameTemplate(winfrey, mckellen))
    assert(XPaths.differingIndexPositions(winfrey, mckellen) == Vector(4, 5))
  }
}
