package repro.core

import repro.SparkSpec
import repro.dom.DomNode.{el, txt}
import repro.dom.{PageDoc, PageTree}
import repro.web.Verticals

class FeatureGenSpec extends SparkSpec {
  import spark.implicits._

  private val page = PageDoc.fromTree("s", "p0",
    el("html", el("body",
      el("div", Map("class" -> "sec-dir"), txt("span", "Director:", Map("class" -> "lbl")),
        txt("span", "Ann Smith", Map("class" -> "val"))),
      el("div", Map("class" -> "sec-genre"), txt("span", "Genre:", Map("class" -> "lbl")),
        el("ul", txt("li", "Drama"), txt("li", "Comedy"))))))
  private val tree = new PageTree(page)
  private def idOf(t: String) = page.textNodes.find(_.text == t).get.id

  test("self attributes are level-0 features") {
    val fs = FeatureGen.nodeFeatures(tree, idOf("Ann Smith"), Set.empty)
    assert(fs.contains("a|0|0|tag|span"))
    assert(fs.contains("a|0|0|class|val"))
  }
  test("ancestor class features carry the section identity") {
    val fs = FeatureGen.nodeFeatures(tree, idOf("Ann Smith"), Set.empty)
    assert(fs.contains("a|1|0|class|sec-dir"))
  }
  test("sibling features include the label node") {
    val fs = FeatureGen.nodeFeatures(tree, idOf("Ann Smith"), Set.empty)
    assert(fs.exists(f => f.startsWith("a|0|-1|") && f.endsWith("lbl")))
  }
  test("sibling index features are emitted along the chain") {
    val fs = FeatureGen.nodeFeatures(tree, idOf("Ann Smith"), Set.empty)
    assert(fs.exists(_.startsWith("i|0|")))
  }
  test("frequent text yields a nearby-text feature") {
    val fs = FeatureGen.nodeFeatures(tree, idOf("Ann Smith"), Set("director"))
    assert(fs.contains("t|1|director"))
  }
  test("non-frequent text yields no text feature") {
    val fs = FeatureGen.nodeFeatures(tree, idOf("Ann Smith"), Set.empty)
    assert(!fs.exists(_.startsWith("t|")))
  }
  test("template path feature present") {
    val fs = FeatureGen.nodeFeatures(tree, idOf("Drama"), Set.empty)
    assert(fs.contains("p|/html/body/div/ul/li"))
  }
  test("list items in one list share template features but differ in index features") {
    val a = FeatureGen.nodeFeatures(tree, idOf("Drama"), Set.empty).toSet
    val b = FeatureGen.nodeFeatures(tree, idOf("Comedy"), Set.empty).toSet
    assert(a.intersect(b).exists(_.startsWith("p|")))
    assert(a != b)
  }
  test("different sections produce different ancestor features") {
    val a = FeatureGen.nodeFeatures(tree, idOf("Ann Smith"), Set.empty).toSet
    val d = FeatureGen.nodeFeatures(tree, idOf("Drama"), Set.empty).toSet
    assert(a.contains("a|1|0|class|sec-dir") && !d.contains("a|1|0|class|sec-dir"))
  }
  test("frequentStrings finds labels across a site") {
    implicit val s = spark
    val site = Verticals.movie(nSites = 1, pagesPerSite = 20, seed = 3).sites.head
    val freq = FeatureGen.frequentStrings(spark.createDataset(site.pages), minFrac = 0.5)
    assert(freq.exists(_.contains("director")), s"freq=$freq")
    assert(freq.exists(_.contains("genre")))
  }
  test("frequentStrings respects the fraction floor") {
    implicit val s = spark
    val site = Verticals.movie(nSites = 1, pagesPerSite = 20, seed = 3).sites.head
    val freq = FeatureGen.frequentStrings(spark.createDataset(site.pages), minFrac = 0.99)
    // Only labels/boilerplate on literally every page survive.
    assert(freq.nonEmpty)
    assert(!freq.exists(_.matches(".*\\d{4} \\d{2} \\d{2}.*")))
  }
}
