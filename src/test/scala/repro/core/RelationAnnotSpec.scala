package repro.core

import repro.SparkSpec
import repro.dom.DomNode.{el, txt}
import repro.dom.{PageDoc, PageTree}
import repro.kb.{KnowledgeBase, Triple}
import repro.web.Verticals

class RelationAnnotSpec extends SparkSpec {
  import spark.implicits._

  // A page where Lee appears in the director section AND inside the cast
  // list next to two other cast members (Example 3.1).
  private val examplePage = PageDoc.fromTree("s", "p0",
    el("html", el("body",
      txt("h1", "Do the Right Thing"),
      el("div", Map("class" -> "dir"), txt("span", "Director:"), txt("span", "Spike Lee")),
      el("div", Map("class" -> "cast"), txt("span", "Cast:"),
        el("ul", txt("li", "Spike Lee"), txt("li", "Danny Aiello"), txt("li", "Ossie Davis"))))))

  private val exampleKb = KnowledgeBase(Vector(
    Triple("f1", "Do the Right Thing", "Film", "directedBy", "Spike Lee"),
    Triple("f1", "Do the Right Thing", "Film", "hasCastMember", "Spike Lee"),
    Triple("f1", "Do the Right Thing", "Film", "hasCastMember", "Danny Aiello"),
    Triple("f1", "Do the Right Thing", "Film", "hasCastMember", "Ossie Davis"),
  ))

  test("bestLocalMentions picks the cast-list mention for the cast predicate") {
    val tree = new PageTree(examplePage)
    val leeMentions = examplePage.textNodes.filter(_.text == "Spike Lee").map(_.id)
    assert(leeMentions.size == 2)
    val objectNorms = Set("spike lee", "danny aiello", "ossie davis")
    val best = RelationAnnot.bestLocalMentions(tree, leeMentions, objectNorms)
    assert(best.size == 1)
    assert(tree.node(best.head).xpath.contains("li"), s"chose ${tree.node(best.head).xpath}")
  }
  test("bestLocalMentions with single mention returns it") {
    val tree = new PageTree(examplePage)
    val aiello = examplePage.textNodes.filter(_.text == "Danny Aiello").map(_.id)
    assert(RelationAnnot.bestLocalMentions(tree, aiello, Set("danny aiello")) == aiello)
  }
  test("annotateFull labels cast members in the list and director in its section") {
    implicit val s = spark
    val pages = spark.createDataset(Seq(examplePage))
    val topics = Vector(TopicId.PageTopic("s", "p0", -1, "f1", "Do the Right Thing", "/html[1]/body[1]/h1[1]", 1.0))
    val kbB = spark.sparkContext.broadcast(exampleKb)
    val (anns, kept) = RelationAnnot.annotateFull(pages, topics, kbB, minAnnotations = 3)
    val castAnn = anns.filter(_.predicate == "hasCastMember")
    assert(castAnn.size == 3)
    assert(castAnn.forall(_.xpath.contains("/li[")))
    val dirAnn = anns.filter(_.predicate == "directedBy")
    assert(dirAnn.size == 1)
    assert(dirAnn.head.xpath.contains("div[1]/span[2]"))
    assert(kept.size == 1)
  }
  test("annotateFull annotates at most one mention per (pred, object)") {
    implicit val s = spark
    val pages = spark.createDataset(Seq(examplePage))
    val topics = Vector(TopicId.PageTopic("s", "p0", -1, "f1", "Do the Right Thing", "/html[1]/body[1]/h1[1]", 1.0))
    val kbB = spark.sparkContext.broadcast(exampleKb)
    val (anns, _) = RelationAnnot.annotateFull(pages, topics, kbB, minAnnotations = 1)
    val grouped = anns.filterNot(_.predicate == RelationAnnot.NamePred)
      .groupBy(a => (a.predicate, repro.util.Normalize(a.value)))
    assert(grouped.values.forall(_.size == 1))
  }
  test("annotateTopicOnly annotates every mention with every relation") {
    implicit val s = spark
    val pages = spark.createDataset(Seq(examplePage))
    val topics = Vector(TopicId.PageTopic("s", "p0", -1, "f1", "Do the Right Thing", "/html[1]/body[1]/h1[1]", 1.0))
    val kbB = spark.sparkContext.broadcast(exampleKb)
    val (anns, _) = RelationAnnot.annotateTopicOnly(pages, topics, kbB, minAnnotations = 1)
    // Lee has 2 mentions x 2 relations = 4 annotations.
    assert(anns.count(_.value == "Spike Lee") == 4)
  }
  test("informativeness filter drops sparse pages") {
    implicit val s = spark
    val pages = spark.createDataset(Seq(examplePage))
    val topics = Vector(TopicId.PageTopic("s", "p0", -1, "f1", "Do the Right Thing", "/html[1]/body[1]/h1[1]", 1.0))
    val smallKb = KnowledgeBase(Vector(
      Triple("f1", "Do the Right Thing", "Film", "directedBy", "Spike Lee")))
    val kbB = spark.sparkContext.broadcast(smallKb)
    val (anns, kept) = RelationAnnot.annotateFull(pages, topics, kbB, minAnnotations = 3)
    assert(anns.isEmpty && kept.isEmpty)
  }
  test("name annotation added for kept pages at the topic xpath") {
    implicit val s = spark
    val pages = spark.createDataset(Seq(examplePage))
    val topics = Vector(TopicId.PageTopic("s", "p0", -1, "f1", "Do the Right Thing", "/html[1]/body[1]/h1[1]", 1.0))
    val kbB = spark.sparkContext.broadcast(exampleKb)
    val (anns, _) = RelationAnnot.annotateFull(pages, topics, kbB, minAnnotations = 1)
    val nameAnn = anns.filter(_.predicate == RelationAnnot.NamePred)
    assert(nameAnn.size == 1 && nameAnn.head.xpath == "/html[1]/body[1]/h1[1]")
  }

  test("end-to-end site annotation: precision is near-perfect on a clean site") {
    implicit val s = spark
    val vd   = Verticals.nbaplayer(nSites = 2, pagesPerSite = 25, seed = 9)
    val site = vd.sites(1)
    val pages = spark.createDataset(site.pages)
    val kbB = spark.sparkContext.broadcast(vd.kb)
    val topics = TopicId.identify(pages, kbB).collect().toVector
    val (anns, _) = RelationAnnot.annotateFull(pages, topics, kbB)
    val truthNodes = site.truth.map(t => (t.pageId, t.xpath, t.predicate)).toSet
    val rel = anns.filterNot(_.predicate == RelationAnnot.NamePred)
    val correct = rel.count(a => truthNodes((a.pageId, a.xpath, a.predicate)))
    assert(rel.nonEmpty)
    assert(correct.toDouble / rel.size > 0.95, s"$correct/${rel.size}")
  }

  test("dup-frequent constant values trigger the clustering path without crashing") {
    implicit val s = spark
    val vd = Verticals.university(nSites = 3, pagesPerSite = 20, seed = 13)
    val site = vd.sites(2) // searchbox site
    val pages = spark.createDataset(site.pages)
    val kbB = spark.sparkContext.broadcast(vd.kb)
    val topics = TopicId.identify(pages, kbB).collect().toVector
    val (anns, _) = RelationAnnot.annotateFull(pages, topics, kbB)
    // The "type" predicate has constant values; annotation must still be
    // one-mention-per-object and produce something.
    assert(anns.nonEmpty)
  }
}
