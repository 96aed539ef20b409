package repro.web

import org.scalatest.funsuite.AnyFunSuite

import repro.dom.PageTree
import repro.util.Normalize

class SiteRendererSpec extends AnyFunSuite {

  private val fields = Vector(
    FieldLayout("title", "Title", multi = false),
    FieldLayout("director", "Director", multi = true),
    FieldLayout("genre", "Genre", multi = true),
  )
  private val entities = Vector(
    WEntity("f0", "Film Zero", "Film",
      Vector("director" -> "Ann Smith", "genre" -> "Drama", "genre" -> "Comedy")),
    WEntity("f1", "Film One", "Film",
      Vector("director" -> "Bob Jones", "director" -> "Cara White", "genre" -> "Action")),
  )
  private def spec(noise: NoiseSpec = NoiseSpec(adInsertProb = 0, missingFieldProb = 0)) =
    SiteSpec("t.com", "title", fields, noise, classPrefix = "t", seed = 3)

  private val rendered = SiteRenderer.render(spec(), entities)

  test("one page per entity") { assert(rendered.pages.size == 2) }
  test("topics recorded") {
    assert(rendered.topics.map(_.entityName) == Vector("Film Zero", "Film One"))
  }
  test("name node asserted as namePred truth") {
    val t = rendered.truth.filter(t => t.pageId == "p0" && t.predicate == "title")
    assert(t.size == 1 && t.head.value == "Film Zero")
  }
  test("every fact value has a truth row at a real xpath") {
    val page = rendered.pages.find(_.pageId == "p0").get
    val tree = new PageTree(page)
    rendered.truth.filter(_.pageId == "p0").foreach { t =>
      val n = tree.nodeAt(t.xpath)
      assert(n.nonEmpty, s"xpath missing: ${t.xpath}")
      assert(n.get.text == t.value)
    }
  }
  test("truth markers are stripped from rendered pages") {
    rendered.pages.foreach(p =>
      assert(p.nodes.forall(!_.attrs.contains(SiteRenderer.TruthAttr))))
  }
  test("multi fields render as list items") {
    val p1 = rendered.pages.find(_.pageId == "p1").get
    val directors = rendered.truth.filter(t => t.pageId == "p1" && t.predicate == "director")
    assert(directors.size == 2)
    assert(directors.forall(_.xpath.contains("/li[")))
    assert(p1.textNodes.exists(_.text == "Cara White"))
  }
  test("missing-field noise drops sections") {
    val noisy = SiteRenderer.render(
      SiteSpec("t.com", "title", fields, NoiseSpec(missingFieldProb = 1.0, adInsertProb = 0), "t", 3),
      entities)
    assert(noisy.truth.count(_.predicate == "director") == 0)
    // name is not a section: still asserted
    assert(noisy.truth.count(_.predicate == "title") == 2)
  }
  test("ad insertion shifts section indices between pages") {
    val many = (0 until 30).map(i =>
      WEntity(s"f$i", s"Film $i", "Film", Vector("director" -> "D P", "genre" -> "Drama")))
    val noisy = SiteRenderer.render(
      SiteSpec("t.com", "title", fields, NoiseSpec(adInsertProb = 0.7, missingFieldProb = 0), "t", 3),
      many.toVector)
    val directorPaths = noisy.truth.filter(_.predicate == "director").map(_.xpath).distinct
    assert(directorPaths.size > 1, "expected index variation from ad insertion")
  }
  test("search box values appear on every page without truth") {
    val noisy = SiteRenderer.render(spec(NoiseSpec(searchBoxValues = Seq("Public", "Private"),
      adInsertProb = 0, missingFieldProb = 0)), entities)
    noisy.pages.foreach(p => assert(p.textNodes.exists(_.text == "Public")))
    assert(!noisy.truth.exists(_.value == "Public"))
  }
  test("superset predicate lists whole universe but asserts only own values") {
    val noisy = SiteRenderer.render(spec(NoiseSpec(
      supersetPreds = Map("genre" -> Vector("Drama", "Comedy", "Action", "Horror")),
      adInsertProb = 0, missingFieldProb = 0)), entities)
    val p0 = noisy.pages.find(_.pageId == "p0").get
    assert(p0.textNodes.count(n => Set("Drama", "Comedy", "Action", "Horror")(n.text)) == 4)
    val asserted = noisy.truth.filter(t => t.pageId == "p0" && t.predicate == "genre").map(_.value).toSet
    assert(asserted == Set("Drama", "Comedy"))
  }
  test("collapsed predicates render one merged section with per-role truth") {
    val ents = Vector(WEntity("p0", "Person Zero", "Person",
      Vector("actedIn" -> "Film A", "directorOf" -> "Film A", "directorOf" -> "Film B")))
    val sp = SiteSpec("t.com", "name",
      Vector(FieldLayout("name", "Name", multi = false),
             FieldLayout("actedIn", "Actor", multi = true),
             FieldLayout("directorOf", "Director", multi = true)),
      NoiseSpec(collapsePreds = Set("actedIn", "directorOf"), adInsertProb = 0, missingFieldProb = 0),
      "t", 3)
    val out = SiteRenderer.render(sp, ents)
    val filmA = out.truth.filter(t => t.value == "Film A" && t.predicate != "name")
    assert(filmA.map(_.predicate).toSet == Set("actedIn", "directorOf"))
    assert(filmA.map(_.xpath).distinct.size == 1, "merged section: single mention for both roles")
  }
  test("strips list object names without truth") {
    val sp = spec(NoiseSpec(strips = Vector(StripSpec("Known For", "kf", Set("director"))),
      adInsertProb = 0, missingFieldProb = 0))
    val out = SiteRenderer.render(sp, entities)
    val p0 = out.pages.find(_.pageId == "p0").get
    val kfTexts = p0.nodes.filter(_.attrs.get("class").contains("kf-i")).map(_.text)
    assert(kfTexts.contains("Ann Smith"))
    // The director is still asserted once (in its section), not in the strip.
    val annPaths = out.truth.filter(t => t.pageId == "p0" && t.value == "Ann Smith").map(_.xpath)
    assert(annPaths.size == 1 && !annPaths.head.contains("kf"))
  }
  test("split predicates produce two lists whose union is all values") {
    val ents = Vector(WEntity("f9", "Film Nine", "Film",
      (1 to 10).map(i => "director" -> s"Person $i").toVector))
    val sp = spec(NoiseSpec(splitPreds = Set("director"), adInsertProb = 0, missingFieldProb = 0))
    val out  = SiteRenderer.render(sp, ents)
    val truths = out.truth.filter(_.predicate == "director")
    assert(truths.size == 10)
    val templates = truths.map(t => repro.dom.XPaths.template(t.xpath)).distinct
    assert(truths.map(_.xpath).exists(_ != truths.head.xpath))
    // Featured and remainder lists sit in different sections.
    assert(out.pages.head.nodes.exists(_.attrs.get("class").exists(_.contains("sec-director-more"))) ||
           templates.size >= 1)
  }
  test("non-detail pages have no topics or truth") {
    val sp = spec(NoiseSpec(nonDetailFrac = 1.0))
    val out = SiteRenderer.render(sp, entities)
    assert(out.pages.nonEmpty)
    assert(out.topics.isEmpty)
    assert(out.truth.isEmpty)
    assert(out.pages.forall(_.pageId.startsWith("c")))
  }
  test("mixed detail/non-detail fraction") {
    val many = (0 until 20).map(i =>
      WEntity(s"f$i", s"Film $i", "Film", Vector("director" -> "D P", "genre" -> "Drama"))).toVector
    val out = SiteRenderer.render(spec(NoiseSpec(nonDetailFrac = 0.4, adInsertProb = 0, missingFieldProb = 0)), many)
    val chart  = out.pages.count(_.pageId.startsWith("c"))
    val detail = out.pages.count(_.pageId.startsWith("p"))
    assert(detail == 20 && chart > 8 && chart < 20)
  }
  test("rec sections show related entities' values without truth") {
    val out = SiteRenderer.render(spec(NoiseSpec(recPreds = Set("genre"), adInsertProb = 0, missingFieldProb = 0)),
      entities, related = _ => Vector(entities(1)))
    val p0 = out.pages.find(_.pageId == "p0").get
    // Film One's Action genre appears on Film Zero's page but is not asserted.
    assert(p0.textNodes.exists(_.text == "Action"))
    assert(!out.truth.exists(t => t.pageId == "p0" && Normalize(t.value) == "action"))
  }
  test("rendering is deterministic") {
    val a = SiteRenderer.render(spec(), entities)
    val b = SiteRenderer.render(spec(), entities)
    assert(a.pages == b.pages && a.truth == b.truth)
  }
  test("dup predicates assert values twice at different xpaths") {
    val out = SiteRenderer.render(spec(NoiseSpec(dupPreds = Set("director"), adInsertProb = 0, missingFieldProb = 0)),
      entities)
    val ann = out.truth.filter(t => t.pageId == "p0" && t.value == "Ann Smith")
    assert(ann.size == 2 && ann.map(_.xpath).distinct.size == 2)
  }
}
