package repro.baseline

import repro.SparkSpec
import repro.core.Metrics
import repro.web.Verticals

class BaselineSpec extends SparkSpec {
  import spark.implicits._

  private lazy val vd   = Verticals.nbaplayer(nSites = 2, pagesPerSite = 30, seed = 25)
  private lazy val site = vd.sites(1)
  private lazy val trainIds = site.pages.map(_.pageId).sorted.take(15).toSet
  private lazy val evalIds  = site.pages.map(_.pageId).toSet -- trainIds

  test("VertexPP: near-perfect from two annotated pages") {
    implicit val s = spark
    val pages = spark.createDataset(site.pages)
    val ex = VertexPP.run(pages, site.truth, namePred = "name")
    val prf = Metrics.extractionPRF(ex, site.truth, _ => "name", evalIds)
    info(s"VertexPP ALL ${Metrics.fmt(prf("ALL"))}")
    assert(prf("ALL").f1 > 0.9, Metrics.fmt(prf("ALL")))
  }
  test("VertexPP: extracts predicates the KB lacks (supervised advantage)") {
    implicit val s = spark
    val mv = Verticals.movie(nSites = 1, pagesPerSite = 20, seed = 26)
    val msite = mv.sites.head
    val ex = VertexPP.run(spark.createDataset(msite.pages), msite.truth, namePred = "title")
    assert(ex.exists(_.predicate == "mpaa"))
  }
  test("CeresBaseline: runs and produces pair extractions") {
    implicit val s = spark
    val pages = spark.createDataset(site.pages)
    val ex = CeresBaseline.run(pages, trainIds, vd.kb)
    assert(ex.nonEmpty)
  }
  test("CeresBaseline: quality is below CERES-Full on the same site") {
    implicit val s = spark
    val pages = spark.createDataset(site.pages)
    val base = CeresBaseline.run(pages, trainIds, vd.kb)
    val basePrf = Metrics.pageHitPRF(base, site.truth, _ => "name", evalIds)
    val full = repro.core.Ceres.run(pages, trainIds, vd.kb)
    val fullPrf = Metrics.pageHitPRF(full.extractions, site.truth, _ => "name", evalIds)
    info(s"baseline=${Metrics.fmt(basePrf("ALL"))} full=${Metrics.fmt(fullPrf("ALL"))}")
    assert(fullPrf("ALL").f1 >= basePrf("ALL").f1)
  }
  test("CeresBaseline: empty KB yields no extractions") {
    implicit val s = spark
    val pages = spark.createDataset(site.pages.take(4))
    val ex = CeresBaseline.run(pages, Set.empty, repro.kb.KnowledgeBase(Vector.empty))
    assert(ex.isEmpty)
  }
}
