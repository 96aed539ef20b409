package repro.core

import repro.SparkSpec
import repro.web.Verticals

class ExtractorSpec extends SparkSpec {
  import spark.implicits._

  private lazy val fixture = {
    implicit val s = spark
    val vd   = Verticals.nbaplayer(nSites = 1, pagesPerSite = 24, seed = 15)
    val site = vd.sites.head
    val pages = spark.createDataset(site.pages)
    val kbB = spark.sparkContext.broadcast(vd.kb)
    val topics = TopicId.identify(pages, kbB).collect().toVector
    val (anns, _) = RelationAnnot.annotateFull(pages, topics, kbB)
    val freqB = spark.sparkContext.broadcast(FeatureGen.frequentStrings(pages))
    val model = Trainer.train(Trainer.buildExamples(pages, anns, freqB))
    val modelB = spark.sparkContext.broadcast(model)
    (site, Extractor.extract(pages, modelB, freqB, threshold = 0.5).collect().toVector)
  }

  test("every page with extractions has exactly one subject") {
    val (_, ex) = fixture
    ex.groupBy(_.pageId).foreach { case (_, es) =>
      assert(es.map(_.subject).distinct.size == 1)
    }
  }
  test("name extraction present per extracted page") {
    val (_, ex) = fixture
    ex.groupBy(_.pageId).foreach { case (_, es) =>
      assert(es.count(_.predicate == RelationAnnot.NamePred) == 1)
    }
  }
  test("confidences respect the threshold") {
    val (_, ex) = fixture
    assert(ex.forall(_.confidence >= 0.5))
  }
  test("subjects are true page names") {
    val (site, ex) = fixture
    val names = site.topics.map(t => t.pageId -> t.entityName).toMap
    val ok = ex.count(e => names.get(e.pageId).contains(e.subject))
    assert(ok.toDouble / ex.size > 0.95)
  }
  test("extraction covers eval-style unseen values") {
    val (site, ex) = fixture
    // Teams etc. of pages the KB may not cover still extracted via structure.
    assert(ex.count(_.predicate == "team") > 15)
  }
  test("raising the threshold prunes extractions monotonically") {
    implicit val s = spark
    val (_, ex) = fixture
    val at09 = ex.count(_.confidence >= 0.9)
    assert(at09 <= ex.size)
  }
}
