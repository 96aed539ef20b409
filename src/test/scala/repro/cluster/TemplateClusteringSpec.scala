package repro.cluster

import repro.SparkSpec
import repro.web.{ImdbWorld, Verticals}

class TemplateClusteringSpec extends SparkSpec {
  import spark.implicits._

  test("identical signatures cluster together") {
    val sigs = Vector("p1" -> Set("/a/b", "/a/c"), "p2" -> Set("/a/b", "/a/c"))
    val m = TemplateClustering.clusterSignatures(sigs, 0.5)
    assert(m("p1") == m("p2"))
  }
  test("disjoint signatures split") {
    val sigs = Vector("p1" -> Set("/a/b"), "p2" -> Set("/x/y"))
    val m = TemplateClustering.clusterSignatures(sigs, 0.5)
    assert(m("p1") != m("p2"))
  }
  test("threshold controls merging") {
    val sigs = Vector("p1" -> Set("/a", "/b", "/c", "/d"), "p2" -> Set("/a", "/b", "/x", "/y"))
    assert(TemplateClustering.clusterSignatures(sigs, 0.3)("p2") == 0) // jaccard 2/6=0.33
    assert(TemplateClustering.clusterSignatures(sigs, 0.5)("p2") == 1)
  }
  test("single-template site forms one cluster") {
    implicit val s = spark
    val site = Verticals.nbaplayer(nSites = 1, pagesPerSite = 20, seed = 1).sites.head
    val out = TemplateClustering.assign(spark.createDataset(site.pages)).collect()
    assert(out.map(_.cluster).toSet.size == 1)
  }
  test("imdb-lite person and title templates separate") {
    implicit val s = spark
    val imdb = ImdbWorld.build(nFilms = 20, nEpisodes = 20, nPersons = 40,
      nPersonPages = 15, nTitlePages = 25, seed = 5)
    val out = TemplateClustering.assign(spark.createDataset(imdb.site.pages)).collect()
    val personClusters = out.filter(_.pageId.startsWith("nm-")).map(_.cluster).toSet
    val titleClusters  = out.filter(!_.pageId.startsWith("nm-")).map(_.cluster).toSet
    assert((personClusters & titleClusters).isEmpty,
      s"person=$personClusters title=$titleClusters")
  }
  test("cluster ids are dense from zero") {
    implicit val s = spark
    val site = Verticals.movie(nSites = 1, pagesPerSite = 10, seed = 2).sites.head
    val out = TemplateClustering.assign(spark.createDataset(site.pages)).collect()
    assert(out.map(_.cluster).min == 0)
  }
  test("assignment is deterministic") {
    implicit val s = spark
    val site = Verticals.movie(nSites = 1, pagesPerSite = 12, seed = 3).sites.head
    val a = TemplateClustering.assign(spark.createDataset(site.pages)).collect().sortBy(_.pageId).map(_.cluster).toVector
    val b = TemplateClustering.assign(spark.createDataset(site.pages)).collect().sortBy(_.pageId).map(_.cluster).toVector
    assert(a == b)
  }
}
