package repro

import org.apache.spark.sql.functions._

import repro.web.Verticals

/** DuckDB-oracle checks for the DataFrame aggregations the pipeline relies
  * on: dominant-XPath counting (Algorithm 1), frequent-string counting
  * (§4.2 text features), and annotation roll-ups.  A broken Spark
  * aggregation would silently skew annotation quality, so these are
  * cross-checked against an independent engine.
  */
class OracleAggSpec extends SparkSpec {
  import spark.implicits._

  private lazy val site = Verticals.movie(nSites = 1, pagesPerSite = 15, seed = 21).sites.head

  private lazy val nodesDf = spark
    .createDataset(site.pages.flatMap(p => p.textNodes.map(n => (p.pageId, n.xpath, n.text))))
    .toDF("pageid", "xpath", "text")
    .cache()

  test("oracle: per-xpath mention counts (dominant-path ranking)") {
    val agg = nodesDf.groupBy($"xpath").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(agg,
      "SELECT xpath, count(*) AS cnt FROM nodes GROUP BY xpath",
      "nodes" -> nodesDf)
  }
  test("oracle: per-page node counts") {
    val agg = nodesDf.groupBy($"pageid").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(agg,
      "SELECT pageid, count(*) AS cnt FROM nodes GROUP BY pageid",
      "nodes" -> nodesDf)
  }
  test("oracle: frequent-string counting matches DuckDB") {
    val perPage = nodesDf.select($"pageid", $"text").distinct()
    val agg = perPage.groupBy($"text").agg(count(lit(1)) as "npages")
    Oracle.assertEquivalent(agg,
      "SELECT text, count(*) AS npages FROM (SELECT DISTINCT pageid, text FROM nodes) GROUP BY text",
      "nodes" -> nodesDf)
  }
  test("oracle: truth roll-up by predicate") {
    val truthDf = spark.createDataset(site.truth.map(t => (t.pageId, t.predicate, t.value)))
      .toDF("pageid", "pred", "value")
    val agg = truthDf.groupBy($"pred").agg(countDistinct($"pageid") as "npages", count(lit(1)) as "nfacts")
    Oracle.assertEquivalent(agg,
      "SELECT pred, count(DISTINCT pageid) AS npages, count(*) AS nfacts FROM truth GROUP BY pred",
      "truth" -> truthDf)
  }
  test("oracle: top-k path ranking is stable under ordering") {
    val agg = nodesDf.groupBy($"xpath").agg(count(lit(1)) as "cnt")
      .filter($"cnt" >= 10)
    Oracle.assertEquivalent(agg,
      "SELECT xpath, count(*) AS cnt FROM nodes GROUP BY xpath HAVING count(*) >= 10",
      "nodes" -> nodesDf)
  }
  test("oracle: join of truth against nodes (annotatable facts)") {
    val truthDf = spark.createDataset(site.truth.map(t => (t.pageId, t.xpath, t.predicate)))
      .toDF("pageid", "xpath", "pred")
    val joined = truthDf.join(nodesDf, Seq("pageid", "xpath"))
      .groupBy($"pred").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(joined,
      "SELECT t.pred, count(*) AS cnt FROM truth t JOIN nodes n " +
        "ON t.pageid = n.pageid AND t.xpath = n.xpath GROUP BY t.pred",
      "truth" -> truthDf, "nodes" -> nodesDf)
  }
}
