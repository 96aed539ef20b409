package repro.exp

import org.apache.spark.sql.SparkSession

import repro.core.{Ceres, Metrics, RelationAnnot}
import repro.web.ImdbWorld

/** The IMDb experiment (§5.4): Tables 5, 6 and 7 on the two-template
  * IMDb-lite site, comparing CERES-Full against CERES-Topic.
  *
  * Person pages carry the `nm-` pageId prefix; extraction quality (Table 5)
  * is computed on the eval half, annotation quality (Table 6) on the train
  * half where annotations are made, topic identification (Table 7) on the
  * train half against renderer truth restricted to KB-covered topics.
  */
object ImdbExperiment {

  case class Run(
      imdb: ImdbWorld.Imdb,
      trainIds: Set[String],
      evalIds: Set[String],
      full: Ceres.Result,
      topic: Ceres.Result,
  ) {
    def isPerson(pageId: String): Boolean = pageId.startsWith("nm-")
    def namePredOf(pageId: String): String = if (isPerson(pageId)) "name" else "title"
    def domainOf(pageId: String): String   = if (isPerson(pageId)) "Person" else "Film/TV"
  }

  def run(
      nFilms: Int = 120,
      nEpisodes: Int = 160,
      nPersons: Int = 260,
      nPersonPages: Int = 120,
      nTitlePages: Int = 200,
      seed: Long = 55,
  )(implicit spark: SparkSession): Run = {
    val imdb = ImdbWorld.build(nFilms, nEpisodes, nPersons, nPersonPages, nTitlePages, seed)
    val pages = spark.createDataset(imdb.site.pages)(org.apache.spark.sql.Encoders.product)
    // 50/50 split within each template so both halves see both page types.
    val (person, title) = imdb.site.pages.map(_.pageId).sorted.partition(_.startsWith("nm-"))
    val trainIds = (person.take(person.size / 2) ++ title.take(title.size / 2)).toSet
    val evalIds  = imdb.site.pages.map(_.pageId).toSet -- trainIds
    val full  = Ceres.run(pages, trainIds, imdb.kb, Ceres.Config(mode = Ceres.Full))
    val topic = Ceres.run(pages, trainIds, imdb.kb, Ceres.Config(mode = Ceres.TopicOnly))
    Run(imdb, trainIds, evalIds, full, topic)
  }

  /** Table 5: per-predicate extraction PRF on the eval half, per domain. */
  def table5(r: Run, result: Ceres.Result, domain: String): Map[String, Metrics.PRF] = {
    val pageFilter = (pid: String) => r.domainOf(pid) == domain
    val evalIds = r.evalIds.filter(pageFilter)
    val truth   = r.imdb.site.truth.filter(t => pageFilter(t.pageId))
    Metrics.extractionPRF(result.extractions.filter(e => pageFilter(e.pageId)),
      truth, r.namePredOf, evalIds)
  }

  /** Table 6: per-predicate annotation PRF on the train half, per domain. */
  def table6(r: Run, result: Ceres.Result, domain: String): Map[String, Metrics.PRF] = {
    val pageFilter = (pid: String) => r.domainOf(pid) == domain
    val trainIds = r.trainIds.filter(pageFilter)
    val truth    = r.imdb.site.truth.filter(t => pageFilter(t.pageId))
    val annots   = result.annotations.filter(a => pageFilter(a.pageId) &&
      a.predicate != RelationAnnot.NamePred)
    Metrics.annotationPRF(annots, truth, r.imdb.site.topics.filter(t => pageFilter(t.pageId)),
      r.imdb.kb, r.namePredOf, trainIds)
  }

  /** Table 7: topic identification accuracy per domain (train half). */
  def table7(r: Run, domain: String): Metrics.PRF = {
    val pageFilter = (pid: String) => r.domainOf(pid) == domain
    Metrics.topicPRF(
      r.full.topics.filter(t => pageFilter(t.pageId)),
      r.imdb.site.topics.filter(t => pageFilter(t.pageId)),
      r.imdb.kb,
      r.trainIds.filter(pageFilter))
  }
}
