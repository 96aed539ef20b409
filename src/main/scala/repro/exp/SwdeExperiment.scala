package repro.exp

import org.apache.spark.sql.SparkSession

import repro.baseline.{CeresBaseline, VertexPP}
import repro.core.{Ceres, Extractor, Metrics}
import repro.web.Verticals

/** The SWDE experiment (§5.3): Tables 3 and 4.
  *
  * For every vertical and site: split pages 50/50 into train (annotation +
  * learning) and eval halves, run the four systems of §5.2, and score the
  * eval half.  Table 3 uses the page-hit protocol of Hao et al. (one
  * prediction per predicate per page); Table 4 reports full mention-level
  * P/R/F1 per predicate.  Distantly supervised systems are scored only on
  * predicates present in the seed KB (footnote a of Table 3); Vertex++ is
  * scored on all predicates.
  */
object SwdeExperiment {

  val Systems = Vector("Vertex++", "CERES-Baseline", "CERES-Topic", "CERES-Full")

  case class SiteRun(
      vertical: String,
      site: String,
      system: String,
      pageHit: Map[String, Metrics.PRF],
      mention: Map[String, Metrics.PRF],
      annotatedPages: Int,
      nTrainPages: Int,
  )

  def run(
      pagesPerSite: Int = 120,
      nSites: Int = 4,
      seed: Long = 7,
      systems: Vector[String] = Systems,
  )(implicit spark: SparkSession): Vector[SiteRun] = {
    val work = for {
      vd <- Verticals.all(pagesPerSite, seed)
      site <- vd.sites
      system <- systems
    } yield (vd, site, system)
    Par.map(work) { case (vd, site, system) =>
      val kbPreds  = vd.kb.predicates + vd.namePred
      val pages    = spark.createDataset(site.pages)(org.apache.spark.sql.Encoders.product)
      val sorted   = site.pages.map(_.pageId).sorted
      val trainIds = sorted.take(sorted.size / 2).toSet
      val evalIds  = sorted.toSet -- trainIds
      val namePredOf = (_: String) => vd.namePred

      def score(ex: Vector[Extractor.Extraction], annotated: Int): SiteRun = {
        val restrict: Map[String, Metrics.PRF] => Map[String, Metrics.PRF] =
          if (system == "Vertex++") identity
          else m => {
            val per = (m - "ALL").filter { case (p, _) => kbPreds(p) }
            per + ("ALL" -> Metrics.PRF("ALL", per.values.map(_.tp).sum,
              per.values.map(_.fp).sum, per.values.map(_.fn).sum))
          }
        // Restrict truth to KB predicates for DS systems before scoring, so
        // unextractable predicates (mpaa) do not show up as fn.
        val truth =
          if (system == "Vertex++") site.truth
          else site.truth.filter(t => kbPreds(t.predicate))
        SiteRun(vd.vertical, site.site, system,
          restrict(Metrics.pageHitPRF(ex, truth, namePredOf, evalIds)),
          restrict(Metrics.extractionPRF(ex, truth, namePredOf, evalIds)),
          annotated, trainIds.size)
      }

      system match {
        case "Vertex++" =>
          score(VertexPP.run(pages, site.truth, vd.namePred), 2)
        case "CERES-Baseline" =>
          score(CeresBaseline.run(pages, trainIds, vd.kb), -1)
        case "CERES-Topic" =>
          val r = Ceres.run(pages, trainIds, vd.kb, Ceres.Config(mode = Ceres.TopicOnly))
          score(r.extractions, r.keptTopics.size)
        case "CERES-Full" =>
          val r = Ceres.run(pages, trainIds, vd.kb, Ceres.Config(mode = Ceres.Full))
          score(r.extractions, r.keptTopics.size)
        case other => sys.error(s"unknown system $other")
      }
    }
  }

  /** Table 3: vertical-level page-hit F1 = mean over sites of the mean
    * per-predicate F1 (predicates the system could target).
    */
  def table3(runs: Vector[SiteRun]): Vector[(String, String, Double)] =
    runs
      .groupBy(r => (r.vertical, r.system))
      .map { case ((v, sys), rs) =>
        val perSite = rs.map { r =>
          val per = r.pageHit - "ALL"
          if (per.isEmpty) 0.0 else per.values.map(_.f1).sum / per.size
        }
        (v, sys, perSite.sum / perSite.size)
      }
      .toVector
      .sortBy(t => (t._1, t._2))

  /** Table 4: per-predicate mention-level PRF summed over a vertical's sites. */
  def table4(runs: Vector[SiteRun], system: String): Vector[(String, String, Metrics.PRF)] =
    runs
      .filter(_.system == system)
      .flatMap(r => (r.mention - "ALL").values.map(m => (r.vertical, m)))
      .groupBy { case (v, m) => (v, m.label) }
      .map { case ((v, pred), ms) =>
        (v, pred, Metrics.PRF(pred, ms.map(_._2.tp).sum, ms.map(_._2.fp).sum, ms.map(_._2.fn).sum))
      }
      .toVector
      .sortBy(t => (t._1, t._2))

  /** Fraction of train pages receiving at least one annotation (§5.3 text). */
  def annotatedFraction(runs: Vector[SiteRun], system: String = "CERES-Full"): Map[String, Double] =
    runs
      .filter(r => r.system == system && r.annotatedPages >= 0)
      .groupBy(_.vertical)
      .view
      .mapValues(rs => rs.map(_.annotatedPages).sum.toDouble / rs.map(_.nTrainPages).sum)
      .toMap
}
