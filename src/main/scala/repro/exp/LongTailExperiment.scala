package repro.exp

import org.apache.spark.sql.SparkSession

import repro.core.{Ceres, Metrics, RelationAnnot}
import repro.util.Normalize
import repro.web.LongTailSites

/** The CommonCrawl-style long-tail experiment (§5.5): Table 8 (per-site
  * breakdown), Table 9 (top predicates), and the Figure-6 precision-vs-
  * extraction-count threshold sweep behind the abstract's headline claim.
  *
  * As in the paper there is no train/eval split: annotation, training and
  * extraction all run over the full site.  Extraction is run at a low base
  * threshold; the tables filter by confidence afterwards, so one trained
  * model serves both the 0.5 tables and the sweep.
  */
object LongTailExperiment {

  case class SiteResult(
      profile: LongTailSites.Profile,
      nPages: Int,
      annotatedPages: Int,
      annotations: Int,
      result: Ceres.Result,
      correctTriples: Set[(String, String, String)],
  )

  case class Row(
      site: String,
      focus: String,
      nPages: Int,
      annotatedPages: Int,
      annotations: Int,
      extractions: Int,
      extractedToAnnotatedPages: Double,
      extractionToAnnotation: Double,
      precision: Double, // NaN when no extraction
  )

  def run(scale: Double = 1.0, seed: Long = 66, baseThreshold: Double = 0.5)(implicit
      spark: SparkSession): Vector[SiteResult] = {
    val lt = LongTailSites.build(scale, seed)
    Par.map(lt.sites) { sd =>
      val pages = spark.createDataset(sd.rendered.pages)(org.apache.spark.sql.Encoders.product)
      val res = Ceres.run(pages, trainIds = Set.empty, lt.kb,
        Ceres.Config(mode = Ceres.Full, threshold = baseThreshold))
      val relAnnots = res.annotations.filterNot(_.predicate == RelationAnnot.NamePred)
      SiteResult(sd.profile, sd.rendered.pages.size, res.keptTopics.size, relAnnots.size,
        res, Metrics.truthTriples(sd.rendered.truth))
    }
  }

  private def relExtractions(sr: SiteResult, threshold: Double) =
    sr.result.extractions
      .filter(e => e.predicate != RelationAnnot.NamePred && e.confidence >= threshold)
      .map(e => (e.pageId, e.predicate, Normalize(e.value)))
      .distinct

  /** Table 8 row for one site at a confidence threshold. */
  def table8Row(sr: SiteResult, threshold: Double = 0.5): Row = {
    val ex       = relExtractions(sr, threshold)
    val correct  = ex.count(sr.correctTriples)
    val exPages  = ex.map(_._1).distinct.size
    Row(sr.profile.site, sr.profile.focus, sr.nPages, sr.annotatedPages, sr.annotations, ex.size,
      if (sr.annotatedPages == 0) 0.0 else exPages.toDouble / sr.annotatedPages,
      if (sr.annotations == 0) 0.0 else ex.size.toDouble / sr.annotations,
      if (ex.isEmpty) Double.NaN else correct.toDouble / ex.size)
  }

  /** Table 9: per-predicate annotations, extractions, precision (threshold 0.5). */
  def table9(srs: Vector[SiteResult], threshold: Double = 0.5, top: Int = 10)
      : Vector[(String, Int, Int, Double)] = {
    val annByPred = srs.flatMap(sr =>
      sr.result.annotations.filterNot(_.predicate == RelationAnnot.NamePred))
      .groupBy(_.predicate).view.mapValues(_.size).toMap
    val exWithCorrect = srs.flatMap { sr =>
      relExtractions(sr, threshold).map(t => (t._2, sr.correctTriples(t)))
    }
    exWithCorrect
      .groupBy(_._1)
      .map { case (pred, xs) =>
        (pred, annByPred.getOrElse(pred, 0), xs.size, xs.count(_._2).toDouble / xs.size)
      }
      .toVector
      .sortBy(-_._3)
      .take(top)
  }

  /** Figure 6: (threshold, #extractions, precision) sweep. */
  def sweep(srs: Vector[SiteResult], thresholds: Vector[Double]): Vector[(Double, Int, Double)] =
    thresholds.map { th =>
      val ex = srs.flatMap(sr => relExtractions(sr, th).map(t => (t, sr.correctTriples(t))))
      (th, ex.size, if (ex.isEmpty) Double.NaN else ex.count(_._2).toDouble / ex.size)
    }

  /** §5.5: ratio of annotated topic entities to distinct extracted subjects. */
  def entityRatio(srs: Vector[SiteResult], threshold: Double = 0.5): (Int, Int) = {
    val annotated = srs.flatMap(_.result.keptTopics.map(t => Normalize(t.entityName))).distinct.size
    val extracted = srs.flatMap(_.result.extractions
      .filter(_.confidence >= threshold).map(e => Normalize(e.subject))).distinct.size
    (annotated, extracted)
  }
}
