package repro.core

import org.apache.spark.sql.{Dataset, SparkSession}

import repro.cluster.TemplateClustering
import repro.dom.PageDoc
import repro.kb.KnowledgeBase

/** End-to-end CERES pipeline (Figure 3): template clustering → per-cluster
  * topic identification → relation annotation → classifier training →
  * extraction over all pages of the cluster.
  *
  * Annotation and training use only `trainIds` pages (the paper's 50/50
  * split; pass an empty set to train on everything, as in the CommonCrawl
  * run); extraction runs over every page, and callers slice the output into
  * train/eval halves for scoring.
  */
object Ceres {

  sealed trait Mode
  case object Full      extends Mode // Algorithm 1 + Algorithm 2
  case object TopicOnly extends Mode // Algorithm 1, annotate all mentions

  case class Config(
      mode: Mode = Full,
      minAnnotations: Int = 3,
      negRatio: Int = 3,
      threshold: Double = 0.5,
      maxTopicPages: Int = 5,
      templateThreshold: Double = 0.45,
      freqMinFrac: Double = 0.2,
      /** Clusters with fewer annotated pages than this are skipped. */
      minAnnotatedPages: Int = 2,
      seed: Long = 17,
  )

  case class Result(
      topics: Vector[TopicId.PageTopic],       // pre-informativeness (Table 7 input)
      keptTopics: Vector[TopicId.PageTopic],   // post-informativeness
      annotations: Vector[RelationAnnot.Annotation],
      extractions: Vector[Extractor.Extraction],
  )

  def run(
      pages: Dataset[PageDoc],
      trainIds: Set[String],
      kb: KnowledgeBase,
      cfg: Config = Config(),
  )(implicit spark: SparkSession): Result = {
    import spark.implicits._
    val kbB = spark.sparkContext.broadcast(kb)

    val clustered = TemplateClustering.assign(pages, cfg.templateThreshold).cache()
    val clusters  = clustered.map(_.cluster).distinct().collect().sorted

    val allTopics   = Vector.newBuilder[TopicId.PageTopic]
    val allKept     = Vector.newBuilder[TopicId.PageTopic]
    val allAnnots   = Vector.newBuilder[RelationAnnot.Annotation]
    val allExtracts = Vector.newBuilder[Extractor.Extraction]

    clusters.foreach { c =>
      val sub      = clustered.filter(_.cluster == c).cache()
      val trainSub = (if (trainIds.isEmpty) sub else sub.filter(p => trainIds.contains(p.pageId))).cache()

      val topics = TopicId.identify(trainSub, kbB, cfg.maxTopicPages).collect().toVector
      allTopics ++= topics

      val (annots, kept) = cfg.mode match {
        case Full      => RelationAnnot.annotateFull(trainSub, topics, kbB, cfg.minAnnotations)
        case TopicOnly => RelationAnnot.annotateTopicOnly(trainSub, topics, kbB, cfg.minAnnotations)
      }
      allKept ++= kept
      allAnnots ++= annots

      if (kept.size >= cfg.minAnnotatedPages) {
        val freq  = FeatureGen.frequentStrings(trainSub, cfg.freqMinFrac)
        val freqB = spark.sparkContext.broadcast(freq)
        val examples = Trainer.buildExamples(trainSub, annots, freqB, cfg.negRatio, cfg.seed)
        val model    = Trainer.train(examples)
        val modelB   = spark.sparkContext.broadcast(model)
        allExtracts ++= Extractor.extract(sub, modelB, freqB, cfg.threshold).collect()
      }
      trainSub.unpersist()
      sub.unpersist()
    }
    clustered.unpersist()

    Result(allTopics.result(), allKept.result(), allAnnots.result(), allExtracts.result())
  }
}
