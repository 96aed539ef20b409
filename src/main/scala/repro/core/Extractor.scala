package repro.core

import org.apache.spark.broadcast.Broadcast
import org.apache.spark.sql.{Dataset, SparkSession}

import repro.dom.{PageDoc, PageTree}

/** Model application (§4.3): classify every DOM node of every page; when a
  * "name" node is identified on a page, its text becomes the subject of all
  * other extractions from that page.  This is how CERES extracts subjects
  * that never appeared in the seed KB (the long-tail ratio of §5.5).
  */
object Extractor {

  case class Extraction(
      site: String,
      pageId: String,
      cluster: Int,
      xpath: String,
      predicate: String,
      value: String,
      subject: String,
      confidence: Double,
  )

  def extract(
      pages: Dataset[PageDoc],
      modelB: Broadcast[Trainer.NodeClassifier],
      frequentB: Broadcast[Set[String]],
      threshold: Double = 0.5,
  )(implicit spark: SparkSession): Dataset[Extraction] = {
    import spark.implicits._
    pages.mapPartitions { it =>
      val model = modelB.value
      val freq  = frequentB.value
      it.flatMap { p =>
        val tree = new PageTree(p)
        val scored = p.textNodes.map { n =>
          val (label, prob) = model.predict(FeatureGen.nodeFeatures(tree, n.id, freq))
          (n, label, prob)
        }
        // Subject resolution: best name-node above threshold, if any.
        val nameCands = scored.filter { case (_, l, pr) => l == RelationAnnot.NamePred && pr >= threshold }
        nameCands.sortBy(-_._3).headOption match {
          case None => Iterator.empty // cannot anchor a subject: extract nothing
          case Some((nameNode, _, namePr)) =>
            val subject = nameNode.text
            val rels = scored.collect {
              case (n, label, pr)
                  if label != Trainer.OtherLabel && label != RelationAnnot.NamePred && pr >= threshold =>
                Extraction(p.site, p.pageId, p.cluster, n.xpath, label, n.text, subject, pr)
            }
            (Extraction(p.site, p.pageId, p.cluster, nameNode.xpath, RelationAnnot.NamePred,
              subject, subject, namePr) +: rels).iterator
        }
      }
    }
  }
}
