package repro.core

import scala.util.Random

import org.apache.spark.broadcast.Broadcast
import org.apache.spark.ml.classification.LogisticRegression
import org.apache.spark.ml.linalg.Vectors
import org.apache.spark.sql.{Dataset, SparkSession}

import repro.dom.{PageDoc, PageTree, XPaths}
import repro.util.FeatureHash

/** Training-set assembly and the multinomial logistic-regression node
  * classifier (§4.1–4.2).
  *
  * Positives come from the (noisy) annotations; for each positive, `negRatio`
  * unlabeled nodes of the same page are sampled as "OTHER" (paper: r = 3).
  * Nodes that differ from a multi-positive list only at its varying XPath
  * indices are excluded from negative sampling — they are likely unlabeled
  * members of the same value list (§4.1).
  *
  * The model mirrors the paper's scikit-learn setup (LBFGS, L2, C=1) with
  * Spark ML's multinomial LogisticRegression over hashed sparse features.
  */
object Trainer {

  val OtherLabel = "OTHER"

  case class Example(label: String, features: Seq[String])

  /** Serializable fitted model: softmax scorer over hashed features. */
  final class NodeClassifier(
      val labels: Vector[String],
      coef: Array[Array[Double]],  // labels.size x FeatureHash.Dim
      intercept: Array[Double],
  ) extends Serializable {
    def probabilities(features: Iterable[String]): Array[Double] = {
      val (idx, _) = FeatureHash.encode(features)
      val margins = Array.tabulate(labels.size) { k =>
        var s = intercept(k)
        val row = coef(k)
        var i = 0
        while (i < idx.length) { s += row(idx(i)); i += 1 }
        s
      }
      val mx  = margins.max
      val exp = margins.map(m => math.exp(m - mx))
      val z   = exp.sum
      exp.map(_ / z)
    }

    /** (label, probability) of the most probable class. */
    def predict(features: Iterable[String]): (String, Double) = {
      val p = probabilities(features)
      val k = p.indices.maxBy(p(_))
      (labels(k), p(k))
    }
  }

  /** Build labeled examples from one corpus slice + its annotations. */
  def buildExamples(
      pages: Dataset[PageDoc],
      annotations: Vector[RelationAnnot.Annotation],
      frequentB: Broadcast[Set[String]],
      negRatio: Int = 3,
      seed: Long = 17,
  )(implicit spark: SparkSession): Dataset[Example] = {
    import spark.implicits._
    val byPage = annotations.groupBy(_.pageId)
    val byPageB = spark.sparkContext.broadcast(byPage)
    pages.mapPartitions { it =>
      val freq = frequentB.value
      it.flatMap { p =>
        byPageB.value.get(p.pageId) match {
          case None => Iterator.empty
          case Some(anns) =>
            val tree = new PageTree(p)
            val posByPath = anns.groupBy(_.xpath).map { case (x, as) =>
              x -> as.map(_.predicate).distinct
            }
            val positives = posByPath.toVector.sortBy(_._1).flatMap { case (xpath, preds) =>
              tree.nodeAt(xpath).toVector.flatMap(n =>
                preds.map(pred => Example(pred, FeatureGen.nodeFeatures(tree, n.id, freq))))
            }
            // Exclusion templates: >= 2 positives of one predicate sharing a
            // template => the whole list-template is off limits as negatives.
            val exclTemplates: Set[String] = anns
              .groupBy(_.predicate)
              .values
              .flatMap { as =>
                as.map(a => XPaths.template(a.xpath))
                  .groupBy(identity)
                  .collect { case (t, xs) if xs.size >= 2 => t }
              }
              .toSet
            val labeled = posByPath.keySet
            val candidates = p.textNodes
              .filter(n => !labeled.contains(n.xpath) && !exclTemplates.contains(XPaths.template(n.xpath)))
            val rng  = new Random(seed ^ p.pageId.hashCode.toLong)
            val negs = rng
              .shuffle(candidates)
              .take(negRatio * positives.size)
              .map(n => Example(OtherLabel, FeatureGen.nodeFeatures(tree, n.id, freq)))
            (positives ++ negs).iterator
        }
      }
    }
  }

  /** Fit the multinomial LR and pull the coefficients back for broadcast. */
  def train(
      examples: Dataset[Example],
      maxIter: Int = 40,
      regParam: Double = 1e-4,
  )(implicit spark: SparkSession): NodeClassifier = {
    import spark.implicits._
    val labels = (examples.map(_.label).distinct().collect().toVector :+ OtherLabel).distinct.sorted
    val labelIndex = labels.zipWithIndex.toMap
    val labelIndexB = spark.sparkContext.broadcast(labelIndex)
    // Training sets are small (10^3–10^5 rows); a few fat partitions keep the
    // per-iteration scheduling cost of LBFGS negligible.
    val rows = examples.map { ex =>
      val (idx, vals) = FeatureHash.encode(ex.features)
      (labelIndexB.value(ex.label).toDouble, Vectors.sparse(FeatureHash.Dim, idx, vals))
    }.toDF("label", "features").coalesce(4).cache()

    val lr = new LogisticRegression()
      .setFamily("multinomial")
      .setMaxIter(maxIter)
      .setRegParam(regParam)
      .setElasticNetParam(0.0) // pure L2, like the paper's scikit-learn setup
      .setStandardization(false)
    val model = lr.fit(rows)
    rows.unpersist()

    val cm = model.coefficientMatrix
    val coef = Array.ofDim[Double](labels.size, FeatureHash.Dim)
    cm.foreachActive { case (r, c, v) => coef(r)(c) = v }
    new NodeClassifier(labels, coef, model.interceptVector.toArray)
  }
}
