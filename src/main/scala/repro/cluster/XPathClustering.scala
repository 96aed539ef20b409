package repro.cluster

import repro.util.Lev

/** Agglomerative clustering of mention XPaths (§3.2.2 global evidence).
  *
  * The paper clusters the XPaths of all potential object mentions of a
  * predicate across the site with agglomerative merging under Levenshtein
  * distance, stopping at k clusters where k = the maximum number of mentions
  * of a single object on one page.  Annotation then prefers mentions whose
  * XPath falls into a larger cluster (Example 3.2: genre mentions at the top
  * of IMDb pages form a big consistent cluster; recommendation-section
  * mentions form a small one).
  *
  * We cluster *distinct* paths weighted by how many mentions carry them —
  * an exact contraction of clustering every duplicated mention — and use
  * average linkage.  `cap` bounds the O(n^2) distance matrix; beyond it the
  * least frequent paths are left unclustered (weight-0 singletons), which
  * only affects rare paths that would lose the largest-cluster vote anyway.
  */
object XPathClustering {

  case class Clusters(assignment: Map[String, Int], sizes: Map[Int, Long]) {
    /** Total mention weight of the cluster containing `path` (0 if unclustered). */
    def weightOf(path: String): Long =
      assignment.get(path).map(sizes.getOrElse(_, 0L)).getOrElse(0L)
  }

  def cluster(weightedPaths: Map[String, Long], targetClusters: Int, cap: Int = 300): Clusters = {
    if (weightedPaths.isEmpty) return Clusters(Map.empty, Map.empty)
    val kept = weightedPaths.toVector.sortBy { case (p, w) => (-w, p) }.take(cap)
    val paths = kept.map(_._1)
    val n     = paths.length
    val k     = math.max(1, math.min(targetClusters, n))

    // Average linkage over a precomputed distance matrix.
    val dist = Array.ofDim[Double](n, n)
    for (i <- 0 until n; j <- (i + 1) until n) {
      val d = Lev.distance(paths(i), paths(j)).toDouble
      dist(i)(j) = d; dist(j)(i) = d
    }
    val members = collection.mutable.Map.empty[Int, Vector[Int]]
    (0 until n).foreach(i => members(i) = Vector(i))

    def avgLink(a: Vector[Int], b: Vector[Int]): Double = {
      var s = 0.0
      for (i <- a; j <- b) s += dist(i)(j)
      s / (a.size.toLong * b.size)
    }

    while (members.size > k) {
      val ids = members.keys.toVector.sorted
      var best = (Double.MaxValue, -1, -1)
      for (ai <- ids.indices; bi <- (ai + 1) until ids.size) {
        val d = avgLink(members(ids(ai)), members(ids(bi)))
        if (d < best._1) best = (d, ids(ai), ids(bi))
      }
      members(best._2) = members(best._2) ++ members(best._3)
      members -= best._3
    }

    val assignment = members.flatMap { case (cid, ms) => ms.map(m => paths(m) -> cid) }.toMap
    val sizes = members.map { case (cid, ms) =>
      cid -> ms.map(m => kept(m)._2).sum
    }.toMap
    Clusters(assignment, sizes)
  }
}
