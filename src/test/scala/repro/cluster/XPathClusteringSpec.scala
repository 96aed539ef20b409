package repro.cluster

import org.scalatest.funsuite.AnyFunSuite

class XPathClusteringSpec extends AnyFunSuite {

  test("empty input") {
    val c = XPathClustering.cluster(Map.empty, 2)
    assert(c.assignment.isEmpty && c.sizes.isEmpty)
  }
  test("single path is its own cluster") {
    val c = XPathClustering.cluster(Map("/a[1]" -> 5L), 3)
    assert(c.assignment.size == 1)
    assert(c.weightOf("/a[1]") == 5L)
  }
  test("two groups of similar paths separate into two clusters") {
    val top = (1 to 5).map(i => s"/html[1]/body[1]/div[1]/ul[1]/li[$i]" -> 10L)
    val rec = (1 to 3).map(i => s"/html[1]/body[1]/div[3]/div[2]/span[$i]" -> 2L)
    val c = XPathClustering.cluster((top ++ rec).toMap, 2)
    val topIds = top.map(p => c.assignment(p._1)).distinct
    val recIds = rec.map(p => c.assignment(p._1)).distinct
    assert(topIds.size == 1 && recIds.size == 1 && topIds != recIds)
  }
  test("larger cluster wins by weight (Example 3.2)") {
    val top = (1 to 5).map(i => s"/html[1]/body[1]/div[1]/ul[1]/li[$i]" -> 10L)
    val rec = (1 to 3).map(i => s"/html[1]/body[1]/div[3]/div[2]/span[$i]" -> 2L)
    val c = XPathClustering.cluster((top ++ rec).toMap, 2)
    assert(c.weightOf(top.head._1) == 50L)
    assert(c.weightOf(rec.head._1) == 6L)
    assert(c.weightOf(top.head._1) > c.weightOf(rec.head._1))
  }
  test("target of 1 merges everything") {
    val paths = (1 to 6).map(i => s"/a[$i]" -> 1L).toMap
    val c = XPathClustering.cluster(paths, 1)
    assert(c.assignment.values.toSet.size == 1)
  }
  test("target larger than n yields n singletons") {
    val paths = Map("/a[1]" -> 1L, "/b[1]" -> 1L)
    val c = XPathClustering.cluster(paths, 10)
    assert(c.assignment.values.toSet.size == 2)
  }
  test("unclustered (capped-out) paths report weight 0") {
    val paths = (1 to 50).map(i => s"/p[$i]" -> (51L - i)).toMap
    val c = XPathClustering.cluster(paths, 2, cap = 10)
    val kept = paths.toVector.sortBy(-_._2).take(10).map(_._1).toSet
    assert(paths.keys.filterNot(kept).forall(p => c.weightOf(p) == 0L))
  }
  test("deterministic") {
    val paths = (1 to 8).map(i => s"/x[1]/y[$i]" -> i.toLong).toMap
    val a = XPathClustering.cluster(paths, 3)
    val b = XPathClustering.cluster(paths, 3)
    assert(a.assignment == b.assignment && a.sizes == b.sizes)
  }
}
