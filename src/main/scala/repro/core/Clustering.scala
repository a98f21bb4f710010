package repro.core

import repro.core.Geometry.Rect

/** Region detection: density-based clustering of elements (paper §4.2).
  *
  * Mondrian modifies DBSCAN to (a) use a custom weighted distance over
  * elements and (b) label no element as noise, with minPts m = 1 so any
  * single element can form a region. The distance between two elements is
  *
  *   d(a,b) = α · closestCellDistance + β · sizeDifference + γ · misalignment
  *
  * (terms from [[Geometry]]). With m = 1 every point is a core point and
  * DBSCAN degenerates to connected components of the ε-neighborhood graph;
  * we implement the general algorithm and unit-test that equivalence.
  */
object Clustering {

  /** Clustering hyperparameters (paper §5.2: α=1; β, γ per dataset). */
  final case class Params(alpha: Double = 1.0, beta: Double = 0.5, gamma: Double = 1.0,
                          eps: Double = 1.5, minPts: Int = 1)

  /** The weighted element distance of §4.2. */
  def elementDistance(a: Rect, b: Rect, p: Params): Double =
    p.alpha * Geometry.distance(a, b) +
      p.beta * Geometry.sizeDifference(a, b) +
      p.gamma * Geometry.misalignment(a, b)

  /** DBSCAN over elements; returns the cluster id of each input element.
    *
    * All elements end up in some cluster: with minPts = 1 no noise exists;
    * for minPts > 1 leftover border/noise points are each assigned a
    * singleton cluster (the paper labels every element, §4.2).
    */
  def dbscan(elems: IndexedSeq[Rect], p: Params): Array[Int] = {
    val n = elems.length
    val labels = Array.fill(n)(-1) // -1 = unvisited
    if (n == 0) return labels
    // Precompute the symmetric distance matrix once; n is per-file small.
    val dist = Array.tabulate(n, n)((i, j) => if (i == j) 0.0 else elementDistance(elems(i), elems(j), p))
    def neighbors(i: Int): IndexedSeq[Int] = (0 until n).filter(j => dist(i)(j) <= p.eps)
    var cluster = -1
    val queue = new scala.collection.mutable.ArrayDeque[Int]()
    for (i <- 0 until n if labels(i) < 0) {
      val ni = neighbors(i)
      if (ni.length >= p.minPts) {
        cluster += 1
        labels(i) = cluster
        queue.clear(); queue ++= ni.filter(_ != i)
        while (queue.nonEmpty) {
          val q = queue.removeHead()
          if (labels(q) < 0) {
            labels(q) = cluster
            val nq = neighbors(q)
            if (nq.length >= p.minPts) queue ++= nq.filter(labels(_) < 0)
          }
        }
      }
    }
    // No noise: leftover points become singleton clusters.
    for (i <- 0 until n if labels(i) < 0) { cluster += 1; labels(i) = cluster }
    labels
  }

  /** Groups elements into regions: each cluster's member rectangles. */
  def clusterElements(elems: IndexedSeq[Rect], p: Params): Vector[Vector[Rect]] = {
    val labels = dbscan(elems, p)
    elems.indices.groupBy(labels).toVector.sortBy(_._1).map { case (_, idx) =>
      idx.map(elems).toVector
    }
  }
}
