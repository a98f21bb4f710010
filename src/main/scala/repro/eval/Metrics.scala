package repro.eval

import repro.core.Geometry.Rect
import repro.core.{Cells, FileGrid}

/** Evaluation metrics of paper §5.3 (IoU, EoB) and §5.4 (homogeneity,
  * completeness, v-measure after Rosenberg & Hirschberg).
  */
object Metrics {

  /** Intersection-over-Union of the *non-empty* cells of two boxes in a
    * grid (paper §5.3: P and T are the sets of non-empty cells).
    */
  def iou(grid: FileGrid, p: Rect, t: Rect): Double = {
    def nonEmptyCells(r: Rect): Set[(Int, Int)] =
      (for {
        y <- math.max(0, r.y0) to math.min(grid.height - 1, r.y1)
        x <- math.max(0, r.x0) to math.min(grid.width - 1, r.x1)
        if !Cells.isEmpty(grid.cell(x, y))
      } yield (x, y)).toSet
    val ps = nonEmptyCells(p); val ts = nonEmptyCells(t)
    val inter = (ps & ts).size
    val union = ps.size + ts.size - inter
    if (union == 0) { if (inter == 0) 1.0 else 0.0 } else inter.toDouble / union
  }

  /** Error of Boundary: max coordinate deviation of the two boxes (§5.3). */
  def eob(p: Rect, t: Rect): Double =
    Seq(math.abs(p.x0 - t.x0), math.abs(p.y0 - t.y0),
        math.abs(p.x1 - t.x1), math.abs(p.y1 - t.y1)).max.toDouble

  /** Per-true-region scores: IoU of the best-overlapping prediction and EoB
    * of the closest prediction; a missed region (no predictions) scores
    * IoU 0 and EoB max(height, width) of the file (§5.3).
    */
  def regionScores(grid: FileGrid, predicted: Vector[Rect], gold: Vector[Rect]): Vector[(Double, Double)] =
    gold.map { t =>
      if (predicted.isEmpty) (0.0, math.max(grid.height, grid.width).toDouble)
      else (predicted.map(pR => iou(grid, pR, t)).max, predicted.map(pR => eob(pR, t)).min)
    }

  /** Homogeneity, completeness and v-measure of a predicted clustering
    * against gold classes (Rosenberg & Hirschberg 2007). Inputs map each
    * item to (goldClass, predictedCluster).
    */
  def vMeasure(assignments: Seq[(Int, Int)]): (Double, Double, Double) = {
    val n = assignments.size.toDouble
    if (n == 0) return (1.0, 1.0, 1.0)
    def entropy(counts: Iterable[Int]): Double =
      counts.filter(_ > 0).map { c => val p = c / n; -p * math.log(p) }.sum
    val byClass   = assignments.groupBy(_._1).view.mapValues(_.size).toMap
    val byCluster = assignments.groupBy(_._2).view.mapValues(_.size).toMap
    val joint     = assignments.groupBy(identity).view.mapValues(_.size).toMap
    val hC = entropy(byClass.values)
    val hK = entropy(byCluster.values)
    // H(C|K) = -sum_{c,k} p(c,k) log( p(c,k) / p(k) )
    val hCgivenK = -joint.map { case ((_, k), cnt) =>
      (cnt / n) * math.log(cnt.toDouble / byCluster(k))
    }.sum
    val hKgivenC = -joint.map { case ((c, _), cnt) =>
      (cnt / n) * math.log(cnt.toDouble / byClass(c))
    }.sum
    val homogeneity  = if (hC == 0.0) 1.0 else 1.0 - hCgivenK / hC
    val completeness = if (hK == 0.0) 1.0 else 1.0 - hKgivenC / hK
    val v =
      if (homogeneity + completeness == 0.0) 0.0
      else 2 * homogeneity * completeness / (homogeneity + completeness)
    (homogeneity, completeness, v)
  }
}
