package repro.core

import repro.core.Geometry.{Rect, SpatialRel}

/** The layout of a spreadsheet file (Def 9): a complete graph whose nodes
  * are the file's regions and whose edges are labeled with the pairwise
  * spatial relationship of the region bounding boxes (direction, magnitude,
  * distance — Defs 3–5 and the overlap extension Def 8).
  *
  * @param fileId  owning file
  * @param regions graph nodes in index order
  * @param edges   `edges(i)(j)` is the spatial relationship of regions i, j
  *                for i != j; the diagonal is None (no self edges)
  */
final case class LayoutGraph(fileId: String,
                             regions: Vector[Region],
                             edges: Vector[Vector[Option[SpatialRel]]]) {
  def size: Int = regions.length
}

object LayoutGraph {

  /** Builds the complete layout graph of a file from its regions. */
  def build(fileId: String, regions: Vector[Region]): LayoutGraph = {
    val n = regions.length
    val edges = Vector.tabulate(n, n) { (i, j) =>
      if (i == j) None
      else Some(Geometry.spatialRel(regions(i).box, regions(j).box))
    }
    LayoutGraph(fileId, regions, edges)
  }

  /** Upper bound on the symmetric layout similarity of two graphs, from the
    * node-count difference: every unmatched node contributes 0 to the
    * average over max(|Ga|,|Gb|) nodes (paper §5.4 pruning).
    */
  def sizeBound(na: Int, nb: Int): Double = {
    val mx = math.max(na, nb)
    if (mx == 0) 1.0 else 1.0 - math.abs(na - nb).toDouble / mx
  }
}
