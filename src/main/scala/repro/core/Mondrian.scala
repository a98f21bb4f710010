package repro.core

import repro.core.Geometry.Rect

/** End-to-end per-file region detection (paper §4.1 + §4.2): image parsing,
  * connected components, rectilinear partitioning into elements, and
  * DBSCAN clustering of elements into regions.
  */
object Mondrian {

  /** Paper hyperparameters per dataset (§5.2): α = 1 fixed;
    * Deco: β = 0.5, γ = 1, static radius 1.5;
    * Fuste: β = 1, γ = 1, static radius 1.4.
    */
  val DecoParams: Clustering.Params  = Clustering.Params(alpha = 1.0, beta = 0.5, gamma = 1.0, eps = 1.5)
  val FusteParams: Clustering.Params = Clustering.Params(alpha = 1.0, beta = 1.0, gamma = 1.0, eps = 1.4)

  /** The dynamic-radius search grid of §5.2: [0.1,2] step 0.1, (2,10] step 1,
    * (10,100] step 10.
    */
  val RadiusGrid: Vector[Double] =
    ((1 to 20).map(_ * 0.1) ++ (3 to 10).map(_.toDouble) ++ (2 to 10).map(_ * 10.0)).toVector

  /** Detects the regions of one file with a fixed radius. */
  def detectRegions(grid: FileGrid, params: Clustering.Params): Vector[Region] = {
    val elems = Segmentation.elements(grid)
    if (elems.isEmpty) Vector.empty
    else Clustering.clusterElements(elems, params).map(RegionSimilarity.fromElements(grid, _))
  }

  /** Dynamic-radius detection (§5.2): runs the clustering for every radius
    * in the grid and keeps the radius whose regions maximize the given
    * score (the paper selects the optimal radius per file against the gold
    * standard; callers pass e.g. mean IoU vs. gold boxes).
    */
  def detectRegionsDynamic(grid: FileGrid, base: Clustering.Params,
                           score: Vector[Region] => Double,
                           radii: Vector[Double] = RadiusGrid): (Double, Vector[Region]) = {
    val elems = Segmentation.elements(grid)
    if (elems.isEmpty) return (radii.head, Vector.empty)
    var bestEps = radii.head
    var bestScore = Double.NegativeInfinity
    var bestRegions: Vector[Region] = Vector.empty
    for (eps <- radii) {
      val regions = Clustering.clusterElements(elems, base.copy(eps = eps))
        .map(RegionSimilarity.fromElements(grid, _))
      val s = score(regions)
      if (s > bestScore) { bestScore = s; bestEps = eps; bestRegions = regions }
    }
    (bestEps, bestRegions)
  }

  /** The connected-components baseline (Coletta et al., §5.2): each
    * connected component's bounding box is one region — no partitioning,
    * no clustering.
    */
  def detectRegionsCC(grid: FileGrid): Vector[Region] =
    Segmentation.connectedComponents(grid).map { c =>
      RegionSimilarity.fromBox(grid, c.boundingBox)
    }

  /** Gold-standard regions from annotated bounding boxes. */
  def regionsFromBoxes(grid: FileGrid, boxes: Vector[Rect]): Vector[Region] =
    boxes.map(RegionSimilarity.fromBox(grid, _))
}
