package repro.core

import repro.core.Geometry.SpatialRel

/** Layout similarity via similarity flooding (paper §4.3, after Melnik et
  * al.): node similarities seeded from region fingerprints are iteratively
  * propagated along edge pairs weighted by edge similarity, then read out
  * with a maximum-weight bipartite matching.
  */
object SimilarityFlooding {

  /** Flooding hyperparameters: the paper recommends stopping at matrix
    * delta 0.1 or 10 iterations (§4.3).
    */
  final case class Params(maxIterations: Int = 10, stopDelta: Double = 0.1)

  /** Edge similarity (§4.3): 0 if either pair lacks an edge or alignment
    * directions differ; otherwise 1 minus the Euclidean distance of the
    * (magnitude, distance) feature vectors "normalized by the maximum
    * value" to land in [0, 1].
    *
    * `scale` is that maximum: the flooding passes the largest edge-feature
    * norm across the two graphs (a per-graph-pair constant), so that small
    * absolute jitters between corresponding edges — e.g. a footnote block
    * shifted by two rows between two files of one template, cf. §2 — yield
    * similarities near 1 instead of being normalized by their own small
    * feature values. Without a scale the per-pair maximum is used.
    */
  def edgeSimilarity(a: Option[SpatialRel], b: Option[SpatialRel], scale: Double = 0.0): Double = (a, b) match {
    case (Some(ea), Some(eb)) if ea.direction == eb.direction =>
      val dm = ea.magnitude.toDouble - eb.magnitude.toDouble
      val dd = ea.distance - eb.distance
      val d  = math.sqrt(dm * dm + dd * dd)
      val norm =
        if (scale > 0.0) scale
        else {
          val mm = math.max(ea.magnitude, eb.magnitude).toDouble
          val md = math.max(math.abs(ea.distance), math.abs(eb.distance))
          math.sqrt(mm * mm + md * md)
        }
      if (norm == 0.0) 1.0 else 1.0 - math.min(1.0, d / norm)
    case _ => 0.0
  }

  /** Largest edge-feature vector norm of a graph (0 if no edges). */
  def featureScale(g: LayoutGraph): Double = {
    var mx = 0.0
    for (row <- g.edges; e <- row; r <- e) {
      val n = math.sqrt(r.magnitude.toDouble * r.magnitude + r.distance * r.distance)
      if (n > mx) mx = n
    }
    mx
  }

  /** Asymmetric flooding similarity sim(Ga, Gb) (§4.3).
    *
    * σ⁰ is the region-fingerprint similarity matrix. Each iteration floods
    * the neighborhood contribution into every node pair (i, j): for every
    * neighbor m of i, only the neighbor n of j with the maximal edge
    * similarity is used (1:1 match assumption), weighted by Φ normalized by
    * 2^|deg(i) − deg(j)|. The update is the *normalized* (convex) form
    *
    *   σ'(i,j) = (σ⁰(i,j) + Σ_m Φ·σ(m,n)) / (1 + Σ_m Φ)
    *
    * rather than the paper's literal unnormalized sum followed by division
    * by the matrix maximum: under the literal form only the argmax pair can
    * ever reach 1, so two *identical* multiregion layouts score strictly
    * below 1 (an 18-region file scores ≈0.988 against itself), making the
    * τ_f = 0.99 threshold of the paper's own Table 3 unreachable for the
    * ≥6-region class it reports C = 0.95 on. The convex form keeps σ in
    * [0, 1], is a fixed point at 1 for equivalent layouts, and preserves
    * the flooding semantics. Documented as a substitution in DESIGN.md.
    * The loop stops when the Frobenius delta falls under `stopDelta` or
    * after `maxIterations`; the final score is the maximum-weight matching
    * average over max(|Ga|, |Gb|).
    */
  def simAsym(ga: LayoutGraph, gb: LayoutGraph, p: Params = Params()): Double = {
    val u = ga.size; val v = gb.size
    if (u == 0 || v == 0) return 0.0
    val sigma0 = Array.tabulate(u, v)((i, j) =>
      RegionSimilarity.similarity(ga.regions(i), gb.regions(j)))
    var sigma = sigma0.map(_.clone())
    val scale = math.max(featureScale(ga), featureScale(gb))

    def degree(g: LayoutGraph, i: Int): Int = g.edges(i).count(_.isDefined)

    var it = 0
    var delta = Double.MaxValue
    while (it < p.maxIterations && delta >= p.stopDelta) {
      val next = Array.tabulate(u, v) { (i, j) =>
        var acc = sigma0(i)(j)
        var weight = 1.0
        val degNorm = math.pow(2.0, math.abs(degree(ga, i) - degree(gb, j)).toDouble)
        var m = 0
        while (m < u) {
          if (m != i && ga.edges(i)(m).isDefined) {
            // 1:1 match assumption: use only the neighbor n of j whose
            // pairing contributes most (maximal Φ·σ — in complete graphs
            // edge similarities tie frequently, so maximizing Φ alone picks
            // arbitrary partners and equivalent layouts stop being a fixed
            // point)
            var bestN = -1; var bestPhi = 0.0; var bestContrib = 0.0
            var n = 0
            while (n < v) {
              if (n != j && gb.edges(j)(n).isDefined) {
                val phi = edgeSimilarity(ga.edges(i)(m), gb.edges(j)(n), scale)
                val contrib = phi * sigma(m)(n)
                if (contrib > bestContrib) { bestContrib = contrib; bestPhi = phi; bestN = n }
              }
              n += 1
            }
            if (bestN >= 0) {
              acc += sigma(m)(bestN) * bestPhi / degNorm
              weight += bestPhi / degNorm
            }
          }
          m += 1
        }
        acc / weight
      }
      // Frobenius delta
      var d2 = 0.0
      for (i <- 0 until u; j <- 0 until v) {
        val d = next(i)(j) - sigma(i)(j); d2 += d * d
      }
      delta = math.sqrt(d2)
      sigma = next
      it += 1
    }

    val matched = Hungarian.maxWeightMatching(sigma)
    val total = matched.map { case (i, j) => sigma(i)(j) }.sum
    total / math.max(u, v)
  }

  /** Symmetric layout similarity: average of both directions (§4.3). */
  def similarity(ga: LayoutGraph, gb: LayoutGraph, p: Params = Params()): Double =
    (simAsym(ga, gb, p) + simAsym(gb, ga, p)) / 2.0
}

/** Maximum-weight bipartite matching via the O(n³) Hungarian algorithm on
  * the rectangular weight matrix (padded internally to square). Used to
  * read a 1:1 node correspondence out of the flooded similarity matrix.
  */
object Hungarian {

  /** Returns the matched (row, col) pairs maximizing total weight; rows or
    * columns beyond min(rows, cols) stay unmatched.
    */
  def maxWeightMatching(w: Array[Array[Double]]): Vector[(Int, Int)] = {
    val rows = w.length
    if (rows == 0) return Vector.empty
    val cols = w(0).length
    if (cols == 0) return Vector.empty
    val n = math.max(rows, cols)
    var mx = 0.0
    for (r <- w; x <- r) mx = math.max(mx, x)
    // min-cost square matrix: cost = mx - weight, padding costs mx (weight 0)
    val cost = Array.tabulate(n, n)((i, j) => if (i < rows && j < cols) mx - w(i)(j) else mx)

    // e-maxx Hungarian with potentials; 1-based internal arrays.
    val INF = Double.MaxValue / 4
    val uPot = new Array[Double](n + 1)
    val vPot = new Array[Double](n + 1)
    val p    = new Array[Int](n + 1) // p(j) = row matched to column j
    val way  = new Array[Int](n + 1)
    for (i <- 1 to n) {
      p(0) = i
      var j0 = 0
      val minv = Array.fill(n + 1)(INF)
      val used = Array.fill(n + 1)(false)
      var continue = true
      while (continue) {
        used(j0) = true
        val i0 = p(j0)
        var d = INF
        var j1 = -1
        for (j <- 1 to n if !used(j)) {
          val cur = cost(i0 - 1)(j - 1) - uPot(i0) - vPot(j)
          if (cur < minv(j)) { minv(j) = cur; way(j) = j0 }
          if (minv(j) < d) { d = minv(j); j1 = j }
        }
        for (j <- 0 to n) {
          if (used(j)) { uPot(p(j)) += d; vPot(j) -= d }
          else minv(j) -= d
        }
        j0 = j1
        if (p(j0) == 0) continue = false
      }
      while (j0 != 0) {
        val j1 = way(j0)
        p(j0) = p(j1)
        j0 = j1
      }
    }
    (1 to n).flatMap { j =>
      val i = p(j)
      if (i >= 1 && i <= rows && j <= cols) Some((i - 1, j - 1)) else None
    }.toVector
  }
}
