package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Geometry.{Rect, SpatialRel}

/** Similarity flooding layout comparison and Hungarian matching (§4.3). */
class SimilarityFloodingSpec extends AnyFunSuite {

  private def grid(rows: String*): FileGrid =
    Grid.fromRows("f", rows.map(_.split("\\|", -1).toSeq))

  private def layoutOf(fileId: String, g: FileGrid, boxes: Rect*): LayoutGraph =
    LayoutGraph.build(fileId, boxes.toVector.map(RegionSimilarity.fromBox(g, _)))

  // --- edge similarity
  test("edge similarity of identical edges is 1") {
    val e = Some(SpatialRel("H", 3, 2.0))
    assert(SimilarityFlooding.edgeSimilarity(e, e) == 1.0)
  }
  test("edge similarity across different directions is 0") {
    assert(SimilarityFlooding.edgeSimilarity(
      Some(SpatialRel("H", 3, 2.0)), Some(SpatialRel("V", 3, 2.0))) == 0.0)
  }
  test("edge similarity with a missing edge is 0") {
    assert(SimilarityFlooding.edgeSimilarity(None, Some(SpatialRel("H", 3, 2.0))) == 0.0)
    assert(SimilarityFlooding.edgeSimilarity(Some(SpatialRel("H", 3, 2.0)), None) == 0.0)
  }
  test("edge similarity decreases with feature distance") {
    val base = Some(SpatialRel("H", 5, 2.0))
    val near = SimilarityFlooding.edgeSimilarity(base, Some(SpatialRel("H", 5, 3.0)))
    val far  = SimilarityFlooding.edgeSimilarity(base, Some(SpatialRel("H", 5, 9.0)))
    assert(near > far)
    assert(near > 0.0 && near < 1.0 && far >= 0.0 && far <= 1.0)
  }
  test("edge similarity of two zero-feature edges is 1") {
    assert(SimilarityFlooding.edgeSimilarity(
      Some(SpatialRel("V", 0, 0.0)), Some(SpatialRel("V", 0, 0.0))) == 1.0)
  }

  // --- Hungarian matching
  test("hungarian picks the identity on a diagonal-dominant matrix") {
    val w = Array(Array(9.0, 1.0, 1.0), Array(1.0, 9.0, 1.0), Array(1.0, 1.0, 9.0))
    assert(Hungarian.maxWeightMatching(w).toSet == Set((0, 0), (1, 1), (2, 2)))
  }
  test("hungarian finds the non-greedy optimum") {
    // greedy picks (0,0)=5 then (1,1)=1 (total 6); optimum is 4+4=8
    val w = Array(Array(5.0, 4.0), Array(4.0, 1.0))
    val m = Hungarian.maxWeightMatching(w).toSet
    assert(m == Set((0, 1), (1, 0)))
  }
  test("hungarian handles rectangular matrices (rows < cols)") {
    val w = Array(Array(1.0, 9.0, 2.0))
    assert(Hungarian.maxWeightMatching(w) == Vector((0, 1)))
  }
  test("hungarian handles rectangular matrices (rows > cols)") {
    val w = Array(Array(1.0), Array(9.0), Array(2.0))
    assert(Hungarian.maxWeightMatching(w) == Vector((1, 0)))
  }
  test("hungarian on empty matrices") {
    assert(Hungarian.maxWeightMatching(Array.empty[Array[Double]]).isEmpty)
  }
  test("hungarian matching is optimal on random matrices (vs brute force)") {
    val rnd = new scala.util.Random(17)
    for (_ <- 0 until 30) {
      val n = 2 + rnd.nextInt(4)
      val w = Array.fill(n, n)(rnd.nextDouble())
      val got = Hungarian.maxWeightMatching(w).map { case (i, j) => w(i)(j) }.sum
      val best = (0 until n).permutations.map(p => p.zipWithIndex.map { case (j, i) => w(i)(j) }.sum).max
      assert(math.abs(got - best) < 1e-9)
    }
  }

  // --- flooding similarity
  test("identical single-region layouts score 1") {
    val g = grid("1|2", "3|4")
    val l = layoutOf("a", g, Rect(0, 0, 1, 1))
    assert(math.abs(SimilarityFlooding.similarity(l, l) - 1.0) < 1e-9)
  }
  test("empty layout scores 0 against anything") {
    val g = grid("1")
    val l = layoutOf("a", g, Rect(0, 0, 0, 0))
    val e = LayoutGraph.build("b", Vector.empty)
    assert(SimilarityFlooding.similarity(l, e) == 0.0)
    assert(SimilarityFlooding.similarity(e, e) == 0.0)
  }
  test("same-template files score higher than different layouts") {
    val f1 = grid("Firm Sales| | ", "1|2|3", "4|5|6", " | | ", "notes| | ")
    val f2 = grid("Peak Demand| | ", "7|8|9", "3|2|1", " | | ", "estimate| | ")
    val f3 = grid("1|a|Xy 9", "2|b|9.5", "3|c|GOOD")
    val l1 = layoutOf("f1", f1, Rect(0, 0, 0, 0), Rect(0, 1, 2, 2), Rect(0, 4, 0, 4))
    val l2 = layoutOf("f2", f2, Rect(0, 0, 0, 0), Rect(0, 1, 2, 2), Rect(0, 4, 0, 4))
    val l3 = layoutOf("f3", f3, Rect(0, 0, 2, 2))
    val same = SimilarityFlooding.similarity(l1, l2)
    val diff = SimilarityFlooding.similarity(l1, l3)
    assert(same > 0.95, s"same-template similarity was $same")
    assert(same > diff)
  }
  test("node-count mismatch bounds the similarity (pruning bound holds)") {
    val g1 = grid("1|2", "3|4")
    val g2 = grid("1|2", "3|4", " | ", "a|b")
    val l1 = layoutOf("a", g1, Rect(0, 0, 1, 1))
    val l2 = layoutOf("b", g2, Rect(0, 0, 1, 1), Rect(0, 3, 1, 3))
    val s = SimilarityFlooding.similarity(l1, l2)
    assert(s <= LayoutGraph.sizeBound(1, 2) + 1e-9)
  }
  test("similarity is symmetric by construction") {
    val g1 = grid("1|2", "a|b")
    val g2 = grid("5|6", "c|d", "7|8")
    val l1 = layoutOf("a", g1, Rect(0, 0, 1, 0), Rect(0, 1, 1, 1))
    val l2 = layoutOf("b", g2, Rect(0, 0, 1, 0), Rect(0, 1, 1, 2))
    assert(math.abs(SimilarityFlooding.similarity(l1, l2) -
                    SimilarityFlooding.similarity(l2, l1)) < 1e-12)
  }
  test("sizeBound formula") {
    assert(LayoutGraph.sizeBound(3, 3) == 1.0)
    assert(LayoutGraph.sizeBound(1, 2) == 0.5)
    assert(LayoutGraph.sizeBound(0, 0) == 1.0)
    assert(LayoutGraph.sizeBound(0, 4) == 0.0)
  }
  test("flooding stays within [0, 1]") {
    val g = grid("1|2|a", "3|4|b", " | | ", "x|y|z")
    val l1 = layoutOf("a", g, Rect(0, 0, 1, 1), Rect(2, 0, 2, 1), Rect(0, 3, 2, 3))
    val l2 = layoutOf("b", g, Rect(0, 0, 2, 1), Rect(0, 3, 2, 3))
    val s = SimilarityFlooding.similarity(l1, l2)
    assert(s >= 0.0 && s <= 1.0)
  }

  // --- layout graph construction
  test("layout graph is complete with labeled edges and no self loops") {
    val g = grid("1|2", "3|4", " | ", "a|b")
    val l = layoutOf("a", g, Rect(0, 0, 1, 1), Rect(0, 3, 1, 3))
    assert(l.size == 2)
    assert(l.edges(0)(0).isEmpty && l.edges(1)(1).isEmpty)
    assert(l.edges(0)(1).contains(Geometry.spatialRel(Rect(0, 0, 1, 1), Rect(0, 3, 1, 3))))
    assert(l.edges(1)(0).contains(Geometry.spatialRel(Rect(0, 3, 1, 3), Rect(0, 0, 1, 1))))
  }
}
