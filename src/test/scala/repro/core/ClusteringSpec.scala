package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Geometry.Rect

/** Modified DBSCAN region clustering (paper §4.2). */
class ClusteringSpec extends AnyFunSuite {

  private val P = Clustering.Params(alpha = 1, beta = 0.5, gamma = 1, eps = 1.5)

  test("empty input yields no clusters") {
    assert(Clustering.dbscan(Vector.empty, P).isEmpty)
    assert(Clustering.clusterElements(Vector.empty, P).isEmpty)
  }
  test("single element forms a singleton region (m = 1)") {
    assert(Clustering.clusterElements(Vector(Rect(0, 0, 1, 1)), P).size == 1)
  }
  test("adjacent equal elements cluster together") {
    val es = Vector(Rect(0, 0, 2, 2), Rect(0, 3, 2, 5))
    assert(Clustering.clusterElements(es, P).size == 1)
  }
  test("elements separated by one empty row still cluster (empty-cell compensation)") {
    // same columns: distance 1, sizediff 0, misalignment 0 -> 1.0 <= 1.5
    val es = Vector(Rect(0, 0, 4, 2), Rect(0, 4, 4, 6))
    assert(Clustering.clusterElements(es, P).size == 1)
  }
  test("distant elements stay separate") {
    val es = Vector(Rect(0, 0, 2, 2), Rect(0, 10, 2, 12))
    assert(Clustering.clusterElements(es, P).size == 2)
  }
  test("no element is ever labeled noise") {
    val es = Vector(Rect(0, 0, 0, 0), Rect(50, 50, 50, 50), Rect(90, 0, 90, 0))
    val labels = Clustering.dbscan(es, P)
    assert(labels.forall(_ >= 0))
    assert(labels.distinct.length == 3)
  }
  test("minPts=1 degenerates to eps-graph connected components") {
    val rnd = new scala.util.Random(11)
    val es = Vector.fill(12) {
      val x = rnd.nextInt(20); val y = rnd.nextInt(20)
      Rect(x, y, x + rnd.nextInt(3), y + rnd.nextInt(3))
    }
    val labels = Clustering.dbscan(es, P)
    // reference: union-find over pairs within eps
    val parent = Array.tabulate(es.size)(identity)
    def find(i: Int): Int = { var r = i; while (parent(r) != r) r = parent(r); r }
    for (i <- es.indices; j <- es.indices if i < j)
      if (Clustering.elementDistance(es(i), es(j), P) <= P.eps) {
        val (ri, rj) = (find(i), find(j)); if (ri != rj) parent(ri) = rj
      }
    val expected = es.indices.groupBy(find).values.map(_.toSet).toSet
    val got = es.indices.groupBy(labels(_)).values.map(_.toSet).toSet
    assert(got == expected)
  }
  test("transitive chains merge into one region") {
    // each neighbor within eps of the next, first and last far apart
    val es = Vector.tabulate(5)(i => Rect(0, i * 4, 4, i * 4 + 2))
    assert(Clustering.clusterElements(es, P).size == 1)
  }
  test("larger radius merges more") {
    val es = Vector(Rect(0, 0, 3, 2), Rect(0, 6, 3, 8))
    assert(Clustering.clusterElements(es, P).size == 2)
    assert(Clustering.clusterElements(es, P.copy(eps = 5)).size == 1)
  }
  test("weighted distance components match the definitions") {
    val a = Rect(0, 0, 4, 2); val b = Rect(0, 4, 4, 6)
    val d = Clustering.elementDistance(a, b, Clustering.Params(alpha = 2, beta = 3, gamma = 5, eps = 1))
    assert(d == 2 * Geometry.distance(a, b) + 3 * Geometry.sizeDifference(a, b) + 5 * Geometry.misalignment(a, b))
  }
  test("misaligned equal-size neighbors are penalized by gamma") {
    val aligned    = Clustering.elementDistance(Rect(0, 0, 4, 2), Rect(0, 4, 4, 6), P)
    val misaligned = Clustering.elementDistance(Rect(0, 0, 4, 2), Rect(3, 4, 7, 6), P)
    assert(aligned < misaligned)
  }
  test("clusterElements partitions the input") {
    val es = Vector(Rect(0, 0, 1, 1), Rect(0, 3, 1, 4), Rect(20, 20, 21, 21))
    val clusters = Clustering.clusterElements(es, P)
    assert(clusters.flatten.sortBy(r => (r.y0, r.x0)) == es.sortBy(r => (r.y0, r.x0)))
  }
  test("minPts > 1 assigns sparse points singleton clusters instead of noise") {
    val es = Vector(Rect(0, 0, 0, 0), Rect(30, 30, 30, 30))
    val labels = Clustering.dbscan(es, P.copy(minPts = 3))
    assert(labels.forall(_ >= 0) && labels(0) != labels(1))
  }
}
