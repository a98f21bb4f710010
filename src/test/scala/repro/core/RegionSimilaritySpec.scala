package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Geometry.Rect

/** Region fingerprints and cross-correlation similarity (paper §4.2). */
class RegionSimilaritySpec extends AnyFunSuite {

  private def grid(rows: String*): FileGrid =
    Grid.fromRows("f", rows.map(_.split("\\|", -1).toSeq))

  test("histogram has 192 bins (64 per channel)") {
    assert(RegionSimilarity.HistogramBins == 192)
    val h = RegionSimilarity.histogram(grid("1|2"), Rect(0, 0, 1, 0))
    assert(h.length == 192)
  }
  test("each cell contributes one count per channel") {
    val h = RegionSimilarity.histogram(grid("1|2|3"), Rect(0, 0, 2, 0))
    assert(h.slice(0, 64).sum == 3 && h.slice(64, 128).sum == 3 && h.slice(128, 192).sum == 3)
  }
  test("empty cells contribute white counts") {
    val h = RegionSimilarity.histogram(grid("1| |1"), Rect(0, 0, 2, 0))
    // white = (255,255,255) -> bin 63 of every channel
    assert(h(63) == 1.0 && h(64 + 63) == 1.0 && h(128 + 63) == 1.0)
  }
  test("histogram bins follow the type colors") {
    val h = RegionSimilarity.histogram(grid("MWH"), Rect(0, 0, 0, 0))
    val (r, g, b) = Cells.UppercaseSt.rgb
    assert(h(r / 4) == 1.0 && h(64 + g / 4) == 1.0 && h(128 + b / 4) == 1.0)
  }
  test("out-of-grid parts of the box are ignored") {
    val h = RegionSimilarity.histogram(grid("1"), Rect(0, 0, 5, 5))
    assert(h.slice(0, 64).sum == 1.0)
  }

  test("cross-correlation of a histogram with itself is 1") {
    val h = RegionSimilarity.histogram(grid("1|a|B C"), Rect(0, 0, 2, 0))
    assert(math.abs(RegionSimilarity.crossCorrelation(h, h) - 1.0) < 1e-12)
  }
  test("cross-correlation is scale-invariant (same type mix, more rows)") {
    val g1 = grid("1|a", "2|b")
    val g2 = grid("1|a", "2|b", "3|c", "4|d")
    val h1 = RegionSimilarity.histogram(g1, Rect(0, 0, 1, 1))
    val h2 = RegionSimilarity.histogram(g2, Rect(0, 0, 1, 3))
    assert(RegionSimilarity.crossCorrelation(h1, h2) > 0.999)
  }
  test("different type mixes score lower than equal mixes") {
    val ints    = RegionSimilarity.histogram(grid("1|2", "3|4"), Rect(0, 0, 1, 1))
    val ints2   = RegionSimilarity.histogram(grid("7|8", "9|10"), Rect(0, 0, 1, 1))
    val strings = RegionSimilarity.histogram(grid("a|b", "c|d"), Rect(0, 0, 1, 1))
    assert(RegionSimilarity.crossCorrelation(ints, ints2) >
           RegionSimilarity.crossCorrelation(ints, strings))
  }
  test("sub-types of one fundamental stay closer than different fundamentals") {
    val lower = RegionSimilarity.histogram(grid("a|b", "c|d"), Rect(0, 0, 1, 1))
    val title = RegionSimilarity.histogram(grid("Aa|Bb", "Cc|Dd"), Rect(0, 0, 1, 1))
    val ints  = RegionSimilarity.histogram(grid("1|2", "3|4"), Rect(0, 0, 1, 1))
    assert(RegionSimilarity.crossCorrelation(lower, title) >
           RegionSimilarity.crossCorrelation(lower, ints))
  }
  test("similarity is clamped to [0, 1]") {
    val a = RegionSimilarity.histogram(grid("1|1", "1|1"), Rect(0, 0, 1, 1))
    val b = RegionSimilarity.histogram(grid("a|a", "a|a"), Rect(0, 0, 1, 1))
    val s = RegionSimilarity.crossCorrelation(a, b)
    assert(s >= 0.0 && s <= 1.0)
  }
  test("length mismatch is rejected") {
    intercept[IllegalArgumentException](
      RegionSimilarity.crossCorrelation(Array(1.0), Array(1.0, 2.0)))
  }

  test("fromElements uses the element bounding box and counts cells") {
    val g = grid("1|1| ", "1|1| ", " | | ", "2|2| ")
    val r = RegionSimilarity.fromElements(g, Vector(Rect(0, 0, 1, 1), Rect(0, 3, 1, 3)))
    assert(r.box == Rect(0, 0, 1, 3))
    assert(r.cellCount == 6)
    assert(r.fileId == "f")
  }
  test("fromBox counts only non-empty cells") {
    val g = grid("1| |1")
    val r = RegionSimilarity.fromBox(g, Rect(0, 0, 2, 0))
    assert(r.cellCount == 2)
  }
  test("regions of equivalent layouts from different files are highly similar") {
    // two 'files' of the same template: same schema, different values
    val g1 = grid("Firm Sales|Total", "1|11.5", "2|12.5", "3|13.5")
    val g2 = grid("Firm Demand|Peak", "7|9.25", "9|8.75", "4|7.25")
    val r1 = RegionSimilarity.fromBox(g1, Rect(0, 0, 1, 3))
    val r2 = RegionSimilarity.fromBox(g2, Rect(0, 0, 1, 3))
    assert(RegionSimilarity.similarity(r1, r2) > 0.99)
  }
}
