package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Geometry.Rect

/** Connected components and rectilinear partitioning (paper §4.1, Fig 4–5). */
class SegmentationSpec extends AnyFunSuite {

  private def grid(rows: String*): FileGrid =
    Grid.fromRows("f", rows.map(_.split("\\|", -1).toSeq))

  test("empty grid has no components") {
    assert(Segmentation.connectedComponents(Grid.fromRows("f", Seq.empty)).isEmpty)
  }
  test("all-empty grid has no components") {
    assert(Segmentation.connectedComponents(grid("| |", "| |")).isEmpty)
  }
  test("single cell is one component") {
    val cs = Segmentation.connectedComponents(grid("a"))
    assert(cs.size == 1 && cs.head.cells == Vector((0, 0)))
  }
  test("horizontally adjacent cells join one component") {
    assert(Segmentation.connectedComponents(grid("a|b|c")).size == 1)
  }
  test("vertically adjacent cells join one component") {
    assert(Segmentation.connectedComponents(grid("a", "b", "c")).size == 1)
  }
  test("diagonal cells are separate components (4-connectivity)") {
    assert(Segmentation.connectedComponents(grid("a| ", " |b")).size == 2)
  }
  test("empty column splits components") {
    assert(Segmentation.connectedComponents(grid("a| |b", "a| |b")).size == 2)
  }
  test("empty row splits components") {
    assert(Segmentation.connectedComponents(grid("a|a", " | ", "b|b")).size == 2)
  }
  test("component bounding box") {
    val cs = Segmentation.connectedComponents(grid("a|a| ", " |a| "))
    assert(cs.head.boundingBox == Rect(0, 0, 1, 1))
  }
  test("components cover every non-empty cell exactly once") {
    val g = grid("a| |b|b", "a| | |b", " | |b|b")
    val cs = Segmentation.connectedComponents(g)
    val all = cs.flatMap(_.cells)
    assert(all.size == all.distinct.size)
    assert(all.toSet == g.nonEmptyCells.toSet)
  }

  test("partition of a solid rectangle is itself") {
    val cs = Segmentation.connectedComponents(grid("a|a|a", "a|a|a"))
    assert(Segmentation.partition(cs.head) == Vector(Rect(0, 0, 2, 1)))
  }
  test("partition of a single cell is itself") {
    val cs = Segmentation.connectedComponents(grid("a"))
    assert(Segmentation.partition(cs.head) == Vector(Rect(0, 0, 0, 0)))
  }
  test("L-shaped component splits into two rectangles") {
    val g = grid("a| ", "a| ", "a|a")
    val parts = Segmentation.partition(Segmentation.connectedComponents(g).head)
    assert(parts.size == 2)
    assert(parts.toSet == Set(Rect(0, 0, 0, 1), Rect(0, 2, 1, 2)))
  }
  test("T-shaped component splits at the concave rows") {
    val g = grid("a|a|a", " |a| ")
    val parts = Segmentation.partition(Segmentation.connectedComponents(g).head)
    assert(parts.toSet == Set(Rect(0, 0, 2, 0), Rect(1, 1, 1, 1)))
  }
  test("two adjacent tables of different heights partition at the height change (Fig 5)") {
    // taller left table + shorter right table, directly adjacent
    val g = grid("a|a|b|b", "a|a|b|b", "a|a| | ")
    val parts = Segmentation.partition(Segmentation.connectedComponents(g).head)
    // shared band rows 0-1 full width, overhang row 2 on the left
    assert(parts.toSet == Set(Rect(0, 0, 3, 1), Rect(0, 2, 1, 2)))
  }
  test("partition tiles the component exactly (no overlap, full cover)") {
    val rnd = new scala.util.Random(5)
    for (_ <- 0 until 50) {
      val rows = Vector.fill(6)(Vector.fill(6)(if (rnd.nextBoolean()) "x" else ""))
      val g = Grid.fromRows("f", rows.map(_.toSeq))
      for (c <- Segmentation.connectedComponents(g)) {
        val covered = Segmentation.partition(c).flatMap(_.cells)
        assert(covered.size == covered.distinct.size, "rectangles overlap")
        assert(covered.toSet == c.cells.toSet, "rectangles must tile the component")
      }
    }
  }
  test("elements pipeline returns partitioned rectangles of every component") {
    val g = grid("a| |b", "a| | ")
    val es = Segmentation.elements(g)
    assert(es.toSet == Set(Rect(0, 0, 0, 1), Rect(2, 0, 2, 0)))
  }
  test("elements contain only non-empty cells") {
    val g = grid("a|a| ", "a| | ", " | |b")
    for (e <- Segmentation.elements(g); (x, y) <- e.cells)
      assert(!Cells.isEmpty(g.cell(x, y)))
  }
}
