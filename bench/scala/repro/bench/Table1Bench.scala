package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Cells

/** Paper Table 1: data types and their colors (spec table).
  *
  * This bench regenerates the type/sub-type/sample/color table and checks
  * each sample parses to its row's sub-type. Shades were re-derived so that
  * same-fundamental sub-types share a histogram bin (DESIGN.md §5).
  */
class Table1Bench extends AnyFunSuite {

  test("Table 1: data types and their colors") {
    val rows = Seq(
      ("Empty",    "Empty",          "«»",            Cells.Empty),
      ("Number",   "Integer",        "14",            Cells.IntegerSt),
      ("Number",   "Floating-point", "47.74",         Cells.FloatSt),
      ("Datetime", "Time",           "17:00",         Cells.TimeSt),
      ("Datetime", "Date",           "17/9/20",       Cells.DateSt),
      ("String",   "Uppercase",      "MWH",           Cells.UppercaseSt),
      ("String",   "Lowercase",      "real/time",     Cells.LowercaseSt),
      ("String",   "Titlecase",      "Firm Sales",    Cells.TitlecaseSt),
      ("String",   "Generic",        "System avg. =", Cells.GenericSt),
    )
    BenchSupport.printTable("Paper Table 1 — data types and their colors",
      Seq("Type", "Sub-type", "Sample cell", "RGB"),
      rows.map { case (t, st, sample, ty) => Seq(t, st, sample, ty.rgb.toString) })
    for ((_, _, sample, ty) <- rows if ty != Cells.Empty)
      assert(Cells.synType(sample) == ty, s"sample '$sample'")
    assert(Cells.synType("") == Cells.Empty)
    assert(Cells.all.map(_.rgb).distinct.size == 9)
  }
}
