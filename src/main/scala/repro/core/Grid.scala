package repro.core

/** A spreadsheet file normalized to a rectangular grid of raw cell strings.
  *
  * Rows are padded with empty cells to the longest row's length (paper §4.1:
  * native csv files need not have the same number of delimiters per row).
  * Coordinates are (x, y) = (column, row) with the origin top-left, matching
  * the paper's Euclidean-space convention.
  *
  * @param fileId   unique file identifier within a corpus
  * @param rows     padded grid, `rows(y)(x)` is the raw content of cell (x,y)
  */
final case class FileGrid(fileId: String, rows: Array[Array[String]]) {
  /** Grid height (number of rows, M in the paper). */
  def height: Int = rows.length
  /** Grid width (number of columns, N in the paper). */
  def width: Int = if (rows.isEmpty) 0 else rows(0).length

  def cell(x: Int, y: Int): String = rows(y)(x)

  /** Syntactic-type code of cell (x, y); 0 is Empty. */
  def typeCode(x: Int, y: Int): Int = Cells.synType(rows(y)(x)).code

  /** All non-empty cell coordinates, row-major. */
  def nonEmptyCells: IndexedSeq[(Int, Int)] =
    for {
      y <- 0 until height
      x <- 0 until width
      if !Cells.isEmpty(rows(y)(x))
    } yield (x, y)
}

object Grid {

  /** Splits one csv line on the delimiter, honoring double-quote quoting
    * (quotes may wrap fields containing delimiters; "" escapes a quote).
    */
  def splitCsvLine(line: String, delim: Char = ','): Array[String] = {
    val out = scala.collection.mutable.ArrayBuffer.empty[String]
    val sb  = new StringBuilder
    var inQ = false
    var i   = 0
    while (i < line.length) {
      val c = line.charAt(i)
      if (inQ) {
        if (c == '"') {
          if (i + 1 < line.length && line.charAt(i + 1) == '"') { sb.append('"'); i += 1 }
          else inQ = false
        } else sb.append(c)
      } else {
        if (c == '"') inQ = true
        else if (c == delim) { out += sb.result(); sb.clear() }
        else sb.append(c)
      }
      i += 1
    }
    out += sb.result()
    out.toArray
  }

  /** Parses csv text into a padded [[FileGrid]] (paper §4.1). */
  def fromCsv(fileId: String, text: String, delim: Char = ','): FileGrid = {
    val raw   = text.split("\n", -1).toIndexedSeq
    val lines = raw.take(raw.lastIndexWhere(_.nonEmpty) + 1)
    val cells = lines.map(l => splitCsvLine(l, delim))
    val w     = if (cells.isEmpty) 0 else cells.map(_.length).max
    FileGrid(fileId, cells.map(r => r.padTo(w, "")).toArray)
  }

  /** Builds a grid from already-split rows, padding to the longest row. */
  def fromRows(fileId: String, rows: Seq[Seq[String]]): FileGrid = {
    val w = if (rows.isEmpty) 0 else rows.map(_.length).max
    FileGrid(fileId, rows.map(r => r.padTo(w, "").toArray).toArray)
  }
}
