package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.TemplateInference
import repro.corpus.Corpora
import repro.eval.{Metrics, Strategies}

/** Paper Table 3: template inference at varying number of regions
  * (homogeneity / completeness / v-measure at τ_f = 0.99, regions detected
  * by Mondrian in the static-radius scenario, outliers excluded).
  *
  * Paper values:
  *   DECO : 1 region  232 files H .92 C .97 V .94 | [2,5] 470 H .97 C .98 V .98 | >=6 150 H .99 C .98 V .99
  *   FUSTE: 1 region  495 files H .98 C .68 V .80 | [2,5] 372 H .98 C .76 V .86 | >=6  18 H 1.00 C .95 V .97
  */
class Table3Bench extends AnyFunSuite {

  private val paper = Map(
    ("deco", "1")      -> (232, 0.92, 0.97, 0.94),
    ("deco", "[2, 5]") -> (470, 0.97, 0.98, 0.98),
    ("deco", ">= 6")   -> (150, 0.99, 0.98, 0.99),
    ("fuste", "1")      -> (495, 0.98, 0.68, 0.80),
    ("fuste", "[2, 5]") -> (372, 0.98, 0.76, 0.86),
    ("fuste", ">= 6")   -> (18, 1.00, 0.95, 0.97),
  )

  private def run(name: String): Map[String, (Int, Double, Double, Double)] = {
    val spark = BenchSupport.spark
    val files = Corpora.excludeOutliers(BenchSupport.corpus(name))
    val other = BenchSupport.corpus(if (name == "deco") "fuste" else "deco")
    val regions = Strategies.detect(spark, "Static Radius", name, files, other)
    val layouts = Strategies.layouts(files, regions)
    val result = TemplateInference.infer(spark, layouts,
      TemplateInference.Params(tauLayout = 0.99))
    val byClass = files.groupBy(BenchSupport.regionClass)
    byClass.map { case (cls, fs) =>
      val assignments = fs.map(f => (f.templateId.hashCode, result.templateOf(f.fileId)))
      val (h, c, v) = Metrics.vMeasure(assignments)
      cls -> (fs.size, h, c, v)
    }
  }

  test("Table 3: template inference at varying number of regions") {
    val rows = for {
      ds <- Seq("deco", "fuste")
      measured = run(ds)
      cls <- Seq("1", "[2, 5]", ">= 6")
    } yield {
      val (pN, pH, pC, pV) = paper((ds, cls))
      val (n, h, c, v) = measured(cls)
      Seq(ds.toUpperCase, cls, s"$pN", s"$n",
        f"$pH%.2f", f"$h%.2f", f"$pC%.2f", f"$c%.2f", f"$pV%.2f", f"$v%.2f")
    }
    BenchSupport.printTable("Paper Table 3 — template inference at varying number of regions (tau_f = 0.99)",
      Seq("dataset", "regions", "#files paper", "#files ours",
          "H paper", "H ours", "C paper", "C ours", "V paper", "V ours"),
      rows)

    val byKey = rows.map(r => (r(0).toLowerCase, r(1)) -> r).toMap
    // file-count marginals match the paper by construction (±1 from the
    // outlier-exclusion bookkeeping)
    for (((ds, cls), row) <- byKey) {
      val (pN, _, _, _) = paper((ds, cls))
      assert(math.abs(row(3).toInt - pN) <= 2, s"$ds/$cls file count ${row(3)} vs $pN")
    }
    // shape assertions: homogeneity high everywhere; scores improve with
    // more regions per file; fuste completeness lags deco completeness
    for (((_, _), row) <- byKey) assert(row(5).toDouble >= 0.85, s"H low: $row")
    for (ds <- Seq("deco", "fuste")) {
      val v1 = byKey((ds, "1"))(9).toDouble
      val v6 = byKey((ds, ">= 6"))(9).toDouble
      assert(v6 >= v1 - 0.05, s"$ds: many-region files should score best (v1=$v1 v6=$v6)")
    }
    val cDeco = byKey(("deco", "[2, 5]"))(7).toDouble
    val cFuste = byKey(("fuste", "[2, 5]"))(7).toDouble
    assert(cFuste <= cDeco + 0.05, "fuste completeness should not exceed deco (template fragmentation)")
  }
}
