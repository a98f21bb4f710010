package repro.eval

import repro.SparkSpec
import repro.corpus.{Corpora, SpreadsheetGen}
import repro.core.Mondrian

/** The seven Table-4 region-detection strategies, smoke-tested end to end. */
class StrategiesSpec extends SparkSpec {

  private lazy val deco = Corpora.generate(spark, "st-deco", Vector(
    Corpora.TemplatePlan("st-deco-t0", SpreadsheetGen.FewRegions, 3),
    Corpora.TemplatePlan("st-deco-t1", SpreadsheetGen.One, 3)))
  private lazy val fuste = Corpora.generate(spark, "st-fuste", Vector(
    Corpora.TemplatePlan("st-fuste-t0", SpreadsheetGen.FewRegions, 3),
    Corpora.TemplatePlan("st-fuste-t1", SpreadsheetGen.One, 3)))

  test("strategy list matches paper Table 4 rows") {
    assert(Strategies.All == Vector("Gold Standard", "Dynamic Radius", "Static Radius",
      "Connected Components", "Genetic (XLS)", "Genetic (CSV)", "Tablesense"))
  }

  test("paramsFor selects per-dataset hyperparameters") {
    assert(Strategies.paramsFor("deco") == Mondrian.DecoParams)
    assert(Strategies.paramsFor("fuste") == Mondrian.FusteParams)
  }

  for (s <- Strategies.All) {
    test(s"strategy '$s' produces regions for every file") {
      val regions = Strategies.detect(spark, s, "deco", deco, fuste)
      assert(regions.keySet == deco.map(_.fileId).toSet)
      // every file with non-empty cells gets at least one region, except
      // Tablesense which by design may miss whole files
      if (s != "Tablesense")
        for (f <- deco if f.grid.nonEmptyCells.nonEmpty)
          assert(regions(f.fileId).nonEmpty, s"no regions for ${f.fileId}")
    }
  }

  test("gold strategy reproduces the gold boxes exactly") {
    val regions = Strategies.detect(spark, "Gold Standard", "deco", deco, fuste)
    for (f <- deco)
      assert(regions(f.fileId).map(_.box) == f.regionBoxes)
  }

  test("dynamic radius is at least as good as static against gold IoU") {
    val stat = Strategies.detect(spark, "Static Radius", "deco", deco, fuste)
    val dyn  = Strategies.detect(spark, "Dynamic Radius", "deco", deco, fuste)
    def meanIoU(m: Map[String, Vector[repro.core.Region]]): Double = {
      val s = deco.flatMap(f => Metrics.regionScores(f.grid, m(f.fileId).map(_.box), f.regionBoxes).map(_._1))
      s.sum / s.size
    }
    assert(meanIoU(dyn) >= meanIoU(stat) - 1e-9)
  }

  test("unknown strategy is rejected") {
    intercept[IllegalArgumentException](Strategies.detect(spark, "Nope", "deco", deco, fuste))
  }

  test("layouts builds one graph per file in corpus order") {
    val regions = Strategies.detect(spark, "Gold Standard", "deco", deco, fuste)
    val ls = Strategies.layouts(deco, regions)
    assert(ls.map(_.fileId) == deco.map(_.fileId))
    assert(ls.forall(g => g.size == regions(g.fileId).size))
  }
}
