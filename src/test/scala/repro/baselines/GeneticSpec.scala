package repro.baselines

import repro.SparkSpec
import repro.baselines.genetic.GeneticTableRec
import repro.baselines.genetic.GeneticTableRec.Config
import repro.core.Geometry.Rect
import repro.corpus.{Corpora, SpreadsheetGen}
import repro.eval.Metrics

/** Genetic-based table recognition baseline (Koci et al.). */
class GeneticSpec extends SparkSpec {

  private lazy val files = Corpora.generate(spark, "gen", Vector(
    Corpora.TemplatePlan("gen-t0", SpreadsheetGen.FewRegions, 4),
    Corpora.TemplatePlan("gen-t1", SpreadsheetGen.FewRegions, 4),
    Corpora.TemplatePlan("gen-t2", SpreadsheetGen.One, 4)))

  private val cfg = Config(useStyle = true, folds = 3, population = 10, generations = 8)

  test("features include the style bit only in the XLS variant") {
    val f = files.head
    val xls = GeneticTableRec.features(f, 0, 0, useStyle = true)
    val csv = GeneticTableRec.features(f, 0, 0, useStyle = false)
    assert(xls.length == csv.length + 1)
  }

  test("cross-validated classification covers every file and non-empty cell") {
    val labels = GeneticTableRec.classifyCells(files, cfg)
    assert(labels.keySet == files.map(_.fileId).toSet)
    for (f <- files)
      assert(labels(f.fileId).keySet == f.grid.nonEmptyCells.toSet)
  }

  test("XLS cell classification accuracy is high (bold is decisive)") {
    val labels = GeneticTableRec.classifyCells(files, cfg)
    val scored = for {
      f <- files; ((x, y), pred) <- labels(f.fileId)
    } yield if (pred == GeneticTableRec.labelOf(f.roles(y)(x))) 1 else 0
    val acc = scored.sum.toDouble / scored.size
    assert(acc > 0.8, s"accuracy $acc")
  }

  test("CSV variant loses accuracy vs XLS (paper's style-feature gap)") {
    def acc(useStyle: Boolean): Double = {
      val labels = GeneticTableRec.classifyCells(files, cfg.copy(useStyle = useStyle))
      val scored = for {
        f <- files; ((x, y), pred) <- labels(f.fileId)
      } yield if (pred == GeneticTableRec.labelOf(f.roles(y)(x))) 1 else 0
      scored.sum.toDouble / scored.size
    }
    assert(acc(true) >= acc(false) - 0.02, "XLS should not be clearly worse than CSV")
  }

  test("vertices group 4-connected same-label cells") {
    val f = files.head
    val labels = Map((0, 0) -> 1, (1, 0) -> 1, (3, 0) -> 1, (0, 1) -> 0)
    val vs = GeneticTableRec.vertices(f.grid, labels)
    assert(vs.map(_.box).toSet == Set(Rect(0, 0, 1, 0), Rect(3, 0, 3, 0), Rect(0, 1, 0, 1)))
  }

  test("genetic recognition returns non-overlapping covering boxes for labeled cells") {
    val f = files.head
    val labels = GeneticTableRec.classifyCells(files, cfg)(f.fileId)
    val boxes = GeneticTableRec.recognize(f.grid, labels, cfg, runSeed = 1)
    assert(boxes.nonEmpty)
    for ((x, y) <- f.grid.nonEmptyCells)
      assert(boxes.exists(_.contains(x, y)), s"cell ($x,$y) uncovered")
  }

  test("end-to-end detection achieves reasonable IoU against gold") {
    val det = GeneticTableRec.detect(spark, files, cfg, runSeed = 0)
    val scores = files.flatMap { f =>
      Metrics.regionScores(f.grid, det(f.fileId), f.regionBoxes).map(_._1)
    }
    val mean = scores.sum / scores.size
    assert(mean > 0.5, s"mean IoU $mean")
  }

  test("detection is reproducible for a fixed run seed") {
    val a = GeneticTableRec.detect(spark, files.take(3), cfg, runSeed = 5)
    val b = GeneticTableRec.detect(spark, files.take(3), cfg, runSeed = 5)
    assert(a == b)
  }
}
