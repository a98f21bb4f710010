package repro.eval

import org.apache.spark.sql.SparkSession
import repro.baselines.genetic.GeneticTableRec
import repro.baselines.tablesense.TableSenseSim
import repro.core._
import repro.corpus.SpreadsheetGen.GoldFile

/** The seven region-detection strategies of paper §5.2/§5.5 (Table 4 rows),
  * each yielding per-file regions ready for template inference.
  */
object Strategies {

  /** Strategy names exactly as printed in paper Table 4. */
  val All: Vector[String] = Vector(
    "Gold Standard", "Dynamic Radius", "Static Radius", "Connected Components",
    "Genetic (XLS)", "Genetic (CSV)", "Tablesense")

  /** Per-dataset Mondrian clustering parameters (§5.2). */
  def paramsFor(dataset: String): Clustering.Params =
    if (dataset.startsWith("deco")) Mondrian.DecoParams else Mondrian.FusteParams

  /** Runs one strategy over a corpus; detection is parallelized per file on
    * Spark. For "Tablesense", `other` is the training corpus (cross-dataset
    * setup); `runSeed` feeds the non-deterministic ML baselines.
    */
  def detect(spark: SparkSession, strategy: String, dataset: String,
             files: Vector[GoldFile], other: Vector[GoldFile],
             runSeed: Long = 0): Map[String, Vector[Region]] = {
    val p = paramsFor(dataset)
    def parallel(f: GoldFile => Vector[Region]): Map[String, Vector[Region]] =
      spark.sparkContext
        .parallelize(files, math.min(files.size, spark.sparkContext.defaultParallelism * 4))
        .map(g => g.fileId -> f(g))
        .collect()
        .toMap

    strategy match {
      case "Gold Standard" =>
        parallel(g => Mondrian.regionsFromBoxes(g.grid, g.regionBoxes))
      case "Static Radius" =>
        parallel(g => Mondrian.detectRegions(g.grid, p))
      case "Dynamic Radius" =>
        // per-file optimal radius against the gold standard (§5.2): the
        // score is the mean IoU of the gold regions vs. the detected ones
        parallel { g =>
          val grid = g.grid
          val gold = g.regionBoxes
          Mondrian.detectRegionsDynamic(grid, p, regions =>
            if (gold.isEmpty) 0.0
            else Metrics.regionScores(grid, regions.map(_.box), gold).map(_._1).sum / gold.size
          )._2
        }
      case "Connected Components" =>
        parallel(g => Mondrian.detectRegionsCC(g.grid))
      case "Genetic (XLS)" =>
        val boxes = GeneticTableRec.detect(spark, files, GeneticTableRec.Config(useStyle = true), runSeed)
        parallel(g => Mondrian.regionsFromBoxes(g.grid, boxes.getOrElse(g.fileId, Vector.empty)))
      case "Genetic (CSV)" =>
        val boxes = GeneticTableRec.detect(spark, files, GeneticTableRec.Config(useStyle = false), runSeed)
        parallel(g => Mondrian.regionsFromBoxes(g.grid, boxes.getOrElse(g.fileId, Vector.empty)))
      case "Tablesense" =>
        val boxes = TableSenseSim.detect(spark, other, files, runSeed = runSeed)
        parallel(g => Mondrian.regionsFromBoxes(g.grid, boxes.getOrElse(g.fileId, Vector.empty)))
      case s => throw new IllegalArgumentException(s"unknown strategy $s")
    }
  }

  /** Layout graphs from per-file regions. */
  def layouts(files: Vector[GoldFile], regions: Map[String, Vector[Region]]): Vector[LayoutGraph] =
    files.map(f => LayoutGraph.build(f.fileId, regions.getOrElse(f.fileId, Vector.empty)))
}
