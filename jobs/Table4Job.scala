package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.TemplateInference
import repro.corpus.Corpora
import repro.eval.Strategies

/** spark-submit entrypoint regenerating paper Table 4 (template inference
  * wall time per region-detection strategy, mean ± std over 3 runs).
  *
  * Usage: spark-submit --class repro.jobs.Table4Job repro-jobs.jar [runs]
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("mondrian-table4").getOrCreate()
    val runs = args.headOption.map(_.toInt).getOrElse(3)
    for (name <- Seq("deco", "fuste")) {
      val files = Corpora.excludeOutliers(
        if (name == "deco") Corpora.deco(spark) else Corpora.fuste(spark))
      val other = if (name == "deco") Corpora.fuste(spark) else Corpora.deco(spark)
      for (strategy <- Strategies.All) {
        val times = (0 until runs).map { run =>
          val regions = Strategies.detect(spark, strategy, name, files, other, runSeed = run)
          val layouts = Strategies.layouts(files, regions)
          val t0 = System.nanoTime()
          TemplateInference.infer(spark, layouts, TemplateInference.Params(tauLayout = 0.99))
          (System.nanoTime() - t0) / 1e9
        }
        val m = times.sum / runs
        val s = math.sqrt(times.map(t => (t - m) * (t - m)).sum / runs)
        println(f"[$name] $strategy%-22s ${m}%8.2f s ± $s%5.2f")
      }
    }
    spark.stop()
  }
}
