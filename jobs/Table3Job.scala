package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.core.TemplateInference
import repro.corpus.Corpora
import repro.eval.{Metrics, Strategies}

/** spark-submit entrypoint regenerating paper Table 3 (template inference
  * H/C/V at τ_f = 0.99 by gold region-count class, static-radius regions).
  *
  * Usage: spark-submit --class repro.jobs.Table3Job repro-jobs.jar [tauF]
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("mondrian-table3").getOrCreate()
    val tauF = args.headOption.map(_.toDouble).getOrElse(0.99)
    for (name <- Seq("deco", "fuste")) {
      val all = if (name == "deco") Corpora.deco(spark) else Corpora.fuste(spark)
      val files = Corpora.excludeOutliers(all)
      val other = if (name == "deco") Corpora.fuste(spark) else Corpora.deco(spark)
      val regions = Strategies.detect(spark, "Static Radius", name, files, other)
      val result = TemplateInference.infer(spark, Strategies.layouts(files, regions),
        TemplateInference.Params(tauLayout = tauF))
      for ((cls, fs) <- files.groupBy(f => f.regions.size match {
        case 1 => "1"; case n if n <= 5 => "[2,5]"; case _ => ">=6"
      }).toSeq.sortBy(_._1)) {
        val (h, c, v) = Metrics.vMeasure(fs.map(f => (f.templateId.hashCode, result.templateOf(f.fileId))))
        println(f"[$name] regions=$cls%-6s files=${fs.size}%4d H=$h%.2f C=$c%.2f V=$v%.2f (tauF=$tauF)")
      }
    }
    spark.stop()
  }
}
