package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.corpus.Corpora

/** spark-submit entrypoint regenerating paper Table 2 (dataset overview).
  *
  * Usage: spark-submit --class repro.jobs.Table2Job repro-jobs.jar
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("mondrian-table2").getOrCreate()
    for (name <- Seq("deco", "fuste")) {
      val files = if (name == "deco") Corpora.deco(spark) else Corpora.fuste(spark)
      val df = Corpora.filesDF(spark, files)
      val row = df.select(
        count(lit(1)).as("files"),
        sum(when(col("n_regions") === 1, 1).otherwise(0)).as("single"),
        sum(when(col("n_regions") > 1, 1).otherwise(0)).as("multi")).collect()(0)
      val t = df.groupBy("template_id").agg(count(lit(1)).as("n"))
        .select(count(lit(1)).as("templates"),
          sum(when(col("n") === 1, 1).otherwise(0)).as("singleton"),
          sum(when(col("n") > 1, 1).otherwise(0)).as("multifile")).collect()(0)
      println(s"[$name] files=${row.getLong(0)} single=${row.getLong(1)} multi=${row.getLong(2)} " +
        s"templates=${t.getLong(0)} singleton=${t.getLong(1)} multifile=${t.getLong(2)}")
    }
    spark.stop()
  }
}
