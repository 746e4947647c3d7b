package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.data.Datasets
import repro.exp.Experiments

/** spark-submit entrypoint for Table 3 (dataset statistics).
  *
  * Usage: spark-submit --class repro.jobs.JobTable3DatasetStats repro.jar
  */
object JobTable3DatasetStats {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("Table3DatasetStats").getOrCreate()
    val rows = Datasets.all.map { spec =>
      val df = Datasets.generate(spark, spec, Experiments.benchScale(spec))
      val stats = df.agg(countDistinct(col("color")), count(lit(1))).collect()(0)
      Seq(spec.name, spec.m.toString, spec.d.toString, spec.nPaper.toString,
        stats.getLong(1).toString, stats.getLong(0).toString)
    }
    Experiments.printTable("Table 3: dataset statistics",
      Seq("Dataset", "m", "d", "n (paper)", "n (ours)", "m (observed)"), rows)
    spark.stop()
  }
}
