package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.data.Datasets
import repro.exp.Experiments

/** spark-submit entrypoint for the Fig. 5/6/9 end-to-end comparison (equal
  * k_j) and Fig. 7/8 (pass `proportional` as first arg).
  *
  * Usage: spark-submit --class repro.jobs.JobEndToEnd repro.jar [proportional]
  */
object JobEndToEnd {
  def main(args: Array[String]): Unit = {
    val proportional = args.contains("proportional")
    val spark = SparkSession.builder.appName("EndToEnd").getOrCreate()
    val specs = Seq(Datasets.adult, Datasets.census, Datasets.popsim1M, Datasets.popsim)
    for (spec <- specs; k <- Seq(20, 60, 100)) {
      val rows = Experiments.endToEnd(spark, spec, k, proportional)
      Experiments.printTable(
        s"${spec.name} k=$k (${if (proportional) "proportional" else "equal"} k_j)",
        Seq("Algorithm", "diversity", "time", "missed"),
        rows.map(r => Seq(r.algo, r.divStr, r.timeStr, f"${r.missedTotal}%.1f")))
    }
    spark.stop()
  }
}
