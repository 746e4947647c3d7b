package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.data.Datasets
import repro.exp.Experiments

/** spark-submit entrypoint for the Fig. 3/4 micro-benchmark (MFD early-
  * stopping g sweep on Adult).
  *
  * Usage: spark-submit --class repro.jobs.JobGSweep repro.jar
  */
object JobGSweep {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("GSweep").getOrCreate()
    val rows = Experiments.fairnessSweep(spark, Datasets.adult,
      Seq(20, 60, 100), Seq(0.1, 0.3, 0.5, 0.7), reps = 3)
    Experiments.printTable(
      "Fig 3/4 (Adult): diversity & runtime vs g",
      Seq("k", "g", "diversity", "time (ms)", "missed total"),
      rows.map(r => Seq(r.k.toString, r.g.toString, f"${r.diversity}%.3f",
        r.millis.toString, f"${r.missedTotal}%.1f")))
    spark.stop()
  }
}
