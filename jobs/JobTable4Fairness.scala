package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.data.Datasets
import repro.exp.Experiments

/** spark-submit entrypoint for Table 4 (avg missed points per color for
  * MFD-0.1 / MFD-0.3 on Diabetes and Popsim).
  *
  * Usage: spark-submit --class repro.jobs.JobTable4Fairness repro.jar
  */
object JobTable4Fairness {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("Table4Fairness").getOrCreate()
    for (spec <- Seq(Datasets.diabetes, Datasets.popsim)) {
      val rows = Experiments.fairnessSweep(spark, spec,
        Seq(20, 40, 60, 80, 100), Seq(0.1, 0.3), reps = 5)
      val colors = (0 until spec.m).toSeq
      Experiments.printTable(
        s"Table 4 (${spec.name}): avg missed per color, 5 runs",
        Seq("Dataset", "k", "g") ++ colors.map(c => s"c$c") :+ "total",
        rows.map(r => Seq(r.dataset, r.k.toString, r.g.toString) ++
          colors.map(c => f"${r.missedPerColor.getOrElse(c, 0.0)}%.1f") :+
          f"${r.missedTotal}%.1f"))
    }
    spark.stop()
  }
}
