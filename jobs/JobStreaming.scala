package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments

/** spark-submit entrypoint for the Fig. 10 streaming comparison on Beer.
  *
  * Usage: spark-submit --class repro.jobs.JobStreaming repro.jar
  */
object JobStreaming {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("Streaming").getOrCreate()
    for (k <- Seq(10, 20, 50)) {
      val rows = Experiments.streaming(spark, k)
      Experiments.printTable(
        s"Fig 10 (Beer, k=$k)",
        Seq("Algorithm", "update (us/item)", "post (ms)", "diversity", "stored"),
        rows.map(r => Seq(r.algo, f"${r.updateMicros}%.2f", r.postMillis.toString,
          f"${r.diversity}%.3f", r.stored.toString)))
    }
    spark.stop()
  }
}
