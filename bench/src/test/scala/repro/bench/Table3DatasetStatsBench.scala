package repro.bench

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.Datasets
import repro.exp.Experiments

/** Table 3 — dataset statistics. Prints the synthetic stand-ins' m, d, n at
  * bench scale next to the paper's n; Spark aggregates oracle-checked.
  */
class Table3DatasetStatsBench extends SparkSpec {

  test("Table 3: dataset statistics (paper vs synthetic at bench scale)") {
    val rows = Datasets.all.map { spec =>
      val df = Datasets.generate(spark, spec, Experiments.benchScale(spec))
      val stats = df.agg(
        countDistinct(col("color")).as("m"),
        count(lit(1)).as("n")).collect()(0)
      val mGot = stats.getLong(0)
      val nGot = stats.getLong(1)
      assert(mGot == spec.m, s"${spec.name}: m=$mGot != ${spec.m}")
      assert(nGot == spec.n(Experiments.benchScale(spec)))
      Seq(spec.name, spec.m.toString, spec.d.toString, spec.nPaper.toString, nGot.toString)
    }
    Experiments.printTable("Table 3: dataset statistics",
      Seq("Dataset", "m", "d", "n (paper)", "n (ours)"), rows)
  }

  test("Table 3: per-color histogram oracle-checked (Census)") {
    val spec = Datasets.census
    val df = Datasets.generate(spark, spec, 0.01)
    val sparkCounts = df.groupBy("color").agg(count(lit(1)).as("cnt"))
      .select(col("color").cast("string").as("color"), col("cnt"))
    Oracle.assertEquivalent(
      sparkCounts,
      "SELECT color, count(*) AS cnt FROM census GROUP BY color",
      "census" -> df.select(col("id").cast("string"), col("color").cast("string")))
  }
}
