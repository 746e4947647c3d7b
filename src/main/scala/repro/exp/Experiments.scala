package repro.exp

import org.apache.spark.sql.SparkSession
import repro.baselines._
import repro.core._
import repro.data.Datasets
import repro.stream.StreamMFD

/** Experiment runner shared by the bench suites (`bench/`) and the
  * spark-submit entrypoints (`jobs/`). Each public method reproduces one
  * table/figure of the paper's §6 and returns printable rows; the bench
  * suites print them as markdown tables (recorded in EXPERIMENTS.md).
  *
  * Scaling knobs (paper → here):
  *  - data scale: per-dataset factor (small datasets kept at full n, the
  *    million-size ones at ×0.1 — DESIGN.md §4);
  *  - run cap: 120 s (paper: 30 min) — exceeded runs are reported "DNF";
  *  - repetitions: MFD-family algorithms are randomized; reps configurable.
  */
object Experiments {

  val DefaultDeadlineMs: Long = sys.env.getOrElse("BENCH_DEADLINE_MS", "120000").toLong

  /** Per-dataset scale: keep the small UCI sets at full size, scale the
    * million-size ones by BENCH_SCALE (default 0.1).
    */
  def benchScale(spec: Datasets.Spec): Double = {
    val s = sys.env.getOrElse("BENCH_SCALE", "0.1").toDouble
    if (spec.nPaper <= 150000L) math.min(1.0, s * 10) else s
  }

  /** Cached collected datasets (bench reuses across suites in one JVM). */
  private val cache = scala.collection.mutable.Map[String, Array[LabeledPoint]]()
  private val dsCache = scala.collection.mutable.Map[String, org.apache.spark.sql.Dataset[LabeledPoint]]()

  def load(spark: SparkSession, spec: Datasets.Spec): Array[LabeledPoint] =
    cache.getOrElseUpdate(spec.name, {
      Datasets.points(spark, spec, benchScale(spec)).collect().sortBy(_.id)
    })

  /** The same data as a persisted distributed Dataset (for the Spark coreset
    * pipeline) — generation is deterministic, so this matches [[load]].
    */
  def loadDS(spark: SparkSession, spec: Datasets.Spec): org.apache.spark.sql.Dataset[LabeledPoint] =
    dsCache.getOrElseUpdate(spec.name, {
      val ds = Datasets.points(spark, spec, benchScale(spec))
        .repartition(spark.sparkContext.defaultParallelism).persist()
      ds.count() // materialise so MFD timings don't include generation
      ds
    })

  /** Clip k to colors that actually exist with enough points. */
  def attainable(pts: Array[LabeledPoint], k: Map[Int, Int]): Map[Int, Int] = {
    val counts = Points.colorCounts(pts.toSeq)
    k.flatMap { case (c, kc) =>
      val n = counts.getOrElse(c, 0)
      if (n == 0) None else Some(c -> math.min(kc, n))
    }
  }

  final case class Run(algo: String, dataset: String, k: Int, diversity: Double,
                       millis: Long, dnf: Boolean, missedTotal: Double) {
    def divStr: String = if (dnf) "DNF" else f"$diversity%.3f"
    def timeStr: String = if (dnf) "DNF" else f"${millis / 1000.0}%.2f s"
  }

  private def timed[A](body: => A): (Option[A], Long) = {
    val t0 = System.nanoTime()
    try {
      val a = body
      (Some(a), (System.nanoTime() - t0) / 1000000)
    } catch {
      case _: Deadline.Exceeded => (None, (System.nanoTime() - t0) / 1000000)
    }
  }

  /** One baseline invocation with deadline + DNF accounting. */
  private def runBaseline(name: String, dataset: String, k: Map[Int, Int], kLabel: Int,
                          body: Long => Array[LabeledPoint]): Run = {
    val deadline = Deadline.in(DefaultDeadlineMs)
    val (res, ms) = timed(body(deadline))
    res match {
      case Some(sel) =>
        Run(name, dataset, kLabel, Points.diversity(sel.toSeq), ms, dnf = false,
          Points.missedPerColor(sel.toSeq, k).values.sum)
      case None => Run(name, dataset, kLabel, 0.0, ms, dnf = true, 0.0)
    }
  }

  /** MFD via the Spark coreset pipeline: coreset once (deterministic), then
    * `reps` MWU+round repetitions with distinct seeds; averaged.
    */
  def runMFD(spark: SparkSession, spec: Datasets.Spec, pts: Array[LabeledPoint],
             k: Map[Int, Int], kLabel: Int, g: Double, reps: Int,
             eps: Double = 0.3): Run = {
    val deadline = Deadline.in(DefaultDeadlineMs)
    val kTotal = k.values.sum
    val t0 = System.nanoTime()
    val ds = loadDS(spark, spec)
    val coreset = CoresetSpark.distributed(ds, kTotal)
    val coresetMs = (System.nanoTime() - t0) / 1000000
    val kAdj = attainable(coreset, k)
    var divSum = 0.0; var missSum = 0.0; var msSum = 0L; var ok = 0
    for (rep <- 1 to reps) {
      val cfg = MFD.Config(eps = eps, g = g, seed = 1000L * rep, deadlineNanos = deadline)
      val (res, ms) = timed(MFD.run(coreset, kAdj, cfg))
      res.foreach { r =>
        divSum += (if (r.diversity.isInfinity) 0.0 else r.diversity)
        missSum += Points.missedPerColor(r.selected.toSeq, k).values.sum
        msSum += ms
        ok += 1
      }
    }
    if (ok == 0) Run(s"MFD-$g", spec.name, kLabel, 0.0, DefaultDeadlineMs, dnf = true, 0.0)
    else Run(s"MFD-$g", spec.name, kLabel, divSum / ok, coresetMs + msSum / ok, dnf = false, missSum / ok)
  }

  /** The paper's Fig. 5/6 (equal k_j) / Fig. 7/8 (proportional) comparison
    * on one dataset and one k: every algorithm, diversity + runtime.
    */
  def endToEnd(spark: SparkSession, spec: Datasets.Spec, kTotal: Int,
               proportional: Boolean, mfdReps: Int = 3): Seq[Run] = {
    val pts = load(spark, spec)
    val kRaw = if (proportional) Datasets.proportionalK(spec, kTotal) else Datasets.equalK(spec.m, kTotal)
    val k = attainable(pts, kRaw)
    val rows = scala.collection.mutable.ArrayBuffer[Run]()
    rows += runMFD(spark, spec, pts, k, kTotal, g = 0.3, reps = mfdReps)
    rows += runBaseline("FairFlow", spec.name, k, kTotal, d => FairFlow.select(pts, k, d))
    rows += runBaseline("FairGreedyFlow", spec.name, k, kTotal, d => FairGreedyFlow.select(pts, k, d))
    rows += runBaseline("FMMD-S", spec.name, k, kTotal, d => FMMDS.select(pts, k, deadlineNanos = d))
    rows += runBaseline("SFDM-2(e=.15)", spec.name, k, kTotal, d => SFDM2.select(pts, k, 0.15, d))
    rows += runBaseline("SFDM-2(e=.75)", spec.name, k, kTotal, d => SFDM2.select(pts, k, 0.75, d))
    rows += runBaseline("Random", spec.name, k, kTotal, _ => RandomSelect.select(pts, k))
    rows.toSeq
  }

  /** Table 4: average missed points per color for MFD-g, plus Fig. 3/4 rows
    * (diversity and runtime per g).
    */
  final case class FairnessRow(dataset: String, k: Int, g: Double,
                               missedPerColor: Map[Int, Double], missedTotal: Double,
                               diversity: Double, millis: Long)

  def fairnessSweep(spark: SparkSession, spec: Datasets.Spec, ks: Seq[Int],
                    gs: Seq[Double], reps: Int = 5): Seq[FairnessRow] = {
    val pts = load(spark, spec)
    val ds = loadDS(spark, spec)
    for (kTotal <- ks; g <- gs) yield {
      val k = attainable(pts, Datasets.equalK(spec.m, kTotal))
      val t0 = System.nanoTime()
      val coreset = CoresetSpark.distributed(ds, kTotal)
      val coresetMs = (System.nanoTime() - t0) / 1000000
      val kAdj = attainable(coreset, k)
      val missed = scala.collection.mutable.Map[Int, Double]().withDefaultValue(0.0)
      var divSum = 0.0; var msSum = 0L
      for (rep <- 1 to reps) {
        val cfg = MFD.Config(eps = 0.3, g = g, seed = 777L * rep)
        val t1 = System.nanoTime()
        val res = MFD.run(coreset, kAdj, cfg)
        msSum += (System.nanoTime() - t1) / 1000000
        divSum += (if (res.diversity.isInfinity) 0.0 else res.diversity)
        Points.missedPerColor(res.selected.toSeq, k).foreach { case (c, miss) =>
          missed(c) += miss.toDouble / reps
        }
      }
      FairnessRow(spec.name, kTotal, g, missed.toMap, missed.values.sum,
        divSum / reps, coresetMs + msSum / reps)
    }
  }

  /** Fig. 10: streaming comparison on the Beer dataset — per-item update
    * time, post-processing time, diversity, stored items.
    */
  final case class StreamRow(algo: String, k: Int, updateMicros: Double,
                             postMillis: Long, diversity: Double, stored: Int)

  def streaming(spark: SparkSession, kTotal: Int): Seq[StreamRow] = {
    val spec = Datasets.beer
    val pts = load(spark, spec)
    val k = attainable(pts, Datasets.equalK(spec.m, kTotal))
    val rows = scala.collection.mutable.ArrayBuffer[StreamRow]()

    // StreamMFD.
    {
      val s = new StreamMFD(k, MFD.Config(eps = 0.5, g = 0.3))
      val t0 = System.nanoTime()
      pts.foreach(s.insert)
      val updNs = System.nanoTime() - t0
      val t1 = System.nanoTime()
      val res = s.postProcess()
      val postMs = (System.nanoTime() - t1) / 1000000
      rows += StreamRow("StreamMFD", kTotal, updNs / 1000.0 / pts.length, postMs,
        if (res.diversity.isInfinity) 0.0 else res.diversity, s.storedCount)
    }
    // SFDM-2 at both epsilons (bounds assumed known pre-stream, as in [50]).
    for (eps <- Seq(0.15, 0.75)) {
      val algo = SFDM2.create(pts, k, eps)
      val t0 = System.nanoTime()
      pts.foreach(algo.insert)
      val updNs = System.nanoTime() - t0
      val t1 = System.nanoTime()
      val sel = algo.postProcess()
      val postMs = (System.nanoTime() - t1) / 1000000
      rows += StreamRow(s"SFDM-2(e=$eps)", kTotal, updNs / 1000.0 / pts.length, postMs,
        Points.diversity(sel.toSeq), algo.storedCount)
    }
    rows.toSeq
  }

  /** Markdown-ish table printer used by benches and jobs. */
  def printTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): Unit = {
    println(s"\n### $title")
    println(header.mkString("| ", " | ", " |"))
    println(header.map(_ => "---").mkString("| ", " | ", " |"))
    rows.foreach(r => println(r.mkString("| ", " | ", " |")))
  }
}
