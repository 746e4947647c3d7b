package repro.core

import repro.{Oracle, SparkSpec, TestUtil}
import repro.data.Datasets

/** Coreset construction — local reference, single-round Spark, and the
  * two-round distributed pipeline. Validates sizes, per-color coverage
  * radii (composability bound), and that MFD run on the coreset preserves
  * diversity within the coreset factor.
  */
class CoresetSpec extends SparkSpec {
  import spark.implicits._

  test("local coreset size is sum of min(k', color size)") {
    val pts = TestUtil.clusteredPoints(300, 2, 3, 5, 11L)
    val counts = Points.colorCounts(pts.toSeq)
    val cs = Coreset.local(pts, 10)
    assert(cs.length == counts.values.map(math.min(10, _)).sum)
    counts.keys.foreach { c =>
      assert(cs.count(_.color == c) == math.min(10, counts(c)))
    }
  }

  test("local coreset points come from the input") {
    val pts = TestUtil.randomPoints(100, 3, 4, 13L)
    val cs = Coreset.local(pts, 5)
    val ids = pts.map(_.id).toSet
    cs.foreach(p => assert(ids.contains(p.id)))
    assert(cs.map(_.id).distinct.length == cs.length)
  }

  /** Coverage radius of `centers` over `all`, per color. */
  private def coverRadius(all: Array[LabeledPoint], centers: Array[LabeledPoint]): Double = {
    all.groupBy(_.color).map { case (c, g) =>
      val cg = centers.filter(_.color == c)
      if (cg.isEmpty) Double.PositiveInfinity
      else g.map(p => cg.map(q => Points.dist(p.x, q.x)).min).max
    }.max
  }

  for (seed <- 1 to 4) {
    test(s"two-round distributed coreset is a constant-factor k-center solution seed=$seed") {
      val pts = TestUtil.clusteredPoints(2000, 2, 3, 8, seed * 29L)
      val ds = spark.createDataset(pts.toSeq).repartition(8)
      val kPrime = 12
      val dist = CoresetSpark.distributed(ds, kPrime)
      val single = CoresetSpark.singleRound(ds, kPrime)
      val local = Coreset.local(pts, kPrime)
      // Sizes: never more than m·k'.
      val m = Points.colorCounts(pts.toSeq).size
      assert(dist.length <= m * kPrime)
      assert(single.length == local.length)
      // Composability: the two-round radius is within a constant factor of
      // the single-pass radius (theory: ≤ 4·opt vs ≤ 2·opt ⇒ ratio ≤ ~4;
      // allow slack for the greedy orderings).
      val rDist = coverRadius(pts, dist)
      val rLocal = coverRadius(pts, local)
      assert(rDist <= math.max(4.0 * rLocal, 1e-9) + 1e-9,
        s"two-round radius $rDist vs local $rLocal")
    }
  }

  test("single-round Spark coreset matches the local reference radius") {
    val pts = TestUtil.clusteredPoints(1000, 3, 2, 6, 31L)
    val ds = spark.createDataset(pts.toSeq).repartition(4)
    val single = CoresetSpark.singleRound(ds, 8)
    val local = Coreset.local(pts, 8)
    val a = coverRadius(pts, single)
    val b = coverRadius(pts, local)
    // Both run Gonzalez per color; ordering inside a task may differ, so
    // compare radii rather than identity.
    assert(a <= 2.0 * b + 1e-9 && b <= 2.0 * a + 1e-9)
  }

  for (seed <- 1 to 3) {
    test(s"MFD on coreset preserves diversity within the coreset factor seed=$seed") {
      val pts = TestUtil.clusteredPoints(800, 2, 2, 10, seed * 53L)
      val k = Map(0 -> 4, 1 -> 4)
      val cfg = MFD.Config(eps = 0.3, g = 1.0, seed = seed)
      val full = MFD.run(pts, k, cfg)
      val cs = Coreset.local(pts, 8)
      val onCore = MFD.run(cs, k, cfg)
      // Coreset is (1+eps'); with randomized rounding allow a generous 0.5.
      assert(onCore.diversity >= 0.5 * full.diversity - 1e-9,
        s"coreset div ${onCore.diversity} vs full ${full.diversity}")
    }
  }

  test("MFDSpark end-to-end returns a near-fair diverse set with timings") {
    val pts = TestUtil.clusteredPoints(3000, 2, 3, 12, 61L)
    val ds = spark.createDataset(pts.toSeq).repartition(8)
    val counts = Points.colorCounts(pts.toSeq)
    val k = counts.map { case (c, _) => c -> 5 }
    val timed = MFDSpark.run(ds, k, MFD.Config(eps = 0.4, g = 0.5))
    assert(timed.coresetSize <= counts.size * k.values.sum)
    assert(timed.result.diversity > 0)
    assert(timed.coresetMillis >= 0 && timed.mwuMillis >= 0)
    // Near-fairness: at most a couple of points missing per color on average
    // behaviour; assert the hard floor of half.
    val missed = Points.missedPerColor(timed.result.selected.toSeq, k)
    missed.foreach { case (c, miss) => assert(miss <= 3, s"color $c missing $miss of 5") }
  }

  test("MFDSpark flat-DataFrame round trip and oracle-checked diversity") {
    val spec = Datasets.adult
    val df = Datasets.generate(spark, spec, 0.01)
    // At this tiny scale a rare color may be absent — clip k to what exists.
    val have = Points.fromFlatDF(df).collect().groupBy(_.color).map { case (c, g) => c -> g.length }
    val k = Datasets.equalK(spec.m, 10).flatMap { case (c, kc) =>
      val n = have.getOrElse(c, 0)
      if (n == 0) None else Some(c -> math.min(kc, n))
    }
    val sel = MFDSpark.runFlat(df, k, MFD.Config(eps = 0.5, g = 0.3))
    assert(sel.count() >= 2)
    Oracle.assertEquivalent(
      Points.diversityDF(sel),
      Points.diversitySql("sel", spec.d),
      "sel" -> sel)
  }
}
