package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.geo.KdTree

/** Section 3.2 high-probability variant: the x̂→ŷ transform preserves
  * per-color mass and enforces same-color support separation; end-to-end
  * rounding achieves the relaxed fairness with repeats.
  */
class MFDHighProbSpec extends AnyFunSuite {

  for (seed <- 1 to 8) {
    test(s"transform preserves per-color mass and separates support seed=$seed") {
      val pts = TestUtil.clusteredPoints(150, 2, 3, 6, seed * 91L)
      val rnd = new java.util.Random(seed)
      val xhat = Array.fill(pts.length)(if (rnd.nextDouble() < 0.3) rnd.nextDouble() else 0.0)
      val gamma = 20.0
      val eps = 0.5
      val yhat = MFDHighProb.transform(pts, xhat, gamma, eps)
      // Mass preservation per color.
      pts.indices.groupBy(pts(_).color).foreach { case (c, idx) =>
        val xm = idx.map(xhat).sum
        val ym = idx.map(yhat).sum
        assert(math.abs(xm - ym) < 1e-6, s"color $c mass $xm -> $ym")
      }
      // Support separation: same-color positives are >= gamma/(3(1+eps)^2).
      val rAgg = gamma / (3.0 * (1 + eps) * (1 + eps))
      val pos = pts.indices.filter(yhat(_) > 1e-12)
      for (i <- pos; j <- pos if i < j && pts(i).color == pts(j).color) {
        assert(Points.dist(pts(i).x, pts(j).x) >= rAgg - 1e-9,
          s"support points at ${Points.dist(pts(i).x, pts(j).x)} < $rAgg")
      }
      // Non-negativity.
      yhat.foreach(y => assert(y >= 0.0))
    }
  }

  test("transform on all-zero weights is all-zero") {
    val pts = TestUtil.randomPoints(50, 2, 2, 3L)
    val y = MFDHighProb.transform(pts, new Array[Double](50), 10.0, 0.5)
    assert(y.forall(_ == 0.0))
  }

  for (seed <- 1 to 4) {
    test(s"end-to-end HP run returns separated, near-fair set seed=$seed") {
      val pts = TestUtil.clusteredPoints(400, 2, 2, 10, seed * 87L)
      val k = Map(0 -> 5, 1 -> 5)
      val eps = 0.5
      val res = MFDHighProb.run(pts, k, MFD.Config(eps = eps, g = 1.0, seed = seed), delta = 0.05)
      // Diversity guarantee of Theorem 3.3: gamma / (6(1+eps)^3).
      if (res.selected.length >= 2)
        assert(res.diversity >= res.gamma / (6.0 * math.pow(1 + eps, 3)) - 1e-9)
      assert(res.roundingAttempts >= 1)
      // Relaxed fairness (1-eps)k_j/(1+eps) = 5/3 — require at least 1 per color.
      val counts = Points.colorCounts(res.selected.toSeq)
      k.keys.foreach(c => assert(counts.getOrElse(c, 0) >= 1, s"color $c empty"))
    }
  }

  test("HP fairness achieved with repeats on well-separated clusters") {
    // Clusters far apart: the LP solution is integral-ish and rounding
    // should reliably meet the relaxed bound.
    val rnd = new java.util.Random(5L)
    val pts = Array.tabulate(200) { i =>
      val cl = i % 10
      LabeledPoint(i.toLong, i % 2, Array(cl * 1000.0 + rnd.nextGaussian(), rnd.nextGaussian()))
    }
    val k = Map(0 -> 3, 1 -> 3)
    val res = MFDHighProb.run(pts, k, MFD.Config(eps = 0.5, g = 1.0), delta = 0.02)
    assert(res.fairnessAchieved, s"counts=${Points.colorCounts(res.selected.toSeq)}")
  }

  test("degenerate input falls back to a fair pick") {
    val pts = Array.tabulate(10)(i => LabeledPoint(i.toLong, i % 2, Array(0.0, 0.0)))
    val res = MFDHighProb.run(pts, Map(0 -> 2, 1 -> 2))
    assert(Points.isFair(res.selected.toSeq, Map(0 -> 2, 1 -> 2)))
  }

  test("transform aggregates nearby mass onto one representative") {
    // Two same-color points 1 apart, gamma large: one must absorb both.
    val pts = Array(
      LabeledPoint(0, 0, Array(0.0, 0.0)),
      LabeledPoint(1, 0, Array(1.0, 0.0)),
      LabeledPoint(2, 0, Array(500.0, 0.0)))
    val xhat = Array(0.5, 0.5, 1.0)
    val y = MFDHighProb.transform(pts, xhat, 30.0, 0.5)
    assert(math.abs(y.sum - 2.0) < 1e-9)
    val firstTwo = Seq(y(0), y(1))
    assert(firstTwo.count(_ > 1e-12) == 1, s"expected one representative, got $firstTwo")
    assert(math.abs(firstTwo.max - 1.0) < 1e-9)
    assert(math.abs(y(2) - 1.0) < 1e-9)
  }
}
