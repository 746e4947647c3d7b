package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil

/** Gonzalez k-center: 2-approximation property (vs brute-force optimum on
  * tiny instances), monotone radii, determinism, degenerate inputs.
  */
class GonzalezSpec extends AnyFunSuite {

  /** Brute-force optimal k-center radius. */
  private def optRadius(pts: Array[LabeledPoint], k: Int): Double = {
    var best = Double.PositiveInfinity
    pts.indices.combinations(k).foreach { centers =>
      val r = pts.map(p => centers.map(c => Points.dist(p.x, pts(c).x)).min).max
      if (r < best) best = r
    }
    best
  }

  for (seed <- 1 to 10) {
    test(s"2-approximation vs brute force seed=$seed") {
      val pts = TestUtil.randomPoints(12, 2, 1, seed * 11L)
      for (k <- 1 to 4) {
        val res = Gonzalez.run(pts, k)
        val opt = optRadius(pts, k)
        assert(res.radius <= 2.0 * opt + 1e-9, s"k=$k radius ${res.radius} opt $opt")
        assert(res.centers.length == k)
        assert(res.centers.distinct.length == k)
      }
    }
  }

  for (seed <- 1 to 5) {
    test(s"radius decreases with k seed=$seed") {
      val pts = TestUtil.randomPoints(60, 3, 1, seed * 7L)
      val radii = (1 to 10).map(k => Gonzalez.run(pts, k).radius)
      radii.sliding(2).foreach { case Seq(a, b) => assert(b <= a + 1e-12) }
    }
  }

  test("deterministic with default seed") {
    val pts = TestUtil.randomPoints(100, 4, 1, 3L)
    val a = Gonzalez.run(pts, 7)
    val b = Gonzalez.run(pts, 7)
    assert(a.centers.toSeq == b.centers.toSeq && a.radius == b.radius)
  }

  test("k >= n returns all points with radius 0") {
    val pts = TestUtil.randomPoints(5, 2, 1, 4L)
    val res = Gonzalez.run(pts, 10)
    assert(res.centers.length == 5)
    assert(res.radius == 0.0)
  }

  test("empty input") {
    val res = Gonzalez.run(Array.empty[LabeledPoint], 3)
    assert(res.centers.isEmpty && res.radius == 0.0)
  }

  test("radius covers every point") {
    val pts = TestUtil.clusteredPoints(200, 3, 2, 5, 21L)
    val res = Gonzalez.run(pts, 8)
    val centers = res.centers.map(pts)
    pts.foreach { p =>
      val d = centers.map(c => Points.dist(p.x, c.x)).min
      assert(d <= res.radius + 1e-9)
    }
  }

  test("diversity upper bound exceeds fair optimum on small instance") {
    val pts = TestUtil.randomPoints(10, 2, 2, 31L)
    val k = Map(0 -> 2, 1 -> 2)
    val opt = TestUtil.bruteForceOpt(pts, k)
    // The min pairwise distance of colorblind Gonzalez(k) centers is an
    // upper bound on the fair diversity (paper §6).
    val ub = Gonzalez.diversityUpperBound(pts, 4)
    assert(ub >= opt - 1e-9)
  }

  test("gonzalez centers have diversity >= half the unfair optimum") {
    // div(Gonzalez k picks) >= sigma_k / 2 (Tamir / Ravi et al.).
    for (seed <- 1 to 6) {
      val pts = TestUtil.randomPoints(11, 2, 1, seed * 101L)
      val k = 4
      var sigma = -1.0
      pts.toSeq.combinations(k).foreach { s =>
        val d = Points.diversity(s)
        if (d > sigma) sigma = d
      }
      val div = Points.diversity(Gonzalez.centers(pts, k).toSeq)
      assert(div >= sigma / 2.0 - 1e-9)
    }
  }
}
