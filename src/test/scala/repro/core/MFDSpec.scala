package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil

/** End-to-end MFD correctness on brute-forceable instances.
  *
  * Checks, per Theorem 3.2 (with the paper's own implementation deviations):
  *  - diversity: div(S) ≥ 0.8·OPT/(2(1+ε)) — the 0.8 absorbs the geometric
  *    γ sweep granularity (one 0.85 step below the optimum in the worst
  *    case);
  *  - fairness in expectation: averaged over many rounding seeds,
  *    |S(c_j)| approaches k_j/(1+ε);
  *  - structural guarantees: selected points are input points, pairwise
  *    distance of S ≥ γ/(2(1+ε)) exactly (deterministic from Round).
  */
class MFDSpec extends AnyFunSuite {

  for (seed <- 1 to 12) {
    test(s"diversity within provable factor of brute-force optimum seed=$seed") {
      val pts = TestUtil.randomPoints(12, 2, 2, seed * 37L)
      val k = Map(0 -> 2, 1 -> 2)
      if (pts.count(_.color == 0) >= 2 && pts.count(_.color == 1) >= 2) {
        val opt = TestUtil.bruteForceOpt(pts, k)
        val eps = 0.25
        val res = MFD.run(pts, k, MFD.Config(eps = eps, g = 1.0, seed = seed))
        assert(res.diversity >= 0.8 * opt / (2 * (1 + eps)) - 1e-9,
          s"div ${res.diversity} vs opt $opt (gamma=${res.gamma})")
      }
    }
  }

  for (seed <- 1 to 6) {
    test(s"selected set respects the gamma separation exactly seed=$seed") {
      val pts = TestUtil.clusteredPoints(80, 3, 3, 6, seed * 41L)
      val counts = Points.colorCounts(pts.toSeq)
      val k = counts.map { case (c, n) => c -> math.min(3, n) }
      val eps = 0.5
      val res = MFD.run(pts, k, MFD.Config(eps = eps, g = 0.5, seed = seed))
      // Deterministic guarantee from Round: min pairwise distance of S is
      // at least gamma / (2(1+eps)).
      if (res.selected.length >= 2)
        assert(Points.diversity(res.selected.toSeq) >= res.gamma / (2 * (1 + eps)) - 1e-9)
      // Selected points are input points.
      val ids = pts.map(_.id).toSet
      res.selected.foreach(p => assert(ids.contains(p.id)))
      // No duplicates.
      assert(res.selected.map(_.id).distinct.length == res.selected.length)
    }
  }

  test("fairness holds in expectation over rounding seeds") {
    val pts = TestUtil.clusteredPoints(120, 2, 2, 8, 99L)
    val k = Map(0 -> 4, 1 -> 4)
    val eps = 0.3
    val runs = 40
    val totals = scala.collection.mutable.Map(0 -> 0, 1 -> 0)
    for (s <- 1 to runs) {
      val res = MFD.run(pts, k, MFD.Config(eps = eps, g = 1.0, seed = s))
      val counts = Points.colorCounts(res.selected.toSeq)
      totals(0) += counts.getOrElse(0, 0)
      totals(1) += counts.getOrElse(1, 0)
    }
    // E[|S(c_j)|] >= k_j/(1+eps); allow statistical slack of 0.75 of that.
    val bound = 0.75 * 4 / (1 + eps)
    assert(totals(0).toDouble / runs >= bound, s"color0 avg ${totals(0).toDouble / runs}")
    assert(totals(1).toDouble / runs >= bound, s"color1 avg ${totals(1).toDouble / runs}")
  }

  test("g controls the iteration budget") {
    val pts = TestUtil.randomPoints(60, 2, 2, 7L)
    val k = Map(0 -> 3, 1 -> 3)
    val r1 = MFD.run(pts, k, MFD.Config(g = 0.1))
    val r2 = MFD.run(pts, k, MFD.Config(g = 0.7))
    assert(r2.mwuIterations > r1.mwuIterations)
  }

  test("infeasible input (color scarcer than k_j) is rejected") {
    val pts = TestUtil.randomPoints(20, 2, 2, 5L)
    val kBad = Map(0 -> (pts.count(_.color == 0) + 1), 1 -> 1)
    assertThrows[IllegalArgumentException](MFD.run(pts, kBad))
  }

  test("duplicate-heavy degenerate input returns a fair set") {
    val pts = Array.tabulate(20)(i => LabeledPoint(i.toLong, i % 2, Array(1.0, 1.0)))
    val res = MFD.run(pts, Map(0 -> 3, 1 -> 3))
    assert(Points.isFair(res.selected.toSeq, Map(0 -> 3, 1 -> 3)))
    assert(res.gamma == 0.0)
  }

  test("single color behaves like unfair max-min diversification") {
    val pts = TestUtil.randomPoints(30, 2, 1, 13L)
    val k = Map(0 -> 5)
    val res = MFD.run(pts, k, MFD.Config(eps = 0.25, g = 1.0))
    // Compare against Gonzalez diversity (a 1/2-approx of sigma_k): MFD
    // should be in the same ballpark (within its own 1/(2(1+eps)) factor).
    val gdiv = Points.diversity(Gonzalez.centers(pts, 5).toSeq)
    assert(res.diversity >= 0.8 * gdiv / (2 * (1 + 0.25)) - 1e-9)
  }

  test("deadline aborts long runs") {
    val pts = TestUtil.clusteredPoints(3000, 4, 4, 10, 55L)
    val k = (0 until 4).map(_ -> 20).toMap
    assertThrows[Deadline.Exceeded] {
      MFD.run(pts, k, MFD.Config(g = 1.0, deadlineNanos = System.nanoTime() + 1000000L))
    }
  }

  test("k larger than a color class via coreset-sized instance still fair-feasible") {
    val pts = TestUtil.clusteredPoints(200, 2, 3, 5, 67L)
    val counts = Points.colorCounts(pts.toSeq)
    val k = counts.map { case (c, n) => c -> math.min(2, n) }
    val res = MFD.run(pts, k)
    assert(res.selected.nonEmpty)
  }

  for (seed <- 1 to 5) {
    test(s"three colors, uneven k_j seed=$seed") {
      val pts = TestUtil.clusteredPoints(150, 2, 3, 6, seed * 71L)
      val counts = Points.colorCounts(pts.toSeq)
      if (counts.size == 3 && counts.values.forall(_ >= 5)) {
        val k = Map(0 -> 4, 1 -> 2, 2 -> 1)
        val res = MFD.run(pts, k, MFD.Config(eps = 0.4, g = 0.5, seed = seed))
        assert(res.diversity > 0)
        assert(res.selected.map(_.id).distinct.length == res.selected.length)
      }
    }
  }
}
