package repro.range

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.{Coreset, MFD, Points}

/** Range-query structure (Theorem 5.2): results lie inside the rectangle,
  * fairness is clipped to what the range contains, and the query diversity
  * is comparable to running MFD offline on P ∩ R.
  */
class QFairDivSpec extends AnyFunSuite {

  private def rect(lo: Double, hi: Double, d: Int): (Array[Double], Array[Double]) =
    (Array.fill(d)(lo), Array.fill(d)(hi))

  for (seed <- 1 to 6) {
    test(s"query results lie in the rectangle and are fair seed=$seed") {
      val pts = TestUtil.clusteredPoints(2000, 2, 3, 10, seed * 23L)
      val q = new QFairDiv(pts, kMax = 12)
      val (qlo, qhi) = rect(20.0, 80.0, 2)
      val inR = pts.filter(p => p.x.forall(v => v >= 20.0 && v <= 80.0))
      if (inR.nonEmpty) {
        val counts = Points.colorCounts(inR.toSeq)
        val k = counts.map { case (c, n) => c -> math.min(3, n) }
        val res = q.query(qlo, qhi, k)
        res.selected.foreach { p =>
          p.x.foreach(v => assert(v >= 20.0 - 1e-9 && v <= 80.0 + 1e-9))
        }
        val ids = inR.map(_.id).toSet
        res.selected.foreach(p => assert(ids.contains(p.id)))
      }
    }
  }

  test("whole-space query matches offline coreset MFD quality") {
    var ok = 0
    for (seed <- 1 to 5) {
      val pts = TestUtil.clusteredPoints(1500, 2, 2, 8, seed * 33L)
      val q = new QFairDiv(pts, kMax = 10)
      val k = Map(0 -> 4, 1 -> 4)
      val (qlo, qhi) = rect(-1000.0, 1000.0, 2)
      val queryDiv = q.query(qlo, qhi, k, MFD.Config(seed = seed)).diversity
      val offline = MFD.run(Coreset.local(pts, 8), k, MFD.Config(seed = seed)).diversity
      if (queryDiv >= 0.4 * offline) ok += 1
    }
    assert(ok >= 4, s"query within 0.4x of offline only $ok/5")
  }

  test("range coreset covers range points within a constant-factor radius") {
    val pts = TestUtil.clusteredPoints(3000, 2, 2, 12, 43L)
    val q = new QFairDiv(pts, kMax = 8)
    val (qlo, qhi) = rect(10.0, 70.0, 2)
    val inR = pts.filter(p => p.x.forall(v => v >= 10.0 && v <= 70.0))
    val cs = q.rangeCoreset(qlo, qhi, 8)
    assert(cs.nonEmpty)
    // Coreset points that claim to represent the range must come from P.
    val ids = pts.map(_.id).toSet
    cs.foreach(p => assert(ids.contains(p.id)))
    // Per color, the coreset's coverage radius over P∩R is within a constant
    // of the offline per-color Gonzalez radius on P∩R.
    inR.groupBy(_.color).foreach { case (c, g) =>
      val mine = cs.filter(_.color == c)
      if (mine.nonEmpty && g.length > 8) {
        val rQuery = g.map(p => mine.map(s => Points.dist(p.x, s.x)).min).max
        val rOffline = repro.core.Gonzalez.run(g, 8).radius
        assert(rQuery <= 6.0 * math.max(rOffline, 1e-9) + 1e-9,
          s"color $c coverage $rQuery vs offline $rOffline")
      }
    }
  }

  test("empty-range query is rejected") {
    val pts = TestUtil.clusteredPoints(500, 2, 2, 5, 53L)
    val q = new QFairDiv(pts, kMax = 5)
    val (qlo, qhi) = rect(-500.0, -400.0, 2)
    assertThrows[IllegalArgumentException](q.query(qlo, qhi, Map(0 -> 2)))
  }

  test("k_j larger than range population is clipped") {
    val pts = TestUtil.clusteredPoints(600, 2, 2, 6, 63L)
    val q = new QFairDiv(pts, kMax = 10)
    // A narrow rectangle with a handful of points.
    val some = pts.take(50)
    val lo = Array(some.map(_.x(0)).min, some.map(_.x(1)).min)
    val hi = Array(some.map(_.x(0)).max, some.map(_.x(1)).max)
    val res = q.query(lo, hi, Map(0 -> 500, 1 -> 500))
    assert(res.selected.nonEmpty)
  }
}
