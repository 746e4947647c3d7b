package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.{Deadline, LabeledPoint, MFD, Points}

/** Contract tests shared by every baseline: fairness of the returned set,
  * membership in the input, no duplicates; plus per-algorithm guarantees
  * (approximation sanity vs brute force on tiny instances) and the
  * qualitative ordering the paper's §6 reports.
  */
class BaselinesSpec extends AnyFunSuite {

  private type Algo = (Array[LabeledPoint], Map[Int, Int]) => Array[LabeledPoint]

  private val algos: Seq[(String, Algo)] = Seq(
    "FairFlow" -> ((p, k) => FairFlow.select(p, k)),
    "FairGreedyFlow" -> ((p, k) => FairGreedyFlow.select(p, k)),
    "FMMD-S" -> ((p, k) => FMMDS.select(p, k)),
    "SFDM-2(.15)" -> ((p, k) => SFDM2.select(p, k, 0.15)),
    "SFDM-2(.75)" -> ((p, k) => SFDM2.select(p, k, 0.75)),
    "Random" -> ((p, k) => RandomSelect.select(p, k))
  )

  for ((name, algo) <- algos; seed <- 1 to 5) {
    test(s"$name returns a fair, duplicate-free subset seed=$seed") {
      val pts = TestUtil.clusteredPoints(200, 2, 3, 6, seed * 43L)
      val counts = Points.colorCounts(pts.toSeq)
      val k = counts.map { case (c, n) => c -> math.min(4, n) }
      val sel = algo(pts, k)
      assert(Points.isFair(sel.toSeq, k), s"$name unfair: ${Points.colorCounts(sel.toSeq)} vs $k")
      val ids = pts.map(_.id).toSet
      sel.foreach(p => assert(ids.contains(p.id)))
      assert(sel.map(_.id).distinct.length == sel.length)
    }
  }

  for ((name, algo) <- algos if name != "Random"; seed <- 1 to 3) {
    test(s"$name diversity is positive on spread data seed=$seed") {
      val pts = TestUtil.randomPoints(150, 2, 2, seed * 59L)
      val k = Map(0 -> 3, 1 -> 3)
      val sel = algo(pts, k)
      assert(Points.diversity(sel.toSeq) > 0)
    }
  }

  test("FMMD-S achieves at least the MFD diversity on small instances") {
    // The paper's headline quality ordering: FMMD-S (exact inner IP) is the
    // diversity ceiling. Allow 0.9 slack for the delta-grid granularity.
    var wins = 0
    for (seed <- 1 to 5) {
      val pts = TestUtil.clusteredPoints(300, 2, 2, 8, seed * 67L)
      val k = Map(0 -> 4, 1 -> 4)
      val fm = Points.diversity(FMMDS.select(pts, k).toSeq)
      val mfd = MFD.run(pts, k, MFD.Config(eps = 0.3, g = 1.0, seed = seed)).diversity
      if (fm >= 0.9 * mfd) wins += 1
    }
    assert(wins >= 4, s"FMMD-S outperformed MFD only $wins/5 times")
  }

  test("FMMD-S selection meets its own threshold guarantee vs brute force") {
    for (seed <- 1 to 5) {
      val pts = TestUtil.randomPoints(12, 2, 2, seed * 71L)
      val k = Map(0 -> math.min(2, pts.count(_.color == 0)),
                  1 -> math.min(2, pts.count(_.color == 1)))
      if (k.values.forall(_ > 0)) {
        val opt = TestUtil.bruteForceOpt(pts, k)
        val sel = FMMDS.select(pts, k)
        // delta sweep with 5% steps from an upper bound ⇒ ≥ (1-eps)·opt·(1/5)
        // in theory; on tiny instances the exact solver typically nails much
        // more — assert a conservative half.
        assert(Points.diversity(sel.toSeq) >= 0.5 * opt - 1e-9)
      }
    }
  }

  test("random selection has clearly worse diversity than MFD on clustered data") {
    var better = 0
    for (seed <- 1 to 5) {
      val pts = TestUtil.clusteredPoints(500, 2, 2, 10, seed * 83L)
      val k = Map(0 -> 5, 1 -> 5)
      val rd = Points.diversity(RandomSelect.select(pts, k, seed).toSeq)
      val md = MFD.run(pts, k, MFD.Config(seed = seed)).diversity
      if (md > rd) better += 1
    }
    assert(better >= 4, s"MFD beat random only $better/5 times")
  }

  test("SFDM-2 with smaller eps gives at least the diversity of larger eps (usually)") {
    var wins = 0
    for (seed <- 1 to 5) {
      val pts = TestUtil.clusteredPoints(400, 2, 2, 8, seed * 97L)
      val k = Map(0 -> 4, 1 -> 4)
      val d15 = Points.diversity(SFDM2.select(pts, k, 0.15).toSeq)
      val d75 = Points.diversity(SFDM2.select(pts, k, 0.75).toSeq)
      if (d15 >= d75 - 1e-9) wins += 1
    }
    assert(wins >= 3, s"eps=.15 beat eps=.75 only $wins/5 times")
  }

  test("SFDM-2 streaming state is bounded by levels × (m+1) × k") {
    val pts = TestUtil.clusteredPoints(1000, 2, 3, 6, 107L)
    val k = Map(0 -> 3, 1 -> 3, 2 -> 3)
    val algo = SFDM2.create(pts, k, 0.5)
    pts.foreach(algo.insert)
    val kTotal = k.values.sum
    assert(algo.storedCount <= algo.levelCount * (k.size + 1) * kTotal)
  }

  test("baseline deadline aborts") {
    val pts = TestUtil.clusteredPoints(20000, 4, 4, 10, 113L)
    val k = (0 until 4).map(_ -> 15).toMap
    assertThrows[Deadline.Exceeded] {
      SFDM2.select(pts, k, 0.05, System.nanoTime() + 1000L)
    }
  }

  test("FairFlow separation guarantee: selected points span distinct clusters") {
    val pts = TestUtil.clusteredPoints(300, 2, 2, 12, 127L)
    val k = Map(0 -> 4, 1 -> 4)
    val sel = FairFlow.select(pts, k)
    assert(sel.length >= 8)
    assert(Points.diversity(sel.toSeq) > 0)
  }
}
