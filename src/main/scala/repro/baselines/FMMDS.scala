package repro.baselines

import repro.core.{Coreset, Deadline, Gonzalez, LabeledPoint}
import repro.ilp.ColorILP

/** FMMD-S baseline (Wang, Mathioudakis, Li, Fabbri, SDM 2023 [52]) —
  * `(1-ε)/5`-approximation; the "highest diversity but slow / does not
  * scale" algorithm in the paper's §6.
  *
  * Structure: per-color Gonzalez candidates; a colorblind Gonzalez(k) run
  * sets the initial threshold δ; then δ decays by (1-ε) while an exact
  * integer-feasibility problem — pick exactly k_j candidates per color with
  * pairwise distance ≥ δ — is solved at each step, returning the first
  * feasible selection. The original calls a MIP solver; our substrate is
  * the exact branch-and-bound in [[repro.ilp.ColorILP]] (node budget
  * exhaustion ⇒ treat δ as infeasible; the overall deadline produces the
  * DNFs the paper reports for large instances).
  */
object FMMDS {

  def select(pts: Array[LabeledPoint], k: Map[Int, Int], eps: Double = 0.05,
             deadlineNanos: Long = Deadline.None): Array[LabeledPoint] = {
    val kTotal = k.values.sum
    val cand = Coreset.local(pts, kTotal)
    var delta = Gonzalez.diversityUpperBound(cand, math.max(2, kTotal))
    if (!java.lang.Double.isFinite(delta) || delta <= 0)
      return k.toSeq.flatMap { case (c, kc) => cand.filter(_.color == c).take(kc) }.toArray

    var attempt = 0
    while (attempt < 400) {
      Deadline.check(deadlineNanos)
      ColorILP.solve(cand, k, delta) match {
        case ColorILP.Feasible(sel) => return sel.map(cand)
        case _ => delta *= (1.0 - eps); attempt += 1
      }
    }
    k.toSeq.flatMap { case (c, kc) => cand.filter(_.color == c).take(kc) }.toArray
  }
}
