package repro.ilp

import repro.core.{LabeledPoint, Points}

/** Exact feasibility solver for the FMMD-S inner integer program:
  * given candidates with colors and a distance threshold δ, decide whether a
  * subset exists containing exactly `k_j` points of each color with all
  * pairwise distances ≥ δ (an independent set in the conflict graph with
  * per-color cardinality constraints), and return one if so.
  *
  * The original FMMD-S implementation calls a MIP solver; offline we replace
  * it with branch-and-bound over the conflict graph: colors are processed in
  * order of scarcity, candidates in order of conflict degree, and a global
  * node budget bounds the search (budget exhaustion is reported as
  * "unknown", which FMMD-S treats as infeasible-at-δ — documented in
  * DESIGN.md). Instances are coreset-sized (≤ m·k points), where greedy
  * orderings almost always succeed without backtracking.
  */
object ColorILP {

  sealed trait Outcome
  final case class Feasible(selected: Array[Int]) extends Outcome
  case object Infeasible extends Outcome
  case object BudgetExhausted extends Outcome

  /** @param pts        candidate points
    * @param k          color → exact count required
    * @param delta      minimum allowed pairwise distance
    * @param nodeBudget max search-tree nodes before giving up
    */
  def solve(pts: Array[LabeledPoint], k: Map[Int, Int], delta: Double,
            nodeBudget: Long = 2000000L): Outcome = {
    val n = pts.length
    val deltaSq = delta * delta
    // Conflict adjacency as bitsets (n ≤ a few thousand).
    val words = (n + 63) >> 6
    val adj = Array.ofDim[Long](n, words)
    var i = 0
    while (i < n) {
      var j = i + 1
      while (j < n) {
        if (Points.distSq(pts(i).x, pts(j).x) < deltaSq) {
          adj(i)(j >> 6) |= 1L << (j & 63)
          adj(j)(i >> 6) |= 1L << (i & 63)
        }
        j += 1
      }
      i += 1
    }
    val degree = Array.tabulate(n)(i => adj(i).map(java.lang.Long.bitCount(_).toLong).sum.toInt)

    // Colors ordered by scarcity (fewest candidates per required point first).
    val colors = k.keys.toArray.sortBy(c => pts.count(_.color == c).toDouble / math.max(1, k(c)))
    // Candidate order within a color: low conflict degree first.
    val byColor: Map[Int, Array[Int]] =
      colors.map(c => c -> pts.indices.filter(pts(_).color == c).sortBy(degree).toArray).toMap

    val forbidden = new Array[Long](words) // union of neighborhoods of chosen points
    val chosen = new scala.collection.mutable.ArrayBuffer[Int]()
    var nodes = 0L
    var exhausted = false

    def isFree(p: Int): Boolean = (forbidden(p >> 6) & (1L << (p & 63))) == 0

    /** Choose `need` more points of colors[ci..], considering candidates of
      * the current color from position `from` on (enforces a canonical
      * increasing order so each subset is tried once). True on success.
      */
    def search(ci: Int, need: Int, from: Int): Boolean = {
      if (exhausted) return false
      if (ci == colors.length) return true
      nodes += 1
      if (nodes > nodeBudget) { exhausted = true; return false }
      val c = colors(ci)
      if (need == 0)
        return search(ci + 1, if (ci + 1 < colors.length) k(colors(ci + 1)) else 0, 0)
      val cands = byColor(c)
      var idx = from
      while (idx <= cands.length - need) {
        val p = cands(idx)
        if (isFree(p)) {
          chosen += p
          val savedF = forbidden.clone()
          var w = 0
          while (w < words) { forbidden(w) |= adj(p)(w); w += 1 }
          forbidden(p >> 6) |= 1L << (p & 63) // a point conflicts with itself
          if (search(ci, need - 1, idx + 1)) return true
          chosen.remove(chosen.length - 1)
          Array.copy(savedF, 0, forbidden, 0, words)
        }
        idx += 1
      }
      false
    }

    val ok = search(0, if (colors.nonEmpty) k(colors(0)) else 0, 0)
    if (ok) Feasible(chosen.toArray)
    else if (exhausted) BudgetExhausted
    else Infeasible
  }
}
