package repro.flow

import scala.collection.mutable.ArrayBuffer

/** Edmonds-Karp max-flow on an adjacency-list residual graph.
  *
  * Substrate for the FairFlow / FairGreedyFlow baselines (the paper's
  * baselines use networkx's Ford-Fulkerson; flow networks there have
  * O(km) nodes and O(mk^2) edges, so BFS augmentation is plenty).
  *
  * Integer capacities only — every FairDiv flow instance is integral, and
  * integrality of the max-flow is what turns a flow into a point selection.
  */
final class MaxFlow(val n: Int) {
  private val head = Array.fill(n)(-1)
  private val to = new ArrayBuffer[Int]()
  private val next = new ArrayBuffer[Int]()
  private val cap = new ArrayBuffer[Int]()

  /** Add a directed edge u→v with capacity c (plus its residual v→u of 0).
    * Returns the edge id, usable with [[flowOn]] after [[maxflow]].
    */
  def addEdge(u: Int, v: Int, c: Int): Int = {
    val id = to.length
    to += v; cap += c; next += head(u); head(u) = id
    to += u; cap += 0; next += head(v); head(v) = id + 1
    id
  }

  /** Flow pushed along edge `id` (forward edges only). */
  def flowOn(id: Int): Int = cap(id + 1)

  /** Max flow from s to t. O(V·E^2) worst case. */
  def maxflow(s: Int, t: Int): Int = {
    var total = 0
    val parentEdge = new Array[Int](n)
    val queue = new Array[Int](n)
    var augmenting = true
    while (augmenting) {
      java.util.Arrays.fill(parentEdge, -1)
      parentEdge(s) = -2
      var qh = 0; var qt = 0
      queue(qt) = s; qt += 1
      var found = false
      while (qh < qt && !found) {
        val u = queue(qh); qh += 1
        var e = head(u)
        while (e != -1 && !found) {
          val v = to(e)
          if (cap(e) > 0 && parentEdge(v) == -1) {
            parentEdge(v) = e
            if (v == t) found = true
            else { queue(qt) = v; qt += 1 }
          }
          e = next(e)
        }
      }
      if (!found) augmenting = false
      else {
        // Find bottleneck and push.
        var bottleneck = Int.MaxValue
        var v = t
        while (v != s) {
          val e = parentEdge(v)
          if (cap(e) < bottleneck) bottleneck = cap(e)
          v = to(e ^ 1)
        }
        v = t
        while (v != s) {
          val e = parentEdge(v)
          cap(e) -= bottleneck
          cap(e ^ 1) += bottleneck
          v = to(e ^ 1)
        }
        total += bottleneck
      }
    }
    total
  }
}
