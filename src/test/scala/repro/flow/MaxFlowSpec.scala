package repro.flow

import org.scalatest.funsuite.AnyFunSuite

/** Edmonds-Karp substrate: known graphs, bipartite-matching equivalence
  * (checked against brute-force maximum matching), flow conservation.
  */
class MaxFlowSpec extends AnyFunSuite {

  test("classic CLRS-style network") {
    // s=0, t=5
    val mf = new MaxFlow(6)
    mf.addEdge(0, 1, 16); mf.addEdge(0, 2, 13)
    mf.addEdge(1, 3, 12); mf.addEdge(2, 1, 4)
    mf.addEdge(2, 4, 14); mf.addEdge(3, 2, 9)
    mf.addEdge(3, 5, 20); mf.addEdge(4, 3, 7)
    mf.addEdge(4, 5, 4)
    assert(mf.maxflow(0, 5) == 23)
  }

  test("disconnected source and sink") {
    val mf = new MaxFlow(4)
    mf.addEdge(0, 1, 5)
    mf.addEdge(2, 3, 5)
    assert(mf.maxflow(0, 3) == 0)
  }

  test("single edge") {
    val mf = new MaxFlow(2)
    val e = mf.addEdge(0, 1, 7)
    assert(mf.maxflow(0, 1) == 7)
    assert(mf.flowOn(e) == 7)
  }

  test("parallel paths accumulate") {
    val mf = new MaxFlow(4)
    mf.addEdge(0, 1, 3); mf.addEdge(1, 3, 3)
    mf.addEdge(0, 2, 4); mf.addEdge(2, 3, 4)
    assert(mf.maxflow(0, 3) == 7)
  }

  /** Brute-force maximum bipartite matching by augmenting DFS (independent
    * reference implementation).
    */
  private def refMatching(nL: Int, nR: Int, edges: Seq[(Int, Int)]): Int = {
    val adj = Array.fill(nL)(List.empty[Int])
    edges.foreach { case (u, v) => adj(u) = v :: adj(u) }
    val matchR = Array.fill(nR)(-1)
    def tryAug(u: Int, seen: Array[Boolean]): Boolean =
      adj(u).exists { v =>
        if (!seen(v)) {
          seen(v) = true
          if (matchR(v) == -1 || tryAug(matchR(v), seen)) { matchR(v) = u; true } else false
        } else false
      }
    (0 until nL).count(u => tryAug(u, Array.fill(nR)(false)))
  }

  for (seed <- 1 to 15) {
    test(s"flow equals maximum bipartite matching seed=$seed") {
      val rnd = new java.util.Random(seed * 17L)
      val nL = 3 + rnd.nextInt(6)
      val nR = 3 + rnd.nextInt(6)
      val edges = for {
        u <- 0 until nL; v <- 0 until nR if rnd.nextDouble() < 0.35
      } yield (u, v)
      // Nodes: 0 source, 1..nL left, nL+1..nL+nR right, last sink.
      val sink = 1 + nL + nR
      val mf = new MaxFlow(sink + 1)
      (0 until nL).foreach(u => mf.addEdge(0, 1 + u, 1))
      edges.foreach { case (u, v) => mf.addEdge(1 + u, 1 + nL + v, 1) }
      (0 until nR).foreach(v => mf.addEdge(1 + nL + v, sink, 1))
      assert(mf.maxflow(0, sink) == refMatching(nL, nR, edges))
    }
  }

  test("flowOn reports integral edge flows that respect capacity") {
    val mf = new MaxFlow(5)
    val e1 = mf.addEdge(0, 1, 2)
    val e2 = mf.addEdge(0, 2, 2)
    val e3 = mf.addEdge(1, 3, 1)
    val e4 = mf.addEdge(2, 3, 3)
    mf.addEdge(3, 4, 10)
    val f = mf.maxflow(0, 4)
    assert(f == 3)
    assert(mf.flowOn(e1) <= 2 && mf.flowOn(e2) <= 2 && mf.flowOn(e3) <= 1 && mf.flowOn(e4) <= 3)
    assert(mf.flowOn(e1) + mf.flowOn(e2) == f)
    assert(mf.flowOn(e3) + mf.flowOn(e4) == f)
  }
}
