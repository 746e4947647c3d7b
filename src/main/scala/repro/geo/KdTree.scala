package repro.geo

import repro.core.{LabeledPoint, Points}
import scala.collection.mutable.ArrayBuffer

/** KD-tree over a fixed point set with the canonical-ball-query interface the
  * MFD algorithm needs from a BBD-tree (the paper's implementation likewise
  * substitutes a KD-tree — ParGeo's — for the theoretical BBD-tree).
  *
  * The tree is static: nodes are laid out in arrays; algorithms attach their
  * own per-node weight arrays (sized [[nodeCount]]) and use
  * [[pathToRoot]] / [[canonicalNodes]] / children accessors to implement the
  * Oracle / Update / Round primitives of the paper in O(log n + ε^{-d})-ish
  * per query.
  *
  * Canonical query contract (`canonicalNodes(q, r, eps)`): returns node ids
  * whose point sets are pairwise disjoint and whose union `S` satisfies the
  * sandwich
  *   `{p : ||p-q|| ≤ r} ⊆ S ⊆ {p : ||p-q|| ≤ (1+eps)·r}`.
  * Internal nodes are returned when their bounding box lies entirely inside
  * `B(q,(1+eps)r)`; leaves (single points) are returned iff within `r`.
  */
final class KdTree private (
    val points: Array[LabeledPoint],
    val left: Array[Int],
    val right: Array[Int],
    val parent: Array[Int],
    val leafPoint: Array[Int],   // node -> point index (-1 for internal)
    val leafOf: Array[Int],      // point index -> leaf node id
    val boxLo: Array[Array[Double]],
    val boxHi: Array[Array[Double]]
) {
  def nodeCount: Int = left.length
  def root: Int = 0
  def isLeaf(u: Int): Boolean = leafPoint(u) >= 0
  private val dim = points(0).x.length

  /** Node ids from the leaf of point `i` up to (and including) the root. */
  def pathToRoot(i: Int): Array[Int] = {
    val buf = new ArrayBuffer[Int]()
    var u = leafOf(i)
    while (u != -1) { buf += u; u = parent(u) }
    buf.toArray
  }

  private def minDistSq(q: Array[Double], u: Int): Double = {
    val lo = boxLo(u); val hi = boxHi(u)
    var s = 0.0; var i = 0
    while (i < dim) {
      val v = q(i)
      if (v < lo(i)) { val d = lo(i) - v; s += d * d }
      else if (v > hi(i)) { val d = v - hi(i); s += d * d }
      i += 1
    }
    s
  }

  private def maxDistSq(q: Array[Double], u: Int): Double = {
    val lo = boxLo(u); val hi = boxHi(u)
    var s = 0.0; var i = 0
    while (i < dim) {
      val d = math.max(math.abs(q(i) - lo(i)), math.abs(q(i) - hi(i)))
      s += d * d
      i += 1
    }
    s
  }

  /** Canonical nodes for the ball `B(q, r)` with slack `eps` (see class doc). */
  def canonicalNodes(q: Array[Double], r: Double, eps: Double): Array[Int] = {
    val out = new ArrayBuffer[Int]()
    val r2 = r * r
    val r2eps = (1 + eps) * r * (1 + eps) * r
    def go(u: Int): Unit = {
      if (minDistSq(q, u) > r2) ()
      else if (isLeaf(u)) {
        if (Points.distSq(points(leafPoint(u)).x, q) <= r2) out += u
      } else if (maxDistSq(q, u) <= r2eps) out += u
      else { go(left(u)); go(right(u)) }
    }
    go(root)
    out.toArray
  }

  /** All point indices stored below node `u`. */
  def pointsUnder(u: Int): Array[Int] = {
    val out = new ArrayBuffer[Int]()
    def go(v: Int): Unit =
      if (isLeaf(v)) out += leafPoint(v)
      else { go(left(v)); go(right(v)) }
    go(u)
    out.toArray
  }
}

object KdTree {

  /** Build a KD-tree (single point per leaf, tight bounding boxes, widest-
    * dimension median splits). O(n log n) expected.
    */
  def build(pts: Array[LabeledPoint]): KdTree = {
    require(pts.nonEmpty, "KdTree over empty set")
    val n = pts.length
    val dim = pts(0).x.length
    val idx = Array.range(0, n)

    val left = new ArrayBuffer[Int]()
    val right = new ArrayBuffer[Int]()
    val parent = new ArrayBuffer[Int]()
    val leafPoint = new ArrayBuffer[Int]()
    val boxLo = new ArrayBuffer[Array[Double]]()
    val boxHi = new ArrayBuffer[Array[Double]]()
    val leafOf = new Array[Int](n)

    def newNode(par: Int): Int = {
      left += -1; right += -1; parent += par; leafPoint += -1
      boxLo += null; boxHi += null
      left.length - 1
    }

    def buildRec(lo: Int, hi: Int, par: Int): Int = {
      val u = newNode(par)
      val blo = Array.fill(dim)(Double.PositiveInfinity)
      val bhi = Array.fill(dim)(Double.NegativeInfinity)
      var i = lo
      while (i < hi) {
        val x = pts(idx(i)).x
        var j = 0
        while (j < dim) {
          if (x(j) < blo(j)) blo(j) = x(j)
          if (x(j) > bhi(j)) bhi(j) = x(j)
          j += 1
        }
        i += 1
      }
      boxLo(u) = blo; boxHi(u) = bhi
      if (hi - lo == 1) {
        leafPoint(u) = idx(lo)
        leafOf(idx(lo)) = u
      } else {
        // Split on the widest dimension at the median of that coordinate.
        var sd = 0; var w = -1.0
        var j = 0
        while (j < dim) {
          val ww = bhi(j) - blo(j)
          if (ww > w) { w = ww; sd = j }
          j += 1
        }
        val mid = (lo + hi) / 2
        selectByDim(idx, lo, hi, mid, pts, sd)
        val l = buildRec(lo, mid, u)
        val r = buildRec(mid, hi, u)
        left(u) = l; right(u) = r
      }
      u
    }

    buildRec(0, n, -1)
    new KdTree(pts, left.toArray, right.toArray, parent.toArray,
      leafPoint.toArray, leafOf, boxLo.toArray, boxHi.toArray)
  }

  /** In-place quickselect of `idx[lo,hi)` so position `mid` holds the median
    * along dimension `sd` (duplicates land arbitrarily but consistently).
    */
  private def selectByDim(idx: Array[Int], lo0: Int, hi0: Int, mid: Int,
                          pts: Array[LabeledPoint], sd: Int): Unit = {
    var lo = lo0; var hi = hi0
    val rnd = new java.util.Random(42L + mid)
    while (hi - lo > 1) {
      val pivotIdx = lo + rnd.nextInt(hi - lo)
      val pivot = pts(idx(pivotIdx)).x(sd)
      var i = lo; var lt = lo; var gt = hi
      // 3-way partition on coordinate value
      while (i < gt) {
        val v = pts(idx(i)).x(sd)
        if (v < pivot) { val t = idx(i); idx(i) = idx(lt); idx(lt) = t; lt += 1; i += 1 }
        else if (v > pivot) { gt -= 1; val t = idx(i); idx(i) = idx(gt); idx(gt) = t }
        else i += 1
      }
      if (mid < lt) hi = lt
      else if (mid >= gt) lo = gt
      else return // mid inside the equal-to-pivot run
    }
  }
}
