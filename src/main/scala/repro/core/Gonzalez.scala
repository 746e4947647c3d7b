package repro.core

/** Gonzalez's greedy algorithm for k-center clustering (2-approximation).
  *
  * Used three ways in the reproduction, exactly as in the paper's §6:
  *  - per-color runs build the (1+ε)-coreset (Theorem 4.2 with Alg = Gonzalez);
  *  - a colorblind run on the whole set supplies the initial upper bound γ on
  *    the FairDiv diversity (min pairwise distance among the k centers);
  *  - node samples of the QFairDiv range structure.
  *
  * O(nk) time, O(n) space. Deterministic given the seed (the seed picks the
  * first center; `seed < 0` starts from index 0).
  */
object Gonzalez {

  /** Result of a run: selected indices (into the input array, in selection
    * order) and `radius` = max distance of any input point to its nearest
    * selected center (the k-center objective value of the solution).
    */
  final case class Result(centers: Array[Int], radius: Double)

  def run(pts: Array[LabeledPoint], k: Int, seed: Long = -1L): Result = {
    val n = pts.length
    if (n == 0) return Result(Array.empty, 0.0)
    val kk = math.min(k, n)
    val first =
      if (seed < 0) 0
      else new java.util.Random(seed).nextInt(n)
    val minD = Array.fill(n)(Double.PositiveInfinity)
    val centers = new Array[Int](kk)
    var cur = first
    var c = 0
    while (c < kk) {
      centers(c) = cur
      val cx = pts(cur).x
      var far = 0; var farD = -1.0
      var i = 0
      while (i < n) {
        val d = Points.distSq(pts(i).x, cx)
        if (d < minD(i)) minD(i) = d
        if (minD(i) > farD) { farD = minD(i); far = i }
        i += 1
      }
      cur = far
      c += 1
    }
    var radius = 0.0
    var i = 0
    while (i < n) { if (minD(i) > radius) radius = minD(i); i += 1 }
    Result(centers, math.sqrt(radius))
  }

  /** Selected points (not indices). */
  def centers(pts: Array[LabeledPoint], k: Int, seed: Long = -1L): Array[LabeledPoint] =
    run(pts, k, seed).centers.map(pts)

  /** Diversity (min pairwise distance) of a colorblind Gonzalez run — the
    * paper's practical upper bound for the γ sweep.
    */
  def diversityUpperBound(pts: Array[LabeledPoint], k: Int): Double = {
    val cs = centers(pts, k)
    if (cs.length < 2) Double.PositiveInfinity else Points.diversity(cs.toSeq)
  }
}
