package repro.core

/** Generic (1+ε)-coreset for FairDiv (Theorem 4.2): run any constant-
  * approximation k-center algorithm independently on each color class and
  * take the union of the centers. The paper's implementation (§6) fixes the
  * algorithm to Gonzalez with k' = k iterations per color, giving a coreset
  * of exactly `m·k` points (capped by color-class size); we do the same.
  */
object Coreset {

  /** Per-color Gonzalez(k') coreset. O(n k') time, O(n) space. */
  def local(pts: Array[LabeledPoint], kPrime: Int): Array[LabeledPoint] =
    pts.groupBy(_.color).values.flatMap(g => Gonzalez.centers(g, kPrime)).toArray
}
