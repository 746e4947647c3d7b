package repro.baselines

import repro.core.LabeledPoint

/** Random selection — the "highly efficient, very poor diversity" extreme
  * discussed in §6.2: k_j points sampled uniformly per color.
  */
object RandomSelect {

  def select(pts: Array[LabeledPoint], k: Map[Int, Int], seed: Long = 7L): Array[LabeledPoint] = {
    val rnd = new scala.util.Random(seed)
    k.toSeq.sortBy(_._1).flatMap { case (c, kc) =>
      rnd.shuffle(pts.filter(_.color == c).toSeq).take(kc)
    }.toArray
  }
}
