package repro.geo

import org.scalacheck.{Gen, Prop, Properties}
import repro.core.{LabeledPoint, Points}

/** ScalaCheck properties for the KD-tree canonical query contract over
  * arbitrary point clouds, radii and slacks — complements the example-based
  * KdTreeSpec with generated instances.
  */
object KdTreeProps extends Properties("KdTree") {

  private val genPoints: Gen[Array[LabeledPoint]] = for {
    n <- Gen.choose(2, 120)
    d <- Gen.choose(1, 4)
    seed <- Gen.choose(0L, 100000L)
  } yield {
    val rnd = new java.util.Random(seed)
    Array.tabulate(n)(i => LabeledPoint(i.toLong, rnd.nextInt(3),
      Array.fill(d)(rnd.nextDouble() * 50.0 - 25.0)))
  }

  property("sandwich: within-r covered, nothing beyond (1+eps)r") =
    Prop.forAll(genPoints, Gen.choose(0.1, 40.0), Gen.oneOf(0.1, 0.5, 1.0)) {
      (pts, r, eps) =>
        val tree = KdTree.build(pts)
        val q = pts(0).x
        val covered = tree.canonicalNodes(q, r, eps).flatMap(tree.pointsUnder).toSet
        pts.indices.forall { i =>
          val dist = Points.dist(pts(i).x, q)
          val mustHave = dist <= r
          val mayHave = dist <= (1 + eps) * r + 1e-9
          (!mustHave || covered.contains(i)) && (!covered.contains(i) || mayHave)
        }
    }

  property("canonical point sets are disjoint") =
    Prop.forAll(genPoints, Gen.choose(0.1, 40.0)) { (pts, r) =>
      val tree = KdTree.build(pts)
      val covered = tree.canonicalNodes(pts(pts.length / 2).x, r, 0.5).flatMap(tree.pointsUnder)
      covered.length == covered.distinct.length
    }

  property("every root path ends at the root and follows parents") =
    Prop.forAll(genPoints) { pts =>
      val tree = KdTree.build(pts)
      pts.indices.forall { i =>
        val p = tree.pathToRoot(i)
        p.head == tree.leafOf(i) && p.last == tree.root &&
          p.sliding(2).forall { case Array(a, b) => tree.parent(a) == b; case _ => true }
      }
    }
}
