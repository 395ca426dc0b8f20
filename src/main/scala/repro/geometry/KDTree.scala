package repro.geometry

import repro.core.{BBox, Dist, Pt}
import scala.collection.mutable.ArrayBuffer

/** Static k-d tree over a point set with bucket leaves.
  *
  * Built once (median split on the widest dimension), then queried
  * concurrently — queries never mutate the tree, matching the paper's usage
  * (§5.1 neighbor-cell lookup, and the pointwise-range-query baselines).
  * The tree is Serializable so it can be broadcast to Spark tasks.
  */
final class KDTree private (root: KDTree.Node) extends Serializable {

  /** Number of points within Euclidean distance `r` of `q` (inclusive). */
  def countWithin(q: Array[Double], r: Double): Int = {
    var count = 0
    val r2 = r * r
    def go(nd: KDTree.Node): Unit = {
      if (nd.bbox.minSqDistTo(q) > r2) return
      if (nd.bbox.maxSqDistTo(q) <= r2) { count += nd.size; return }
      nd match {
        case l: KDTree.Leaf =>
          var i = 0
          while (i < l.pts.length) { if (Dist.sq(l.pts(i).x, q) <= r2) count += 1; i += 1 }
        case in: KDTree.Inner => go(in.left); go(in.right)
      }
    }
    go(root)
    count
  }

  /** All points within Euclidean distance `r` of `q` (inclusive). */
  def within(q: Array[Double], r: Double): Array[Pt] = {
    val out = new ArrayBuffer[Pt]()
    val r2 = r * r
    def go(nd: KDTree.Node): Unit = {
      if (nd.bbox.minSqDistTo(q) > r2) return
      nd match {
        case l: KDTree.Leaf =>
          var i = 0
          while (i < l.pts.length) { if (Dist.sq(l.pts(i).x, q) <= r2) out += l.pts(i); i += 1 }
        case in: KDTree.Inner => go(in.left); go(in.right)
      }
    }
    go(root)
    out.toArray
  }

  /** True iff some point satisfying `pred` lies within `r` of `q`; early exit. */
  def existsWithin(q: Array[Double], r: Double, pred: Pt => Boolean): Boolean = {
    val r2 = r * r
    def go(nd: KDTree.Node): Boolean = {
      if (nd.bbox.minSqDistTo(q) > r2) false
      else nd match {
        case l: KDTree.Leaf =>
          var i = 0
          while (i < l.pts.length) {
            if (Dist.sq(l.pts(i).x, q) <= r2 && pred(l.pts(i))) return true
            i += 1
          }
          false
        case in: KDTree.Inner => go(in.left) || go(in.right)
      }
    }
    go(root)
  }

  def size: Int = root.size
}

object KDTree {
  private val LeafSize = 16

  sealed trait Node extends Serializable { def bbox: BBox; def size: Int }
  final case class Leaf(bbox: BBox, pts: Array[Pt]) extends Node { def size: Int = pts.length }
  final case class Inner(bbox: BBox, left: Node, right: Node) extends Node {
    val size: Int = left.size + right.size
  }

  /** Build over a non-empty point array. O(n log^2 n) via per-level sorts. */
  def build(pts: Array[Pt]): KDTree = {
    require(pts.nonEmpty, "KDTree.build: empty point set")
    new KDTree(buildNode(pts.clone()))
  }

  private def buildNode(pts: Array[Pt]): Node = {
    val bbox = BBox.of(pts)
    if (pts.length <= LeafSize) Leaf(bbox, pts)
    else {
      // Split the widest dimension at its median.
      var axis = 0; var w = -1.0; var j = 0
      while (j < bbox.d) {
        val wj = bbox.hi(j) - bbox.lo(j)
        if (wj > w) { w = wj; axis = j }
        j += 1
      }
      if (w <= 0.0) Leaf(bbox, pts) // all points identical
      else {
        val sorted = pts.sortBy(_.x(axis))
        val mid = sorted.length / 2
        Inner(bbox, buildNode(sorted.take(mid)), buildNode(sorted.drop(mid)))
      }
    }
  }
}
