package repro.core

/** A point in d-dimensional Euclidean space with a stable global id.
  *
  * Ids must be dense in `[0, n)` for a dataset of n points — every stage of
  * the pipeline (core flags, cluster labels, border sets) indexes plain
  * arrays by point id, mirroring the paper's shared-memory layout.
  */
final case class Pt(id: Long, x: Array[Double]) extends Serializable {
  /** Dimensionality of the point. */
  def d: Int = x.length
  override def toString: String = s"Pt($id, [${x.mkString(",")}])"
}

/** Primitive-loop Euclidean distance helpers used in every hot path. */
object Dist {
  /** Squared Euclidean distance between two coordinate vectors. */
  def sq(a: Array[Double], b: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < a.length) { val t = a(i) - b(i); s += t * t; i += 1 }
    s
  }

  /** Euclidean distance. */
  def apply(a: Array[Double], b: Array[Double]): Double = math.sqrt(sq(a, b))

  /** `d(a,b) <= eps` with an early exit once the partial sum exceeds eps^2. */
  def leq(a: Array[Double], b: Array[Double], eps: Double): Boolean = {
    val e2 = eps * eps
    var s = 0.0; var i = 0
    while (i < a.length) {
      val t = a(i) - b(i); s += t * t
      if (s > e2) return false
      i += 1
    }
    true
  }
}

/** Axis-aligned bounding box, closed on both sides. */
final case class BBox(lo: Array[Double], hi: Array[Double]) extends Serializable {
  def d: Int = lo.length

  /** Squared distance from `p` to the nearest point of the box (0 if inside). */
  def minSqDistTo(p: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < p.length) {
      val v = p(i)
      val t = if (v < lo(i)) lo(i) - v else if (v > hi(i)) v - hi(i) else 0.0
      s += t * t; i += 1
    }
    s
  }

  /** Squared distance from `p` to the farthest point of the box. */
  def maxSqDistTo(p: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < p.length) {
      val t = math.max(math.abs(p(i) - lo(i)), math.abs(p(i) - hi(i)))
      s += t * t; i += 1
    }
    s
  }

  /** Squared min distance between two boxes (0 if they intersect). */
  def minSqDist(o: BBox): Double = {
    var s = 0.0; var i = 0
    while (i < lo.length) {
      val t =
        if (hi(i) < o.lo(i)) o.lo(i) - hi(i)
        else if (o.hi(i) < lo(i)) lo(i) - o.hi(i)
        else 0.0
      s += t * t; i += 1
    }
    s
  }

  def center: Array[Double] = {
    val c = new Array[Double](d)
    var i = 0; while (i < d) { c(i) = (lo(i) + hi(i)) / 2; i += 1 }
    c
  }
}

object BBox {
  /** Tight bounding box of a non-empty point set. */
  def of(pts: Array[Pt]): BBox = {
    require(pts.nonEmpty, "BBox.of: empty point set")
    val d = pts(0).d
    val lo = Array.fill(d)(Double.PositiveInfinity)
    val hi = Array.fill(d)(Double.NegativeInfinity)
    var i = 0
    while (i < pts.length) {
      val x = pts(i).x; var j = 0
      while (j < d) {
        if (x(j) < lo(j)) lo(j) = x(j)
        if (x(j) > hi(j)) hi(j) = x(j)
        j += 1
      }
      i += 1
    }
    BBox(lo, hi)
  }
}
