package repro.geometry

import org.scalatest.funsuite.AnyFunSuite

import java.util.SplittableRandom

/** Delaunay triangulation checked against the empty-circumcircle
  * characterization and known structural properties. */
class DelaunaySpec extends AnyFunSuite {

  private def randPts(n: Int, seed: Long): (Array[Double], Array[Double]) = {
    val rnd = new SplittableRandom(seed)
    val px = Array.fill(n)(rnd.nextDouble() * 100)
    val py = Array.fill(n)(rnd.nextDouble() * 100)
    (px, py)
  }

  /** Brute-force DT edges: (a,b) is Delaunay iff some circle through a and b
    * contains no other point — checked over all circumcircles with a third
    * point plus the diametral circle. O(n^4), for tiny n only. */
  private def bruteDelaunayEdges(px: Array[Double], py: Array[Double]): Set[(Int, Int)] = {
    val n = px.length
    def circum(a: Int, b: Int, c: Int): Option[(Double, Double, Double)] = {
      val ax = px(a); val ay = py(a); val bx = px(b); val by = py(b); val cx = px(c); val cy = py(c)
      val dd = 2 * (ax * (by - cy) + bx * (cy - ay) + cx * (ay - by))
      if (math.abs(dd) < 1e-12) None
      else {
        val ux = ((ax * ax + ay * ay) * (by - cy) + (bx * bx + by * by) * (cy - ay) + (cx * cx + cy * cy) * (ay - by)) / dd
        val uy = ((ax * ax + ay * ay) * (cx - bx) + (bx * bx + by * by) * (ax - cx) + (cx * cx + cy * cy) * (bx - ax)) / dd
        Some((ux, uy, math.hypot(ax - ux, ay - uy)))
      }
    }
    def emptyCircle(cx: Double, cy: Double, r: Double, skip: Set[Int]): Boolean =
      (0 until n).forall(k => skip.contains(k) || math.hypot(px(k) - cx, py(k) - cy) > r - 1e-9)
    (for {
      a <- 0 until n
      b <- (a + 1) until n
      isDel = {
        // Diametral circle…
        val mx = (px(a) + px(b)) / 2; val my = (py(a) + py(b)) / 2
        val r = math.hypot(px(a) - mx, py(a) - my)
        emptyCircle(mx, my, r, Set(a, b)) ||
        // …or any circumcircle with a third point.
        (0 until n).exists { c =>
          c != a && c != b && circum(a, b, c).exists { case (ux, uy, rr) =>
            emptyCircle(ux, uy, rr, Set(a, b, c))
          }
        }
      }
      if isDel
    } yield (a, b)).toSet
  }

  for (seed <- Seq(3L, 4L, 5L, 6L)) test(s"matches brute-force empty-circle edges (n=18, seed=$seed)") {
    val (px, py) = randPts(18, seed)
    val got = new Delaunay(px, py).edges().toSet
    val want = bruteDelaunayEdges(px, py)
    assert(got === want)
  }

  for (seed <- Seq(11L, 12L)) test(s"Euclidean MST edges are Delaunay edges (n=300, seed=$seed)") {
    val (px, py) = randPts(300, seed)
    val edges = new Delaunay(px, py).edges().toSet
    // Prim's algorithm on the complete graph.
    val n = px.length
    val inTree = new Array[Boolean](n)
    val dist = Array.fill(n)(Double.PositiveInfinity)
    val parent = Array.fill(n)(-1)
    dist(0) = 0
    for (_ <- 0 until n) {
      var u = -1
      for (v <- 0 until n if !inTree(v) && (u < 0 || dist(v) < dist(u))) u = v
      inTree(u) = true
      for (v <- 0 until n if !inTree(v)) {
        val w = math.hypot(px(u) - px(v), py(u) - py(v))
        if (w < dist(v)) { dist(v) = w; parent(v) = u }
      }
    }
    for (v <- 1 until n) {
      val e = (math.min(v, parent(v)), math.max(v, parent(v)))
      assert(edges.contains(e), s"MST edge $e missing from DT")
    }
  }

  test("edge count is at most 3n-6") {
    val (px, py) = randPts(500, 21L)
    val edges = new Delaunay(px, py).edges()
    assert(edges.length <= 3 * 500 - 6)
    assert(edges.length >= 500 - 1) // connected planar graph lower bound
  }

  test("closest pair is always a Delaunay edge") {
    for (seed <- 30L until 36L) {
      val (px, py) = randPts(80, seed)
      val n = px.length
      var best = (0, 1); var bd = Double.PositiveInfinity
      for (a <- 0 until n; b <- (a + 1) until n) {
        val d = math.hypot(px(a) - px(b), py(a) - py(b))
        if (d < bd) { bd = d; best = (a, b) }
      }
      assert(new Delaunay(px, py).edges().toSet.contains(best))
    }
  }

  test("handles duplicates and tiny inputs") {
    assert(new Delaunay(Array(1.0), Array(1.0)).edges().isEmpty)
    assert(new Delaunay(Array(1.0, 2.0), Array(1.0, 2.0)).edges().toSet === Set((0, 1)))
    val e = new Delaunay(Array(1.0, 1.0, 2.0), Array(1.0, 1.0, 2.0)).edges().toSet
    assert(e === Set((0, 2))) // duplicate vertex 1 is skipped
  }
}
