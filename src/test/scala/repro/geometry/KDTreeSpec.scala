package repro.geometry

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.{Dist, Pt}

import java.util.SplittableRandom

/** k-d tree vs brute force over many random configurations. */
class KDTreeSpec extends AnyFunSuite {

  private def brute(pts: Array[Pt], q: Array[Double], r: Double): Array[Pt] =
    pts.filter(p => Dist.sq(p.x, q) <= r * r)

  for {
    d <- Seq(1, 2, 3, 5, 7)
    n <- Seq(1, 17, 200)
    seed <- Seq(1L, 2L)
  } test(s"countWithin/within match brute force d=$d n=$n seed=$seed") {
    val pts = TestUtil.uniformPts(n, d, 100.0, seed)
    val tree = KDTree.build(pts)
    val rnd = new SplittableRandom(seed + 99)
    for (_ <- 0 until 30) {
      val q = Array.fill(d)(rnd.nextDouble() * 120 - 10)
      val r = rnd.nextDouble() * 60
      val want = brute(pts, q, r)
      assert(tree.countWithin(q, r) === want.length)
      assert(tree.within(q, r).map(_.id).sorted.toSeq === want.map(_.id).sorted.toSeq)
    }
  }

  test("existsWithin respects predicate and radius") {
    val pts = TestUtil.uniformPts(500, 2, 100.0, 7L)
    val tree = KDTree.build(pts)
    val rnd = new SplittableRandom(11)
    for (_ <- 0 until 50) {
      val q = Array.fill(2)(rnd.nextDouble() * 100)
      val r = rnd.nextDouble() * 20
      val wantAny = brute(pts, q, r).nonEmpty
      assert(tree.existsWithin(q, r, _ => true) === wantAny)
      val wantEven = brute(pts, q, r).exists(_.id % 2 == 0)
      assert(tree.existsWithin(q, r, _.id % 2 == 0) === wantEven)
    }
  }

  test("duplicate points are all counted") {
    val pts = Array.tabulate(40)(i => Pt(i, Array(1.0, 2.0)))
    val tree = KDTree.build(pts)
    assert(tree.countWithin(Array(1.0, 2.0), 0.0) === 40)
    assert(tree.countWithin(Array(5.0, 2.0), 1.0) === 0)
  }

  test("size reflects the number of points") {
    assert(KDTree.build(TestUtil.uniformPts(123, 3, 10.0, 3L)).size === 123)
  }

  test("radius boundary is inclusive") {
    val pts = Array(Pt(0, Array(0.0, 0.0)), Pt(1, Array(3.0, 4.0)))
    val tree = KDTree.build(pts)
    assert(tree.countWithin(Array(0.0, 0.0), 5.0) === 2)
    assert(tree.countWithin(Array(0.0, 0.0), 4.999) === 1)
  }
}
