package repro.geometry

import org.scalatest.funsuite.AnyFunSuite

import java.util.SplittableRandom

class UnionFindSpec extends AnyFunSuite {

  test("singletons start disconnected") {
    val uf = new UnionFind(10)
    assert(uf.numComponents === 10)
    assert(!uf.connected(0, 9))
  }

  test("union connects and is idempotent") {
    val uf = new UnionFind(5)
    assert(uf.union(0, 1))
    assert(!uf.union(0, 1))
    assert(uf.connected(0, 1))
    assert(uf.numComponents === 4)
  }

  test("transitivity via chains") {
    val uf = new UnionFind(100)
    (0 until 99).foreach(i => uf.union(i, i + 1))
    assert(uf.connected(0, 99))
    assert(uf.numComponents === 1)
  }

  test("matches brute-force components on random unions") {
    val rnd = new SplittableRandom(13)
    val n = 60
    for (_ <- 0 until 20) {
      val uf = new UnionFind(n)
      val adj = Array.fill(n)(scala.collection.mutable.Set[Int]())
      for (_ <- 0 until 40) {
        val a = rnd.nextInt(n); val b = rnd.nextInt(n)
        uf.union(a, b)
        adj(a) += b; adj(b) += a
      }
      // Brute-force BFS labeling.
      val label = Array.fill(n)(-1)
      var next = 0
      for (s <- 0 until n if label(s) < 0) {
        label(s) = next
        val q = scala.collection.mutable.ArrayDeque(s)
        while (q.nonEmpty) {
          val u = q.removeHead()
          adj(u).foreach { v => if (label(v) < 0) { label(v) = next; q += v } }
        }
        next += 1
      }
      for (i <- 0 until n; j <- 0 until n)
        assert(uf.connected(i, j) === (label(i) == label(j)), s"pair ($i,$j)")
    }
  }
}
