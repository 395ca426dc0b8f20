package repro.core

import repro.{Oracle, SparkSpec, TestUtil}

/** Grid cell construction (paper §4.1) — DataFrame assignment vs DuckDB, and
  * the CellIndex invariants every later stage relies on. */
class GridSpec extends SparkSpec {

  for {
    d <- Seq(2, 3, 5)
    eps <- Seq(3.0, 10.0)
  } test(s"DataFrame cell assignment matches DuckDB floor arithmetic d=$d eps=$eps") {
    val pts = TestUtil.uniformPts(300, d, 50.0, seed = d * 100 + eps.toInt)
    val df = TestUtil.ptsDF(spark, pts)
    val side = CellIndex.sideFor(eps, d)
    val got = CellIndex.assignCellsDF(df, (0 until d).map(j => s"x$j"), eps)
      .selectExpr("id" +: (0 until d).map(j => s"cell[$j] as c$j"): _*)
    val cols = (0 until d).map(j => s"CAST(FLOOR(x$j::DOUBLE / $side) AS INT) AS c$j").mkString(", ")
    Oracle.assertEquivalent(got, s"SELECT id::BIGINT AS id, $cols FROM pts", "pts" -> df)
  }

  for {
    d <- Seq(2, 3, 7)
    eps <- Seq(2.0, 8.0)
  } test(s"CellIndex invariants d=$d eps=$eps") {
    val pts = TestUtil.uniformPts(500, d, 40.0, seed = d * 7 + eps.toInt)
    val idx = CellIndex.grid(spark.sparkContext.parallelize(pts.toSeq, 4), eps, d)
    val side = CellIndex.sideFor(eps, d)

    // Every point lands in exactly one cell; ids partition [0, n).
    val allIds = idx.pts.flatten.map(_.id).sorted
    assert(allIds.toSeq === (0L until 500L))
    assert(idx.n === 500)

    // Cell extent per dimension is < side, so the diagonal is <= eps:
    // any two points of a cell are within eps of each other.
    for (c <- 0 until idx.numCells) {
      for (j <- 0 until d) assert(idx.tightHi(c)(j) - idx.tightLo(c)(j) <= side + 1e-12)
      for (p <- idx.pts(c); q <- Seq(idx.pts(c).head))
        assert(Dist.leq(p.x, q.x, eps))
      // Key consistency.
      for (p <- idx.pts(c)) assert(CellIndex.gridKey(p.x, side) === idx.keys(c))
    }

    // Neighbor lists: symmetric, complete vs brute force, self-free.
    val e2 = eps * eps
    for (a <- 0 until idx.numCells; b <- 0 until idx.numCells if a != b) {
      val near = idx.bbox(a).minSqDist(idx.bbox(b)) <= e2
      assert(idx.neighbors(a).contains(b) === near, s"cells $a,$b near=$near")
    }
    for (a <- 0 until idx.numCells; b <- idx.neighbors(a))
      assert(idx.neighbors(b).contains(a))
  }

  test("points on cell boundaries are assigned consistently") {
    val eps = math.sqrt(2.0) // side = 1.0 in 2D
    val pts = Array(
      Pt(0, Array(0.0, 0.0)), Pt(1, Array(1.0, 0.0)), Pt(2, Array(1.0 - 1e-12, 0.0)),
      Pt(3, Array(-1.0, -1.0)), Pt(4, Array(-0.5, 2.0)))
    val idx = CellIndex.grid(spark.sparkContext.parallelize(pts.toSeq, 2), eps, 2)
    val keyOf = idx.keys.zipWithIndex.toMap
    def cellOf(p: Pt): Vector[Int] = idx.keys(idx.pts.indexWhere(_.exists(_.id == p.id)))
    assert(cellOf(pts(0)) === Vector(0, 0))
    assert(cellOf(pts(1)) === Vector(1, 0))
    assert(cellOf(pts(2)) === Vector(0, 0))
    assert(cellOf(pts(3)) === Vector(-1, -1))
    assert(keyOf.size === idx.numCells)
  }

  test("empty and singleton inputs") {
    val one = CellIndex.grid(spark.sparkContext.parallelize(Seq(Pt(0, Array(1.0, 1.0)))), 1.0, 2)
    assert(one.numCells === 1)
    assert(one.neighbors(0).isEmpty)
  }
}
