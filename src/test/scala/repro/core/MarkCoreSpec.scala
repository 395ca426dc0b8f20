package repro.core

import repro.{Oracle, SparkSpec, TestUtil}

/** MarkCore (paper Alg. 2) against the DuckDB relational definition of a core
  * point: |{q : d(p,q) <= eps}| >= minPts. */
class MarkCoreSpec extends SparkSpec {

  private def coreIdsDF(flags: Array[Boolean]) = {
    val ids = flags.zipWithIndex.collect { case (true, i) => i.toLong }.toSeq
    spark.createDataFrame(ids.map(Tuple1(_))).toDF("id")
  }

  for {
    d <- Seq(2, 3, 5)
    (eps, minPts) <- Seq((2.0, 5), (4.0, 20), (8.0, 50))
    qt <- Seq(false, true)
  } test(s"core flags match SQL d=$d eps=$eps minPts=$minPts qt=$qt") {
    val pts = TestUtil.blobPts(400, d, numBlobs = 3, sigma = 2.0, extent = 30.0,
      noiseFrac = 0.2, seed = d * 1000 + minPts)
    val sc = spark.sparkContext
    val idx = CellIndex.grid(sc.parallelize(pts.toSeq, 4), eps, d)
    val bcIdx = sc.broadcast(idx)
    val bcQt = if (qt) Some(sc.broadcast(MarkCore.buildCellQuadTrees(sc, bcIdx))) else None
    val flags = MarkCore.run(sc, bcIdx, minPts, bcQt)
    val sql =
      s"""SELECT p.id::BIGINT AS id FROM pts p JOIN pts q
         |ON ${TestUtil.sqlDistLeq("p", "q", d, eps)}
         |GROUP BY p.id HAVING COUNT(*) >= $minPts""".stripMargin
    Oracle.assertEquivalent(coreIdsDF(flags), sql, "pts" -> TestUtil.ptsDF(spark, pts))
  }

  test("a cell with >= minPts points is entirely core") {
    // 30 coincident points: single cell, all core at minPts=30.
    val pts = Array.tabulate(30)(i => Pt(i, Array(5.0, 5.0)))
    val sc = spark.sparkContext
    val bcIdx = sc.broadcast(CellIndex.grid(sc.parallelize(pts.toSeq, 2), 1.0, 2))
    val flags = MarkCore.run(sc, bcIdx, 30, None)
    assert(flags.forall(identity))
  }

  test("isolated points are never core for minPts > 1") {
    val pts = Array.tabulate(10)(i => Pt(i, Array(i * 100.0, 0.0)))
    val sc = spark.sparkContext
    val bcIdx = sc.broadcast(CellIndex.grid(sc.parallelize(pts.toSeq, 2), 1.0, 2))
    val flags = MarkCore.run(sc, bcIdx, 2, None)
    assert(flags.forall(!_))
  }

  test("minPts = 1 marks every point core") {
    val pts = TestUtil.uniformPts(50, 3, 100.0, 9L)
    val sc = spark.sparkContext
    val bcIdx = sc.broadcast(CellIndex.grid(sc.parallelize(pts.toSeq, 2), 2.0, 3))
    val flags = MarkCore.run(sc, bcIdx, 1, None)
    assert(flags.forall(identity))
  }

  test("cross-cell neighborhoods are counted (points straddling a boundary)") {
    // Two tight clumps of 5, eps apart across a cell boundary; minPts=10
    // requires counting both clumps.
    val eps = 1.0
    val pts = (0 until 5).map(i => Pt(i, Array(0.95 + i * 1e-4, 0.5))).toArray ++
              (0 until 5).map(i => Pt(5 + i, Array(1.05 + i * 1e-4, 0.5)))
    val sc = spark.sparkContext
    val bcIdx = sc.broadcast(CellIndex.grid(sc.parallelize(pts.toSeq, 2), eps, 2))
    val flags = MarkCore.run(sc, bcIdx, 10, None)
    assert(flags.forall(identity))
  }
}
