package repro.core

import repro.{Oracle, SparkSpec, TestUtil}

/** ClusterBorder (paper Alg. 4): border membership vs the DuckDB definition
  * — every cluster containing a core point within ε of the border point. */
class ClusterBorderSpec extends SparkSpec {

  for {
    d <- Seq(2, 3)
    (eps, minPts) <- Seq((2.0, 8), (3.0, 15))
    seed <- Seq(3L, 4L)
  } test(s"border membership matches SQL d=$d eps=$eps minPts=$minPts seed=$seed") {
    val pts = TestUtil.blobPts(400, d, numBlobs = 3, sigma = 2.0, extent = 35.0,
      noiseFrac = 0.3, seed = seed * 101 + d)
    val res = DBSCAN.run(spark, spark.sparkContext.parallelize(pts.toSeq, 4), d,
      DBSCANConfig(eps, minPts))
    // All memberships — core points and border points — against full SQL DBSCAN.
    val sql = TestUtil.sqlDbscanPrelude(d, eps, minPts) +
      """SELECT id, rep FROM comp
        |UNION
        |SELECT DISTINCT d.a AS id, c.rep
        |FROM dist2 d JOIN comp c ON c.id = d.b
        |WHERE d.a NOT IN (SELECT id FROM core)""".stripMargin
    Oracle.assertEquivalent(TestUtil.membershipDF(spark, res), sql,
      "pts" -> TestUtil.ptsDF(spark, pts))
  }

  test("a border point between two clusters belongs to both") {
    // Two 10-point chains (spacing 0.1) with a single point equidistant from
    // both chain ends: it sees only 3 points in its ε-ball (not core at
    // minPts=4) but is within ε of a core point of each chain.
    val left = (0 until 10).map(i => Pt(i, Array(i * 0.1, 0.0)))
    val right = (0 until 10).map(i => Pt(10 + i, Array(1.9 + i * 0.1, 0.0)))
    val mid = Pt(20, Array(1.4, 0.0))
    val pts = (left ++ right :+ mid).toArray
    val eps = 0.5; val minPts = 4
    val res = DBSCAN.run(spark, spark.sparkContext.parallelize(pts.toSeq, 2), 2,
      DBSCANConfig(eps, minPts))
    assert(res.numClusters === 2)
    assert(!res.isCore(20))
    assert(res.borderClusters(20).length === 2, "mid point should border both clusters")
  }

  test("noise points get no clusters") {
    val clump = (0 until 20).map(i => Pt(i, Array(0.0 + i * 1e-3, 0.0)))
    val far = Pt(20, Array(100.0, 100.0))
    val pts = (clump :+ far).toArray
    val res = DBSCAN.run(spark, spark.sparkContext.parallelize(pts.toSeq, 2), 2,
      DBSCANConfig(1.0, 5))
    assert(res.isNoise(20))
    assert(res.numClusters === 1)
  }
}
