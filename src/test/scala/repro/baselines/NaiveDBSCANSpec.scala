package repro.baselines

import repro.{Oracle, SparkSpec, TestUtil}

/** The sequential reference itself is validated against full DBSCAN-in-SQL
  * on DuckDB (core flags, clustering, border membership). */
class NaiveDBSCANSpec extends SparkSpec {

  for {
    d <- Seq(2, 3)
    (eps, minPts) <- Seq((2.0, 5), (3.5, 12), (1.0, 3))
    seed <- Seq(1L, 2L)
  } test(s"naive == SQL DBSCAN d=$d eps=$eps minPts=$minPts seed=$seed") {
    val pts = TestUtil.blobPts(250, d, 3, 2.0, 30.0, 0.25, seed * 19 + d)
    val res = NaiveDBSCAN.run(pts, eps, minPts)
    val sql = TestUtil.sqlDbscanPrelude(d, eps, minPts) +
      """SELECT id, rep FROM comp
        |UNION
        |SELECT DISTINCT d.a AS id, c.rep
        |FROM dist2 d JOIN comp c ON c.id = d.b
        |WHERE d.a NOT IN (SELECT id FROM core)""".stripMargin
    Oracle.assertEquivalent(TestUtil.membershipDF(spark, res), sql,
      "pts" -> TestUtil.ptsDF(spark, pts))
  }

  test("two separated clumps give two clusters") {
    val a = (0 until 10).map(i => repro.core.Pt(i, Array(0.0 + i * 0.01, 0.0)))
    val b = (0 until 10).map(i => repro.core.Pt(10 + i, Array(50.0 + i * 0.01, 0.0)))
    val res = NaiveDBSCAN.run((a ++ b).toArray, 1.0, 5)
    assert(res.numClusters === 2)
    assert(res.numCore === 20)
  }
}
