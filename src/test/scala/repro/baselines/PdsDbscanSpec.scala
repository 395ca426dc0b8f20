package repro.baselines

import repro.{SparkSpec, TestUtil}

/** PDSDBSCAN stand-in is exact: must equal the sequential reference. */
class PdsDbscanSpec extends SparkSpec {

  for {
    d <- Seq(2, 3, 5)
    (eps, minPts) <- Seq((2.0, 5), (4.0, 20))
    seed <- Seq(1L, 2L)
  } test(s"pdsdbscan == naive d=$d eps=$eps minPts=$minPts seed=$seed") {
    val pts = TestUtil.blobPts(400, d, 4, 2.0, 40.0, 0.2, seed * 23 + d)
    val got = PdsDbscan.run(spark, pts, eps, minPts)
    TestUtil.assertSameClustering(got, NaiveDBSCAN.run(pts, eps, minPts))
  }

  test("all-noise and all-one-cluster extremes") {
    val pts = TestUtil.uniformPts(100, 2, 1000.0, 5L)
    val noise = PdsDbscan.run(spark, pts, 1.0, 5)
    assert(noise.numClusters === 0)
    val one = PdsDbscan.run(spark, pts, 5000.0, 5)
    assert(one.numClusters === 1)
  }
}
