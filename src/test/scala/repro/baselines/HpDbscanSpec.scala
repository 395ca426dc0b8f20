package repro.baselines

import repro.{SparkSpec, TestUtil}

/** HPDBSCAN stand-in is exact: must equal the sequential reference for any
  * slab count, including slabs narrower than ε (multi-slab halos). */
class HpDbscanSpec extends SparkSpec {

  for {
    d <- Seq(2, 3)
    slabs <- Seq(1, 4, 13)
    (eps, minPts) <- Seq((2.0, 6), (4.0, 18))
    seed <- Seq(1L, 2L)
  } test(s"hpdbscan == naive d=$d slabs=$slabs eps=$eps minPts=$minPts seed=$seed") {
    val pts = TestUtil.blobPts(400, d, 4, 2.0, 40.0, 0.2, seed * 29 + d)
    val got = HpDbscan.run(spark, pts, eps, minPts, numSlabs0 = slabs)
    TestUtil.assertSameClustering(got, NaiveDBSCAN.run(pts, eps, minPts))
  }

  test("clusters spanning slab boundaries are merged") {
    // A single dense line along x: every slab boundary cuts the cluster.
    val pts = Array.tabulate(200)(i => repro.core.Pt(i, Array(i * 0.4, 0.0)))
    val got = HpDbscan.run(spark, pts, eps = 1.0, minPts = 3, numSlabs0 = 8)
    assert(got.numClusters === 1)
    TestUtil.assertSameClustering(got, NaiveDBSCAN.run(pts, 1.0, 3))
  }

  test("slabs narrower than eps still produce exact results") {
    val pts = TestUtil.blobPts(300, 2, 2, 1.5, 20.0, 0.2, 31L)
    val got = HpDbscan.run(spark, pts, eps = 5.0, minPts = 10, numSlabs0 = 16)
    TestUtil.assertSameClustering(got, NaiveDBSCAN.run(pts, 5.0, 10))
  }
}
