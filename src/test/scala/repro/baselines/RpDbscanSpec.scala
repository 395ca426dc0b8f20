package repro.baselines

import repro.{SparkSpec, TestUtil}

/** RP-DBSCAN stand-in is approximate (the paper notes it "does not return
  * the same result as DBSCAN"); tests check structural sanity on inputs
  * where any reasonable approximation must agree with the exact answer. */
class RpDbscanSpec extends SparkSpec {

  test("recovers well-separated dense blobs") {
    val pts = TestUtil.blobPts(2000, 2, 4, 2.0, 500.0, 0.0, 7L)
    val rdd = spark.sparkContext.parallelize(pts.toSeq, 8)
    val res = RpDbscan.run(spark, rdd, 2, eps = 10.0, minPts = 20)
    assert(res.numClusters === 4, s"expected 4 blobs, got ${res.numClusters}")
    // Points of the same blob end in the same cluster.
    val want = NaiveDBSCAN.run(pts, 10.0, 20)
    val wantClusters = TestUtil.membership(want)
    val gotByCluster = (0 until res.n).filter(res.isCore(_)).groupBy(res.coreCluster)
    for ((_, members) <- gotByCluster) {
      val wantLabels = members.flatMap(m => wantClusters.getOrElse(m, Set.empty[Long])).toSet
      assert(wantLabels.size <= 1, "an rp cluster mixes two exact clusters")
    }
  }

  test("degenerate single-cell dataset: one cluster, all core") {
    val pts = TestUtil.uniformPts(500, 13, 10.0, 9L)
    val rdd = spark.sparkContext.parallelize(pts.toSeq, 8)
    val res = RpDbscan.run(spark, rdd, 13, eps = 500.0, minPts = 100)
    assert(res.numClusters === 1)
    assert(res.isCore.forall(identity))
  }

  test("deterministic across partitioning") {
    val pts = TestUtil.blobPts(1000, 3, 3, 2.0, 300.0, 0.05, 11L)
    val a = RpDbscan.run(spark, spark.sparkContext.parallelize(pts.toSeq, 2), 3, 8.0, 15)
    val b = RpDbscan.run(spark, spark.sparkContext.parallelize(pts.toSeq, 16), 3, 8.0, 15)
    assert(a.numClusters === b.numClusters)
    assert(a.isCore.toSeq === b.isCore.toSeq)
  }
}
