package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{DBSCANResult, Pt}

import java.util.SplittableRandom

/** Shared helpers for the DBSCAN test battery. */
object TestUtil {

  /** Uniform random points in [0, extent]^d with dense ids. */
  def uniformPts(n: Int, d: Int, extent: Double, seed: Long): Array[Pt] = {
    val rnd = new SplittableRandom(seed)
    Array.tabulate(n)(i => Pt(i, Array.fill(d)(rnd.nextDouble() * extent)))
  }

  /** Gaussian blobs plus uniform noise — guarantees core, border and noise
    * points for sensible (eps, minPts). */
  def blobPts(n: Int, d: Int, numBlobs: Int, sigma: Double, extent: Double,
              noiseFrac: Double, seed: Long): Array[Pt] = {
    val rnd = new SplittableRandom(seed)
    val centers = Array.fill(numBlobs)(Array.fill(d)(rnd.nextDouble() * extent))
    Array.tabulate(n) { i =>
      if (rnd.nextDouble() < noiseFrac) Pt(i, Array.fill(d)(rnd.nextDouble() * extent))
      else {
        val c = centers(rnd.nextInt(numBlobs))
        Pt(i, Array.tabulate(d)(j => c(j) + rnd.nextGaussian() * sigma))
      }
    }
  }

  /** Canonical label of a cluster: the smallest core-point id it contains. */
  def clusterReps(r: DBSCANResult): Map[Int, Long] = {
    val rep = scala.collection.mutable.HashMap[Int, Long]()
    var i = 0
    while (i < r.n) {
      if (r.isCore(i)) {
        val c = r.coreCluster(i)
        if (!rep.contains(c) || rep(c) > i) rep(c) = i
      }
      i += 1
    }
    rep.toMap
  }

  /** Point-id -> set of canonical cluster labels (core: singleton). */
  def membership(r: DBSCANResult): Map[Int, Set[Long]] = {
    val reps = clusterReps(r)
    (0 until r.n).flatMap { i =>
      val cs: Set[Long] =
        if (r.isCore(i)) Set(reps(r.coreCluster(i)))
        else r.borderClusters(i).map(reps).toSet
      if (cs.nonEmpty) Some(i -> cs) else None
    }.toMap
  }

  /** Assert two results are the same clustering up to label renaming. */
  def assertSameClustering(got: DBSCANResult, want: DBSCANResult): Unit = {
    require(got.n == want.n, s"n mismatch: ${got.n} vs ${want.n}")
    val gc = got.isCore.toSeq; val wc = want.isCore.toSeq
    require(gc == wc,
      s"core flags differ at ids ${gc.zip(wc).zipWithIndex.collect { case ((a, b), i) if a != b => i }.take(5)}")
    require(got.numClusters == want.numClusters,
      s"cluster count: ${got.numClusters} vs ${want.numClusters}")
    val gm = membership(got); val wm = membership(want)
    val diff = (gm.keySet ++ wm.keySet).filter(k => gm.get(k) != wm.get(k))
    require(diff.isEmpty,
      s"membership differs for ids ${diff.take(5)}: got=${diff.take(3).map(gm.get)} want=${diff.take(3).map(wm.get)}")
  }

  /** Points as a (id, x0..x{d-1}) DataFrame for the DuckDB oracle. */
  def ptsDF(spark: SparkSession, pts: Array[Pt]): DataFrame = {
    import org.apache.spark.sql.types._
    val d = pts(0).d
    val schema = StructType(
      StructField("id", LongType, nullable = false) +:
        (0 until d).map(j => StructField(s"x$j", DoubleType, nullable = false)))
    val rows = pts.map(p => org.apache.spark.sql.Row.fromSeq(p.id +: p.x.toSeq)).toSeq
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 2), schema)
  }

  /** SQL predicate: dist(alias a, alias b) <= eps, over VARCHAR-stored cols. */
  def sqlDistLeq(a: String, b: String, d: Int, eps: Double): String = {
    val sum = (0 until d)
      .map(j => s"($a.x$j::DOUBLE - $b.x$j::DOUBLE) * ($a.x$j::DOUBLE - $b.x$j::DOUBLE)")
      .mkString(" + ")
    s"($sum) <= ${eps * eps}"
  }

  /** Complete DBSCAN in DuckDB SQL over the `pts` table: returns the WITH
    * prelude defining dist2 / core / ce / lbl / comp. Clusters are labeled by
    * their minimum core point id (same canonical form as [[clusterReps]]). */
  def sqlDbscanPrelude(d: Int, eps: Double, minPts: Int): String =
    s"""WITH RECURSIVE dist2 AS (
       |  SELECT p.id::BIGINT AS a, q.id::BIGINT AS b
       |  FROM pts p JOIN pts q ON ${sqlDistLeq("p", "q", d, eps)}
       |),
       |core AS (SELECT a AS id FROM dist2 GROUP BY a HAVING COUNT(*) >= $minPts),
       |ce AS (
       |  SELECT d.a, d.b FROM dist2 d
       |  WHERE d.a IN (SELECT id FROM core) AND d.b IN (SELECT id FROM core)
       |),
       |lbl(id, l) AS (
       |  SELECT id, id FROM core
       |  UNION
       |  SELECT ce.b, lbl.l FROM lbl JOIN ce ON ce.a = lbl.id
       |),
       |comp AS (SELECT id, MIN(l) AS rep FROM lbl GROUP BY id)
       |""".stripMargin

  /** (id, rep) membership rows of a result: one row per core point and one
    * per border membership, labels canonicalized to min core id. */
  def membershipDF(spark: SparkSession, r: DBSCANResult): DataFrame = {
    val rows = membership(r).toSeq.flatMap { case (i, cs) => cs.map(c => (i.toLong, c)) }
    spark.createDataFrame(rows).toDF("id", "rep")
  }
}
