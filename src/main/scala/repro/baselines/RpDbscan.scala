package repro.baselines

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.SparkSession
import repro.core._
import repro.geometry.UnionFind

/** Stand-in for RP-DBSCAN (Song & Lee 2018) — the distributed *approximate*
  * DBSCAN the paper compares against in Table 2.
  *
  * Pipeline (mirroring the real system's structure and cost profile, not its
  * code): (1) pseudo-random partitioning of the points; (2) each partition
  * builds a local *cell dictionary* — per-cell population counts plus a
  * bounded sample of points; (3) the dictionaries are merged in a shuffle
  * (the "communication" cost the paper credits for its win in Table 2);
  * (4) cell-level clustering on the merged dictionary: cells with ≥ minPts
  * points are core, cell connectivity is decided from bounded samples
  * (within ε(1+ρ)) or box adjacency — an ρ-approximation, like the real
  * RP-DBSCAN, which "does not return the same result as DBSCAN"; (5) a
  * second full pass labels every point from the broadcast dictionary.
  */
object RpDbscan {

  final case class CellInfo(count: Int, samples: Array[Pt])

  def run(spark: SparkSession, points: RDD[Pt], d: Int, eps: Double, minPts: Int,
          rho: Double = 0.01, maxSamples: Int = 16): DBSCANResult = {
    val sc = spark.sparkContext
    val side = CellIndex.sideFor(eps, d)

    // (1)+(2) random partitioning, then per-partition cell dictionaries.
    val numParts = sc.defaultParallelism * 4
    val dicts = points
      .map(p => ((p.id * 0x9E3779B97F4A7C15L).abs % numParts.toLong, p))
      .partitionBy(new org.apache.spark.HashPartitioner(numParts))
      .mapPartitions { it =>
        val local = scala.collection.mutable.HashMap[Vector[Int], (Int, scala.collection.mutable.ArrayBuffer[Pt])]()
        it.foreach { case (_, p) =>
          val k = CellIndex.gridKey(p.x, side)
          val e = local.getOrElseUpdate(k, (0, scala.collection.mutable.ArrayBuffer[Pt]()))
          if (e._2.length < 16) e._2 += p
          local(k) = (e._1 + 1, e._2)
        }
        local.iterator.map { case (k, (c, s)) => (k, CellInfo(c, s.toArray)) }
      }

    // (3) dictionary merge — the shuffle the real system pays for.
    val merged = dicts.reduceByKey { (a, b) =>
      CellInfo(a.count + b.count, (a.samples ++ b.samples).take(maxSamples))
    }.collect()

    val m = merged.length
    val keys = merged.map(_._1)
    val infos = merged.map(_._2)
    val keyToId = keys.zipWithIndex.toMap
    def cellLo(k: Vector[Int]): Array[Double] = k.map(_ * side).toArray
    def cellHi(k: Vector[Int]): Array[Double] = k.map(i => (i + 1) * side).toArray
    val boxes = keys.map(k => BBox(cellLo(k), cellHi(k)))

    // Neighbor cells via a k-d tree over cell centers.
    val centers = Array.tabulate(m)(i => Pt(i, boxes(i).center))
    val tree = repro.geometry.KDTree.build(centers)
    val diag = side * math.sqrt(d.toDouble)
    val e2 = eps * eps
    val neighborsOf: Int => Array[Int] = i =>
      tree.within(centers(i).x, eps + diag).map(_.id.toInt)
        .filter(j => j != i && boxes(i).minSqDist(boxes(j)) <= e2)

    // (4a) core cells: exact for dense cells, neighbor-count approximation
    // for sparse ones (the approximation RP-DBSCAN's two-level cells admit).
    val isCoreCell = new Array[Boolean](m)
    var i = 0
    while (i < m) {
      if (infos(i).count >= minPts) isCoreCell(i) = true
      else {
        val total = infos(i).count + neighborsOf(i).map(infos(_).count).sum
        isCoreCell(i) = total >= minPts
      }
      i += 1
    }

    // (4b) cell graph from samples: connected when boxes touch or some
    // sample pair comes within ε(1+ρ).
    val uf = new UnionFind(m)
    val epsOut = eps * (1 + rho)
    i = 0
    while (i < m) {
      if (isCoreCell(i)) {
        neighborsOf(i).foreach { j =>
          if (isCoreCell(j) && j < i && uf.find(i) != uf.find(j)) {
            val touching = boxes(i).minSqDist(boxes(j)) == 0.0
            val sampleHit = infos(i).samples.exists(a =>
              infos(j).samples.exists(b => Dist.leq(a.x, b.x, epsOut)))
            if (touching || sampleHit) uf.union(i, j)
          }
        }
      }
      i += 1
    }
    val rootToCluster = scala.collection.mutable.HashMap[Int, Int]()
    val cellCluster = Array.tabulate(m) { c =>
      if (isCoreCell(c)) rootToCluster.getOrElseUpdate(uf.find(c), rootToCluster.size) else -1
    }
    val cellNbrClusters = Array.tabulate(m) { c =>
      (neighborsOf(c) :+ c).filter(isCoreCell).map(j => cellCluster(j)).distinct.sorted
    }

    // (5) final labeling pass over all points.
    val bcKeyToId = sc.broadcast(keyToId)
    val bcCoreCell = sc.broadcast(isCoreCell)
    val bcCellCluster = sc.broadcast(cellCluster)
    val bcNbr = sc.broadcast(cellNbrClusters)
    val labeled = points.map { p =>
      val c = bcKeyToId.value(CellIndex.gridKey(p.x, side))
      if (bcCoreCell.value(c)) (p.id.toInt, true, Array(bcCellCluster.value(c)))
      else (p.id.toInt, false, bcNbr.value(c))
    }.collect()

    val n = labeled.length
    val isCore = new Array[Boolean](n)
    val cluster = Array.fill(n)(-1)
    val border = Array.fill(n)(Array.empty[Int])
    labeled.foreach { case (pid, core, cs) =>
      if (core) { isCore(pid) = true; cluster(pid) = cs(0) }
      else border(pid) = cs
    }
    Seq(bcKeyToId, bcCoreCell, bcCellCluster, bcNbr).foreach(_.destroy())
    DBSCANResult(n, isCore, cluster, border, rootToCluster.size,
      RunStats(0, 0, 0, 0, GraphStats(m, isCoreCell.count(identity), 0, 0, 0)))
  }
}
