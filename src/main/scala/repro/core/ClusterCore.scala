package repro.core

import org.apache.spark.SparkContext
import org.apache.spark.broadcast.Broadcast
import repro.geometry.{Delaunay, UnionFind}

/** Statistics from cell-graph construction (used by the bucketing benches). */
final case class GraphStats(
    numCells: Int,
    numCoreCells: Int,
    candidatePairs: Long,
    queriesRun: Long,
    edges: Long,
)

/** Parallel ClusterCore (paper Alg. 3).
  *
  * Builds the cell graph — an edge between neighboring core cells whose core
  * points come within ε — and returns each cell's connected component.
  *
  * Connectivity *queries* are evaluated in parallel in Spark; the union-find
  * over the (small) cell graph lives on the driver. Pairs already in the same
  * component are pruned before evaluation. With `bucketing` (paper §4.4),
  * cells are sorted by core-point count (descending) and processed in
  * batches: big, highly-connected cells union early and prune many later
  * queries — without it, all pairs evaluate in one fully-parallel batch,
  * which is what an unsynchronized parallel execution degrades to.
  */
object ClusterCore {

  /** Returns (component id per cell, -1 for non-core cells; stats). */
  def run(sc: SparkContext, bcIdx: Broadcast[CellIndex], bcFlags: Broadcast[Array[Boolean]],
          bcCtx: Broadcast[ConnCtx], method: GraphMethod, bucketing: Boolean,
          numBuckets: Int = 32, par: Int = 0): (Array[Int], GraphStats) = {
    val idx = bcIdx.value
    val ctx = bcCtx.value
    val m = idx.numCells
    val p = if (par > 0) par else sc.defaultParallelism
    method match {
      case DelaunayGraph => runDelaunay(sc, bcIdx, bcFlags, ctx, p)
      case _ =>
        // Rank core cells by core count, descending (paper's SortBySize).
        val coreCells = (0 until m).filter(ctx.coreCount(_) > 0).toArray
        val order = coreCells.sortBy(c => (-ctx.coreCount(c), c))
        val rank = Array.fill(m)(Int.MaxValue)
        order.zipWithIndex.foreach { case (c, r) => rank(c) = r }

        val uf = new UnionFind(m)
        var candidate = 0L; var run = 0L; var edges = 0L
        val batches: Iterator[Array[Int]] =
          if (bucketing) {
            val bs = math.max(1, (order.length + numBuckets - 1) / numBuckets)
            order.grouped(bs)
          } else Iterator.single(order)
        for (batch <- batches) {
          // Each unordered pair is owned by the later-ranked cell, so it is
          // considered exactly once, in its owner's batch. An owner walks its
          // neighbor list *sequentially* (paper Alg. 3 line 5 is a plain
          // `for`): a query is pruned when the target's component — as of the
          // start of the batch, extended by the owner's own links — is
          // already connected to the owner. Owners across a batch evaluate in
          // parallel.
          val owners = batch.iterator.map { g =>
            (g, idx.neighbors(g).filter(h => ctx.coreCount(h) > 0 && rank(h) < rank(g)))
          }.filter(_._2.nonEmpty).toSeq
          candidate += owners.iterator.map(_._2.length.toLong).sum
          if (owners.nonEmpty) {
            val snap = Array.tabulate(m)(uf.find)
            val bcSnap = sc.broadcast(snap)
            // Owners are cheap units; group ~16 per partition so small
            // batches don't pay for dozens of near-empty tasks.
            val parts = Par.parts(owners.length / 16 + 1, p)
            val results = sc.parallelize(owners, parts).map { case (g, hs) =>
              val snapV = bcSnap.value
              val linked = scala.collection.mutable.HashSet[Int](snapV(g))
              val hits = scala.collection.mutable.ArrayBuffer[(Int, Int)]()
              var queries = 0L
              var i = 0
              while (i < hs.length) {
                val h = hs(i)
                if (!linked.contains(snapV(h))) {
                  queries += 1
                  if (CellGraph.connected(bcIdx.value, bcCtx.value, method, g, h, bcFlags.value)) {
                    linked += snapV(h)
                    hits += ((g, h))
                  }
                }
                i += 1
              }
              (hits.toArray, queries)
            }.collect()
            bcSnap.destroy()
            results.foreach { case (hits, q) =>
              run += q
              edges += hits.length
              hits.foreach { case (g, h) => uf.union(g, h) }
            }
          }
        }
        val comp = Array.tabulate(m)(c => if (ctx.coreCount(c) > 0) uf.find(c) else -1)
        (comp, GraphStats(m, coreCells.length, candidate, run, edges))
    }
  }

  /** Delaunay-triangulation cell graph (2D): triangulate all core points on
    * the driver, then filter edges (length ≤ ε, endpoints in different
    * cells) in parallel — each surviving edge links two cells. */
  private def runDelaunay(sc: SparkContext, bcIdx: Broadcast[CellIndex],
                          bcFlags: Broadcast[Array[Boolean]],
                          ctx: ConnCtx, par: Int): (Array[Int], GraphStats) = {
    val idx = bcIdx.value
    require(idx.d == 2, "Delaunay cell graph is 2D-only")
    val flags = bcFlags.value
    val m = idx.numCells
    // Gather core points with their cell ids.
    val corePts = new scala.collection.mutable.ArrayBuffer[(Double, Double, Int)]()
    var c = 0
    while (c < m) {
      val ps = idx.pts(c)
      var i = 0
      while (i < ps.length) {
        if (flags(ps(i).id.toInt)) corePts += ((ps(i).x(0), ps(i).x(1), c))
        i += 1
      }
      c += 1
    }
    val px = corePts.map(_._1).toArray
    val py = corePts.map(_._2).toArray
    val cellOf = corePts.map(_._3).toArray
    val uf = new UnionFind(m)
    var edgeCount = 0L
    var dtEdges = 0L
    if (px.length >= 2) {
      val dt = new Delaunay(px, py).edges()
      dtEdges = dt.length
      val eps2 = idx.eps * idx.eps
      val bcPx = sc.broadcast(px); val bcPy = sc.broadcast(py); val bcCell = sc.broadcast(cellOf)
      val parts = Par.parts(dt.length / 4096 + 1, par)
      val hits = sc.parallelize(dt.toSeq, parts).flatMap { case (a, b) =>
        val xs = bcPx.value; val ys = bcPy.value; val cl = bcCell.value
        val dx = xs(a) - xs(b); val dy = ys(a) - ys(b)
        if (cl(a) != cl(b) && dx * dx + dy * dy <= eps2) Iterator.single((cl(a), cl(b)))
        else Iterator.empty
      }.distinct().collect()
      edgeCount = hits.length
      hits.foreach { case (g, h) => uf.union(g, h) }
    }
    val comp = Array.tabulate(m)(c => if (ctx.coreCount(c) > 0) uf.find(c) else -1)
    val numCoreCells = (0 until m).count(ctx.coreCount(_) > 0)
    (comp, GraphStats(m, numCoreCells, dtEdges, dtEdges, edgeCount))
  }
}
