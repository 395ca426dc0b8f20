package repro.core

import org.apache.spark.SparkContext
import org.apache.spark.broadcast.Broadcast
import repro.geometry.QuadTree

/** Which cell-construction method to use (paper §4.1 / §4.2). */
sealed trait CellMethod extends Serializable
case object GridCells extends CellMethod
/** 2D-only x-strip / y-box construction. */
case object BoxCells extends CellMethod

/** How MarkCore implements RangeCount (paper §4.3 / §5.2). */
sealed trait CoreMethod extends Serializable
case object ScanCore extends CoreMethod
case object QtCore extends CoreMethod

/** How ClusterCore decides whether two core cells are connected (§4.4/§5.2). */
sealed trait GraphMethod extends Serializable
/** Bichromatic closest pair with ε-filtering and early termination. */
case object BcpGraph extends GraphMethod
/** Exact RangeCount on a quadtree over each cell's core points. */
case object QtGraph extends GraphMethod
/** Unit-spherical emptiness check with line separation (2D only). */
case object UsecGraph extends GraphMethod
/** Delaunay triangulation over all core points (2D only). */
case object DelaunayGraph extends GraphMethod
/** ρ-approximate RangeCount on a depth-limited quadtree (Gan & Tao). */
final case class ApproxGraph(rho: Double) extends GraphMethod

/** Per-run connectivity context: everything a distributed pair-query needs
  * beyond the broadcast [[CellIndex]]. Built once after MarkCore. */
final class ConnCtx(
    val coreCount: Array[Int],
    val coreLo: Array[Array[Double]],  // bbox of each cell's core points (null if none)
    val coreHi: Array[Array[Double]],
    val coreQt: Array[QuadTree],       // per-core-cell quadtree over core points (null unless qt/approx)
    val sortedBy0: Array[Array[Pt]],   // core points sorted by axis 0 (null unless usec)
    val sortedBy1: Array[Array[Pt]],
) extends Serializable

object ConnCtx {

  /** Assemble the context. Quadtree / sorted-array builds run distributed. */
  def build(sc: SparkContext, bcIdx: Broadcast[CellIndex], bcFlags: Broadcast[Array[Boolean]],
            method: GraphMethod, par: Int = 0): ConnCtx = {
    val idx = bcIdx.value
    val flags = bcFlags.value
    val m = idx.numCells
    val coreCount = new Array[Int](m)
    val coreLo = new Array[Array[Double]](m)
    val coreHi = new Array[Array[Double]](m)
    var c = 0
    while (c < m) {
      val cps = idx.pts(c).filter(p => flags(p.id.toInt))
      coreCount(c) = cps.length
      if (cps.nonEmpty) {
        val bb = BBox.of(cps)
        coreLo(c) = bb.lo; coreHi(c) = bb.hi
      }
      c += 1
    }
    val coreCells = (0 until m).filter(coreCount(_) > 0)
    val p = if (par > 0) par else sc.defaultParallelism
    val parts = Par.parts(coreCells.size, p)

    val qts = method match {
      case QtGraph | ApproxGraph(_) =>
        val minSide = method match {
          case ApproxGraph(rho) => rho * idx.cellSide // ρ·ε/√d
          case _                => 0.0
        }
        val built = sc.parallelize(coreCells, parts).map { c =>
          val i = bcIdx.value
          val cps = i.pts(c).filter(p => bcFlags.value(p.id.toInt))
          val qt =
            if (minSide > 0) QuadTree.buildApprox(cps, i.qtLo(c), i.cellSide, minSide)
            else QuadTree.build(cps, i.qtLo(c), i.cellSide)
          (c, qt)
        }.collect()
        val arr = new Array[QuadTree](m)
        built.foreach { case (c, qt) => arr(c) = qt }
        arr
      case _ => null
    }

    val (s0, s1) = method match {
      case UsecGraph =>
        require(idx.d == 2, "USEC cell graph is 2D-only")
        val built = sc.parallelize(coreCells, parts).map { c =>
          val i = bcIdx.value
          val cps = i.pts(c).filter(p => bcFlags.value(p.id.toInt))
          (c, cps.sortBy(_.x(0)), cps.sortBy(_.x(1)))
        }.collect()
        val a0 = new Array[Array[Pt]](m); val a1 = new Array[Array[Pt]](m)
        built.foreach { case (c, by0, by1) => a0(c) = by0; a1(c) = by1 }
        (a0, a1)
      case _ => (null, null)
    }

    new ConnCtx(coreCount, coreLo, coreHi, qts, s0, s1)
  }
}

/** The per-pair connectivity queries of ClusterCore (paper §4.4, §5.2). */
object CellGraph {

  /** Should core cells g and h be linked in the cell graph? */
  def connected(idx: CellIndex, ctx: ConnCtx, method: GraphMethod, g: Int, h: Int,
                flags: Array[Boolean]): Boolean = method match {
    case BcpGraph       => bcpConnected(idx, ctx, g, h, flags)
    case QtGraph        => qtConnected(idx, ctx, g, h, flags, rho = 0.0)
    case ApproxGraph(r) => qtConnected(idx, ctx, g, h, flags, rho = r)
    case UsecGraph      => usecConnected(idx, ctx, g, h)
    case DelaunayGraph  =>
      throw new IllegalArgumentException("Delaunay builds the whole graph at once")
  }

  /** Core points of cell c that lie within ε of the other cell's core bbox —
    * the paper's (Gan & Tao's) filtering optimization before the BCP scan. */
  private def filteredCore(idx: CellIndex, ctx: ConnCtx, c: Int, other: Int,
                           flags: Array[Boolean]): Array[Pt] = {
    val bb = BBox(ctx.coreLo(other), ctx.coreHi(other))
    val e2 = idx.eps * idx.eps
    idx.pts(c).filter(p => flags(p.id.toInt) && bb.minSqDistTo(p.x) <= e2)
  }

  /** BCP with filtering + early termination. The paper parallelizes inside a
    * pair with fixed-size blocks; here the parallelism is across pairs (one
    * Spark task evaluates whole pairs), so a plain early-exit scan is the
    * faithful per-pair kernel. */
  def bcpConnected(idx: CellIndex, ctx: ConnCtx, g: Int, h: Int,
                   flags: Array[Boolean]): Boolean = {
    val a = filteredCore(idx, ctx, g, h, flags)
    if (a.isEmpty) return false
    val b = filteredCore(idx, ctx, h, g, flags)
    if (b.isEmpty) return false
    val eps = idx.eps
    var i = 0
    while (i < a.length) {
      var j = 0
      val pa = a(i).x
      while (j < b.length) {
        if (Dist.leq(pa, b(j).x, eps)) return true
        j += 1
      }
      i += 1
    }
    false
  }

  /** Connectivity via (approximate) RangeCount on the target's core quadtree:
    * connected iff some core point of one cell has a non-zero (approximate)
    * count in the other (paper §5.2). Queries from the smaller cell. */
  def qtConnected(idx: CellIndex, ctx: ConnCtx, g: Int, h: Int,
                  flags: Array[Boolean], rho: Double): Boolean = {
    val (qSide, tSide) = if (ctx.coreCount(g) <= ctx.coreCount(h)) (g, h) else (h, g)
    val queries = filteredCore(idx, ctx, qSide, tSide, flags)
    val qt = ctx.coreQt(tSide)
    val eps = idx.eps
    var i = 0
    while (i < queries.length) {
      val hit =
        if (rho > 0) qt.approxExists(queries(i).x, eps, rho)
        else qt.existsWithin(queries(i).x, eps)
      if (hit) return true
      i += 1
    }
    false
  }

  /** USEC with line separation (2D). The cells' boxes are disjoint, so some
    * axis separates them; we scan both cells' core points in sorted order
    * along the *other* axis with a ±ε sliding window and early-exit on the
    * first point falling inside the union of ε-balls (see DESIGN.md §5 for
    * the wavefront substitution). */
  def usecConnected(idx: CellIndex, ctx: ConnCtx, g: Int, h: Int): Boolean = {
    // Separating axis: tight core bboxes are disjoint in the axis where the
    // cells' key intervals differ; fall back to axis of largest gap.
    val gLo = ctx.coreLo(g); val gHi = ctx.coreHi(g)
    val hLo = ctx.coreLo(h); val hHi = ctx.coreHi(h)
    val sepAxis =
      if (gHi(0) < hLo(0) || hHi(0) < gLo(0)) 0
      else 1
    val scanAxis = 1 - sepAxis
    val a = if (scanAxis == 0) ctx.sortedBy0(g) else ctx.sortedBy1(g)
    val b = if (scanAxis == 0) ctx.sortedBy0(h) else ctx.sortedBy1(h)
    val eps = idx.eps
    var jLo = 0
    var i = 0
    while (i < a.length) {
      val pa = a(i).x
      val t = pa(scanAxis)
      while (jLo < b.length && b(jLo).x(scanAxis) < t - eps) jLo += 1
      var j = jLo
      while (j < b.length && b(j).x(scanAxis) <= t + eps) {
        if (Dist.leq(pa, b(j).x, eps)) return true
        j += 1
      }
      i += 1
    }
    false
  }
}
