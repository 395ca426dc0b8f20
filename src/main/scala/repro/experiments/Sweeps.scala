package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.experiments.Experiments._

/** The experiment behind each table/figure of the paper's evaluation
  * (§7.2-§7.3). Every function returns the raw rows; jobs and benches format
  * and assert on them. `scale` shrinks every dataset for smoke runs. */
object Sweeps {

  /** Skip-list entry: (dataset, method) pairs that blew the time budget — the
    * analogue of the paper's 1-hour cutoff ("data points that did not finish
    * within an hour are not shown"). */
  type Dnf = Set[(String, String)]

  private def n(base: Long, scale: Double): Long = math.max(500L, (base * scale).toLong)

  /** Figure 6: running time vs ε, d >= 3 datasets, all methods. */
  def epsSweep(spark: SparkSession, scale: Double = 1.0,
               budgetMs: Long = 120000): (Seq[RunRow], Dnf) = {
    val datasets = Seq(
      dataset("ss-simden-3d", n(100000, scale)),
      dataset("ss-varden-3d", n(100000, scale)),
      dataset("uniform-3d", n(100000, scale)),
      dataset("ss-simden-5d", n(50000, scale)),
      dataset("geolife", n(100000, scale)))
    sweep(spark, datasets, highDimMethods, budgetMs) { (w, method) =>
      w.ds.epsSweep.map(eps => (eps, w.ds.minPts))
    }
  }

  /** Figure 7: running time vs minPts at the default ε. */
  def minPtsSweep(spark: SparkSession, scale: Double = 1.0,
                  budgetMs: Long = 120000): (Seq[RunRow], Dnf) = {
    val datasets = Seq(
      dataset("ss-simden-3d", n(100000, scale)),
      dataset("ss-varden-3d", n(100000, scale)),
      dataset("uniform-3d", n(100000, scale)))
    sweep(spark, datasets, highDimMethods, budgetMs) { (w, method) =>
      Seq(10, 100, 1000, 10000).map(mp => (w.ds.defaultEps, mp))
    }
  }

  /** Figures 8-9: speedup vs parallelism (partitions stand in for threads). */
  def speedup(spark: SparkSession, scale: Double = 1.0,
              pars: Seq[Int] = Seq(1, 2, 4, 8, 16)): Seq[RunRow] = {
    // 50k keeps the serial (p=1) baseline runs of the pointwise competitors
    // within minutes — the paper's 1-hour cutoff scaled to our sizes.
    val datasets = Seq(
      dataset("ss-simden-3d", n(50000, scale)),
      dataset("ss-varden-3d", n(50000, scale)))
    val methods = Seq("our-exact", "our-exact-qt", "our-approx", "pdsdbscan", "hpdbscan")
    val out = Seq.newBuilder[RunRow]
    for (ds <- datasets) {
      val w = ds.make(spark)
      try {
        for (m <- methods; p <- pars)
          out += run(spark, w, m, ds.defaultEps, ds.minPts, par = p)
      } finally w.unpersist()
    }
    out.result()
  }

  /** Figure 10: running time vs ρ for the approximate methods, with the best
    * exact method as baseline. */
  def rhoSweep(spark: SparkSession, scale: Double = 1.0): Seq[RunRow] = {
    val datasets = Seq(
      dataset("ss-simden-3d", n(100000, scale)),
      dataset("ss-varden-3d", n(100000, scale)))
    val rhos = Seq(0.001, 0.01, 0.1, 1.0)
    val out = Seq.newBuilder[RunRow]
    for (ds <- datasets) {
      val w = ds.make(spark)
      try {
        for (rho <- rhos; m <- Seq("our-approx", "our-approx-qt")) {
          val r = run(spark, w, m, ds.defaultEps, ds.minPts, rho = rho)
          out += r.copy(method = s"$m(rho=$rho)")
        }
        out += run(spark, w, "our-exact", ds.defaultEps, ds.minPts)
      } finally w.unpersist()
    }
    out.result()
  }

  /** Figure 11: the six 2D variants plus competitors. */
  def twoDim(spark: SparkSession, scale: Double = 1.0,
             budgetMs: Long = 120000): (Seq[RunRow], Dnf) = {
    val datasets = Seq(
      dataset("ss-simden-2d", n(100000, scale)),
      dataset("ss-varden-2d", n(100000, scale)),
      dataset("uniform-2d", n(100000, scale)))
    sweep(spark, datasets, twoDimMethods, budgetMs) { (w, method) =>
      w.ds.epsSweep.map(eps => (eps, w.ds.minPts))
    }
  }

  /** Table 2: our-exact (bucketing on geolife, as in the paper) vs the
    * RP-DBSCAN stand-in on the four large-dataset stand-ins, minPts = 100. */
  def table2(spark: SparkSession, scale: Double = 1.0,
             budgetMs: Long = 300000): (Seq[RunRow], Dnf) = {
    val datasets = Seq(
      dataset("geolife", n(200000, scale)),
      dataset("cosmo50", n(200000, scale)),
      dataset("openstreetmap", n(300000, scale)),
      dataset("teraclicklog", n(200000, scale)))
    val out = Seq.newBuilder[RunRow]
    var dnf: Dnf = Set.empty
    for (ds <- datasets) {
      val w = ds.make(spark)
      try {
        val ourMethod = if (ds.name == "geolife") "our-exact-bucketing" else "our-exact"
        for (m <- Seq(ourMethod, "rpdbscan"); eps <- ds.epsSweep) {
          if (!dnf.contains((ds.name, m))) {
            val r = run(spark, w, m, eps, ds.minPts)
            out += r
            if (r.ms > budgetMs) dnf += ((ds.name, m))
          }
        }
      } finally w.unpersist()
    }
    (out.result(), dnf)
  }

  /** Shared sweep loop with per-(dataset, method) DNF budgets; parameters
    * ascend so skipping after one blowout is safe for ε-monotone baselines. */
  private def sweep(spark: SparkSession, datasets: Seq[Dataset], methods: Seq[String],
                    budgetMs: Long)(
      params: (Workload, String) => Seq[(Double, Int)]): (Seq[RunRow], Dnf) = {
    val out = Seq.newBuilder[RunRow]
    var dnf: Dnf = Set.empty
    for (ds <- datasets) {
      val w = ds.make(spark)
      try {
        for (m <- methods; (eps, minPts) <- params(w, m)) {
          if (!dnf.contains((ds.name, m))) {
            val r = run(spark, w, m, eps, minPts)
            out += r
            if (r.ms > budgetMs) dnf += ((ds.name, m))
          }
        }
      } finally w.unpersist()
    }
    (out.result(), dnf)
  }
}
