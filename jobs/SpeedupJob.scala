package repro.jobs

import repro.experiments.{Experiments, Sweeps}

/** Reproduces paper Figures 8-9 (as a table): self-relative speedup vs
  * parallelism (Spark partitions stand in for threads) and speedup over the
  * serial run of the fastest method.
  *
  * Usage: spark-submit ... repro.jobs.SpeedupJob [scale]
  */
object SpeedupJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("speedup")
    try {
      val rows = Sweeps.speedup(spark, JobSpark.scaleArg(args))
      println(Experiments.formatMatrix("Figures 8-9: running time vs parallelism (seconds)",
        r => s"${r.dataset} p=${r.par}", _.method, rows))
      // Self-relative speedups.
      val byMethod = rows.groupBy(r => (r.dataset, r.method))
      println("\nSelf-relative speedup (T_1 / T_p):")
      for (((ds, m), rs) <- byMethod.toSeq.sortBy(_._1)) {
        val t1 = rs.find(_.par == 1).map(_.ms.toDouble).getOrElse(Double.NaN)
        val line = rs.sortBy(_.par).map(r => f"p=${r.par}: ${t1 / r.ms}%.2fx").mkString("  ")
        println(f"$ds%-16s $m%-16s $line")
      }
    } finally spark.stop()
  }
}
