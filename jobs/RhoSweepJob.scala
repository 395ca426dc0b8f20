package repro.jobs

import repro.experiments.{Experiments, Sweeps}

/** Reproduces paper Figure 10 (as a table): running time vs ρ for the two
  * approximate methods against the best exact method.
  *
  * Usage: spark-submit ... repro.jobs.RhoSweepJob [scale]
  */
object RhoSweepJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("rho-sweep")
    try {
      val rows = Sweeps.rhoSweep(spark, JobSpark.scaleArg(args))
      println(Experiments.formatTable("Figure 10: running time vs rho", rows))
    } finally spark.stop()
  }
}
