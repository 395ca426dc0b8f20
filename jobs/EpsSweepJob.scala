package repro.jobs

import repro.experiments.{Experiments, Sweeps}

/** Reproduces paper Figure 6 (as a table): running time vs ε for the
  * d >= 3 datasets across all our variants and the pointwise baselines.
  *
  * Usage: spark-submit ... repro.jobs.EpsSweepJob [scale]
  */
object EpsSweepJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("eps-sweep")
    try {
      val (rows, dnf) = Sweeps.epsSweep(spark, JobSpark.scaleArg(args))
      println(Experiments.formatMatrix("Figure 6: running time vs eps (seconds)",
        r => s"${r.dataset} eps=${r.eps}", _.method, rows, dnf))
    } finally spark.stop()
  }
}
