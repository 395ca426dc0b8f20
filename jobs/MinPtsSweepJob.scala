package repro.jobs

import repro.experiments.{Experiments, Sweeps}

/** Reproduces paper Figure 7 (as a table): running time vs minPts at the
  * default ε of each dataset.
  *
  * Usage: spark-submit ... repro.jobs.MinPtsSweepJob [scale]
  */
object MinPtsSweepJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("minpts-sweep")
    try {
      val (rows, dnf) = Sweeps.minPtsSweep(spark, JobSpark.scaleArg(args))
      println(Experiments.formatMatrix("Figure 7: running time vs minPts (seconds)",
        r => s"${r.dataset} minPts=${r.minPts}", _.method, rows, dnf))
    } finally spark.stop()
  }
}
