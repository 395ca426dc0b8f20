package repro.jobs

import repro.experiments.{Experiments, Sweeps}

/** Reproduces paper Figure 11 (as a table): the six 2D variants (grid/box ×
  * BCP/USEC/Delaunay) plus the pointwise baselines on the 2D datasets.
  *
  * Usage: spark-submit ... repro.jobs.TwoDimJob [scale]
  */
object TwoDimJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("two-dim")
    try {
      val (rows, dnf) = Sweeps.twoDim(spark, JobSpark.scaleArg(args))
      println(Experiments.formatMatrix("Figure 11: 2D variants, running time vs eps (seconds)",
        r => s"${r.dataset} eps=${r.eps}", _.method, rows, dnf))
    } finally spark.stop()
  }
}
