package repro.jobs

import repro.experiments.{Experiments, Sweeps}

/** Reproduces paper Table 2: parallel running times of our-exact (bucketing
  * on GeoLife) vs the RP-DBSCAN stand-in on the four large-dataset stand-ins
  * across four ε values each, minPts = 100.
  *
  * Usage: spark-submit ... repro.jobs.Table2Job [scale]
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("table2")
    try {
      val (rows, dnf) = Sweeps.table2(spark, JobSpark.scaleArg(args))
      println(Experiments.formatMatrix("Table 2: large-scale datasets (seconds)",
        r => s"${r.dataset} eps=${r.eps}", _.method, rows, dnf))
      println(Experiments.formatTable("Table 2 raw rows", rows))
    } finally spark.stop()
  }
}
