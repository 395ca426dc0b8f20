package repro.jobs

import repro.experiments.Experiments

/** Parameter search harness (paper §7: "we performed a search on ε and
  * minPts ... and chose the default parameters to be those that output a
  * correct clustering"): prints cluster count / core% / noise% for each
  * dataset across its ε sweep so defaults can be validated.
  *
  * Usage: spark-submit ... repro.jobs.CalibrateJob [scale]
  */
object CalibrateJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSpark.session("calibrate")
    try {
      val scale = JobSpark.scaleArg(args)
      val names = Seq("ss-simden-2d", "ss-varden-2d", "ss-simden-3d", "ss-varden-3d",
        "ss-simden-5d", "uniform-2d", "uniform-3d", "geolife", "cosmo50",
        "openstreetmap", "teraclicklog")
      val rows = for {
        name <- names
        ds = Experiments.dataset(name, math.max(500L, (100000 * scale).toLong))
        w = ds.make(spark)
        eps <- ds.epsSweep
      } yield {
        val r = Experiments.run(spark, w, "our-exact", eps, ds.minPts)
        if (eps == ds.epsSweep.last) w.unpersist()
        r
      }
      println(Experiments.formatTable("Calibration: our-exact across eps sweeps", rows))
    } finally spark.stop()
  }
}
