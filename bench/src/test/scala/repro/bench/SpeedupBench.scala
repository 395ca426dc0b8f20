package repro.bench

import repro.experiments.{Experiments, Sweeps}

/** Paper Figures 8-9 (as a table): running time and self-relative speedup vs
  * parallelism. Spark partitions stand in for the paper's threads; local[*]
  * schedules at most #cores of them concurrently.
  *
  * Shape claims reproduced: our methods scale with parallelism (paper:
  * 2-89x self-relative on 36h cores), so p=16 must beat p=1 clearly.
  */
class SpeedupBench extends BenchBase {

  private lazy val rows = Sweeps.speedup(spark, scale)

  test("figures 8-9 matrix and speedups") {
    emit(Experiments.formatMatrix(
      s"Figures 8-9 (scale=$scale): running time vs parallelism, seconds",
      r => s"${r.dataset} p=${r.par}", _.method, rows))
    val sb = new StringBuilder("\nSelf-relative speedup (T_1 / T_p):\n")
    for (((ds, m), rs) <- rows.groupBy(r => (r.dataset, r.method)).toSeq.sortBy(_._1)) {
      val t1 = rs.find(_.par == 1).map(_.ms.toDouble).getOrElse(Double.NaN)
      sb.append(f"$ds%-16s $m%-14s ")
      rs.sortBy(_.par).foreach(r => sb.append(f"p=${r.par}: ${t1 / r.ms}%.2fx  "))
      sb.append("\n")
    }
    emit(sb.toString)
    assert(rows.nonEmpty)
  }

  test("our-exact gets parallel speedup at p=16 over p=1") {
    requireFullScale()
    for (ds <- rows.map(_.dataset).distinct) {
      val rs = rows.filter(r => r.dataset == ds && r.method == "our-exact")
      val t1 = rs.find(_.par == 1).get.ms
      val t16 = rs.find(_.par == 16).get.ms
      assert(t16 < t1, s"$ds: p=16 (${t16}ms) not faster than p=1 (${t1}ms)")
    }
  }

  test("results are identical across parallelism levels") {
    for (((ds, m), rs) <- rows.groupBy(r => (r.dataset, r.method)))
      assert(rs.map(r => (r.clusters, r.corePct, r.noisePct)).distinct.size === 1,
        s"$ds/$m results vary across parallelism")
  }
}
