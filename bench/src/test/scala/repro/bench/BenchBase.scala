package repro.bench

import repro.SparkSpec

/** Base for benchmark suites: shared SparkSession plus the scale knob.
  *
  * `BENCH_SCALE` (default 1.0) multiplies every dataset size, so the same
  * suites serve as smoke tests (0.05) and full reproductions (1.0).
  */
trait BenchBase extends SparkSpec {
  val scale: Double = sys.env.getOrElse("BENCH_SCALE", "1.0").toDouble
  val budgetMs: Long = sys.env.getOrElse("BENCH_BUDGET_MS", "90000").toLong

  /** Print through ScalaTest's output so `sbt bench/test | tee` captures it. */
  def emit(s: String): Unit = { println(s); Console.out.flush() }

  /** Performance-shape assertions only make sense when runs are long enough
    * for algorithmic cost to dominate Spark's fixed per-job overhead
    * (~100 ms); smoke runs at tiny BENCH_SCALE cancel them via `assume`. */
  def requireFullScale(): Unit =
    assume(scale >= 0.5, s"perf-shape assertion skipped at BENCH_SCALE=$scale")
}
