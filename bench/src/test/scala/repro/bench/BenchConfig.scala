package repro.bench

/** Shared bench knobs, env-overridable so CI and interactive runs can trade
  * coverage for time without code changes.
  */
object BenchConfig {
  /** Per-variant time budget; past it a cell reports INF (paper: 4 days). */
  val budgetMs: Long = sys.env.getOrElse("REPRO_BENCH_BUDGET_MS", "90000").toLong

  /** Hop thresholds swept by the efficiency/async tables. */
  val hs: Seq[Int] = sys.env.getOrElse("REPRO_BENCH_HS", "2,3").split(",").map(_.trim.toInt).toSeq

  /** Max worker threads (the paper's default is 20 on a 2-socket Xeon). */
  val threads: Int = sys.env.getOrElse("REPRO_BENCH_THREADS",
    Runtime.getRuntime.availableProcessors().toString).toInt
}
