package repro.jobs

import repro.bench.Harness
import repro.graph.Datasets

/** Reproduces the paper's Figure 5 as a table: Paral time and speedup vs
  * Single (1 thread) across thread counts on YT, VL, GA, AM.
  *
  * Usage: ``spark-submit --class repro.jobs.Table3Speedup <jar> [h...]``
  * (default h = 2 3).
  */
object Table3Speedup {
  def main(args: Array[String]): Unit = {
    val hs = if (args.nonEmpty) args.map(_.toInt).toSeq else Seq(2, 3)
    Harness.warmup()
    val threadCounts = Seq(1, 2, 4, 8, 16)
    val datasets = Seq(Datasets.YT, Datasets.VL, Datasets.GA, Datasets.AM)
    val rows = Harness.speedupRows(datasets, hs, threadCounts, JobSession.budgetMs)
    println(Harness.formatTable("Figure 5 (as table): Paral speedup vs Single",
      Harness.speedupHeader(threadCounts), rows))
  }
}
