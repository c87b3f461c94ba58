package repro.jobs

import repro.bench.Harness
import repro.graph.Datasets

/** Reproduces the paper's Figure 4 as a table: response time of Base /
  * Paral / Paral+ on every dataset across h, plus the Spark dataflow
  * engine's times on the datasets where its pair tables fit comfortably.
  *
  * Usage: ``spark-submit --class repro.jobs.Table2Efficiency <jar>
  * [h...]`` (default h = 2 3).
  */
object Table2Efficiency {
  def main(args: Array[String]): Unit = {
    val hs = if (args.nonEmpty) args.map(_.toInt).toSeq else Seq(2, 3)
    lazy val spark = JobSession.build("table2-efficiency")
    Harness.warmup()
    val rows = Harness.efficiencyRows(
      Datasets.all, hs, threads = Runtime.getRuntime.availableProcessors(),
      budgetMs = JobSession.budgetMs,
      sparkFor = (ds, h) => ds.code == "YT" && h == hs.min, spark = spark)
    println(Harness.formatTable("Figure 4 (as table): efficiency on all datasets",
      Harness.efficiencyHeader, rows))
  }
}
