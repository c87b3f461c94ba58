package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.graph.{DatasetSpec, Datasets, LocalGraph}

/** Shared experiment harness behind both the ``jobs/`` spark-submit
  * entrypoints and the ``bench/`` suites: runs each paper variant under a
  * time budget (INF past budget, mirroring the paper's 4-day cutoff),
  * collects times/round counts, and renders aligned ASCII tables whose rows
  * match the paper's Table 1 and Figures 4–6 (figures rendered as tables;
  * see EXPERIMENTS.md for the paper-vs-ours diff).
  */
object Harness {

  /** One measurement: wall time (None = exceeded budget → INF) and, for the
    * H-index engines, the rounds-to-convergence count (the Fig. 6 metric).
    */
  final case class Measured(millis: Option[Double], rounds: Option[Int]) {
    def timeCell: String   = millis.map(ms => f"$ms%.0f").getOrElse("INF")
    def roundsCell: String = rounds.map(_.toString).getOrElse("-")
  }

  private def isBudget(t: Throwable, depth: Int = 0): Boolean =
    t != null && depth < 16 &&
      (t.isInstanceOf[Budget.Exceeded] || isBudget(t.getCause, depth + 1))

  /** Time ``f`` under ``budgetMs``; ``f`` receives the absolute deadline and
    * returns an optional round count.
    */
  def run(budgetMs: Long)(f: Long => Option[Int]): Measured = {
    val dl = Budget.deadline(budgetMs)
    val t0 = System.nanoTime()
    try {
      val rounds = f(dl)
      Measured(Some((System.nanoTime() - t0) / 1e6), rounds)
    } catch {
      case e: Throwable if isBudget(e) => Measured(None, None)
    }
  }

  /** Base: the sequential peeling baseline (Algorithm 1). */
  def runBase(g: LocalGraph, h: Int, budgetMs: Long): Measured =
    run(budgetMs) { dl => BaselinePeeling.trussness(g, h, dl); None }

  /** Local engine variant (Single/Paral/Asyn/Paral+ by config). */
  def runLocal(g: LocalGraph, h: Int, threads: Int, async: Boolean,
               pruning: Boolean, budgetMs: Long): Measured =
    run(budgetMs) { dl =>
      val r = LocalHIndexDecomposition.decompose(
        g, h, LocalHIndexConfig(threads, async, pruning, deadlineNanos = dl))
      Some(r.rounds)
    }

  /** Spark dataflow engine variant. */
  def runSpark(spark: SparkSession, ds: DatasetSpec, h: Int,
               mode: SparkHIndexDecomposition.Mode, budgetMs: Long): Measured =
    run(budgetMs) { dl =>
      val r = SparkHIndexDecomposition.decompose(ds.edgesDf(spark), h, mode, deadlineNanos = dl)
      r.trussness.count() // materialize the full result
      Some(r.rounds)
    }

  // ---------------------------------------------------------------- tables

  /** Render an aligned ASCII table. */
  def formatTable(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  /** Table 1 rows: dataset statistics, paper vs generated analogue. */
  def table1Rows: Seq[Seq[String]] =
    Datasets.all.map { ds =>
      val g = ds.localGraph
      Seq(ds.code, ds.name, ds.paperV.toString, ds.paperE.toString,
          g.n.toString, g.m.toString, f"${ds.scale}%.2f")
    }

  val table1Header: Seq[String] =
    Seq("code", "dataset", "paper |V|", "paper |E|", "ours |V|", "ours |E|", "scale")

  /** Figure-4-as-table rows: response time of Base / Paral / Paral+ (local
    * engine, paper's shared-memory setting) and of the Spark dataflow
    * engine's Paral / Paral+ where enabled.
    */
  /** Spark-engine cells get a larger budget: one BSP round costs far more
    * fixed overhead than a shared-memory sweep, and the Fig. 4 comparison
    * point is the algorithmic shape, not the per-round constant.
    */
  val SparkBudgetFactor = 8L

  def efficiencyRows(datasets: Seq[DatasetSpec], hs: Seq[Int], threads: Int,
                     budgetMs: Long, sparkFor: (DatasetSpec, Int) => Boolean,
                     spark: => SparkSession): Seq[Seq[String]] =
    for (ds <- datasets; h <- hs) yield {
      val g      = ds.localGraph
      val base   = runBase(g, h, budgetMs)
      val paral  = runLocal(g, h, threads, async = false, pruning = false, budgetMs)
      val paralP = runLocal(g, h, threads, async = true, pruning = true, budgetMs)
      val (sp, spp) =
        if (sparkFor(ds, h)) {
          val b  = budgetMs * SparkBudgetFactor
          val s1 = runSpark(spark, ds, h, SparkHIndexDecomposition.Sync, b)
          val s2 = runSpark(spark, ds, h, SparkHIndexDecomposition.AsyncPruned(2), b)
          (s1.timeCell, s2.timeCell)
        } else ("-", "-")
      Seq(ds.code, h.toString, base.timeCell, paral.timeCell, paralP.timeCell, sp, spp)
    }

  val efficiencyHeader: Seq[String] =
    Seq("dataset", "h", "Base ms", "Paral ms", "Paral+ ms", "Spark-Paral ms", "Spark-Paral+ ms")

  /** Figure-5-as-table rows: Paral time and speedup vs Single (threads=1)
    * across thread counts.
    */
  def speedupRows(datasets: Seq[DatasetSpec], hs: Seq[Int], threadCounts: Seq[Int],
                  budgetMs: Long): Seq[Seq[String]] =
    for (ds <- datasets; h <- hs) yield {
      val g = ds.localGraph
      val times = threadCounts.map { t =>
        runLocal(g, h, t, async = false, pruning = false, budgetMs).millis
      }
      val single = times.head
      val cells = threadCounts.indices.flatMap { i =>
        val ms = times(i)
        val speedup = for (s <- single; m <- ms) yield s / m
        Seq(ms.map(v => f"$v%.0f").getOrElse("INF"),
            speedup.map(v => f"$v%.2f").getOrElse("-"))
      }
      Seq(ds.code, h.toString) ++ cells
    }

  def speedupHeader(threadCounts: Seq[Int]): Seq[String] =
    Seq("dataset", "h") ++ threadCounts.flatMap(t => Seq(s"t=$t ms", s"t=$t x"))

  /** Figure-6-as-table rows: rounds to convergence, Paral vs Asyn, for both
    * the local engine and (where enabled) the Spark dataflow engine.
    */
  def asyncRows(datasets: Seq[DatasetSpec], hs: Seq[Int], threads: Int, budgetMs: Long,
                sparkFor: (DatasetSpec, Int) => Boolean, spark: => SparkSession): Seq[Seq[String]] =
    for (ds <- datasets; h <- hs) yield {
      val g    = ds.localGraph
      val sync = runLocal(g, h, threads, async = false, pruning = false, budgetMs)
      val asyn = runLocal(g, h, threads, async = true, pruning = false, budgetMs)
      val (sp, spa) =
        if (sparkFor(ds, h)) {
          val b  = budgetMs * SparkBudgetFactor
          val s1 = runSpark(spark, ds, h, SparkHIndexDecomposition.Sync, b)
          val s2 = runSpark(spark, ds, h, SparkHIndexDecomposition.AsyncBlocks(2), b)
          (s1.roundsCell, s2.roundsCell)
        } else ("-", "-")
      Seq(ds.code, h.toString, sync.roundsCell, asyn.roundsCell, sp, spa)
    }

  val asyncHeader: Seq[String] =
    Seq("dataset", "h", "Paral rounds", "Asyn rounds", "Spark-Paral rounds", "Spark-Asyn rounds")

  /** One small decomposition per engine to JIT-warm hot paths before
    * measuring (the paper averages 10 runs; we warm up and run once).
    */
  def warmup(): Unit = {
    val g = LocalGraph.fromEdges(repro.graph.GraphGen.smallWorld(200, 6, 0.1, 7))
    BaselinePeeling.trussness(g, 2)
    LocalHIndexDecomposition.decompose(g, 2, LocalHIndexConfig(threads = 4))
    ()
  }
}
