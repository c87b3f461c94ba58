package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.Datasets

/** Reproduces **Figure 5 as a table**: Paral runtime and speedup over
  * Single (= 1 thread) while varying the thread count, on the four datasets
  * the paper uses (YT, VL, GA, AM).
  *
  * Paper shape to reproduce: speedup grows with threads; larger/denser
  * inputs scale better (paper: up to ~32x at 32 threads on GA h=3,4);
  * small inputs that converge in a few cheap rounds scale worse.
  */
class Table3SpeedupBench extends AnyFunSuite {

  test("Figure 5 (as table): Paral speedup vs Single") {
    Harness.warmup()
    val threadCounts = Seq(1, 2, 4, 8, 16).filter(_ <= BenchConfig.threads) :+ BenchConfig.threads
    val tc = threadCounts.distinct
    val datasets = Seq(Datasets.YT, Datasets.VL, Datasets.GA, Datasets.AM)
    val rows = Harness.speedupRows(datasets, BenchConfig.hs, tc, BenchConfig.budgetMs)
    println(Harness.formatTable(
      s"Figure 5 (as table): Paral speedup vs Single, budget=${BenchConfig.budgetMs}ms",
      Harness.speedupHeader(tc), rows))

    assert(rows.length == datasets.length * BenchConfig.hs.length)
    // Shape check: on the largest finished configuration, the max-thread run
    // must beat single-threaded (speedup > 1).
    val best = rows.flatMap { r =>
      val last = r.last
      if (last == "-") None else Some(last.toDouble)
    }
    assert(best.nonEmpty && best.max > 1.0,
           s"no configuration showed parallel speedup: $rows")
  }
}
