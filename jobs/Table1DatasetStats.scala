package repro.jobs

import repro.bench.Harness

/** Reproduces the paper's Table 1 (dataset statistics): paper |V|/|E| next
  * to our synthetic analogues'. Usage: ``spark-submit --class
  * repro.jobs.Table1DatasetStats <jar>``.
  */
object Table1DatasetStats {
  def main(args: Array[String]): Unit = {
    println(Harness.formatTable("Table 1: dataset statistics (paper vs synthetic analogue)",
      Harness.table1Header, Harness.table1Rows))
  }
}
