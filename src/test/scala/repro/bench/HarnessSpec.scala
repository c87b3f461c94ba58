package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.Datasets

/** Harness plumbing: measurement, budget handling, table formatting. */
class HarnessSpec extends AnyFunSuite {

  test("run measures time and propagates rounds") {
    val m = Harness.run(10000) { _ => Some(7) }
    assert(m.rounds.contains(7))
    assert(m.millis.exists(_ >= 0))
    assert(m.roundsCell == "7")
  }

  test("run reports INF on budget exhaustion") {
    val m = Harness.run(1) { dl =>
      Thread.sleep(5)
      repro.core.Budget.check(dl)
      None
    }
    assert(m.millis.isEmpty)
    assert(m.timeCell == "INF")
  }

  test("run unwraps nested budget exceptions") {
    val m = Harness.run(1) { _ =>
      throw new RuntimeException(new repro.core.Budget.Exceeded)
    }
    assert(m.millis.isEmpty)
  }

  test("non-budget exceptions propagate") {
    intercept[IllegalStateException] {
      Harness.run(1000) { _ => throw new IllegalStateException("boom") }
    }
  }

  test("formatTable aligns columns and includes every row") {
    val s = Harness.formatTable("T", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("33", "4")))
    val lines = s.linesIterator.toSeq
    assert(lines.head == "== T ==")
    assert(lines.length == 5)
    assert(lines.drop(1).map(_.length).distinct.length == 1, "aligned widths")
  }

  test("table1Rows covers all six datasets with paper numbers") {
    val rows = Harness.table1Rows
    assert(rows.map(_.head) == Seq("YT", "VL", "SC", "GA", "AM", "AN"))
    val yt = rows.head
    assert(yt(2) == "1870" && yt(3) == "2227")
    assert(rows.forall(_.length == Harness.table1Header.length))
  }

  test("runBase and runLocal produce consistent timings on a tiny dataset") {
    val g = repro.graph.LocalGraph.fromEdges(repro.TestGraphs.fig1Like)
    val base = Harness.runBase(g, 2, 30000)
    val par  = Harness.runLocal(g, 2, threads = 2, async = false, pruning = false, 30000)
    assert(base.millis.isDefined && par.millis.isDefined)
    assert(par.rounds.exists(_ >= 1))
  }

  test("speedup header matches row arity") {
    val tc = Seq(1, 2, 4)
    val rows = Harness.speedupRows(Seq(Datasets.YT), Seq(2), tc, 60000)
    assert(rows.forall(_.length == Harness.speedupHeader(tc).length))
  }
}
