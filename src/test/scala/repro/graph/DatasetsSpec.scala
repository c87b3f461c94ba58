package repro.graph

import org.scalatest.funsuite.AnyFunSuite

/** Dataset analogues: sizes match the spec, generation is deterministic. */
class DatasetsSpec extends AnyFunSuite {

  test("all six paper datasets are present, in Table 1 order") {
    assert(Datasets.all.map(_.code) == Seq("YT", "VL", "SC", "GA", "AM", "AN"))
  }

  test("byCode resolves case-insensitively and rejects unknowns") {
    assert(Datasets.byCode("yt") eq Datasets.YT)
    assert(Datasets.byCode("AM") eq Datasets.AM)
    intercept[IllegalArgumentException](Datasets.byCode("XX"))
  }

  test("full-scale datasets match the paper's |E| exactly") {
    for (ds <- Seq(Datasets.YT, Datasets.VL, Datasets.SC)) {
      assert(ds.scale == 1.0)
      assert(ds.edges.length == ds.paperE, ds.code)
    }
  }

  test("scaled datasets match their declared scaled |E|") {
    for (ds <- Seq(Datasets.GA, Datasets.AM, Datasets.AN)) {
      assert(ds.scale < 1.0)
      assert(ds.edges.length == ds.paperE, ds.code)
    }
  }

  test("vertex counts are close to the declared |V|") {
    // Random generators may leave a few vertices isolated (not in any edge);
    // the realized vertex count must stay within 15% of the target.
    for (ds <- Datasets.all) {
      val g = ds.localGraph
      assert(g.n <= ds.paperV, s"${ds.code}: ${g.n} > ${ds.paperV}")
      assert(g.n >= (ds.paperV * 0.85).toInt, s"${ds.code}: ${g.n} too small")
    }
  }

  test("generation is deterministic") {
    for (ds <- Seq(Datasets.YT, Datasets.AN))
      assert(ds.edges == ds.edges)
  }

  test("edges are canonical and distinct") {
    for (ds <- Datasets.all) {
      val e = ds.edges
      assert(e.forall { case (u, v) => u < v }, ds.code)
      assert(e.distinct.length == e.length, ds.code)
    }
  }

  test("AN (small-world mix) has more triangles per edge than GA (p2p)") {
    def triangleRate(ds: DatasetSpec): Double = {
      val g   = ds.localGraph
      val sup = repro.core.HSupport.local(g, 1)
      sup.sum.toDouble / g.m
    }
    assert(triangleRate(Datasets.AN) > triangleRate(Datasets.GA))
  }
}
