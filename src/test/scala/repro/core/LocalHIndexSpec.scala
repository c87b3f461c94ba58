package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.{NaiveReference, TestGraphs}
import repro.graph.{GraphGen, LocalGraph}

/** The shared-memory H-index engine (Paral/Single/Asyn/Paral+) against the
  * peeling baseline, the definition oracle, and the naive step reference.
  */
class LocalHIndexSpec extends AnyFunSuite {

  private val variants: Seq[(String, LocalHIndexConfig)] = Seq(
    "Single"        -> LocalHIndexConfig(threads = 1),
    "Paral(4)"      -> LocalHIndexConfig(threads = 4),
    "Asyn(1)"       -> LocalHIndexConfig(threads = 1, async = true),
    "Asyn(4)"       -> LocalHIndexConfig(threads = 4, async = true),
    "Pruned(1)"     -> LocalHIndexConfig(threads = 1, pruning = true),
    "Paral+(4)"     -> LocalHIndexConfig(threads = 4, async = true, pruning = true),
  )

  private def checkAll(edges: Seq[(Int, Int)], h: Int, label: String): Unit = {
    val g = LocalGraph.fromEdges(edges)
    val expect = BruteForce.trussness(g, h).toSeq
    for ((name, cfg) <- variants) {
      val got = LocalHIndexDecomposition.decompose(g, h, cfg)
      assert(got.trussness.toSeq == expect, s"$label h=$h variant=$name")
    }
  }

  test("hand graphs at h=1 (all variants)") {
    for ((e, i) <- Seq(TestGraphs.triangle, TestGraphs.k5, TestGraphs.bowtie,
                       TestGraphs.twoCliquesBridge, TestGraphs.path5).zipWithIndex)
      checkAll(e, 1, s"hand$i")
  }

  test("hand graphs at h=2 (all variants)") {
    for ((e, i) <- Seq(TestGraphs.k4, TestGraphs.bowtie, TestGraphs.star5,
                       TestGraphs.c6, TestGraphs.twoCliquesBridge,
                       TestGraphs.fig1Like).zipWithIndex)
      checkAll(e, 2, s"hand$i")
  }

  test("hand graphs at h=3 (all variants)") {
    for ((e, i) <- Seq(TestGraphs.bowtie, TestGraphs.c6,
                       TestGraphs.twoCliquesBridge, TestGraphs.fig1Like).zipWithIndex)
      checkAll(e, 3, s"hand$i")
  }

  test("random pool at h=1") {
    for ((e, i) <- TestGraphs.randomPool(12, 22, 110).zipWithIndex) checkAll(e, 1, s"rand$i")
  }

  test("random pool at h=2") {
    for ((e, i) <- TestGraphs.randomPool(12, 18, 210).zipWithIndex) checkAll(e, 2, s"rand$i")
  }

  test("random pool at h=3") {
    for ((e, i) <- TestGraphs.randomPool(6, 14, 310).zipWithIndex) checkAll(e, 3, s"rand$i")
  }

  test("larger graphs agree with the peeling baseline") {
    for ((edges, h) <- Seq(
        (GraphGen.chungLu(300, 700, 2.3, 41), 2),
        (GraphGen.smallWorld(250, 6, 0.1, 42), 2),
        (GraphGen.plantedCommunities(4, 12, 0.6, 10, 43), 2),
        (GraphGen.erdosRenyi(200, 400, 44), 3))) {
      val g = LocalGraph.fromEdges(edges)
      val expect = BaselinePeeling.trussness(g, h).toSeq
      val sync   = LocalHIndexDecomposition.decompose(g, h, LocalHIndexConfig(threads = 8))
      val asyncP = LocalHIndexDecomposition.decompose(
        g, h, LocalHIndexConfig(threads = 8, async = true, pruning = true))
      assert(sync.trussness.toSeq == expect)
      assert(asyncP.trussness.toSeq == expect)
    }
  }

  test("order-0 values are the h-supports") {
    val g = LocalGraph.fromEdges(TestGraphs.fig1Like)
    for (h <- 1 to 3) {
      val r = LocalHIndexDecomposition.decompose(g, h, LocalHIndexConfig(threads = 2))
      assert(r.initialSupport.toSeq == HSupport.local(g, h).toSeq)
    }
  }

  test("first synchronous round matches the naive Algorithm-3 step") {
    for (seed <- 0 until 5; h <- 1 to 2) {
      val edges = TestGraphs.randomPool(1, 14, 800 + seed).head
      val g = LocalGraph.fromEdges(edges)
      val sup = HSupport.local(g, h)
      val key = (0 until g.m)
        .map(e => (g.label(g.edgeSrc(e)), g.label(g.edgeDst(e))) -> sup(e)).toMap
      val expect = NaiveReference.hStep(edges, key, h)
      val scratch = new HopScratch(g)
      for (e <- 0 until g.m) {
        val got = scratch.computeHIndex(e, h, sup, sup(e))
        val pair = (g.label(g.edgeSrc(e)), g.label(g.edgeDst(e)))
        assert(math.min(got, sup(e)) == expect(pair), s"seed=$seed h=$h e=$pair")
      }
    }
  }

  test("synchronous rounds are deterministic and thread-count independent") {
    val g = LocalGraph.fromEdges(GraphGen.chungLu(120, 300, 2.3, 77))
    val r1 = LocalHIndexDecomposition.decompose(g, 2, LocalHIndexConfig(threads = 1))
    val r4 = LocalHIndexDecomposition.decompose(g, 2, LocalHIndexConfig(threads = 4))
    val r16 = LocalHIndexDecomposition.decompose(g, 2, LocalHIndexConfig(threads = 16))
    assert(r1.trussness.toSeq == r4.trussness.toSeq)
    assert(r1.rounds == r4.rounds && r4.rounds == r16.rounds)
  }

  test("sequential async needs no more rounds than sync (Fig. 6 effect)") {
    for (seed <- 0 until 6) {
      val g = LocalGraph.fromEdges(GraphGen.smallWorld(80, 6, 0.15, 60 + seed))
      val sync = LocalHIndexDecomposition.decompose(g, 2, LocalHIndexConfig(threads = 1))
      val asyn = LocalHIndexDecomposition.decompose(
        g, 2, LocalHIndexConfig(threads = 1, async = true))
      assert(asyn.rounds <= sync.rounds, s"seed=$seed: ${asyn.rounds} > ${sync.rounds}")
    }
  }

  test("monotone convergence: trussness - 2 <= initial support") {
    val g = LocalGraph.fromEdges(GraphGen.chungLu(60, 150, 2.2, 91))
    val r = LocalHIndexDecomposition.decompose(g, 2, LocalHIndexConfig(threads = 2))
    for (e <- 0 until g.m) assert(r.trussness(e) - 2 <= r.initialSupport(e))
  }

  test("budget exceeded raises Budget.Exceeded") {
    val g = LocalGraph.fromEdges(GraphGen.smallWorld(400, 8, 0.1, 3))
    intercept[Budget.Exceeded] {
      LocalHIndexDecomposition.decompose(
        g, 3, LocalHIndexConfig(threads = 4, deadlineNanos = System.nanoTime() + 1000L))
    }
  }

  test("empty graph converges immediately") {
    val r = LocalHIndexDecomposition.decompose(LocalGraph.fromEdges(Seq.empty), 2)
    assert(r.trussness.isEmpty && r.rounds == 0)
  }
}
