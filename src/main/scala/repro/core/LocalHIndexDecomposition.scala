package repro.core

import java.util.concurrent.{Callable, Executors}
import scala.jdk.CollectionConverters._
import repro.graph.LocalGraph

/** Shared-memory parallel H-index decomposition engine (Algorithms 2–3 with
  * the Section 4.3 optimizations), mirroring the paper's OpenMP setting.
  *
  * Variants, selected by [[LocalHIndexConfig]]:
  *  - '''Single''': ``threads = 1, async = false, pruning = false``
  *  - '''Paral''':  ``threads = T, async = false, pruning = false`` —
  *    synchronous rounds; every edge's order-n value is computed from the
  *    order-(n-1) snapshot.
  *  - '''Asyn''':   ``async = true`` — threads read the live shared key
  *    array, so later edges in a round see already-updated same-round values
  *    (Section 4.1 shows this preserves monotonicity and the fixpoint).
  *  - '''Paral+''': ``async = true, pruning = true`` — additionally skips
  *    edges none of whose dependencies changed in a way that can lower their
  *    value (Lemma 4: a drop of e' from old to new affects H(e) only when
  *    ``new < H(e) <= old``).
  *
  * Determinism: the final trussness vector is the unique fixpoint and is
  * identical across variants and thread counts; only the round count of the
  * async variants may vary with scheduling.
  */
final case class LocalHIndexConfig(
    threads: Int = 1,
    async: Boolean = false,
    pruning: Boolean = false,
    maxRounds: Int = 1 << 20,
    deadlineNanos: Long = Long.MaxValue,
)

/** Result of a decomposition run: per-edge h-trussness (CSR edge order),
  * the number of full sweeps until convergence (the paper's Fig. 6 metric;
  * includes the final no-change sweep for the unpruned variants), and the
  * initial h-supports (order-0 values + 2 would be the support upper bound).
  */
final case class LocalHIndexResult(trussness: Array[Int], rounds: Int, initialSupport: Array[Int])

object LocalHIndexDecomposition {

  /** Run the decomposition of graph ``g`` at hop threshold ``h``. */
  def decompose(g: LocalGraph, h: Int, config: LocalHIndexConfig = LocalHIndexConfig()): LocalHIndexResult = {
    require(h >= 1, s"need h >= 1, got $h")
    require(config.threads >= 1, s"need threads >= 1, got ${config.threads}")
    val m = g.m
    if (m == 0) return LocalHIndexResult(new Array[Int](0), 0, new Array[Int](0))

    val nThreads = math.min(config.threads, m)
    val pool     = Executors.newFixedThreadPool(nThreads)
    try {
      val scratches = Array.fill(nThreads)(new HopScratch(g))
      val chunks: Array[(Int, Int)] = {
        val size = (m + nThreads - 1) / nThreads
        (0 until nThreads).map(i => (i * size, math.min(m, (i + 1) * size))).toArray
      }

      def parallelDo[A](work: Int => A): Seq[A] = {
        val tasks: Seq[Callable[A]] =
          (0 until nThreads).map(i => new Callable[A] { def call(): A = work(i) })
        pool.invokeAll(tasks.asJava).asScala.map { fut =>
          try fut.get()
          catch {
            // Surface the worker's own exception (e.g. Budget.Exceeded).
            case e: java.util.concurrent.ExecutionException if e.getCause != null =>
              throw e.getCause
          }
        }.toSeq
      }

      // Order-0 values: h-supports, computed in parallel (Alg. 2 lines 1-3).
      val hcur = new Array[Int](m)
      parallelDo { i =>
        val (from, until) = chunks(i)
        var e = from
        while (e < until) {
          if ((e & 63) == 0) Budget.check(config.deadlineNanos)
          hcur(e) = scratches(i).support(g.edgeSrc(e), g.edgeDst(e), h, null)
          e += 1
        }
      }
      val sup0 = hcur.clone()

      var active = new java.util.BitSet(m); active.set(0, m)
      var rounds = 0
      var done   = false
      while (!done && rounds < config.maxRounds) {
        rounds += 1
        val snapshot = if (config.async) hcur else hcur.clone()
        // Per-thread change logs: (edge, oldValue) pairs for activation.
        val changes = parallelDo { i =>
          val (from, until) = chunks(i)
          val log = new scala.collection.mutable.ArrayBuffer[(Int, Int)]()
          var e = from
          while (e < until) {
            if ((e & 63) == 0) Budget.check(config.deadlineNanos)
            if (active.get(e)) {
              val old = hcur(e)
              val nh  = scratches(i).computeHIndex(e, h, snapshot, old)
              if (nh < old) {
                hcur(e) = nh
                log += ((e, old))
              }
            }
            e += 1
          }
          log
        }
        val changed = changes.map(_.length).sum
        if (config.pruning) {
          // Lemma-4 activation: a changed e' = (x, y) can affect only the
          // edges with an endpoint within h-1 hops of x or y, and only if
          // its drop crossed their current value (new < H(f) <= old).
          // Changed edges sharing a root vertex are merged (max old,
          // min new) before the BFS — a sound conservative superset that
          // turns O(|changed|) ball walks into O(|distinct roots|), which
          // matters on hub-heavy graphs where one vertex carries thousands
          // of changed edges.
          val next    = new java.util.BitSet(m)
          val act     = scratches(0)
          val oldMax  = new Array[Int](g.n)
          val newMin  = new Array[Int](g.n)
          val rootSet = new java.util.BitSet(g.n)
          for (log <- changes; (ePrime, old) <- log) {
            val nw = hcur(ePrime)
            var side = 0
            while (side < 2) {
              val root = if (side == 0) g.edgeSrc(ePrime) else g.edgeDst(ePrime)
              if (!rootSet.get(root)) { rootSet.set(root); oldMax(root) = old; newMin(root) = nw }
              else {
                if (old > oldMax(root)) oldMax(root) = old
                if (nw < newMin(root)) newMin(root) = nw
              }
              side += 1
            }
          }
          var root = rootSet.nextSetBit(0)
          while (root >= 0) {
            val old = oldMax(root); val nw = newMin(root)
            act.forEachBallVertex(root, h - 1, null) { z =>
              var i = g.offsets(z)
              val end = g.offsets(z + 1)
              while (i < end) {
                val f = g.adjEdge(i)
                if (!next.get(f) && nw < hcur(f) && hcur(f) <= old) next.set(f)
                i += 1
              }
            }
            root = rootSet.nextSetBit(root + 1)
          }
          active = next
          done = next.isEmpty
        } else {
          done = changed == 0
        }
      }
      LocalHIndexResult(hcur.map(_ + 2), rounds, sup0)
    } finally pool.shutdown()
  }
}
