package repro.core

import repro.graph.LocalGraph

/** Per-thread scratch workspace for h-hop computations on a [[LocalGraph]].
  *
  * Holds reusable stamped arrays for two simultaneous BFS frontiers (one per
  * edge endpoint), the hop-bounded maximin ("widest path") DP buffers of
  * Algorithm 3, and a contributions buffer for the H-index aggregation —
  * all allocation-free in steady state. One instance per worker thread;
  * instances must not be shared across threads.
  */
final class HopScratch(g: LocalGraph) {
  private var token = 0

  private val stampU = new Array[Int](g.n)
  private val distU  = new Array[Int](g.n)
  private val orderU = new Array[Int](g.n)
  private val stampV = new Array[Int](g.n)
  private val distV  = new Array[Int](g.n)
  private val orderV = new Array[Int](g.n)

  private val keyU1 = new Array[Int](g.n)
  private val keyU2 = new Array[Int](g.n)
  private val keyV1 = new Array[Int](g.n)
  private val keyV2 = new Array[Int](g.n)

  private var contrib = new Array[Int](64)

  private def nextToken(): Int = { token += 1; token }

  /** h-support of the edge ``(u, v)`` over ``alive`` edges (``null`` = all):
    * the number of vertices within distance ``h`` of both endpoints,
    * excluding the endpoints themselves.
    */
  def support(u: Int, v: Int, h: Int, alive: java.util.BitSet): Int = {
    val tU   = nextToken()
    val cntU = g.bfs(u, h, alive, stampU, tU, distU, orderU)
    val tV   = nextToken()
    g.bfs(v, h, alive, stampV, tV, distV, orderV)
    var count = 0
    var i = 0
    while (i < cntU) {
      val w = orderU(i)
      if (w != u && w != v && stampV(w) == tV) count += 1
      i += 1
    }
    count
  }

  /** Hop-bounded maximin path keys from ``src`` (Algorithm 3's BFS/DP): for
    * every vertex ``w`` within ``h`` hops, ``key(w) = max over paths p from
    * src to w with |p| <= h of min over edges e in p of hval(e)``.
    *
    * Returns the key array (valid only at vertices stamped with the
    * returned token in ``stamp``); ``order``/count expose the visited ball.
    * Runs ``h`` synchronous relaxation sweeps over the ball's adjacency, so
    * cost is O(h * ball-edges).
    */
  private def maximinKeys(src: Int, h: Int, hval: Array[Int],
                          stamp: Array[Int], dist: Array[Int], order: Array[Int],
                          key1: Array[Int], key2: Array[Int]): (Array[Int], Int, Int) = {
    val t   = nextToken()
    val cnt = g.bfs(src, h, null, stamp, t, dist, order)
    var i = 0
    while (i < cnt) { key1(order(i)) = -1; i += 1 }
    key1(src) = Int.MaxValue
    var ka = key1
    var kb = key2
    var d = 0
    while (d < h) {
      var j = 0
      while (j < cnt) {
        val w = order(j)
        if (w != src) {
          var best = ka(w)
          var p    = g.offsets(w)
          val end  = g.offsets(w + 1)
          while (p < end) {
            val x = g.adjVert(p)
            if (stamp(x) == t) {
              val kx = ka(x)
              if (kx >= 0) {
                val he   = hval(g.adjEdge(p))
                val cand = if (kx < he) kx else he
                if (cand > best) best = cand
              }
            }
            p += 1
          }
          kb(w) = best
        }
        j += 1
      }
      kb(src) = Int.MaxValue
      val tmp = ka; ka = kb; kb = tmp
      d += 1
    }
    (ka, t, cnt)
  }

  /** One Algorithm-3 step: the next-order H-index of edge ``e`` given the
    * current per-edge keys ``hval``, capped by ``cap`` (the previous value —
    * the sequence is non-increasing by Theorem 1).
    */
  def computeHIndex(e: Int, h: Int, hval: Array[Int], cap: Int): Int = {
    val u = g.edgeSrc(e)
    val v = g.edgeDst(e)
    val (keyU, tU, cntU) = maximinKeys(u, h, hval, stampU, distU, orderU, keyU1, keyU2)
    val (keyV, tV, _)    = maximinKeys(v, h, hval, stampV, distV, orderV, keyV1, keyV2)
    var nContrib = 0
    var i = 0
    while (i < cntU) {
      val w = orderU(i)
      if (w != u && w != v && stampV(w) == tV) {
        val c = math.min(keyU(w), keyV(w))
        if (nContrib == contrib.length) contrib = java.util.Arrays.copyOf(contrib, contrib.length * 2)
        contrib(nContrib) = math.max(c, 0)
        nContrib += 1
      }
      i += 1
    }
    HIndex.boundedHIndex(contrib, nContrib, cap)
  }

  /** Visit every vertex within ``depth`` hops of ``src`` (including ``src``)
    * over ``alive`` edges, applying ``f``. Used for peeling invalidation and
    * Lemma-4 activation.
    */
  def forEachBallVertex(src: Int, depth: Int, alive: java.util.BitSet)(f: Int => Unit): Unit = {
    val t   = nextToken()
    val cnt = g.bfs(src, depth, alive, stampU, t, distU, orderU)
    var i = 0
    while (i < cnt) { f(orderU(i)); i += 1 }
  }
}
