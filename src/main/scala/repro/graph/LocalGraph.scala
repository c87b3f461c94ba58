package repro.graph

import org.apache.spark.sql.DataFrame

/** Immutable CSR (compressed sparse row) view of an undirected graph.
  *
  * Vertices are re-indexed densely as ``0 until n``; ``label(i)`` recovers
  * the original vertex id. Edges are indexed ``0 until m`` in canonical
  * ``(src < dst)`` order sorted by ``(src, dst)``; ``edgeSrc``/``edgeDst``
  * give the dense endpoints of edge ``i`` and [[eids]] the stable 64-bit id
  * used by the distributed engine (so results can be joined across engines).
  *
  * The adjacency arrays carry, for each ``(v, neighbor)`` slot, the id of
  * the connecting edge (``adjEdge``) so per-edge key lookups during BFS are
  * O(1). All decomposition engines treat deletions via an ``alive`` bitmask
  * rather than mutating the CSR.
  */
final class LocalGraph private (
    val n: Int,
    val m: Int,
    val label: Array[Int],
    val edgeSrc: Array[Int],
    val edgeDst: Array[Int],
    val offsets: Array[Int],
    val adjVert: Array[Int],
    val adjEdge: Array[Int],
) {

  /** Stable 64-bit edge ids (original labels), aligned with edge indices. */
  lazy val eids: Array[Long] = {
    val out = new Array[Long](m)
    var i = 0
    while (i < m) { out(i) = EdgeList.eid(label(edgeSrc(i)), label(edgeDst(i))); i += 1 }
    out
  }

  /** Degree of dense vertex ``v``. */
  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  /** Neighbors of dense vertex ``v`` (fresh array; use offsets for hot loops). */
  def neighbors(v: Int): Array[Int] = adjVert.slice(offsets(v), offsets(v + 1))

  /** BFS from ``src`` to depth ``maxHops`` over edges where ``alive`` is
    * true (null = all alive). Returns the visited dense vertices (including
    * ``src``) and their distances, via the provided scratch buffers:
    * ``stamp``/``token`` implement O(1) resettable visited marks and
    * ``dist`` holds distances for stamped vertices. ``out`` receives the
    * visit order. Returns the number of visited vertices.
    *
    * Scratch-buffer contract: arrays must have length >= n; ``token`` must
    * be unique per call (caller increments it).
    */
  def bfs(src: Int, maxHops: Int, alive: java.util.BitSet,
          stamp: Array[Int], token: Int, dist: Array[Int], out: Array[Int]): Int = {
    var head = 0; var tail = 0
    out(tail) = src; tail += 1
    stamp(src) = token; dist(src) = 0
    while (head < tail) {
      val v = out(head); head += 1
      val dv = dist(v)
      if (dv < maxHops) {
        var i = offsets(v)
        val end = offsets(v + 1)
        while (i < end) {
          if (alive == null || alive.get(adjEdge(i))) {
            val w = adjVert(i)
            if (stamp(w) != token) {
              stamp(w) = token; dist(w) = dv + 1
              out(tail) = w; tail += 1
            }
          }
          i += 1
        }
      }
    }
    tail
  }

  /** Convenience (allocating) h-hop neighborhood of ``v``: dense vertices at
    * distance 1..h. Used by tests; hot paths use [[bfs]] with scratch.
    */
  def ball(v: Int, h: Int): Set[Int] = {
    val stamp = new Array[Int](n)
    val dist  = new Array[Int](n)
    val out   = new Array[Int](n)
    val cnt   = bfs(v, h, null, stamp, 1, dist, out)
    (0 until cnt).map(out(_)).toSet - v
  }

  /** Common h-neighbors of edge ``(u, v)`` (dense ids, excluding u and v). */
  def commonHNeighbors(u: Int, v: Int, h: Int): Set[Int] =
    (ball(u, h) intersect ball(v, h)) - u - v

  /** Edges as canonical original-label pairs, aligned with edge indices. */
  def edgePairs: Seq[(Int, Int)] =
    (0 until m).map(i => (label(edgeSrc(i)), label(edgeDst(i))))
}

object LocalGraph {

  /** Build from canonical or raw pairs (self-loops dropped, duplicates
    * merged, orientation normalized).
    */
  def fromEdges(pairs: Seq[(Int, Int)]): LocalGraph = {
    val canonical = pairs.iterator
      .filter { case (u, v) => u != v }
      .map { case (u, v) => if (u < v) (u, v) else (v, u) }
      .toSeq.distinct
    val labels = canonical.flatMap(e => Seq(e._1, e._2)).distinct.sorted.toArray
    val index  = labels.zipWithIndex.toMap
    val dense  = canonical.map { case (u, v) =>
      val (a, b) = (index(u), index(v)); if (a < b) (a, b) else (b, a)
    }.sortBy(identity).toArray
    val n = labels.length
    val m = dense.length
    val edgeSrc = dense.map(_._1)
    val edgeDst = dense.map(_._2)
    val deg = new Array[Int](n)
    dense.foreach { case (u, v) => deg(u) += 1; deg(v) += 1 }
    val offsets = new Array[Int](n + 1)
    var i = 0
    while (i < n) { offsets(i + 1) = offsets(i) + deg(i); i += 1 }
    val cursor  = offsets.clone()
    val adjVert = new Array[Int](2 * m)
    val adjEdge = new Array[Int](2 * m)
    var e = 0
    while (e < m) {
      val u = edgeSrc(e); val v = edgeDst(e)
      adjVert(cursor(u)) = v; adjEdge(cursor(u)) = e; cursor(u) += 1
      adjVert(cursor(v)) = u; adjEdge(cursor(v)) = e; cursor(v) += 1
      e += 1
    }
    new LocalGraph(n, m, labels, edgeSrc, edgeDst, offsets, adjVert, adjEdge)
  }

  /** Collect a canonical edge DataFrame (``src``, ``dst`` columns) to a
    * local CSR graph. Caller guarantees the graph fits on the driver.
    */
  def fromDataFrame(edges: DataFrame): LocalGraph =
    fromEdges(edges.select("src", "dst").collect().map(r => (r.getInt(0), r.getInt(1))).toSeq)
}
