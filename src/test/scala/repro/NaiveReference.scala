package repro

import scala.collection.mutable

/** Tiny, deliberately slow reference implementations — independent of every
  * production code path (adjacency maps + exhaustive search) — used to
  * validate BFS distances, h-supports, maximin path keys, and single
  * H-index steps on small graphs.
  */
object NaiveReference {

  def adjacency(edges: Seq[(Int, Int)]): Map[Int, Set[Int]] = {
    val m = mutable.Map.empty[Int, Set[Int]].withDefaultValue(Set.empty)
    for ((u, v) <- edges if u != v) { m(u) = m(u) + v; m(v) = m(v) + u }
    m.toMap.withDefaultValue(Set.empty)
  }

  /** All-pairs shortest distances by per-vertex BFS over an adjacency map. */
  def distances(edges: Seq[(Int, Int)]): Map[(Int, Int), Int] = {
    val adj = adjacency(edges)
    val vs  = edges.flatMap(e => Seq(e._1, e._2)).distinct
    val out = mutable.Map.empty[(Int, Int), Int]
    for (s <- vs) {
      val dist  = mutable.Map(s -> 0)
      var front = Set(s)
      var d     = 0
      while (front.nonEmpty) {
        d += 1
        front = front.flatMap(adj).filterNot(dist.contains)
        front.foreach(v => dist(v) = d)
      }
      dist.foreach { case (v, dv) => out((s, v)) = dv }
    }
    out.toMap
  }

  /** Common h-neighbors of (u, v): within distance h of both, excluding
    * endpoints.
    */
  def commonHNeighbors(edges: Seq[(Int, Int)], u: Int, v: Int, h: Int): Set[Int] = {
    val d  = distances(edges)
    val vs = edges.flatMap(e => Seq(e._1, e._2)).distinct
    vs.filter { w =>
      w != u && w != v &&
        d.get((u, w)).exists(_ <= h) && d.get((v, w)).exists(_ <= h)
    }.toSet
  }

  /** h-support of every canonical edge. */
  def hSupport(edges: Seq[(Int, Int)], h: Int): Map[(Int, Int), Int] = {
    val canon = edges.map { case (u, v) => if (u < v) (u, v) else (v, u) }.distinct
    canon.map(e => e -> commonHNeighbors(canon, e._1, e._2, h).size).toMap
  }

  /** H-index by sorting (independent of the counting implementation). */
  def hIndex(values: Seq[Int]): Int = {
    val sorted = values.sorted(Ordering.Int.reverse)
    sorted.zipWithIndex.takeWhile { case (v, i) => v >= i + 1 }.length
  }

  /** Maximin path key P(u, w) over simple paths of length <= h, by
    * exhaustive DFS (Definition 6). ``key`` maps canonical edges to their
    * current values. Returns None if no such path exists.
    */
  def maximinKey(edges: Seq[(Int, Int)], key: Map[(Int, Int), Int],
                 u: Int, w: Int, h: Int): Option[Int] = {
    val adj  = adjacency(edges)
    var best = Option.empty[Int]
    def canon(a: Int, b: Int): (Int, Int) = if (a < b) (a, b) else (b, a)
    def dfs(v: Int, used: Set[Int], minKey: Int, hops: Int): Unit = {
      if (v == w && hops > 0) {
        if (best.forall(_ < minKey)) best = Some(minKey)
      }
      if (hops < h) {
        for (x <- adj(v) if !used(x)) {
          dfs(x, used + x, math.min(minKey, key(canon(v, x))), hops + 1)
        }
      }
    }
    dfs(u, Set(u), Int.MaxValue, 0)
    best
  }

  /** One synchronous H-index round for every edge (Algorithm 3 by brute
    * force): next(e) = H({min(P(u,w), P(v,w)) | w in common h-neighbors}).
    */
  def hStep(edges: Seq[(Int, Int)], key: Map[(Int, Int), Int], h: Int): Map[(Int, Int), Int] = {
    val canon = edges.map { case (u, v) => if (u < v) (u, v) else (v, u) }.distinct
    canon.map { case e @ (u, v) =>
      val contribs = commonHNeighbors(canon, u, v, h).toSeq.map { w =>
        val pu = maximinKey(canon, key, u, w, h).getOrElse(0)
        val pv = maximinKey(canon, key, v, w, h).getOrElse(0)
        math.min(pu, pv)
      }
      e -> math.min(key(e), hIndex(contribs))
    }.toMap
  }
}
