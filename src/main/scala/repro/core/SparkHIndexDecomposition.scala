package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.graph.HopNeighborhoods

/** Distributed H-index decomposition engine: Algorithms 2–3 expressed as
  * iterative DataFrame (Catalyst) dataflow.
  *
  * Static per (G, h): the h-hop pair table (distributed BFS), the
  * common-h-neighbor table ``(eid, u, v, w)``, and the oriented adjacency —
  * all persisted. Each round then:
  *
  *  1. joins per-edge keys onto the adjacency and runs ``h`` hop-bounded
  *     maximin DP steps (join + max-aggregate) to get the reachable-path
  *     keys ``P(a, b)`` of Definition 6;
  *  2. joins ``P`` onto the common-neighbor table from both endpoints and
  *     aggregates ``min(P(u,w), P(v,w))`` per edge with the H-index UDF;
  *  3. merges the new values, counts changes, and ``localCheckpoint``s the
  *     key table to keep lineage flat across rounds.
  *
  * Modes (mirroring the paper's variants in a BSP engine):
  *  - [[SparkHIndexDecomposition.Sync]] — Paral: every edge recomputed from
  *    the previous round's keys.
  *  - [[SparkHIndexDecomposition.AsyncBlocks]] — Asyn: true shared-memory
  *    asynchrony does not exist in BSP, so it is emulated by block
  *    Gauss–Seidel: edges are split into ``blocks`` groups updated
  *    sequentially within one outer round, each seeing the latest keys.
  *    The paper's Fig. 6 metric (round count) is what this reproduces.
  *  - [[SparkHIndexDecomposition.AsyncPruned]] — Paral+: AsyncBlocks plus
  *    Lemma-4 active-set pruning via joins against the (h-1)-hop pair table
  *    (a changed edge activates edges with an endpoint within h-1 hops of
  *    its endpoints, only when its drop crosses their current value).
  */
object SparkHIndexDecomposition {

  /** Update-schedule variants. */
  sealed trait Mode
  /** Paral: synchronous Jacobi rounds. */
  case object Sync extends Mode
  /** Asyn: block Gauss–Seidel with ``blocks`` sequential sub-updates. */
  final case class AsyncBlocks(blocks: Int) extends Mode
  /** Paral+: [[AsyncBlocks]] plus Lemma-4 active-set pruning. */
  final case class AsyncPruned(blocks: Int) extends Mode

  /** Decomposition output: ``trussness`` with schema
    * ``(eid BIGINT, src INT, dst INT, trussness INT)`` and the number of
    * (outer) rounds to convergence — the Fig. 6 metric.
    */
  final case class Result(trussness: DataFrame, rounds: Int)

  /** Run the decomposition over a canonical edge DataFrame
    * (``src, dst, eid`` — see [[repro.graph.EdgeList]]).
    */
  def decompose(edges: DataFrame, h: Int, mode: Mode = Sync, maxRounds: Int = 10000,
                deadlineNanos: Long = Long.MaxValue): Result = {
    require(h >= 1, s"need h >= 1, got $h")
    val hIdx  = HIndex.hIndexUdf
    val spark = edges.sparkSession
    // The per-round relations are small relative to the session default
    // (tuned for SF~0.1 OLAP); fewer shuffle partitions cut scheduling and
    // planning overhead across the many fixpoint rounds. Restored on exit.
    val prevShuffle = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions",
                   math.max(4, spark.sparkContext.defaultParallelism / 2))
    try decomposeImpl(edges, h, mode, maxRounds, deadlineNanos, hIdx)
    finally spark.conf.set("spark.sql.shuffle.partitions", prevShuffle)
  }

  private def decomposeImpl(edges: DataFrame, h: Int, mode: Mode, maxRounds: Int,
                            deadlineNanos: Long,
                            hIdx: org.apache.spark.sql.expressions.UserDefinedFunction): Result = {

    // Static tables are eagerly localCheckpoint-ed (not just persisted): a
    // checkpoint truncates the logical plan to a flat RDD scan, so the many
    // per-round jobs that reference these tables serialize small task
    // binaries instead of the whole construction lineage.
    val e0 = edges.select("src", "dst", "eid").localCheckpoint().toDF("src", "dst", "eid")
    val adj = repro.graph.EdgeList.oriented(e0).localCheckpoint().toDF("a", "b", "eid")
    val pairs = HopNeighborhoods.hopDistances(e0, h).localCheckpoint().toDF("a", "b", "dist")
    val common = HopNeighborhoods.commonNeighbors(e0, pairs)
      .localCheckpoint().toDF("eid", "u", "v", "w")
    // (h-1)-hop pairs for Lemma-4 activation; at h = 1 only distance 0
    // (the identity, handled separately) qualifies.
    val pairsHm1 = pairs.where(col("dist") <= h - 1).select("a", "b")
      .localCheckpoint().toDF("a", "b")

    val (blocks, pruned) = mode match {
      case Sync              => (1, false)
      case AsyncBlocks(b)    => (math.max(1, b), false)
      case AsyncPruned(b)    => (math.max(1, b), true)
    }

    // Current per-edge keys H^(n): (eid, src, dst, hval).
    // ``toDF`` after each checkpoint re-aliases with fresh expression ids so
    // union branches across rounds never share attribute ids (Catalyst's
    // union constraint rewrite requires distinct child outputs).
    var hdf = e0.join(HSupport.distributed(e0, h, Some(pairs)), "eid")
      .select(col("eid"), col("src"), col("dst"), col("sup") as "hval")
      .localCheckpoint()
      .toDF("eid", "src", "dst", "hval")

    // Active set for pruning; null means "all edges".
    var activeDf: DataFrame = null
    var rounds = 0
    var done   = false
    while (!done && rounds < maxRounds) {
      rounds += 1
      var roundChanged = 0L
      // Changed-edge log for this outer round (for Lemma-4 activation).
      var changedLog: DataFrame = null
      var b = 0
      while (b < blocks) {
        Budget.check(deadlineNanos)
        // Target: this block's slice of the active set.
        val inBlock = if (blocks == 1) lit(true) else pmod(col("eid"), lit(blocks)) === b
        val target =
          if (activeDf == null) hdf.where(inBlock)
          else hdf.where(inBlock).join(activeDf, Seq("eid"), "left_semi")
        val p = pathKeys(hdf, adj, h)
        val contrib = common
          .join(target.select(col("eid")), Seq("eid"), "left_semi")
          .alias("c")
          .join(p.alias("pu"), col("c.u") === col("pu.a") && col("c.w") === col("pu.b"))
          .join(p.alias("pv"), col("c.v") === col("pv.a") && col("c.w") === col("pv.b"))
          .select(col("c.eid") as "eid", least(col("pu.p"), col("pv.p")) as "contrib")
        val recomputed = contrib.groupBy("eid")
          .agg(hIdx(collect_list(col("contrib"))) as "hnew")
        // One eager checkpoint materializes the whole round pipeline once;
        // the change log and the merged key table both read from it.
        val updatedTarget = target
          .join(recomputed, Seq("eid"), "left")
          .select(col("eid"), col("src"), col("dst"), col("hval"),
                  least(col("hval"), coalesce(col("hnew"), lit(0))) as "hnext")
          .localCheckpoint()
          .toDF("eid", "src", "dst", "hval", "hnext")
        val blockChanged = updatedTarget
          .where(col("hnext") < col("hval"))
          .select(col("eid"), col("src"), col("dst"),
                  col("hval") as "hold", col("hnext") as "hnew")
        roundChanged += blockChanged.count()
        changedLog = if (changedLog == null) blockChanged else changedLog.unionAll(blockChanged)
        val rest = if (blocks == 1 && activeDf == null) {
          hdf.limit(0)
        } else hdf.join(updatedTarget.select("eid"), Seq("eid"), "left_anti")
        hdf = rest.select("eid", "src", "dst", "hval")
          .unionAll(updatedTarget.select(col("eid"), col("src"), col("dst"), col("hnext") as "hval"))
          .localCheckpoint()
          .toDF("eid", "src", "dst", "hval")
        b += 1
      }
      if (pruned) {
        val nextActive = activate(changedLog, pairsHm1, adj, hdf)
          .localCheckpoint()
          .toDF("eid")
        val nActive = nextActive.count()
        activeDf = nextActive
        done = nActive == 0
      } else {
        done = roundChanged == 0
      }
    }

    val result = hdf.select(col("eid"), col("src"), col("dst"), (col("hval") + 2) as "trussness")
    Result(result, rounds)
  }

  /** Hop-bounded maximin reachable-path keys: ``P(a, b)`` for all ordered
    * pairs within ``h`` hops, given current per-edge keys. ``h`` DP steps:
    * ``P_d = max(P_{d-1}, extend-by-one-edge(P_{d-1}))``.
    */
  private[core] def pathKeys(hdf: DataFrame, adj: DataFrame, h: Int): DataFrame = {
    val edgesH = adj.join(hdf.select("eid", "hval"), "eid")
      .select(col("a"), col("b"), col("hval"))
    var p = edgesH.select(col("a"), col("b"), col("hval") as "p")
    var d = 2
    while (d <= h) {
      val step = p.alias("p")
        .join(edgesH.alias("e"), col("p.b") === col("e.a"))
        .select(col("p.a") as "a", col("e.b") as "b", least(col("p.p"), col("e.hval")) as "p")
        .where(col("a") =!= col("b"))
      p = p.unionAll(step).groupBy("a", "b").agg(max(col("p")) as "p")
      d += 1
    }
    p
  }

  /** Lemma-4 activation: edges with an endpoint within h-1 hops of a changed
    * edge's endpoint, whose current value lies in the crossed interval
    * ``(hnew, hold]``.
    */
  private[core] def activate(changedLog: DataFrame, pairsHm1: DataFrame,
                             adj: DataFrame, hdf: DataFrame): DataFrame = {
    val changedV = changedLog
      .select(explode(array(col("src"), col("dst"))) as "cv", col("hold"), col("hnew"))
    // Vertices within h-1 hops of a changed endpoint, plus the endpoint itself.
    val reached = changedV
      .join(pairsHm1, col("cv") === col("a"))
      .select(col("b") as "av", col("hold"), col("hnew"))
      .unionAll(changedV.select(col("cv") as "av", col("hold"), col("hnew")))
    reached.alias("r")
      .join(adj.alias("j"), col("r.av") === col("j.a"))
      .select(col("j.eid") as "eid", col("r.hold") as "hold", col("r.hnew") as "hnew")
      .join(hdf.select(col("eid"), col("hval")), Seq("eid"))
      .where(col("hnew") < col("hval") && col("hval") <= col("hold"))
      .select("eid")
      .distinct()
  }
}
