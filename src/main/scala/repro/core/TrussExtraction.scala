package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import repro.graph.LocalGraph

/** Retrieval of (k,h)-trusses from a completed decomposition: by Lemma 1
  * (containment) the (k,h)-truss is exactly the set of edges with
  * ``t(e,h) >= k``, so decomposition subsumes all truss queries.
  */
object TrussExtraction {

  /** Edges of the (k,h)-truss as an alive-mask over CSR edge indices. */
  def khTrussMask(trussness: Array[Int], k: Int): java.util.BitSet = {
    val out = new java.util.BitSet(trussness.length)
    var e = 0
    while (e < trussness.length) { if (trussness(e) >= k) out.set(e); e += 1 }
    out
  }

  /** Edge pairs (original labels) of the (k,h)-truss. */
  def khTrussEdges(g: LocalGraph, trussness: Array[Int], k: Int): Seq[(Int, Int)] =
    (0 until g.m).collect { case e if trussness(e) >= k =>
      (g.label(g.edgeSrc(e)), g.label(g.edgeDst(e)))
    }

  /** Distributed form over a decomposition result DataFrame with a
    * ``trussness`` column.
    */
  def khTrussDf(decomposed: DataFrame, k: Int): DataFrame =
    decomposed.where(col("trussness") >= k)
}
