package repro.metis

import repro.core.Graph

/** Node-weighted working graph for the multilevel partitioner.
  *
  * Same CSR layout as `repro.core.Graph` plus a vertex weight per node.
  * Vertex weight is *activity* (W_v + 2 w_vv, i.e. the account's total
  * transaction involvement) — METIS-style partitioners balance this weight,
  * NOT the blockchain workload, which is exactly the mismatch the paper
  * criticizes (Section II-C) and which our evaluation must reproduce.
  */
final case class WGraph(
    n: Int,
    offsets: Array[Int],
    nbr: Array[Int],
    wgt: Array[Double],
    nodeW: Array[Double]) {

  def totalNodeW: Double = nodeW.sum

  @inline def foreachNbr(v: Int)(f: (Int, Double) => Unit): Unit = {
    var e = offsets(v)
    while (e < offsets(v + 1)) { f(nbr(e), wgt(e)); e += 1 }
  }

  /** Total weight of edges crossing the partition (each edge counted once). */
  def cut(part: Array[Int]): Double = {
    var c = 0.0
    var v = 0
    while (v < n) {
      foreachNbr(v)((u, w) => if (u > v && part(u) != part(v)) c += w)
      v += 1
    }
    c
  }
}

object WGraph {

  /** Lift the account graph: vertex weight = strength + 2 * self-loop. */
  def fromGraph(g: Graph): WGraph =
    WGraph(g.n, g.offsets, g.nbr, g.wgt,
           Array.tabulate(g.n)(v => g.strength(v) + 2 * g.self(v)))
}
