package repro.metis

import scala.collection.mutable

/** Coarsening phase: deterministic heavy-edge matching (METIS HEM).
  *
  * Nodes are visited in ascending index; an unmatched node is matched with
  * its unmatched neighbor of maximal edge weight (ties: lowest index). The
  * matched pair becomes one coarse node whose vertex weight is the sum and
  * whose adjacency is the aggregated union (intra-pair edges vanish — edge
  * cut only ever shrinks under coarsening).
  */
object Coarsening {

  /** One matching pass. Returns the coarse graph and the fine->coarse map.
    * `maxNodeW` caps the merged vertex weight (METIS's maxvwgt), preventing
    * heavy hubs from snowballing into un-balanceable coarse nodes.
    */
  def coarsenOnce(g: WGraph, maxNodeW: Double = Double.PositiveInfinity): (WGraph, Array[Int]) = {
    val map = Array.fill(g.n)(-1)
    var nc = 0
    var v = 0
    while (v < g.n) {
      if (map(v) < 0) {
        var best = -1
        var bestW = 0.0
        g.foreachNbr(v) { (u, w) =>
          if (u != v && map(u) < 0 && g.nodeW(v) + g.nodeW(u) <= maxNodeW &&
              (w > bestW + 1e-15 || (math.abs(w - bestW) <= 1e-15 && best >= 0 && u < best)))
            { best = u; bestW = w }
        }
        map(v) = nc
        if (best >= 0) map(best) = nc
        nc += 1
      }
      v += 1
    }

    // Aggregate coarse adjacency and node weights.
    val nodeW = new Array[Double](nc)
    v = 0
    while (v < g.n) { nodeW(map(v)) += g.nodeW(v); v += 1 }

    val adj = Array.fill(nc)(new mutable.TreeMap[Int, Double]())
    v = 0
    while (v < g.n) {
      val cv = map(v)
      g.foreachNbr(v) { (u, w) =>
        val cu = map(u)
        if (cu != cv && u > v) {
          adj(cv).update(cu, adj(cv).getOrElse(cu, 0.0) + w)
          adj(cu).update(cv, adj(cu).getOrElse(cv, 0.0) + w)
        }
      }
      v += 1
    }
    val offsets = new Array[Int](nc + 1)
    var c = 0
    while (c < nc) { offsets(c + 1) = offsets(c) + adj(c).size; c += 1 }
    val nbr = new Array[Int](offsets(nc))
    val wgt = new Array[Double](offsets(nc))
    c = 0
    while (c < nc) {
      var e = offsets(c)
      adj(c).foreach { case (u, w) => nbr(e) = u; wgt(e) = w; e += 1 }
      c += 1
    }
    (WGraph(nc, offsets, nbr, wgt, nodeW), map)
  }

  /** Coarsen until `targetN` nodes or the matching stalls (< 5% shrink).
    * Returns the level stack: (graphs, fine->coarse maps), finest first.
    */
  def coarsen(g: WGraph, targetN: Int,
              maxNodeW: Double = Double.PositiveInfinity): (List[WGraph], List[Array[Int]]) = {
    var graphs = List(g)
    var maps = List.empty[Array[Int]]
    var cur = g
    var stalled = false
    while (cur.n > targetN && !stalled) {
      val (coarse, map) = coarsenOnce(cur, maxNodeW)
      if (coarse.n >= cur.n * 0.95) stalled = true
      else {
        graphs = coarse :: graphs
        maps = map :: maps
        cur = coarse
      }
    }
    (graphs.reverse, maps.reverse) // finest first; maps(i): graphs(i) -> graphs(i+1)
  }
}
