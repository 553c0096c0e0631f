package repro.core

import scala.collection.mutable

/** Deterministic multilevel Louvain community detection (paper Section V-B
  * initialization; Blondel et al. 2008).
  *
  * Determinism (paper Section IV-A) comes from: nodes visited in ascending
  * account-id order, candidate communities visited in adjacency order, moves
  * taken only on strictly positive modularity gain with smaller-label
  * tie-breaking, and a deterministic coarse-graph construction. Two runs on
  * the same graph produce identical labelings.
  */
object Louvain {

  /** Community label per node index, compacted to 0..l-1 in order of first
    * occurrence by node index. The number of communities l is discovered by
    * the algorithm (typically l >> k on long-tailed transaction graphs).
    */
  def cluster(g: Graph, maxLevels: Int = 20, maxSweeps: Int = 20): Array[Int] = {
    var cur = g
    // mapping(v) = community of original node v in the current level's graph
    var mapping = Array.tabulate(g.n)(identity)
    var level = 0
    var done = false
    while (!done && level < maxLevels) {
      val comm = localMoves(cur, maxSweeps)
      val labels = compact(comm)
      val nc = if (labels.isEmpty) 0 else labels.max + 1
      if (nc == cur.n) done = true
      else {
        mapping = mapping.map(labels)
        cur = coarsen(cur, labels, nc)
        level += 1
      }
    }
    compact(mapping)
  }

  /** Newman-Girvan modularity of an assignment (used by tests; any consistent
    * convention works — here k_v = W_v + 2 w_vv, 2m = sum k_v).
    */
  def modularity(g: Graph, comm: Array[Int]): Double = {
    val m2 = (0 until g.n).map(v => g.strength(v) + 2 * g.self(v)).sum
    if (m2 == 0) return 0.0
    val nc = if (g.n == 0) 0 else comm.max + 1
    val win = new Array[Double](nc)
    val tot = new Array[Double](nc)
    var v = 0
    while (v < g.n) {
      val c = comm(v)
      tot(c) += g.strength(v) + 2 * g.self(v)
      win(c) += g.self(v)
      g.foreachNbr(v)((u, w) => if (u > v && comm(u) == c) win(c) += w)
      v += 1
    }
    (0 until nc).map(c => 2 * win(c) / m2 - math.pow(tot(c) / m2, 2)).sum
  }

  /** One level of sequential local moves; returns raw community labels. */
  private def localMoves(g: Graph, maxSweeps: Int): Array[Int] = {
    val n = g.n
    val comm = Array.tabulate(n)(identity)
    val k = Array.tabulate(n)(v => g.strength(v) + 2 * g.self(v))
    val m2 = k.sum
    if (m2 == 0) return comm
    val sigmaTot = k.clone()

    val wvc = new Array[Double](n)       // scratch: weight from v to community c
    val touched = new Array[Int](n)
    var sweep = 0
    var moved = true
    while (moved && sweep < maxSweeps) {
      moved = false
      var v = 0
      while (v < n) {
        val p = comm(v)
        var nt = 0
        g.foreachNbr(v) { (u, w) =>
          val c = comm(u)
          if (wvc(c) == 0.0 && w > 0) { touched(nt) = c; nt += 1 }
          wvc(c) += w
        }
        sigmaTot(p) -= k(v)
        var best = p
        var bestGain = wvc(p) - k(v) * sigmaTot(p) / m2
        var t = 0
        while (t < nt) {
          val c = touched(t)
          if (c != p) {
            val gain = wvc(c) - k(v) * sigmaTot(c) / m2
            if (gain > bestGain + 1e-12 || (math.abs(gain - bestGain) <= 1e-12 && c < best)) {
              best = c; bestGain = gain
            }
          }
          t += 1
        }
        sigmaTot(best) += k(v)
        if (best != p) { comm(v) = best; moved = true }
        // reset scratch
        t = 0
        while (t < nt) { wvc(touched(t)) = 0.0; t += 1 }
        wvc(p) = 0.0 // p may not be in touched if v has no intra-community nbrs
        v += 1
      }
      sweep += 1
    }
    comm
  }

  /** Relabel to 0..l-1 in order of first occurrence (ascending node index). */
  private[core] def compact(comm: Array[Int]): Array[Int] = {
    val map = new mutable.HashMap[Int, Int]
    comm.map(c => map.getOrElseUpdate(c, map.size))
  }

  /** Aggregate communities into supernodes: intra weight (plus member
    * self-loops) becomes the supernode's self-loop; inter-community weights
    * are summed.
    */
  private def coarsen(g: Graph, labels: Array[Int], nc: Int): Graph = {
    val selfC = new Array[Double](nc)
    val inter = new mutable.HashMap[(Long, Long), Double]
    var v = 0
    while (v < g.n) {
      val cv = labels(v)
      selfC(cv) += g.self(v)
      g.foreachNbr(v) { (u, w) =>
        if (u > v) {
          val cu = labels(u)
          if (cu == cv) selfC(cv) += w
          else {
            val key = if (cv <= cu) (cv.toLong, cu.toLong) else (cu.toLong, cv.toLong)
            inter.update(key, inter.getOrElse(key, 0.0) + w)
          }
        }
      }
      v += 1
    }
    val edges =
      (0 until nc).map(c => (c.toLong, c.toLong, selfC(c))) ++
        inter.iterator.map { case ((a, b), w) => (a, b, w) }
    Graph.fromEdges(edges)
  }
}
