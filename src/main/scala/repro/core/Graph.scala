package repro.core

import scala.collection.mutable

/** Compact undirected weighted graph in CSR form (driver-side).
  *
  * Node ids are the original account ids; `ids` is sorted ascending and node
  * *indices* (0-based positions into `ids`) are what every algorithm loops
  * over, which makes the paper's required deterministic node order ("the hash
  * value of the accounts can determine the order") simply ascending account id.
  *
  * Each proper undirected edge is stored in both directions in (`nbr`,`wgt`);
  * self-loops live separately in `self` (the paper's w_{v,v}). `strength(v)`
  * is W_v = w_{v, V/v}, the total weight from v to *other* nodes — the exact
  * quantity used by the paper's gain equations.
  */
final class Graph private[core] (
    val n: Int,
    val ids: Array[Long],
    val offsets: Array[Int],
    val nbr: Array[Int],
    val wgt: Array[Double],
    val self: Array[Double]) {

  /** W_v: total edge weight from v to other nodes (self-loops excluded). */
  val strength: Array[Double] = {
    val s = new Array[Double](n)
    var v = 0
    while (v < n) {
      var e = offsets(v)
      while (e < offsets(v + 1)) { s(v) += wgt(e); e += 1 }
      v += 1
    }
    s
  }

  /** Total graph weight: each proper edge once + self-loops. Equals the number
    * of transactions (every transaction distributes total weight 1).
    */
  val totalWeight: Double = strength.sum / 2.0 + self.sum

  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  /** Node index for an account id, or -1 if absent (binary search). */
  def indexOf(id: Long): Int = {
    val i = java.util.Arrays.binarySearch(ids, id)
    if (i >= 0) i else -1
  }

  /** Iterate neighbors of v: f(neighborIndex, weight). */
  @inline def foreachNbr(v: Int)(f: (Int, Double) => Unit): Unit = {
    var e = offsets(v)
    while (e < offsets(v + 1)) { f(nbr(e), wgt(e)); e += 1 }
  }

  /** Undirected edge list by account id (canonical src <= dst), self-loops
    * included — the inverse of `Graph.fromEdges`, used for incremental merges.
    */
  def toEdges: IndexedSeq[(Long, Long, Double)] = {
    val buf = IndexedSeq.newBuilder[(Long, Long, Double)]
    var v = 0
    while (v < n) {
      if (self(v) > 0) buf += ((ids(v), ids(v), self(v)))
      var e = offsets(v)
      while (e < offsets(v + 1)) {
        if (v < nbr(e)) buf += ((ids(v), ids(nbr(e)), wgt(e)))
        e += 1
      }
      v += 1
    }
    buf.result()
  }
}

object Graph {

  /** Build from an undirected weighted edge list keyed by account id.
    * `(v, v, w)` entries are self-loops. Duplicate pairs (in either direction)
    * are summed. Deterministic: nodes sorted by id, adjacency sorted by
    * neighbor index.
    */
  def fromEdges(edges: Iterable[(Long, Long, Double)]): Graph = {
    // Canonicalize and aggregate.
    val agg = new mutable.HashMap[(Long, Long), Double]
    edges.foreach { case (a, b, w) =>
      val key = if (a <= b) (a, b) else (b, a)
      agg.update(key, agg.getOrElse(key, 0.0) + w)
    }
    val ids = agg.keysIterator.flatMap { case (a, b) => Iterator(a, b) }.toArray.distinct.sorted
    val n = ids.length
    val idx = new mutable.HashMap[Long, Int]
    var i = 0
    while (i < n) { idx.update(ids(i), i); i += 1 }

    val self = new Array[Double](n)
    val deg = new Array[Int](n)
    val proper = agg.iterator.filter { case ((a, b), _) => a != b }.map { case ((a, b), w) =>
      val u = idx(a); val v = idx(b)
      deg(u) += 1; deg(v) += 1
      (u, v, w)
    }.toArray
    agg.foreach { case ((a, b), w) => if (a == b) self(idx(a)) += w }

    val offsets = new Array[Int](n + 1)
    i = 0
    while (i < n) { offsets(i + 1) = offsets(i) + deg(i); i += 1 }
    val cursor = java.util.Arrays.copyOf(offsets, n)
    val nbr = new Array[Int](proper.length * 2)
    val wgt = new Array[Double](proper.length * 2)
    proper.foreach { case (u, v, w) =>
      nbr(cursor(u)) = v; wgt(cursor(u)) = w; cursor(u) += 1
      nbr(cursor(v)) = u; wgt(cursor(v)) = w; cursor(v) += 1
    }
    // Sort each adjacency row by neighbor index for deterministic iteration.
    var v = 0
    while (v < n) {
      val lo = offsets(v); val hi = offsets(v + 1)
      val order = (lo until hi).sortBy(nbr)
      val nn = order.map(nbr).toArray
      val ww = order.map(wgt).toArray
      System.arraycopy(nn, 0, nbr, lo, nn.length)
      System.arraycopy(ww, 0, wgt, lo, ww.length)
      v += 1
    }
    new Graph(n, ids, offsets, nbr, wgt, self)
  }

  /** Merge newly committed edges into an existing graph (A-TxAllo step). */
  def merge(g: Graph, newEdges: Iterable[(Long, Long, Double)]): Graph =
    fromEdges(g.toEdges ++ newEdges)

  /** The empty graph. */
  val empty: Graph = fromEdges(Nil)
}
