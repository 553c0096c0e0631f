package repro.metis

import repro.core.Graph

/** METIS-like multilevel k-way partitioner (baseline of Fynn et al. /
  * BrokerChain; see DESIGN.md substitution #2).
  *
  * Pipeline: heavy-edge-matching coarsening -> greedy weighted seeding on the
  * coarsest graph -> projection + FM-style refinement at every level. The
  * objective is minimal edge cut under *vertex-weight* balance; the paper's
  * point is precisely that this objective ignores the cross-shard workload
  * factor eta, so METIS allocations overload the hub account's shard.
  */
object Metis {

  /** @return shard per node index, values in [0, k), deterministic. */
  def partition(g: Graph, k: Int, imbalance: Double = 0.05): Array[Int] = {
    require(k >= 1, "k must be >= 1")
    if (g.n == 0) return Array.emptyIntArray
    if (k == 1) return new Array[Int](g.n)

    val wg = WGraph.fromGraph(g)
    val targetN = math.max(4 * k, 128)
    // METIS maxvwgt: coarse nodes stay individually balanceable.
    val maxNodeW = wg.totalNodeW / (3.0 * k)
    val (graphs, maps) = Coarsening.coarsen(wg, targetN, maxNodeW)

    var part = InitialPartition.seed(graphs.last, k, imbalance)
    part = Refinement.refine(graphs.last, part, k, imbalance)

    // Uncoarsen: project through each level (maps(i): graphs(i)->graphs(i+1)).
    var i = graphs.length - 2
    while (i >= 0) {
      val fine = graphs(i)
      val map = maps(i)
      val projected = Array.tabulate(fine.n)(v => part(map(v)))
      part = Refinement.refine(fine, projected, k, imbalance)
      i -= 1
    }
    part
  }

  /** Timed run keyed by account id (the harness-facing entrypoint). */
  def allocate(g: Graph, k: Int, imbalance: Double = 0.05): (Map[Long, Int], Long) = {
    val t0 = System.nanoTime()
    val part = partition(g, k, imbalance)
    val millis = (System.nanoTime() - t0) / 1000000L
    (g.ids.iterator.zip(part.iterator).toMap, millis)
  }
}
