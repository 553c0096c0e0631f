package repro.metis

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.{Graph, GraphMetrics}

/** METIS-like multilevel partitioner: invariants, balance, cut quality. */
class MetisSpec extends AnyFunSuite {

  test("produces a complete partition with shards in [0, k)") {
    val (g, _) = TestUtil.planted(6, 15, 40, 30)
    val part = Metis.partition(g, 4)
    assert(part.length == g.n)
    part.foreach(s => assert(s >= 0 && s < 4))
  }

  for (seed <- 1 to 5) {
    test(s"deterministic (seed=$seed)") {
      val g = TestUtil.randomGraph(70, 250, 8, seed)
      assert(Metis.partition(g, 5).toSeq == Metis.partition(g, 5).toSeq)
    }
  }

  test("k = 1 puts everything in part 0") {
    val g = TestUtil.cliques(3, 4)
    assert(Metis.partition(g, 1).forall(_ == 0))
  }

  test("empty graph") {
    assert(Metis.partition(Graph.empty, 4).isEmpty)
  }

  test("disjoint cliques with matching k get a zero cut") {
    val g = TestUtil.cliques(4, 8)
    val part = Metis.partition(g, 4)
    assert(GraphMetrics.cutRatio(g, part) == 0.0)
  }

  test("planted partition: cut well below random") {
    val (g, _) = TestUtil.planted(6, 20, 60, 40, seed = 13)
    val part = Metis.partition(g, 6)
    val cut = GraphMetrics.cutRatio(g, part)
    val rnd = new scala.util.Random(1)
    val randomCut = GraphMetrics.cutRatio(g, Array.fill(g.n)(rnd.nextInt(6)))
    assert(cut < randomCut / 2, s"metis cut $cut vs random $randomCut")
    assert(cut < 0.3, s"cut too high: $cut")
  }

  test("vertex-weight balance holds up to the cap plus one node") {
    val (g, _) = TestUtil.planted(8, 15, 40, 30, seed = 17)
    val wg = WGraph.fromGraph(g)
    val k = 4
    val part = Metis.partition(g, k, imbalance = 0.05)
    val loads = new Array[Double](k)
    (0 until g.n).foreach(v => loads(part(v)) += wg.nodeW(v))
    val cap = wg.totalNodeW / k * 1.05
    val maxNode = wg.nodeW.max
    loads.foreach(l => assert(l <= cap + maxNode + 1e-9, s"load $l exceeds cap $cap"))
  }

  test("coarsening conserves total vertex weight and shrinks the graph") {
    val g = TestUtil.randomGraph(100, 400, 10, seed = 3)
    val wg = WGraph.fromGraph(g)
    val (coarse, map) = Coarsening.coarsenOnce(wg)
    assert(coarse.n < wg.n)
    assert(math.abs(coarse.totalNodeW - wg.totalNodeW) < 1e-9)
    map.foreach(c => assert(c >= 0 && c < coarse.n))
  }

  test("coarsening level stack maps line up") {
    val g = TestUtil.randomGraph(200, 800, 10, seed = 4)
    val (graphs, maps) = Coarsening.coarsen(WGraph.fromGraph(g), targetN = 32)
    assert(graphs.length == maps.length + 1)
    maps.zipWithIndex.foreach { case (m, i) =>
      assert(m.length == graphs(i).n)
      m.foreach(c => assert(c >= 0 && c < graphs(i + 1).n))
    }
  }

  test("refinement never increases the cut") {
    val g = TestUtil.randomGraph(80, 350, 5, seed = 6)
    val wg = WGraph.fromGraph(g)
    val rnd = new scala.util.Random(2)
    val start = Array.fill(g.n)(rnd.nextInt(4))
    val before = wg.cut(start)
    val after = wg.cut(Refinement.refine(wg, start.clone(), 4, 0.05))
    assert(after <= before + 1e-9, s"cut went up: $before -> $after")
  }

  test("initial partition respects the feasibility cap when possible") {
    val wg = WGraph(4, Array(0, 0, 0, 0, 0), Array.emptyIntArray, Array.emptyDoubleArray,
                    Array(1.0, 1.0, 1.0, 1.0))
    val part = InitialPartition.seed(wg, 2, imbalance = 0.0)
    val loads = new Array[Double](2)
    (0 until 4).foreach(v => loads(part(v)) += 1.0)
    assert(loads.toSeq == Seq(2.0, 2.0))
  }

  test("allocate returns a timed account-id mapping") {
    val (g, _) = TestUtil.planted(3, 10, 25, 10)
    val (map, ms) = Metis.allocate(g, 3)
    assert(map.size == g.n)
    assert(ms >= 0)
    assert(map.keySet == g.ids.toSet)
  }

  test("a hub-heavy graph overloads one shard in *workload* terms") {
    // Star around node 0 (the hub) + background cliques: METIS balances vertex
    // weight, so the hub shard's eta-aware workload ends up above average —
    // the paper's core criticism (Fig. 4b).
    val star = (1 to 60).map(i => (0L, (1000 + i).toLong, 1.0))
    val cliques = for { c <- 0 until 4; i <- 0 until 6; j <- (i + 1) until 6 }
      yield ((100 + c * 10 + i).toLong, (100 + c * 10 + j).toLong, 1.0)
    val g = Graph.fromEdges(star ++ cliques)
    val part = Metis.partition(g, 4)
    val eta = 4.0
    val loads = GraphMetrics.workloads(g, part, 4, eta)
    val mean = loads.sum / 4
    assert(loads.max > 1.2 * mean, s"expected an overloaded shard, loads=${loads.toSeq}")
  }
}
