package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil

/** Deterministic Louvain: structure recovery, determinism, modularity. */
class LouvainSpec extends AnyFunSuite {

  test("two disjoint cliques become two communities") {
    val g = TestUtil.cliques(2, 5)
    val c = Louvain.cluster(g)
    assert(c.max == 1)
    assert((0 until 5).map(c(_)).toSet.size == 1)
    assert((5 until 10).map(c(_)).toSet.size == 1)
    assert(c(0) != c(5))
  }

  test("eight disjoint cliques become eight communities") {
    val g = TestUtil.cliques(8, 6)
    val c = Louvain.cluster(g)
    assert(c.max == 7)
    (0 until 8).foreach { q =>
      assert((0 until 6).map(i => c(q * 6 + i)).toSet.size == 1, s"clique $q split")
    }
  }

  test("ring of cliques connected by weak bridges keeps cliques together") {
    // 4 cliques of 6, bridges weight 0.1 between consecutive cliques.
    val cliqueEdges = for {
      c <- 0 until 4; i <- 0 until 6; j <- (i + 1) until 6
    } yield ((c * 6 + i).toLong, (c * 6 + j).toLong, 1.0)
    val bridges = (0 until 4).map(c => ((c * 6).toLong, (((c + 1) % 4) * 6).toLong, 0.1))
    val g = Graph.fromEdges(cliqueEdges ++ bridges)
    val c = Louvain.cluster(g)
    (0 until 4).foreach { q =>
      assert((0 until 6).map(i => c(q * 6 + i)).toSet.size == 1, s"clique $q split")
    }
  }

  test("planted partition is recovered") {
    val (g, plantedComm) = TestUtil.planted(nComm = 6, perComm = 20, intraPerComm = 60,
                                            interTotal = 30, seed = 3)
    val c = Louvain.cluster(g)
    // Nodes of the same planted community should (almost) all share a label.
    (0 until 6).foreach { q =>
      val labels = (0 until 20).map(i => c(g.indexOf((q * 20 + i).toLong)))
      val majority = labels.groupBy(identity).values.map(_.size).max
      assert(majority >= 18, s"planted community $q too fragmented: $labels")
    }
  }

  test("labels are compact 0..l-1 in first-occurrence order") {
    val g = TestUtil.cliques(3, 4)
    val c = Louvain.cluster(g)
    assert(c(0) == 0) // first node defines label 0
    val seen = scala.collection.mutable.Set.empty[Int]
    c.foreach { l => assert(l >= 0 && l <= c.max); seen += l }
    assert(seen == (0 to c.max).toSet)
  }

  for (seed <- 1 to 5) {
    test(s"clustering is deterministic (seed=$seed)") {
      val g = TestUtil.randomGraph(60, 200, 10, seed)
      assert(Louvain.cluster(g).toSeq == Louvain.cluster(g).toSeq)
    }
  }

  test("modularity of the whole graph in one community is 0") {
    val g = TestUtil.cliques(2, 4)
    assert(math.abs(Louvain.modularity(g, Array.fill(g.n)(0))) < 1e-12)
  }

  test("clustering modularity beats singletons and the one-community split") {
    val (g, _) = TestUtil.planted(4, 15, 40, 20, seed = 5)
    val c = Louvain.cluster(g)
    val qc = Louvain.modularity(g, c)
    val qSingle = Louvain.modularity(g, Array.tabulate(g.n)(identity))
    assert(qc > qSingle)
    assert(qc > 0.3, s"modularity too low: $qc")
  }

  test("self-loop-only node is handled and keeps its own community") {
    val g = Graph.fromEdges(Seq((1L, 2L, 1.0), (9L, 9L, 5.0)))
    val c = Louvain.cluster(g)
    assert(c.length == 3)
    assert(c(g.indexOf(9L)) != c(g.indexOf(1L)))
  }

  test("empty and single-node graphs") {
    assert(Louvain.cluster(Graph.empty).isEmpty)
    val g1 = Graph.fromEdges(Seq((3L, 3L, 1.0)))
    assert(Louvain.cluster(g1).toSeq == Seq(0))
  }

  test("long-tail graph: number of communities l exceeds typical shard counts") {
    val (g, _) = TestUtil.planted(40, 10, 25, 40, seed = 9)
    val c = Louvain.cluster(g)
    assert(c.max + 1 > 12, s"expected many communities, got ${c.max + 1}")
  }
}
