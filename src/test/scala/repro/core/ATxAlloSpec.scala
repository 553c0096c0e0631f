package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil

/** A-TxAllo (Algorithm 2): incremental updates from a previous mapping. */
class ATxAlloSpec extends AnyFunSuite {

  private def boot(g: Graph, k: Int, eta: Double = 2.0): AllocResult =
    GTxAllo.run(g, TxAlloParams.default(g, k, eta))

  test("new accounts are allocated; previous accounts keep a valid shard") {
    val (g0, _) = TestUtil.planted(4, 15, 40, 20, seed = 1)
    val prev = boot(g0, 3).toMap
    // New block: fresh accounts 1000..1009 attach to community 0's nodes.
    val newEdges = (0 until 10).map(i => ((1000 + i).toLong, i.toLong, 1.0))
    val g1 = Graph.merge(g0, newEdges)
    val active = newEdges.map(_._1).toSet ++ newEdges.map(_._2)
    val res = ATxAllo.run(g1, prev, active, TxAlloParams.default(g1, 3, 2.0))
    assert(res.assign.length == g1.n)
    res.assign.foreach(s => assert(s >= 0 && s < 3))
    // New hub-attached accounts should co-locate with their counterparty.
    val c0 = res.toMap(0L)
    val colocated = (0 until 10).count(i => res.toMap((1000 + i).toLong) == c0)
    assert(colocated >= 8, s"only $colocated/10 new accounts co-located")
  }

  test("inactive nodes never move") {
    val (g0, _) = TestUtil.planted(4, 15, 40, 20, seed = 2)
    val prev = boot(g0, 4).toMap
    val newEdges = Seq((999L, 0L, 1.0))
    val g1 = Graph.merge(g0, newEdges)
    val res = ATxAllo.run(g1, prev, Set(999L, 0L), TxAlloParams.default(g1, 4, 2.0))
    val moved = prev.filter { case (id, s) => id != 0L && res.toMap(id) != s }
    assert(moved.isEmpty, s"inactive nodes moved: ${moved.take(5)}")
  }

  test("empty V-hat and no new nodes leaves the mapping unchanged") {
    val (g, _) = TestUtil.planted(3, 12, 30, 15, seed = 3)
    val prev = boot(g, 3).toMap
    val res = ATxAllo.run(g, prev, Set.empty, TxAlloParams.default(g, 3, 2.0))
    assert(res.toMap == prev)
  }

  for (seed <- 1 to 5) {
    test(s"deterministic (seed=$seed)") {
      val (g0, _) = TestUtil.planted(4, 12, 30, 15, seed)
      val prev = boot(g0, 3).toMap
      val newEdges = (0 until 8).map(i => ((500 + i).toLong, (i * 3).toLong, 1.0))
      val g1 = Graph.merge(g0, newEdges)
      val active: Set[Long] = newEdges.flatMap(e => Seq(e._1, e._2)).toSet
      val p = TxAlloParams.default(g1, 3, 2.0)
      val a = ATxAllo.run(g1, prev, active, p).assign.toSeq
      val b = ATxAllo.run(g1, prev, active, p).assign.toSeq
      assert(a == b)
    }
  }

  test("adaptive result stays close to a full G-TxAllo rerun") {
    val (g0, _) = TestUtil.planted(5, 20, 60, 30, seed = 7)
    val prev = boot(g0, 4).toMap
    val rnd = new scala.util.Random(99)
    val newEdges = (0 until 60).map { _ =>
      val c = rnd.nextInt(5)
      ((c * 20 + rnd.nextInt(20)).toLong, (c * 20 + rnd.nextInt(20)).toLong, 1.0)
    }.filter(e => e._1 != e._2)
    val g1 = Graph.merge(g0, newEdges)
    val active: Set[Long] = newEdges.flatMap(e => Seq(e._1, e._2)).toSet
    val p = TxAlloParams.default(g1, 4, 2.0)
    val adaptive = ATxAllo.run(g1, prev, active, p)
    val global = GTxAllo.run(g1, p)
    assert(adaptive.finalThroughput >= 0.85 * global.finalThroughput,
           s"adaptive ${adaptive.finalThroughput} vs global ${global.finalThroughput}")
  }

  test("adaptive optimization never decreases modeled throughput") {
    val (g0, _) = TestUtil.planted(4, 15, 40, 25, seed = 8)
    val prev = boot(g0, 3).toMap
    val newEdges = (0 until 20).map(i => ((700 + i).toLong, (i % 60).toLong, 1.0))
    val g1 = Graph.merge(g0, newEdges)
    val active: Set[Long] = newEdges.flatMap(e => Seq(e._1, e._2)).toSet
    val res = ATxAllo.run(g1, prev, active, TxAlloParams.default(g1, 3, 2.0))
    assert(res.finalThroughput >= res.initThroughput - 1e-9)
  }

  test("rejects a previous mapping with out-of-range shards") {
    val g = TestUtil.cliques(2, 4)
    assertThrows[IllegalArgumentException] {
      ATxAllo.run(g, Map(0L -> 7), Set.empty, TxAlloParams.default(g, 2, 2.0))
    }
  }

  test("multi-step pipeline keeps Definition 1 invariants") {
    var g = TestUtil.planted(4, 15, 40, 20, seed = 9)._1
    var assign = boot(g, 4).toMap
    val rnd = new scala.util.Random(5)
    for (step <- 0 until 4) {
      val newEdges = (0 until 25).map { i =>
        ((2000 + step * 25 + i).toLong, rnd.nextInt(60).toLong, 1.0)
      }
      g = Graph.merge(g, newEdges)
      val active: Set[Long] = newEdges.flatMap(e => Seq(e._1, e._2)).toSet
      val res = ATxAllo.run(g, assign, active, TxAlloParams.default(g, 4, 2.0))
      assign = res.toMap
      assert(assign.size == g.n)
      assign.values.foreach(s => assert(s >= 0 && s < 4))
    }
  }
}
