package repro

import repro.alloc.{Alloc, HashAllocator, ShardScheduler}
import repro.chain.{ChainParams, TxGen}
import repro.core.{GTxAllo, TxAlloParams, TxGraph}
import repro.eval.Metrics
import repro.metis.Metis

/** Full-pipeline integration: the paper's qualitative ordering must hold on
  * the synthetic ledger at test scale (shape reproduction of Figs. 2-5).
  */
class EndToEndSpec extends SparkSpec {

  // The paper's case-study setting (Fig. 4): k = 20, eta = 2. At very small k
  // the hub "dump" shard (see EXPERIMENTS.md) weighs relatively more and the
  // greedy can trail METIS slightly; from k ~ 20 G-TxAllo leads consistently.
  private val k = 20
  private val eta = 2.0
  private lazy val p = ChainParams.atScale(0.01, seed = 42)
  private lazy val txs = TxGen.transactions(spark, p).cache()
  private lazy val txAcc = TxGen.txAccounts(txs).cache()
  private lazy val g = TxGraph.fromTxs(txs)

  private lazy val hashM = {
    val alloc = HashAllocator.allocate(TxGen.accounts(txs), k)
    Metrics.evaluate(txAcc, alloc, k, eta)
  }
  private lazy val metisM = {
    val (m, _) = Metis.allocate(g, k)
    Metrics.evaluate(txAcc, Alloc.toDf(spark, m), k, eta)
  }
  private lazy val schedM = {
    val stream = txs.select("txId", "accounts").sort("txId").collect()
      .map(r => (r.getLong(0), r.getSeq[Long](1).toArray))
    val (m, _) = ShardScheduler.allocate(stream.iterator, k, eta)
    Metrics.evaluate(txAcc, Alloc.toDf(spark, m), k, eta)
  }
  private lazy val txalloM = {
    val res = GTxAllo.run(g, TxAlloParams.default(g, k, eta))
    Metrics.evaluate(txAcc, Alloc.toDf(spark, res.toMap), k, eta)
  }

  test("hash allocation is dominated on the cross-shard ratio") {
    assert(hashM.gamma > 0.8, s"hash gamma ${hashM.gamma}")
    assert(txalloM.gamma < hashM.gamma)
    assert(metisM.gamma < hashM.gamma)
    assert(schedM.gamma < hashM.gamma)
  }

  test("G-TxAllo achieves the lowest (or tied-lowest) cross-shard ratio") {
    assert(txalloM.gamma <= metisM.gamma + 0.05,
           s"txallo ${txalloM.gamma} vs metis ${metisM.gamma}")
    assert(txalloM.gamma < 0.45, s"txallo gamma ${txalloM.gamma}")
  }

  test("G-TxAllo achieves the best throughput of the graph-based methods") {
    assert(txalloM.normThroughput >= metisM.normThroughput - 0.3,
           s"txallo ${txalloM.normThroughput} vs metis ${metisM.normThroughput}")
    assert(txalloM.normThroughput > hashM.normThroughput,
           s"txallo ${txalloM.normThroughput} vs hash ${hashM.normThroughput}")
  }

  test("all methods satisfy completeness over the account universe") {
    val nAcc = TxGen.accounts(txs).count()
    assert(g.n.toLong == nAcc)
    Seq(hashM, metisM, schedM, txalloM).foreach { m =>
      assert(m.nTx == p.nTx, s"allocation dropped transactions: ${m.nTx} != ${p.nTx}")
    }
  }

  test("scheduler has the flattest workload distribution (paper Fig. 4c)") {
    assert(schedM.rho <= metisM.rho + 1e-9,
           s"scheduler rho ${schedM.rho} vs metis ${metisM.rho}")
  }

  test("G-TxAllo imbalance stays within a small factor of METIS") {
    // Paper Fig. 3 ranks G-TxAllo ahead of METIS on rho; on the synthetic
    // ledger the throughput-optimal greedy concentrates the aggregate
    // overflow on one hub "dump" shard (the paper's own Fig. 4d outlier),
    // which inflates rho — bounded here, deviation documented in
    // EXPERIMENTS.md.
    assert(txalloM.rho <= metisM.rho * 3.0 + 1e-9,
           s"txallo rho ${txalloM.rho} vs metis rho ${metisM.rho}")
  }

  test("average latency: G-TxAllo at or near the best") {
    val best = Seq(hashM, metisM, schedM).map(_.avgLatency).min
    assert(txalloM.avgLatency <= best + 0.5,
           s"txallo ${txalloM.avgLatency} vs best baseline $best")
  }

  test("normalized throughput is bounded by k") {
    Seq(hashM, metisM, schedM, txalloM).foreach(m => assert(m.normThroughput <= k + 1e-6))
  }
}
