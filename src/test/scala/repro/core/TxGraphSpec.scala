package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.chain.{ChainParams, TxGen}

/** Transaction-graph construction (Definition 2): pair expansion, 1/pi
  * weights, self-loops, aggregation — plus a DuckDB oracle check.
  */
class TxGraphSpec extends SparkSpec {
  import spark.implicits._

  private def mkTxs(rows: Seq[(Long, Seq[Long])]) =
    rows.map { case (id, acc) => (id, 0L, acc) }.toDF("txId", "block", "accounts")

  private def edgeMap(rows: Seq[(Long, Seq[Long])]): Map[(Long, Long), Double] =
    TxGraph.edges(mkTxs(rows)).collect()
      .map(r => (r.getLong(0), r.getLong(1)) -> r.getDouble(2)).toMap

  test("two-account transaction becomes one edge of weight 1") {
    assert(edgeMap(Seq((0L, Seq(1L, 2L)))) == Map((1L, 2L) -> 1.0))
  }

  test("edge endpoints are canonical: src <= dst regardless of input order") {
    assert(edgeMap(Seq((0L, Seq(5L, 2L)))) == Map((2L, 5L) -> 1.0))
  }

  test("three-account transaction splits into 3 edges of weight 1/3") {
    val m = edgeMap(Seq((0L, Seq(1L, 2L, 3L))))
    assert(m.keySet == Set((1L, 2L), (1L, 3L), (2L, 3L)))
    m.values.foreach(w => assert(math.abs(w - 1.0 / 3) < 1e-12))
  }

  test("four-account transaction splits into 6 edges of weight 1/6") {
    val m = edgeMap(Seq((0L, Seq(1L, 2L, 3L, 4L))))
    assert(m.size == 6)
    m.values.foreach(w => assert(math.abs(w - 1.0 / 6) < 1e-12))
  }

  test("single-account transaction becomes a self-loop of weight 1") {
    assert(edgeMap(Seq((0L, Seq(7L)))) == Map((7L, 7L) -> 1.0))
  }

  test("duplicate accounts inside one transaction are deduplicated") {
    assert(edgeMap(Seq((0L, Seq(1L, 1L, 2L)))) == Map((1L, 2L) -> 1.0))
    assert(edgeMap(Seq((0L, Seq(3L, 3L)))) == Map((3L, 3L) -> 1.0))
  }

  test("weights aggregate across transactions") {
    val m = edgeMap(Seq((0L, Seq(1L, 2L)), (1L, Seq(1L, 2L)), (2L, Seq(1L, 2L, 3L))))
    assert(math.abs(m((1L, 2L)) - (2.0 + 1.0 / 3)) < 1e-12)
    assert(math.abs(m((1L, 3L)) - 1.0 / 3) < 1e-12)
  }

  test("every transaction distributes exactly total weight 1") {
    val rows = Seq((0L, Seq(1L, 2L)), (1L, Seq(3L)), (2L, Seq(4L, 5L, 6L)),
                   (3L, Seq(1L, 4L, 7L, 9L)), (4L, Seq(2L, 2L)))
    val total = edgeMap(rows).values.sum
    assert(math.abs(total - rows.size) < 1e-9)
  }

  test("collect builds a Graph whose totalWeight equals the tx count") {
    val p = ChainParams.atScale(0.002, seed = 11)
    val txs = TxGen.transactions(spark, p)
    val g = TxGraph.fromTxs(txs)
    assert(math.abs(g.totalWeight - p.nTx) < 1e-6 * p.nTx)
  }

  test("graph nodes are exactly the accounts appearing in the ledger") {
    val p = ChainParams.atScale(0.001, seed = 3)
    val txs = TxGen.transactions(spark, p)
    val g = TxGraph.fromTxs(txs)
    val accounts = TxGen.accounts(txs).collect().map(_.getLong(0)).toSet
    assert(g.ids.toSet == accounts)
  }

  test("proper-pair aggregation matches DuckDB (oracle)") {
    val p = ChainParams.atScale(0.0005, seed = 5)
    val txs = TxGen.transactions(spark, p)
    val txAcc = TxGen.txAccounts(txs)
    val sparkEdges = TxGraph.edges(txs)
      .where(col("src") =!= col("dst"))
      .select(col("src"), col("dst"), round(col("weight"), 6) as "weight")
    Oracle.assertEquivalent(
      sparkEdges,
      """SELECT CAST(a.account AS BIGINT) AS src,
        |       CAST(b.account AS BIGINT) AS dst,
        |       ROUND(SUM(2.0 / (c.m * (c.m - 1.0))), 6) AS weight
        |FROM txacc a
        |JOIN txacc b ON a.txId = b.txId
        |            AND CAST(a.account AS BIGINT) < CAST(b.account AS BIGINT)
        |JOIN (SELECT txId, COUNT(*) AS m FROM txacc GROUP BY txId) c ON c.txId = a.txId
        |GROUP BY 1, 2""".stripMargin,
      "txacc" -> txAcc)
  }

  test("self-loop aggregation matches DuckDB (oracle)") {
    val p = ChainParams.atScale(0.0005, seed = 6)
    val txs = TxGen.transactions(spark, p)
    val txAcc = TxGen.txAccounts(txs)
    val sparkSelf = TxGraph.edges(txs)
      .where(col("src") === col("dst"))
      .select(col("src") as "account", round(col("weight"), 6) as "weight")
    Oracle.assertEquivalent(
      sparkSelf,
      """SELECT CAST(account AS BIGINT) AS account, ROUND(COUNT(*) * 1.0, 6) AS weight
        |FROM (SELECT txId, MIN(account) AS account
        |      FROM txacc GROUP BY txId HAVING COUNT(*) = 1) s
        |GROUP BY 1""".stripMargin,
      "txacc" -> txAcc)
  }

  test("edges are deterministic across invocations") {
    val p = ChainParams.atScale(0.0005, seed = 9)
    val a = TxGraph.edges(TxGen.transactions(spark, p)).sort("src", "dst").collect().toSeq
    val b = TxGraph.edges(TxGen.transactions(spark, p)).sort("src", "dst").collect().toSeq
    assert(a == b)
  }
}
