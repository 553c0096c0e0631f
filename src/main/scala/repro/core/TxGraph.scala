package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Transaction-graph construction (paper Definition 2) on Spark DataFrames.
  *
  * A transaction with account set A (|A| = m) becomes:
  *   - m == 1: a self-loop edge (a, a) with weight 1;
  *   - m >= 2: all C(m,2) unordered pairs, each with weight 1 / C(m,2),
  * and the final edge weight is the sum over all transactions touching the
  * pair, so every transaction distributes exactly total weight 1 and the
  * graph's total weight equals |T|.
  */
object TxGraph {

  /** Aggregated undirected edge list `(src, dst, weight)` with `src <= dst`
    * (src == dst marks a self-loop) from a `(txId, block, accounts)` ledger.
    * `accounts` is assumed deduplicated (TxGen emits `array_distinct`); we
    * re-apply distinct+sort defensively for hand-built inputs.
    */
  def edges(txs: DataFrame): DataFrame = {
    val t = txs.select(col("txId"), array_sort(array_distinct(col("accounts"))) as "acc")
    val m = size(col("acc"))

    val selfLoops = t
      .where(m === 1)
      .select(element_at(col("acc"), 1) as "src", element_at(col("acc"), 1) as "dst",
              lit(1.0) as "w")

    // posexplode twice + i < j enumerates the C(m,2) pairs; acc is sorted so
    // i < j implies src < dst, already canonical.
    val pairs = t
      .where(m >= 2)
      .select(col("txId"), col("acc"), posexplode(col("acc")).as(Seq("i", "src")))
      .select(col("txId"), col("acc"), col("i"), col("src"),
              posexplode(col("acc")).as(Seq("j", "dst")))
      .where(col("i") < col("j"))
      .select(col("src"), col("dst"),
              (lit(2.0) / (size(col("acc")) * (size(col("acc")) - 1))) as "w")

    selfLoops
      .unionByName(pairs)
      .groupBy("src", "dst")
      .agg(sum("w") as "weight")
  }

  /** Collect an aggregated edge DataFrame into the driver-side CSR graph. */
  def collect(edgesDf: DataFrame): Graph =
    Graph.fromEdges(
      edgesDf
        .select("src", "dst", "weight")
        .collect()
        .map(r => (r.getLong(0), r.getLong(1), r.getDouble(2))))

  /** Convenience: ledger DataFrame straight to driver graph. */
  def fromTxs(txs: DataFrame): Graph = collect(edges(txs))
}
