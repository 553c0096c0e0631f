package repro.alloc

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Hash-based random allocation — the baseline of OmniLedger, RapidChain,
  * Monoxide and Chainspace (`SHA256(address) mod k`). We use `xxhash64` as the
  * deterministic, uniform stand-in; with mostly two-account transactions this
  * yields the paper's ~`1 - 1/k` cross-shard ratio (98% at k = 60).
  */
object HashAllocator {

  /** @param accounts DataFrame with a single `account: Long` column
    * @return (account, shard) DataFrame, shard = xxhash64(account) mod k
    */
  def allocate(accounts: DataFrame, k: Int): DataFrame =
    accounts.select(
      col("account"),
      pmod(xxhash64(col("account")), lit(k.toLong)).cast("int") as "shard")
}
