package repro.alloc

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Helpers moving account-shard mappings between driver maps and the
  * `(account: Long, shard: Int)` DataFrame shape consumed by
  * `repro.eval.Metrics`, plus Definition 1 invariant checks.
  */
object Alloc {

  /** Driver map -> (account, shard) DataFrame. */
  def toDf(spark: SparkSession, mapping: Map[Long, Int]): DataFrame = {
    import spark.implicits._
    mapping.toSeq.sortBy(_._1).toDF("account", "shard")
  }

  /** Definition 1: every account mapped exactly once, shard in [0, k). */
  def requireValid(mapping: Map[Long, Int], accounts: Iterable[Long], k: Int): Unit = {
    accounts.foreach { a =>
      val s = mapping.getOrElse(a, sys.error(s"account $a unallocated (completeness violated)"))
      require(s >= 0 && s < k, s"account $a mapped to shard $s outside [0,$k)")
    }
  }
}
