package repro.jobs

import repro.harness.Tables

/** T2 (paper Fig. 2): cross-shard transaction ratio gamma vs k, per eta. */
object F2CrossShardJob {
  def main(args: Array[String]): Unit = {
    val res = JobUtil.runSweep("F2CrossShard", args)
    println(Tables.sweepTable("T2 cross-shard transaction ratio gamma", res, _.gamma))
  }
}
