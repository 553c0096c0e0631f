package repro.jobs

import repro.harness.Tables

/** T6 (paper Fig. 6): average transaction confirmation latency zeta. */
object F6LatencyJob {
  def main(args: Array[String]): Unit = {
    val res = JobUtil.runSweep("F6Latency", args)
    println(Tables.sweepTable("T6 average confirmation latency zeta [blocks]", res, _.avgLatency))
  }
}
