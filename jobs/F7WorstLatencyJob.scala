package repro.jobs

import repro.harness.Tables

/** T7 (paper Fig. 7): worst-case latency (most over-loaded shard). */
object F7WorstLatencyJob {
  def main(args: Array[String]): Unit = {
    val res = JobUtil.runSweep("F7WorstLatency", args)
    println(Tables.sweepTable("T7 worst-case latency [blocks]", res, _.worstLatency))
  }
}
