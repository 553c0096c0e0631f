package repro.jobs

import repro.harness.Tables

/** T5 (paper Fig. 5): normalized throughput Lambda/lambda vs k, per eta. */
object F5ThroughputJob {
  def main(args: Array[String]): Unit = {
    val res = JobUtil.runSweep("F5Throughput", args)
    println(Tables.sweepTable("T5 normalized throughput Lambda/lambda", res, _.normThroughput))
  }
}
