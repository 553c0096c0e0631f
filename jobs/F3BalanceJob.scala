package repro.jobs

import repro.harness.Tables

/** T3 (paper Fig. 3): workload balance rho (std-dev of shard workloads). */
object F3BalanceJob {
  def main(args: Array[String]): Unit = {
    val res = JobUtil.runSweep("F3Balance", args)
    println(Tables.sweepTable("T3 workload balance rho / lambda", res, _.rhoNorm))
  }
}
