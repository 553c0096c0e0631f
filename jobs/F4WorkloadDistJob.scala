package repro.jobs

import repro.harness.Tables

/** T4 (paper Fig. 4): per-shard normalized workload case study (k=20, eta=2). */
object F4WorkloadDistJob {
  def main(args: Array[String]): Unit = {
    val res = JobUtil.runSweep("F4WorkloadDist", args)
    println(Tables.caseStudyTable(res))
  }
}
