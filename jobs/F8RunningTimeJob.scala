package repro.jobs

import repro.harness.Tables

/** T8 (paper Fig. 8): allocation algorithm running time. */
object F8RunningTimeJob {
  def main(args: Array[String]): Unit = {
    val res = JobUtil.runSweep("F8RunningTime", args)
    println(Tables.runningTimeTable(res))
  }
}
