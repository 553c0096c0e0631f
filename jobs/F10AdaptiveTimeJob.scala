package repro.jobs

import repro.harness.Tables

/** T10 (paper Fig. 10): per-step update time, pure G-TxAllo vs hybrid TxAllo. */
object F10AdaptiveTimeJob {
  def main(args: Array[String]): Unit = {
    val res = JobUtil.runEvolution("F10AdaptiveTime", args)
    println(Tables.adaptiveTimeTable(res))
  }
}
