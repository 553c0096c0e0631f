package repro.jobs

import repro.harness.Tables

/** T9 (paper Fig. 9): A-TxAllo throughput evolution vs pure G-TxAllo. */
object F9EvolutionJob {
  def main(args: Array[String]): Unit = {
    val res = JobUtil.runEvolution("F9Evolution", args)
    println(Tables.evolutionTable(res))
  }
}
