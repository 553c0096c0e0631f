package repro.harness

import repro.SparkSpec

/** Smoke tests of the table harnesses at tiny scale (the bench project runs
  * them at SF=0.1 and prints the full tables).
  */
class HarnessSpec extends SparkSpec {

  private lazy val sweep = Sweep.run(
    spark,
    SweepConfig(sf = 0.002, ks = Seq(4, 8), etas = Seq(2.0, 6.0), caseStudyK = 4))

  private lazy val evo = Evolution.run(
    spark,
    EvolutionConfig(sf = 0.002, k = 4, eta = 2.0, nSteps = 3, hybridGaps = Seq(2)))

  test("sweep produces one row per (method, k, eta)") {
    assert(sweep.rows.size == Sweep.Methods.size * 2 * 2)
    Sweep.Methods.foreach { m =>
      assert(sweep.rows.count(_.method == m) == 4, s"missing rows for $m")
    }
  }

  test("sweep metrics are in range") {
    sweep.rows.foreach { r =>
      assert(r.gamma >= 0.0 && r.gamma <= 1.0, s"$r")
      assert(r.normThroughput > 0.0 && r.normThroughput <= r.k + 1e-9, s"$r")
      assert(r.avgLatency >= 1.0 && r.worstLatency >= r.avgLatency - 1e-9, s"$r")
      assert(r.allocMillis >= 0)
    }
  }

  test("sweep tables render every cell") {
    val t2 = Tables.sweepTable("T2 gamma", sweep, _.gamma)
    assert(!t2.contains("         -"), s"missing cell in:\n$t2")
    assert(t2.contains("eta = 2.0") && t2.contains("eta = 6.0"))
    Sweep.Methods.foreach(m => assert(t2.contains(m)))
    val t4 = Tables.caseStudyTable(sweep)
    assert(Sweep.Methods.forall(t4.contains))
    val t8 = Tables.runningTimeTable(sweep)
    assert(t8.contains("T8"))
  }

  test("evolution runs all strategies over all steps") {
    assert(evo.runs.map(_.name) == Seq("pure-G", "pure-A", "hybrid-g2"))
    evo.runs.foreach { r =>
      assert(r.steps.size == 3)
      r.steps.foreach { s =>
        assert(s.normThroughput > 0.0)
        assert(s.updateMillis >= 0)
      }
    }
  }

  test("hybrid strategy uses the global algorithm exactly every gap steps") {
    val hybrid = evo.runs.find(_.name == "hybrid-g2").get
    assert(hybrid.steps.map(_.usedGlobal) == Seq(false, true, false))
    val pureG = evo.runs.find(_.name == "pure-G").get
    assert(pureG.steps.forall(_.usedGlobal))
    val pureA = evo.runs.find(_.name == "pure-A").get
    assert(pureA.steps.forall(!_.usedGlobal))
  }

  test("pure-A throughput stays within 25% of pure-G (paper Fig. 9 shape)") {
    val pg = evo.runs.find(_.name == "pure-G").get.avgThroughput
    val pa = evo.runs.find(_.name == "pure-A").get.avgThroughput
    assert(pa >= 0.75 * pg, s"pure-A $pa vs pure-G $pg")
  }

  test("evolution tables render") {
    val t9 = Tables.evolutionTable(evo)
    assert(t9.contains("T9") && t9.contains("pure-G") && t9.contains("avg"))
    val t10 = Tables.adaptiveTimeTable(evo)
    assert(t10.contains("T10") && t10.contains("(G)") && t10.contains("(A)"))
  }
}
