package repro.eval

import org.scalatest.funsuite.AnyFunSuite

/** Confirmation-latency model (Eq. 4, exact-integral form). */
class LatencySpec extends AnyFunSuite {

  test("idle shard has latency 1") {
    assert(Latency.avgLatency(0.0) == 1.0)
  }

  test("under-capacity shards have latency 1") {
    assert(Latency.avgLatency(0.25) == 1.0)
    assert(Latency.avgLatency(0.999) == 1.0)
    assert(Latency.avgLatency(1.0) == 1.0)
  }

  test("sigmaHat = 2 averages latencies 1 and 2") {
    assert(math.abs(Latency.avgLatency(2.0) - 1.5) < 1e-12)
  }

  test("sigmaHat = 3 averages latencies 1, 2, 3") {
    assert(math.abs(Latency.avgLatency(3.0) - 2.0) < 1e-12)
  }

  test("sigmaHat = 1.5: half a unit at latency 2") {
    // integral = 1*1 + 0.5*2 = 2; avg = 2/1.5
    assert(math.abs(Latency.avgLatency(1.5) - 2.0 / 1.5) < 1e-12)
  }

  test("fractional overload example sigmaHat = 2.5") {
    // integral = 1 + 2 + 0.5*3 = 4.5; avg = 1.8
    assert(math.abs(Latency.avgLatency(2.5) - 1.8) < 1e-12)
  }

  test("asymptotically ~ sigmaHat/2 for large workloads") {
    val s = 1000.0
    assert(math.abs(Latency.avgLatency(s) - (s + 1) / 2) < 1e-6)
  }

  test("rejects negative workloads") {
    assertThrows[IllegalArgumentException](Latency.avgLatency(-0.1))
  }

  for (m <- 1 to 6) {
    test(s"continuous at integer boundary m=$m") {
      val below = Latency.avgLatency(m - 1e-9)
      val at = Latency.avgLatency(m.toDouble)
      assert(math.abs(below - at) < 1e-6, s"discontinuity at $m: $below vs $at")
    }
  }
}
