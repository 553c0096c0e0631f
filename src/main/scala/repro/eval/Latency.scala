package repro.eval

/** Transaction confirmation latency model (paper Eq. 4).
  *
  * For a shard with normalized workload sigmaHat = sigma / lambda, latency of
  * the x-th workload fraction is ceil(x) time units (chronological processing,
  * one capacity-unit per block); the shard's average latency is the exact
  * integral of ceil over [0, sigmaHat], divided by sigmaHat:
  *
  *   zeta(s) = ( floor(s) * (floor(s)+1) / 2 + (s - floor(s)) * (floor(s)+1) ) / s
  *
  * This equals the paper's closed form at every non-integer s and fixes its
  * discontinuity at integer s (the paper's form yields m/2 instead of the
  * integral's (m+1)/2 — see DESIGN.md substitution #5). An idle shard (s = 0)
  * is defined to have latency 1 (commits within one block).
  */
object Latency {

  def avgLatency(sigmaHat: Double): Double = {
    require(sigmaHat >= 0.0, s"normalized workload must be >= 0, got $sigmaHat")
    if (sigmaHat <= 0.0) 1.0
    else {
      val fl = math.floor(sigmaHat)
      (fl * (fl + 1) / 2.0 + (sigmaHat - fl) * (fl + 1)) / sigmaHat
    }
  }
}
