package repro.core

/** Mutable account-shard assignment state with the paper's incremental
  * throughput-gain equations (Eqs. 3, 5-8 and Lemma 1).
  *
  * Per community i the state tracks:
  *   - sigma(i):  workload (Eq. 5) — intra weight + eta * cross weight;
  *   - lamHat(i): capacity-sufficient throughput — intra weight + cross/2;
  * and comm(v) in [0, k) or `Unassigned` (= -1, a node of a dissolved small
  * community / a brand-new account). Edges incident to an unassigned endpoint
  * are counted as cross-shard for the assigned endpoint, which is exactly how
  * the paper's join equation (sigma'_q adds eta for every non-q connection)
  * treats them, so incremental updates and `recompute()` agree at all times.
  */
final class AllocState(val g: Graph, val params: TxAlloParams) {
  import AllocState.Unassigned

  val k: Int = params.k
  val eta: Double = params.eta
  val lambda: Double = params.lambda

  val comm: Array[Int] = Array.fill(g.n)(Unassigned)
  val sigma: Array[Double] = new Array[Double](k)
  val lamHat: Array[Double] = new Array[Double](k)

  // Scratch for per-node neighbor-community weights (w_{v,C}).
  private val wvc = new Array[Double](k)
  private val touched = new Array[Int](k)

  /** Throughput of a community with workload sig and sufficient-capacity
    * throughput lh (Eq. 3 / Eq. 7).
    */
  @inline def thr(sig: Double, lh: Double): Double =
    if (sig <= lambda) lh else lambda / sig * lh

  def communityThroughput(c: Int): Double = thr(sigma(c), lamHat(c))

  /** Overall modeled throughput Lambda (Eq. 2). */
  def totalThroughput: Double = {
    var s = 0.0; var c = 0
    while (c < k) { s += communityThroughput(c); c += 1 }
    s
  }

  /** Rebuild sigma/lamHat from scratch from `comm` (kills float drift; also
    * the brute-force reference the incremental equations are tested against).
    */
  def recompute(): Unit = {
    java.util.Arrays.fill(sigma, 0.0)
    java.util.Arrays.fill(lamHat, 0.0)
    var v = 0
    while (v < g.n) {
      val cv = comm(v)
      if (cv != Unassigned) { sigma(cv) += g.self(v); lamHat(cv) += g.self(v) }
      g.foreachNbr(v) { (u, w) =>
        if (u > v) {
          val cu = comm(u)
          if (cv == cu) {
            if (cv != Unassigned) { sigma(cv) += w; lamHat(cv) += w }
          } else {
            if (cv != Unassigned) { sigma(cv) += eta * w; lamHat(cv) += w / 2 }
            if (cu != Unassigned) { sigma(cu) += eta * w; lamHat(cu) += w / 2 }
          }
        }
      }
      v += 1
    }
  }

  /** Fill the scratch with w_{v,C} for assigned neighbor communities; returns
    * the number of touched communities. Values are read via `weightTo`, and
    * MUST be cleared with `clearScratch(nt)` before the next node.
    */
  def gatherNeighborWeights(v: Int): Int = {
    var nt = 0
    g.foreachNbr(v) { (u, w) =>
      val c = comm(u)
      if (c != Unassigned) {
        if (wvc(c) == 0.0) { touched(nt) = c; nt += 1 }
        wvc(c) += w
      }
    }
    nt
  }

  def touchedComm(t: Int): Int = touched(t)
  def weightTo(c: Int): Double = wvc(c)
  def clearScratch(nt: Int): Unit = {
    var t = 0
    while (t < nt) { wvc(touched(t)) = 0.0; t += 1 }
  }

  /** Throughput gain of community q when v (currently NOT in q) joins it
    * (Eq. 6), given w_vq = weight from v to members of q.
    */
  def joinGain(v: Int, q: Int, wvq: Double): Double = {
    val sigN = sigma(q) + g.self(v) + eta * (g.strength(v) - wvq) + (1 - eta) * wvq
    val lhN = lamHat(q) + g.self(v) + g.strength(v) / 2
    thr(sigN, lhN) - thr(sigma(q), lamHat(q))
  }

  /** Throughput gain of community p = comm(v) when v leaves it, given
    * a = w_{v, V_p / v} = weight from v to the other members of p.
    */
  def leaveGain(v: Int, a: Double): Double = {
    val p = comm(v)
    val sigN = sigma(p) - g.self(v) - eta * (g.strength(v) - a) + (eta - 1) * a
    val lhN = lamHat(p) - g.self(v) - g.strength(v) / 2
    thr(sigN, lhN) - thr(sigma(p), lamHat(p))
  }

  /** Apply "v joins q" (v must be unassigned or already removed bookkeeping-
    * wise handled by the caller via applyMove).
    */
  def applyJoin(v: Int, q: Int, wvq: Double): Unit = {
    sigma(q) += g.self(v) + eta * (g.strength(v) - wvq) + (1 - eta) * wvq
    lamHat(q) += g.self(v) + g.strength(v) / 2
    comm(v) = q
  }

  /** Apply "v moves from its current community p to q" (Lemma 1: only p and q
    * change).
    */
  def applyMove(v: Int, q: Int, wvp: Double, wvq: Double): Unit = {
    val p = comm(v)
    sigma(p) += -g.self(v) - eta * (g.strength(v) - wvp) + (eta - 1) * wvp
    lamHat(p) += -g.self(v) - g.strength(v) / 2
    comm(v) = q
    sigma(q) += g.self(v) + eta * (g.strength(v) - wvq) + (1 - eta) * wvq
    lamHat(q) += g.self(v) + g.strength(v) / 2
  }
}

object AllocState {
  /** comm value of a node not (yet) mapped to any shard. */
  final val Unassigned: Int = -1
}
