package repro.fraud

import scala.util.Random

/** Case-study simulator (§6.4, Table 9): latency L vs. prevention ratio R.
  *
  * Substitution for Grab's production stream (DESIGN.md §3): fraud
  * communities appear over a timeline and emit transactions across an
  * activity window. A detector runs back-to-back scans; a scan started at
  * time s completes at s + L and flags every community that had become
  * *detectable* by s (emitted at least `detectableFrac` of its
  * transactions — a density-based detector can only see a community once
  * enough of its edges exist). A fraudulent transaction at time t is
  * prevented iff some completed scan had already flagged its community,
  * i.e. flag-time ≤ t. R = prevented / total fraudulent transactions —
  * a deterministic, monotone-decreasing function of L.
  *
  * Latencies measured on our ~1/1000-scale graphs are multiplied by
  * `latencyScale` to place them on the production-scale timeline (the
  * paper's L values are per-detection on a 2-billion-edge graph); the
  * *ordering* of methods is what the table asserts and is scale-invariant.
  */
object PreventionSim {

  final case class Community(start: Double, window: Double, txTimes: Vector[Double])

  final case class Stream(horizon: Double, communities: Vector[Community]) {
    def totalFraudTx: Int = communities.map(_.txTimes.size).sum
  }

  /** Seeded stream: `nCommunities` fraud rings over `horizon` seconds, each
    * emitting `txPer` transactions uniformly across its `window`.
    */
  def stream(nCommunities: Int = 40, txPer: Int = 200,
             horizon: Double = 86400.0, window: Double = 3600.0,
             seed: Long = 7): Stream = {
    val rnd = new Random(seed)
    val cs = Vector.fill(nCommunities) {
      val start = rnd.nextDouble() * (horizon - window)
      val times = Vector.fill(txPer)(start + rnd.nextDouble() * window).sorted
      Community(start, window, times)
    }
    Stream(horizon, cs)
  }

  /** Prevention ratio R for a detector with per-scan latency `latency`. */
  def preventionRatio(s: Stream, latency: Double,
                      detectableFrac: Double = 0.1): Double = {
    require(latency >= 0)
    val total = s.totalFraudTx
    if (total == 0) return 0.0
    var prevented = 0
    s.communities.foreach { c =>
      val detectableAt = c.txTimes((detectableFrac * (c.txTimes.size - 1)).toInt)
      // Scans run back-to-back with duration L; in expectation the first
      // scan starting after detectability waits L/2 and takes L, so the
      // flag lands at d + 1.5·L. The expected-phase form keeps R strictly
      // monotone in L (exact ceil-alignment is not, which would make
      // cross-method comparisons flap on ties).
      val flagTime = detectableAt + 1.5 * latency
      prevented += c.txTimes.count(_ >= flagTime)
    }
    prevented.toDouble / total
  }
}
