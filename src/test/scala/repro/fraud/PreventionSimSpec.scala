package repro.fraud

import org.scalatest.funsuite.AnyFunSuite

/** The case-study simulator: R must be a sane, monotone-decreasing
  * function of detection latency (§6.4's premise).
  */
class PreventionSimSpec extends AnyFunSuite {

  private val s = PreventionSim.stream(seed = 3)

  test("stream generation is deterministic and sized as requested") {
    val a = PreventionSim.stream(seed = 1)
    val b = PreventionSim.stream(seed = 1)
    assert(a == b)
    assert(a.communities.size == 40)
    assert(a.totalFraudTx == 40 * 200)
  }

  test("transactions stay inside each community's window") {
    s.communities.foreach { c =>
      assert(c.txTimes.forall(t => t >= c.start && t <= c.start + c.window))
    }
  }

  test("prevention ratio is within [0, 1]") {
    for (l <- Seq(0.0, 1.0, 100.0, 1e6)) {
      val r = PreventionSim.preventionRatio(s, l)
      assert(r >= 0.0 && r <= 1.0, s"latency $l")
    }
  }

  test("zero latency prevents nearly everything after detectability") {
    val r = PreventionSim.preventionRatio(s, 0.0)
    assert(r > 0.85, s"got $r")
  }

  test("R is monotone non-increasing in latency") {
    val latencies = Seq(0.0, 10.0, 60.0, 300.0, 1200.0, 3600.0, 14400.0, 86400.0)
    val rs = latencies.map(PreventionSim.preventionRatio(s, _))
    rs.sliding(2).foreach { case Seq(a, b) => assert(b <= a + 1e-12) }
  }

  test("latency beyond the horizon prevents nothing") {
    assert(PreventionSim.preventionRatio(s, 10 * s.horizon) == 0.0)
  }

  test("a stricter detectability threshold lowers R at zero latency") {
    val loose = PreventionSim.preventionRatio(s, 0.0, detectableFrac = 0.05)
    val strict = PreventionSim.preventionRatio(s, 0.0, detectableFrac = 0.5)
    assert(strict <= loose)
  }

  test("negative latency is rejected") {
    assertThrows[IllegalArgumentException](PreventionSim.preventionRatio(s, -1.0))
  }

  test("the paper's qualitative ordering emerges from the L gaps") {
    // seconds-scale (Dupin), minutes-scale (Spade), hours-scale (GBBS).
    val stream = PreventionSim.stream(window = 14400.0, seed = 3)
    val dupin = PreventionSim.preventionRatio(stream, 240.0)
    val spade = PreventionSim.preventionRatio(stream, 3000.0)
    val gbbs = PreventionSim.preventionRatio(stream, 15000.0)
    assert(dupin > spade && spade > gbbs)
    assert(dupin > 0.8 && gbbs < 0.2)
  }
}
