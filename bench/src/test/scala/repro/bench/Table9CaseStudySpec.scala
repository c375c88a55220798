package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Tables

/** Table 9 (case study): latency vs prevention ratio on the Grab-stream
  * analogue. Shape (§6.4): Dupin's latency is lowest and its prevention
  * ratio highest; the slower the method, the less fraud it prevents.
  */
class Table9CaseStudySpec extends AnyFunSuite {

  lazy val (text, cells) = Tables.table9()

  private def lat(method: String, m: String): Option[Double] = cells((method, m)).latency
  private def ratio(method: String, m: String): Option[Double] = cells((method, m)).ratio

  test("Table 9 renders") {
    assert(text.contains("Prevention"))
  }

  test("Dupin completes with finite latency on all four metrics") {
    for (m <- Seq("DG", "DW", "FD")) assert(lat("Dupin", m).nonEmpty, m)
    assert(lat("Dupin", "TDS").nonEmpty)
  }

  test("Dupin's detection latency beats Spade and GBBS where weights matter") {
    // Per-metric on the weighted metrics (Grab's deployed ones); DG is
    // cheap for every engine at this scale, so only aggregate there.
    for (m <- Seq("DW", "FD")) {
      val d = lat("Dupin", m).get
      for (l <- lat("Spade", m)) assert(d < l, s"$m: Dupin $d vs Spade $l")
      for (l <- lat("GBBS", m)) assert(d < l, s"$m: Dupin $d vs GBBS $l")
    }
    def agg(method: String) =
      Seq("DG", "DW", "FD").map(m => lat(method, m).getOrElse(1e9)).sum
    assert(agg("Dupin") < agg("Spade"), "aggregate vs Spade")
    assert(agg("Dupin") < agg("GBBS"), "aggregate vs GBBS")
  }

  test("Dupin's prevention ratio is the highest on the weighted metrics") {
    for (m <- Seq("DW", "FD")) {
      val d = ratio("Dupin", m).get
      for (other <- Seq("Spade", "GBBS"); r <- ratio(other, m))
        assert(d >= r, s"$m: Dupin $d vs $other $r")
    }
  }

  test("prevention decreases as latency grows across all measured cells") {
    val measured = cells.values.toSeq.flatMap(c =>
      for (l <- c.latency; r <- c.ratio) yield (l, r))
    for (Seq((l1, r1), (l2, r2)) <- measured.sortBy(_._1).sliding(2))
      assert(r2 <= r1 + 1e-9, s"R rose from $r1@$l1 to $r2@$l2")
  }

  test("Dupin prevents a high share of fraud with the default FD metric") {
    assert(ratio("Dupin", "FD").get > 0.5, s"got ${ratio("Dupin", "FD")}")
  }
}
