package repro.bench

import repro.SparkSpec
import repro.data.Datasets
import repro.exp.{Runner, Tables}

/** Tables 5 (runtime) — the full DG/DW/FD sweep over 8 datasets × 6
  * methods on the shared substrate, plus supplemental Dupin-Spark rows.
  *
  * Shape assertions mirror §6.2's claims: Dupin always completes, beats
  * Spade and the weighted-bucket GBBS runs decisively in aggregate, and
  * beats FWA/ALENEX.
  */
class Table5EfficiencySpec extends SparkSpec {

  lazy val sweep = Tables.edgeSweep
  private val metrics = Seq("DG", "DW", "FD")
  private def time(method: String, metric: String): Double =
    Datasets.tableOrder.map { ds =>
      sweep((ds, method, metric)) match {
        case Runner.Ok(s, _, _) => s
        case Runner.Tle         => Runner.timeoutSec
      }
    }.sum

  test("Table 5 renders with Spark supplemental rows") {
    val text = Tables.table5(Some(spark))
    assert(text.contains("Dupin(Spark)"))
  }

  test("Dupin completes on every dataset and metric (no TLE)") {
    for (ds <- Datasets.tableOrder; m <- metrics)
      assert(sweep((ds, "Dupin", m)) != Runner.Tle, s"$ds $m")
  }

  test("Dupin beats Spade's per-batch latency in aggregate on every metric") {
    for (m <- metrics)
      assert(time("Dupin", m) < time("Spade", m),
        s"$m: dupin=${time("Dupin", m)} spade=${time("Spade", m)}")
  }

  test("Dupin beats GBBS on the weighted metrics (bucket pathology)") {
    for (m <- Seq("DW", "FD"))
      assert(time("Dupin", m) < time("GBBS", m),
        s"$m: dupin=${time("Dupin", m)} gbbs=${time("GBBS", m)}")
  }

  test("GBBS degrades from DG to the weighted metrics, Dupin does not") {
    val gbbsDegrade = (time("GBBS", "DW") + time("GBBS", "FD")) / (2 * time("GBBS", "DG"))
    val dupinDegrade = (time("Dupin", "DW") + time("Dupin", "FD")) / (2 * time("Dupin", "DG"))
    assert(gbbsDegrade > dupinDegrade,
      s"gbbs x$gbbsDegrade vs dupin x$dupinDegrade")
  }

  test("Dupin beats FWA and ALENEX in aggregate") {
    for (m <- metrics) {
      assert(time("Dupin", m) < time("FWA", m), s"FWA $m")
      assert(time("Dupin", m) < time("ALENEX", m), s"ALENEX $m")
    }
  }

  test("the Spark engine agrees with the local engine's density (gfg, DG)") {
    val local = sweep(("gfg", "Dupin", "DG")) match {
      case Runner.Ok(_, d, _) => d
      case _                  => fail("local gfg DG timed out")
    }
    Runner.runSpark(spark, repro.core.DG, Datasets("gfg")) match {
      case Runner.Ok(_, d, _) =>
        assert(math.abs(d - local) < 1e-6 * math.max(1.0, local))
      case Runner.Tle => fail("spark run TLE")
    }
  }
}
