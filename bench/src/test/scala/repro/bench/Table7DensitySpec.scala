package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.Datasets
import repro.exp.{Runner, Tables}

/** Table 7 (densities for DG/DW/FD) from the same sweep as Table 5.
  * Shape (§6.3): Dupin's densities are within a few percent of the exact
  * greedy baselines; PKMC's are the lowest.
  */
class Table7DensitySpec extends AnyFunSuite {

  lazy val sweep = Tables.edgeSweep
  private val metrics = Seq("DG", "DW", "FD")

  private def density(ds: String, method: String, metric: String): Option[Double] =
    sweep((ds, method, metric)) match {
      case Runner.Ok(_, d, _) => Some(d)
      case Runner.Tle         => None
    }

  test("Table 7 renders") {
    assert(Tables.table7().contains("Dupin"))
  }

  test("Dupin stays within the k(1+eps) guarantee of the best method") {
    for (ds <- Datasets.tableOrder; m <- metrics) {
      val all = Runner.edgeMethods.flatMap(density(ds, _, m))
      val dupin = density(ds, "Dupin", m).get
      // best observed ≤ optimum, and Dupin ≥ optimum/(2(1+ε)).
      assert(dupin >= all.max / 2.2 - 1e-9, s"$ds $m: dupin=$dupin best=${all.max}")
    }
  }

  test("Dupin is within ~15% of exact greedy peeling on average (paper: ~7%)") {
    val ratios = for (ds <- Datasets.tableOrder; m <- metrics;
                      spade <- density(ds, "Spade", m); dupin <- density(ds, "Dupin", m)
                      if spade > 0)
      yield dupin / spade
    val avg = ratios.sum / ratios.size
    assert(avg > 0.85, f"average Dupin/greedy density ratio $avg%.3f")
  }

  test("PKMC densities are the lowest in aggregate (paper shape)") {
    for (m <- metrics) {
      def total(method: String) =
        Datasets.tableOrder.flatMap(density(_, method, m)).sum
      assert(total("PKMC") <= total("Spade") + 1e-9, s"$m: PKMC vs Spade")
      assert(total("PKMC") <= total("FWA") + 1e-9, s"$m: PKMC vs FWA")
    }
  }

  test("exact greedy (Spade) never loses to approximate methods by much") {
    for (ds <- Datasets.tableOrder; m <- metrics;
         spade <- density(ds, "Spade", m); dupin <- density(ds, "Dupin", m)) {
      assert(spade >= dupin * 0.8 - 1e-9, s"$ds $m")
    }
  }

  test("densities are strictly positive on all datasets (planted blocks exist)") {
    for (ds <- Datasets.tableOrder; m <- metrics) {
      assert(density(ds, "Dupin", m).get > 0, s"$ds $m")
    }
  }
}
