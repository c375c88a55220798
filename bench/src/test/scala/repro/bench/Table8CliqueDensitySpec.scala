package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.Datasets
import repro.exp.{Runner, Tables}

/** Table 8 (densities for TDS/kCLiDS-4). Shape (§6.3): Dupin is within a
  * few percent of kCLIST (which is exact greedy clique peeling) and often
  * matches it.
  */
class Table8CliqueDensitySpec extends AnyFunSuite {

  lazy val sweep = Tables.cliqueSweep
  private val metrics = Seq("TDS", "kCLiDS")

  private def density(ds: String, method: String, metric: String): Option[Double] =
    sweep((ds, method, metric)) match {
      case Runner.Ok(_, d, _) => Some(d)
      case Runner.Tle         => None
    }

  test("Table 8 renders") {
    assert(Tables.table8().contains("TDS"))
  }

  test("Dupin's clique densities respect the k(1+eps) bound vs best observed") {
    for (ds <- Datasets.tableOrder; m <- metrics) {
      val k = if (m == "TDS") 3 else 4
      val all = Runner.cliqueMethods.flatMap(density(ds, _, m))
      val dupin = density(ds, "Dupin", m).get
      assert(dupin >= all.max / (k * 1.1) - 1e-9, s"$ds $m: $dupin vs ${all.max}")
    }
  }

  test("Dupin is close to kCLIST's density on average (paper: within ~7%)") {
    val ratios = for (ds <- Datasets.tableOrder; m <- metrics;
                      kc <- density(ds, "kCLIST", m); du <- density(ds, "Dupin", m)
                      if kc > 0) yield du / kc
    val avg = ratios.sum / ratios.size
    assert(avg > 0.7, f"average Dupin/kCLIST clique density ratio $avg%.3f")
  }

  test("planted blocks give nonzero clique density on non-bipartite graphs") {
    // gfg is bipartite → zero triangles (the paper reports 0 too).
    assert(density("gfg", "Dupin", "TDS").get == 0.0)
    assert(density("soc", "Dupin", "TDS").get > 0.0)
  }
}
