package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Tables

/** Table 3: GPO/LPO impact on peeling rounds (dataset `la` analogue).
  * Paper shape: GPO cuts rounds (most for DW, least for FD); LPO cuts far
  * more (up to ~93% for DW); both prune nonzero vertex populations.
  */
class Table3PruningSpec extends AnyFunSuite {

  lazy val (text, stats) = Tables.table3()

  test("Table 3 renders") {
    assert(text.contains("Rounds with GPO"))
  }

  test("GPO never increases rounds; pruning strictly cuts them overall") {
    for (m <- Seq("DG", "DW", "FD"))
      assert(stats(m).roundsGpo <= stats(m).roundsPlain, m)
    val plainTotal = Seq("DG", "DW", "FD").map(m => stats(m).roundsPlain).sum
    val lpoTotal = Seq("DG", "DW", "FD").map(m => stats(m).roundsLpo).sum
    assert(lpoTotal < plainTotal,
      s"pruning did not cut rounds: plain=$plainTotal lpo=$lpoTotal")
  }

  test("LPO reduces rounds at least as much as GPO overall") {
    val gpoTotal = Seq("DG", "DW", "FD").map(m => stats(m).roundsGpo).sum
    val lpoTotal = Seq("DG", "DW", "FD").map(m => stats(m).roundsLpo).sum
    assert(lpoTotal <= gpoTotal)
  }

  test("pruning populations are nonzero where rounds shrank") {
    for (m <- Seq("DG", "DW", "FD")) {
      if (stats(m).roundsGpo < stats(m).roundsPlain)
        assert(stats(m).longTail > 0, s"$m: rounds shrank but no long-tail peels")
      assert(stats(m).sparse >= 0)
    }
  }

  test("LPO trims a nonzero sparse-vertex population on this graph") {
    assert(Seq("DG", "DW", "FD").map(m => stats(m).sparse).sum > 0)
  }
}
