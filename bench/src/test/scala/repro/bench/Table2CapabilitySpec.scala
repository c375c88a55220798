package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Tables

/** Table 2: the capability matrix is a property of what we implemented;
  * assert it reproduces the paper's matrix exactly.
  */
class Table2CapabilitySpec extends AnyFunSuite {

  test("Table 2 renders and matches the paper row for row") {
    val text = Tables.table2()
    assert(text.contains("Dupin"))
    val caps = Tables.capabilities
    // paper's claims, row by row: (metrics, parallel, weighted, pruning)
    assert(caps("Spade") == (Set("DG", "DW", "FD", "TDS", "kCLiDS"), false, true, false))
    assert(caps("GBBS") == (Set("DG", "DW", "FD"), true, false, false))
    assert(caps("PKMC") == (Set("DG", "DW", "FD"), true, false, false))
    assert(caps("FWA") == (Set("DG", "DW", "FD"), true, false, false))
    assert(caps("ALENEX") == (Set("DG", "DW", "FD"), true, false, false))
    assert(caps("kCLIST") == (Set("TDS", "kCLiDS"), true, false, false))
    assert(caps("PBBS") == (Set("TDS", "kCLiDS"), true, false, false))
    assert(caps("Dupin") == (Set("DG", "DW", "FD", "TDS", "kCLiDS"), true, true, true))
  }

  test("only Dupin supports all five metrics, weights, and pruning in parallel") {
    val full = Tables.capabilities.collect {
      case (name, (metrics, par, weighted, pruning))
        if metrics.size == 5 && par && weighted && pruning => name
    }
    assert(full.toSeq == Seq("Dupin"))
  }
}
