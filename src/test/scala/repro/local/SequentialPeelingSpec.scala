package repro.local

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.testkit.Check.forAll
import repro.testkit.TestGraphs

/** Algorithm 1 (exact greedy peeling) against the paper's worked example
  * and the brute-force optimum (Theorems 2.1 / 2.2).
  */
class SequentialPeelingSpec extends AnyFunSuite {

  test("paper example: first two removals are u1 then u2") {
    val res = SequentialPeeling.run(DW, TestGraphs.paperExample)
    assert(res.order.take(2).toSeq == Seq(0, 1))
  }

  test("paper example: density peaks at 2.75 on {u3,u4,u5,u6}") {
    val res = SequentialPeeling.run(DW, TestGraphs.paperExample)
    assert(math.abs(res.bestDensity - 2.75) < 1e-12)
    assert(res.bestSet.toSet == Set(2, 3, 4, 5))
  }

  test("paper example: initial density 2.33, final density 0") {
    val res = SequentialPeeling.run(DW, TestGraphs.paperExample)
    assert(math.abs(res.history.head - 14.0 / 6) < 1e-9)
    assert(res.history.last == 0.0)
  }

  test("paper example: peeling is non-monotonic (density rises then falls)") {
    val res = SequentialPeeling.run(DW, TestGraphs.paperExample)
    val h = res.history
    assert(h.exists(_ > h.head), "density should rise above the initial value")
    assert(h.max > h.last)
  }

  test("every vertex is peeled exactly once") {
    val res = SequentialPeeling.run(DW, TestGraphs.paperExample)
    assert(res.order.sorted.toSeq == (0 until 6))
  }

  test("clique with tail: the clique is returned (DG)") {
    val g = TestGraphs.cliqueWithTail(6, 8)
    val res = SequentialPeeling.run(DG, g)
    assert(res.bestSet.toSet == (0 until 6).toSet)
    assert(math.abs(res.bestDensity - 15.0 / 6) < 1e-12)
  }

  test("heavier weighted block wins under DW even with equal topology") {
    val light = for (i <- 0 until 4; j <- i + 1 until 4) yield (i, j, 1.0)
    val heavy = for (i <- 4 until 8; j <- i + 1 until 8) yield (i, j, 5.0)
    val g = LocalGraph.fromEdges(8, light ++ heavy)
    val res = SequentialPeeling.run(DW, g)
    assert(res.bestSet.toSet == (4 until 8).toSet)
  }

  test("TDS: densest triangle subgraph on clique+tail is the clique") {
    val g = TestGraphs.cliqueWithTail(5, 6)
    val res = SequentialPeeling.run(TDS, g)
    assert(res.bestSet.toSet == (0 until 5).toSet)
    assert(math.abs(res.bestDensity - 10.0 / 5) < 1e-12)
  }

  test("kCLiDS-4: densest 4-clique subgraph on clique+tail is the clique") {
    val g = TestGraphs.cliqueWithTail(5, 6)
    val res = SequentialPeeling.run(KCliDS(4), g)
    assert(res.bestSet.toSet == (0 until 5).toSet)
    assert(math.abs(res.bestDensity - 1.0) < 1e-12)
  }

  test("empty-weight graph peels without error") {
    val g = LocalGraph.fromEdges(3, Seq.empty[(Int, Int, Double)])
    val res = SequentialPeeling.run(DG, g)
    assert(res.bestDensity == 0.0)
    assert(res.order.length == 3)
  }

  test("greedy removes a minimum-weight vertex at every step (DW)") {
    forAll(TestGraphs.genGraph(maxN = 9), n = 15) { g =>
      val res = SequentialPeeling.run(DW, g)
      var active = (0 until g.n).toSet
      res.order.foreach { u =>
        val minW = active.map(v => TestGraphs.directWeight(DW, g, active, v)).min
        val wU = TestGraphs.directWeight(DW, g, active, u)
        assert(wU <= minW + 1e-9, s"removed $u with w=$wU, min=$minW")
        active -= u
      }
    }
  }

  test("Theorem 2.1: 2-approximation for DG, DW, FD") {
    for (m <- Seq(DG, DW, FD)) {
      forAll(TestGraphs.genGraph(maxN = 10), n = 25) { g =>
        val (_, opt) = TestGraphs.bruteForceDensest(m, g)
        val res = SequentialPeeling.run(m, g)
        assert(res.bestDensity >= opt / 2 - 1e-9,
          s"${m.name}: got ${res.bestDensity}, opt $opt")
      }
    }
  }

  test("Theorem 2.2: 3-approximation for TDS, 4 for kCLiDS-4") {
    for (m <- Seq(TDS, KCliDS(4))) {
      forAll(TestGraphs.genGraph(maxN = 8, p = 0.6), n = 15) { g =>
        val (_, opt) = TestGraphs.bruteForceDensest(m, g)
        val res = SequentialPeeling.run(m, g)
        assert(res.bestDensity >= opt / m.k - 1e-9,
          s"${m.name}: got ${res.bestDensity}, opt $opt")
      }
    }
  }

  test("sequential peeling is frequently optimal on small graphs (sanity)") {
    var optimalCount = 0; var total = 0
    forAll(TestGraphs.genGraph(maxN = 8), n = 20) { g =>
      val (_, opt) = TestGraphs.bruteForceDensest(DW, g)
      val res = SequentialPeeling.run(DW, g)
      total += 1
      if (res.bestDensity >= opt - 1e-9) optimalCount += 1
    }
    assert(optimalCount >= total / 2, s"only $optimalCount/$total optimal")
  }

  test("deadline aborts long runs with TleException") {
    val g = TestGraphs.cliqueWithTail(10, 2000)
    assertThrows[TleException] {
      SequentialPeeling.run(DG, g, deadline = System.nanoTime() - 1)
    }
  }
}
