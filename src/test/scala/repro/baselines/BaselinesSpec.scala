package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.local.{LocalGraph, SequentialPeeling}
import repro.testkit.Check.forAll
import repro.testkit.TestGraphs

/** The baseline analogues: GBBS/PBBS bucket peeling, kCLIST, FWA, PKMC,
  * ALENEX — correctness properties plus the structural behaviours the
  * paper's comparison rests on (bucket granularity, core quality, etc.).
  */
class BaselinesSpec extends AnyFunSuite {

  // --------------------------------------------------------- BucketPeeling
  test("bucket peeling peels every vertex exactly once") {
    val g = TestGraphs.paperExample
    val res = BucketPeeling.run(DW, g, threads = 1)
    assert(res.order.sorted.toSeq == (0 until 6))
  }

  test("bucket peeling matches sequential best density on unweighted DG") {
    forAll(TestGraphs.genGraph(maxN = 10, weighted = false), n = 20) { g =>
      val seq = SequentialPeeling.run(DG, g)
      val bkt = BucketPeeling.run(DG, g, threads = 1)
      // Buckets group tied weights; on integer weights this visits the same
      // nested family up to tie order, preserving the 2-approx quality.
      assert(bkt.bestDensity >= seq.bestDensity / 2 - 1e-9)
    }
  }

  test("bucket peeling is a 2-approximation for DG/DW/FD") {
    for (m <- Seq(DG, DW, FD)) {
      forAll(TestGraphs.genGraph(maxN = 9), n = 12) { g =>
        val (_, opt) = TestGraphs.bruteForceDensest(m, g)
        val res = BucketPeeling.run(m, g, threads = 1)
        assert(res.bestDensity >= opt / 2 - 1e-9, m.name)
      }
    }
  }

  test("weighted graphs collapse buckets to singletons (GBBS pathology)") {
    // distinct real weights ⇒ one vertex per bucket ⇒ ~|V| rounds,
    // while unweighted DG peels whole degree classes per round.
    val rnd = new scala.util.Random(3)
    val edges = for (i <- 0 until 30; j <- i + 1 until 30 if rnd.nextDouble() < 0.3)
      yield (i, j, rnd.nextDouble() * 10)
    val g = LocalGraph.fromEdges(30, edges)
    val dw = BucketPeeling.run(DW, g, threads = 1)
    val dg = BucketPeeling.run(DG, g, threads = 1)
    assert(dw.rounds > dg.rounds)
    assert(dw.rounds >= g.n / 2, s"DW rounds=${dw.rounds}")
  }

  test("PBBS (bucket peeling on TDS) finds the planted clique") {
    val g = TestGraphs.cliqueWithTail(5, 10)
    val res = BucketPeeling.run(TDS, g, threads = 1)
    assert(res.bestSet.toSet == (0 until 5).toSet)
  }

  // ---------------------------------------------------------------- kCLIST
  test("kCLIST rejects edge metrics") {
    assertThrows[IllegalArgumentException](Kclist.run(DG, TestGraphs.paperExample))
  }

  test("kCLIST equals sequential clique peeling (it is one)") {
    forAll(TestGraphs.genGraph(maxN = 8, p = 0.6), n = 10) { g =>
      val a = Kclist.run(TDS, g)
      val b = SequentialPeeling.run(TDS, g)
      assert(a.bestDensity == b.bestDensity)
    }
  }

  test("kCLIST is a k-approximation for TDS and kCLiDS-4") {
    for (m <- Seq(TDS, KCliDS(4))) {
      forAll(TestGraphs.genGraph(maxN = 8, p = 0.65), n = 10) { g =>
        val (_, opt) = TestGraphs.bruteForceDensest(m, g)
        assert(Kclist.run(m, g).bestDensity >= opt / m.k - 1e-9, m.name)
      }
    }
  }

  // ------------------------------------------------------------------- FWA
  test("FWA finds the exact densest subgraph on clique+tail (DG)") {
    val g = TestGraphs.cliqueWithTail(6, 10)
    val res = Fwa.run(DG, g, iters = 60)
    assert(res.bestSet.toSet == (0 until 6).toSet)
    assert(math.abs(res.bestDensity - 15.0 / 6) < 1e-9)
  }

  test("FWA respects the 1/2 bound and usually much better") {
    for (m <- Seq(DG, DW)) {
      forAll(TestGraphs.genGraph(maxN = 9), n = 12) { g =>
        val (_, opt) = TestGraphs.bruteForceDensest(m, g)
        val res = Fwa.run(m, g, iters = 80)
        assert(res.bestDensity >= opt / 2 - 1e-9, m.name)
      }
    }
  }

  test("FWA quality improves (weakly) with iterations") {
    forAll(TestGraphs.genGraph(maxN = 10), n = 8) { g =>
      val short = Fwa.run(DW, g, iters = 2)
      val long = Fwa.run(DW, g, iters = 100)
      assert(long.bestDensity >= short.bestDensity - 0.15 * math.max(1.0, short.bestDensity))
    }
  }

  test("FWA rejects clique metrics") {
    assertThrows[IllegalArgumentException](Fwa.run(TDS, TestGraphs.paperExample))
  }

  // ------------------------------------------------------------------ PKMC
  test("PKMC returns the max core (the clique) on clique+tail") {
    val g = TestGraphs.cliqueWithTail(6, 10)
    val res = Pkmc.run(DG, g)
    assert(res.bestSet.toSet == (0 until 6).toSet)
  }

  test("PKMC max-core density is a 2-approximation for DG") {
    forAll(TestGraphs.genGraph(maxN = 10), n = 20) { g =>
      val (_, opt) = TestGraphs.bruteForceDensest(DG, g)
      val res = Pkmc.run(DG, g)
      assert(res.bestDensity >= opt / 2 - 1e-9)
    }
  }

  test("PKMC density never exceeds sequential peeling's under DG") {
    forAll(TestGraphs.genGraph(maxN = 10), n = 15) { g =>
      val core = Pkmc.run(DG, g)
      val seq = SequentialPeeling.run(DG, g)
      assert(core.bestDensity <= seq.bestDensity + 1e-9)
    }
  }

  test("PKMC metricDensity matches brute-force subset density") {
    forAll(TestGraphs.genGraph(maxN = 8), n = 10) { g =>
      val rnd = new scala.util.Random(5)
      val inSet = Array.fill(g.n)(rnd.nextBoolean())
      val size = inSet.count(identity)
      val mask = (0 until g.n).filter(inSet).foldLeft(0)((m, v) => m | (1 << v))
      for (m <- Seq(DG, DW, FD, TDS)) {
        val a = Pkmc.metricDensity(m, g, inSet, size)
        val b = if (size == 0) 0.0 else TestGraphs.subsetDensity(m, g, mask)
        assert(math.abs(a - b) < 1e-9, m.name)
      }
    }
  }

  // ---------------------------------------------------------------- ALENEX
  test("ALENEX achieves a tighter approximation than Dupin's default eps") {
    forAll(TestGraphs.genGraph(maxN = 10), n = 15) { g =>
      val (_, opt) = TestGraphs.bruteForceDensest(DW, g)
      val res = Alenex.run(DW, g, threads = 1)
      assert(res.bestDensity >= opt / (2 * 1.01) - 1e-9)
    }
  }

  test("ALENEX takes at least as many rounds as Dupin (smaller eps)") {
    val g = repro.local.Datasets20k.social
    val alenex = Alenex.run(DW, g, threads = 2)
    val dupin = repro.local.DupinLocal.run(DW, g,
      repro.local.DupinLocal.Config(eps = 0.1, threads = 2))
    assert(alenex.rounds >= dupin.rounds)
  }
}
