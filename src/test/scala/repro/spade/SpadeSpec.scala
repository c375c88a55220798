package repro.spade

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.local.{LocalGraph, SequentialPeeling}
import repro.testkit.Check.forAll
import repro.testkit.TestGraphs

/** Incremental Spade: suffix re-peel correctness, its cost profile under
  * fraud-forming batches, and the stale-weight error accumulation the
  * paper's case study (Fig. 12 / §6.4) attributes to it.
  */
class SpadeSpec extends AnyFunSuite {

  private def batches[A](xs: Vector[A], size: Int): Seq[Vector[A]] =
    xs.grouped(size).toSeq

  test("single-batch insert equals from-scratch sequential peel (DW)") {
    val sp = new Spade(DW, 6)
    sp.insertBatch(TestGraphs.paperExampleEdges)
    val ref = SequentialPeeling.run(DW, TestGraphs.paperExample)
    assert(math.abs(sp.reportedDensity - ref.bestDensity) < 1e-9)
  }

  test("property: incremental DG stays within greedy quality after batches") {
    // DG has integer weights, so greedy tie-breaking may differ between the
    // stitched order and a fresh peel; the guarantee is the 2-approx bound.
    forAll(TestGraphs.genGraph(maxN = 10), n = 15) { g =>
      val sp = new Spade(DG, g.n)
      val edges = g.canonicalEdges.toVector
      var inserted = Vector.empty[(Int, Int, Double)]
      batches(edges, 3).foreach { b =>
        sp.insertBatch(b)
        inserted ++= b
        val lg = LocalGraph.fromEdges(g.n, inserted)
        val (_, opt) = TestGraphs.bruteForceDensest(DG, lg)
        assert(sp.reportedDensity >= opt / 2 - 1e-9, s"after ${inserted.size} edges")
        assert(sp.reportedDensity <= opt + 1e-9)
      }
    }
  }

  test("property: incremental matches recompute for DW (static weights)") {
    forAll(TestGraphs.genGraph(maxN = 9), n = 10) { g =>
      val sp = new Spade(DW, g.n)
      val edges = g.canonicalEdges.toVector
      var inserted = Vector.empty[(Int, Int, Double)]
      batches(edges, 4).foreach { b =>
        sp.insertBatch(b)
        inserted ++= b
        val ref = SequentialPeeling.run(DW, LocalGraph.fromEdges(g.n, inserted))
        assert(math.abs(sp.reportedDensity - ref.bestDensity) < 1e-9)
      }
    }
  }

  test("FD: no error right after a fresh full build") {
    val g = TestGraphs.paperExample
    val sp = new Spade(FD, 6, Array.fill(6)(0.1))
    sp.insertBatch(g.canonicalEdges.toVector)
    // Single batch: stale weights were computed on final degrees.
    assert(sp.densityError < 1e-9)
  }

  test("FD: stale edge weights accumulate density error as degrees grow") {
    // A star grows around vertex 0: early edges were weighted at low
    // degree (heavy, 1/log small) but the true weight shrinks as deg grows.
    val n = 40
    val sp = new Spade(FD, n)
    sp.insertBatch(Vector((0, 1, 1.0), (0, 2, 1.0), (1, 2, 1.0)))
    val errEarly = sp.densityError
    (3 until n).foreach(i => sp.insertBatch(Vector((0, i, 1.0))))
    val errLate = sp.densityError
    assert(errLate > errEarly)
    assert(errLate > 0.01, s"expected visible staleness, got $errLate")
  }

  test("error is monotone-ish over a degree-shifting stream (Fig. 1b shape)") {
    val n = 60
    val sp = new Spade(FD, n)
    sp.insertBatch((1 until 12).map(i => (0, i, 1.0)).toVector)
    val errs = (12 until 60 by 12).map { lo =>
      sp.insertBatch((lo until math.min(lo + 12, n)).map(i => (0, i, 1.0)).toVector)
      sp.densityError
    }
    assert(errs.last >= errs.head)
  }

  test("forming a new fraud ring re-peels more than reinforcing the dense head") {
    // The established dense block peels last (highest weights → last order
    // positions), so updates inside it re-peel a tiny suffix; a *newly
    // forming* ring among ordinary mid-order users touches early positions
    // and forces a near-complete re-peel — Spade's §6.4 pathology.
    val n = 400
    val bg = repro.data.GraphGen.powerLaw(n, 1500, 0.5, seed = 21)
    val block = (0 until 8).toVector
    val blockEdges = for (i <- block; j <- block if i < j) yield (i, j, 5.0)
    val sp = new Spade(DW, n)
    sp.insertBatch(bg ++ blockEdges)
    val reinforce = sp.insertBatch(Vector((block(0), block(1), 5.0), (block(2), block(3), 5.0)))
    val sp2 = new Spade(DW, n)
    sp2.insertBatch(bg ++ blockEdges)
    val newRing = (200 until 206).toVector
    val ringEdges = for (i <- newRing; j <- newRing if i < j) yield (i, j, 5.0)
    val forming = sp2.insertBatch(ringEdges)
    assert(forming.suffixSize > reinforce.suffixSize,
      s"forming suffix ${forming.suffixSize} <= reinforce ${reinforce.suffixSize}")
  }

  test("edge count tracks insertions") {
    val sp = new Spade(DG, 5)
    sp.insertBatch(Vector((0, 1, 1.0), (1, 2, 1.0)))
    sp.insertBatch(Vector((2, 3, 1.0)))
    assert(sp.edgeCount == 3)
  }

  test("Spade supports clique metrics too (TDS incremental = recompute)") {
    forAll(TestGraphs.genGraph(maxN = 8, p = 0.6), n = 6) { g =>
      val sp = new Spade(TDS, g.n)
      val edges = g.canonicalEdges.toVector
      var inserted = Vector.empty[(Int, Int, Double)]
      batches(edges, 5).foreach { b =>
        sp.insertBatch(b)
        inserted ++= b
        val ref = SequentialPeeling.run(TDS, LocalGraph.fromEdges(g.n, inserted))
        assert(math.abs(sp.reportedDensity - ref.bestDensity) < 1e-9)
      }
    }
  }
}
