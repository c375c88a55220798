package repro.local

import org.scalatest.funsuite.AnyFunSuite
import repro.testkit.{Check, TestGraphs}
import repro.testkit.Check.forAll

class LocalGraphSpec extends AnyFunSuite {

  private val g = LocalGraph.fromEdges(4,
    Seq((0, 1, 2.0), (1, 2, 1.0), (0, 2, 0.5), (2, 3, 4.0)))

  test("vertex and edge counts") {
    assert(g.n == 4)
    assert(g.m == 4)
  }

  test("degrees") {
    assert(g.degree(0) == 2)
    assert(g.degree(1) == 2)
    assert(g.degree(2) == 3)
    assert(g.degree(3) == 1)
  }

  test("adjacency is sorted") {
    for (u <- 0 until g.n) {
      val nb = (g.offsets(u) until g.offsets(u + 1)).map(g.nbrs)
      assert(nb == nb.sorted, s"adjacency of $u not sorted")
    }
  }

  test("hasEdge agrees with edge list in both directions") {
    assert(g.hasEdge(0, 1) && g.hasEdge(1, 0))
    assert(g.hasEdge(2, 3) && g.hasEdge(3, 2))
    assert(!g.hasEdge(0, 3) && !g.hasEdge(3, 0))
    assert(!g.hasEdge(1, 3))
  }

  test("totalEdgeWeight counts each undirected edge once") {
    assert(math.abs(g.totalEdgeWeight - 7.5) < 1e-12)
  }

  test("parallel (duplicate) edges coalesce by summing weights") {
    val h = LocalGraph.fromEdges(3, Seq((0, 1, 1.0), (1, 0, 2.5), (0, 1, 0.5)))
    assert(h.m == 1)
    assert(math.abs(h.totalEdgeWeight - 4.0) < 1e-12)
  }

  test("self-loops are dropped") {
    val h = LocalGraph.fromEdges(3, Seq((0, 0, 9.0), (0, 1, 1.0)))
    assert(h.m == 1)
  }

  test("reversed input edges are canonicalized") {
    val h = LocalGraph.fromEdges(3, Seq((2, 0, 1.0)))
    assert(h.canonicalEdges.toSeq == Seq((0, 2, 1.0)))
  }

  test("canonicalEdges round-trips through fromEdges") {
    val h = LocalGraph.fromEdges(4, g.canonicalEdges.toSeq)
    assert(h.canonicalEdges.toSeq.sorted == g.canonicalEdges.toSeq.sorted)
  }

  test("mapEdgeWeights rewrites weights, keeps structure") {
    val h = g.mapEdgeWeights((_, _, _) => 1.0)
    assert(h.m == g.m)
    assert(math.abs(h.totalEdgeWeight - 4.0) < 1e-12)
    assert(h.degree(2) == g.degree(2))
  }

  test("mapVertexWeights rewrites vw") {
    val h = g.mapVertexWeights(u => u.toDouble)
    assert(h.vw.toSeq == Seq(0.0, 1.0, 2.0, 3.0))
  }

  test("vertex weights default to zero") {
    assert(g.vw.forall(_ == 0.0))
  }

  test("explicit vertex weights are preserved") {
    val h = LocalGraph.fromEdges(2, Seq((0, 1, 1.0)), Array(0.5, 1.5))
    assert(h.vw.toSeq == Seq(0.5, 1.5))
  }

  test("out-of-range edges are rejected") {
    assertThrows[IllegalArgumentException] {
      LocalGraph.fromEdges(2, Seq((0, 5, 1.0)))
    }
  }

  test("isolated vertices are representable") {
    val h = LocalGraph.fromEdges(5, Seq((0, 1, 1.0)))
    assert(h.n == 5 && h.degree(4) == 0)
  }

  test("property: degree sums to twice the edge count") {
    forAll(TestGraphs.genGraph(maxN = 12)) { h =>
      assert((0 until h.n).map(h.degree).sum.toLong == 2 * h.m)
    }
  }

  test("property: hasEdge symmetric and matches canonical list") {
    forAll(TestGraphs.genGraph(maxN = 10)) { h =>
      val set = h.canonicalEdges.map(e => (e._1, e._2)).toSet
      for (u <- 0 until h.n; v <- 0 until h.n if u != v)
        assert(h.hasEdge(u, v) == (set.contains((u, v)) || set.contains((v, u))))
    }
  }
}
