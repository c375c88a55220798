package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{DG, DW}
import repro.local.{DupinLocal, LocalGraph}

/** Generators and the dataset registry: determinism, structural knobs, and
  * that planted fraud blocks are actually what DSD recovers.
  */
class GraphGenSpec extends AnyFunSuite {

  test("powerLaw is deterministic in its seed") {
    val a = GraphGen.powerLaw(100, 500, 0.5, seed = 1)
    val b = GraphGen.powerLaw(100, 500, 0.5, seed = 1)
    val c = GraphGen.powerLaw(100, 500, 0.5, seed = 2)
    assert(a == b)
    assert(a != c)
  }

  test("powerLaw respects the vertex range and drops loops") {
    val es = GraphGen.powerLaw(50, 400, 0.6, seed = 3)
    assert(es.forall { case (a, b, _) => a >= 0 && b < 50 && a < b })
  }

  test("powerLaw skew concentrates degree on low ids") {
    val es = GraphGen.powerLaw(200, 3000, 0.8, seed = 4)
    val g = LocalGraph.fromEdges(200, es)
    val lowDeg = (0 until 20).map(g.degree).sum
    val highDeg = (180 until 200).map(g.degree).sum
    assert(lowDeg > 3 * highDeg)
  }

  test("bipartite keeps customers and merchants disjoint") {
    val es = GraphGen.bipartite(30, 10, 300, 0.5, seed = 5)
    assert(es.forall { case (c, m, _) => c < 30 && m >= 30 && m < 40 })
  }

  test("plantBlock produces a dense block") {
    val members = (10 until 20).toVector
    val es = GraphGen.plantBlock(members, 1.0, 2.0, seed = 6)
    assert(es.size == 45) // all pairs at p=1
    assert(es.forall { case (a, b, _) => members.contains(a) && members.contains(b) })
  }

  test("sample returns distinct vertices") {
    val s = GraphGen.sample(100, 20, seed = 7)
    assert(s.distinct.size == 20)
    assert(s.forall(v => v >= 0 && v < 100))
  }

  test("dataset registry exposes the eight Table-4 analogues") {
    assert(Datasets.names.toSet ==
      Set("gfg", "soc", "uk", "rv", "kron", "sk", "la", "bio"))
    assert(Datasets.tableOrder.toSet == Datasets.names.toSet)
  }

  test("dataset builds are cached and deterministic") {
    val a = Datasets("bio"); val b = Datasets("bio")
    assert(a eq b)
    assert(a.m > 0 && a.n > 0)
  }

  test("gfg analogue is bipartite with planted fraud on both sides") {
    val d = Datasets("gfg")
    val nC = (d.n * 0.75).toInt
    assert(d.edges.forall { case (a, b, _) => a < nC && b >= nC })
    assert(d.fraudMembers.exists(_ < nC) && d.fraudMembers.exists(_ >= nC))
  }

  test("average degrees are in the ballpark of Table 4's profile") {
    // kron is the densest, bio/gfg the lightest — relative ordering only.
    val deg = Datasets.names.map(n => n -> Datasets(n).avgDegree).toMap
    assert(deg("kron") > deg("soc"))
    assert(deg("rv") > deg("gfg"))
  }

  test("peeling recovers the planted fraud block (bio, DW)") {
    val d = Datasets("bio")
    val res = DupinLocal.run(DW, d.graph, DupinLocal.Config(threads = 2))
    val overlap = res.bestSet.count(d.fraudMembers.contains).toDouble
    assert(overlap / res.bestSet.length > 0.5,
      s"best set of ${res.bestSet.length} overlaps fraud only ${overlap.toInt}")
  }

  test("clique variants respect the size caps") {
    val cv = Datasets.cliqueVariant("la")
    assert(cv.n <= 2500 && cv.m <= 60000, s"n=${cv.n} m=${cv.m}")
  }

  test("clique variant of an already-small dataset is the dataset itself") {
    assert(Datasets.cliqueVariant("kron").name.startsWith("kron"))
  }

  test("grabStream is a bipartite transaction graph with fraud tail") {
    val d = Datasets.grabStream
    assert(d.kind == "Transaction")
    // planted (fraud) edges are appended last — the stream's tail.
    val tail = d.edges.takeRight(50)
    val nC = (d.n * 0.75).toInt
    assert(tail.forall { case (a, b, _) => (a < nC) != (b < nC) })
  }
}
