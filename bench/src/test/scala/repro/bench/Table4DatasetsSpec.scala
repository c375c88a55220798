package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Tables

/** Table 4: dataset statistics of the eight analogues. */
class Table4DatasetsSpec extends AnyFunSuite {

  lazy val (text, ds) = Tables.table4()

  test("Table 4 renders with all eight datasets") {
    assert(Seq("gfg", "soc", "uk", "rv", "kron", "sk", "la", "bio").forall(text.contains))
  }

  test("all analogues are non-trivial graphs") {
    ds.foreach { d =>
      assert(d.n > 100 || d.name == "bio" || d.name == "kron", d.name)
      assert(d.m > d.n, s"${d.name} should have avg degree > 2")
    }
  }

  test("relative sizes mirror the paper (la/sk largest, bio/kron smallest)") {
    val m = ds.map(d => d.name -> d.m.toLong).toMap
    assert(m("la") > m("gfg") && m("sk") > m("gfg"))
    assert(m("la") > m("bio") && m("rv") > m("kron"))
  }

  test("degree profile: kron densest, transaction graph lightest-ish") {
    val deg = ds.map(d => d.name -> d.avgDegree).toMap
    assert(deg("kron") == deg.values.max)
  }

  test("types match the paper's categories") {
    val kinds = ds.map(d => d.name -> d.kind).toMap
    assert(kinds("gfg") == "Transaction")
    assert(kinds("soc") == "Social network" && kinds("la") == "Social network")
    assert(kinds("uk") == "Web graph" && kinds("sk") == "Web graph")
    assert(kinds("bio") == "Biologic graph")
  }
}
