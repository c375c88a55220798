package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.local.{DupinLocal, LocalGraph}
import repro.testkit.Check.forAll
import repro.testkit.TestGraphs

/** The Spark dataflow engine: paper example, DuckDB oracle over the
  * weight aggregations, and exact cross-validation against the local
  * engine (same removal order and densities).
  */
class SparkPeelingSpec extends SparkSpec {
  import spark.implicits._

  private def sg(g: LocalGraph) = SparkGraph.fromLocal(spark, g)

  private def localCfg(eps: Double, gpo: Boolean, lpo: Boolean) =
    DupinLocal.Config(eps = eps, gpo = gpo, lpo = lpo, threads = 1)
  private def sparkCfg(eps: Double, gpo: Boolean, lpo: Boolean) =
    SparkPeeling.Config(eps = eps, gpo = gpo, lpo = lpo)

  test("paper Fig. 5 on the Spark engine: 3 rounds, groups [u1,u2;u3,u4;u5,u6]") {
    val res = SparkPeeling.run(spark, sg(TestGraphs.paperExample), DW, sparkCfg(0.0, false, false))
    assert(res.rounds == 3)
    assert(math.abs(res.bestDensity - 2.75) < 1e-12)
    assert(res.bestSet.toSeq == Seq(2L, 3L, 4L, 5L))
  }

  test("DG on clique+tail returns the clique") {
    val res = SparkPeeling.run(spark, sg(TestGraphs.cliqueWithTail(6, 8)), DG)
    assert(res.bestSet.toSeq == (0L until 6L))
    assert(math.abs(res.bestDensity - 2.5) < 1e-12)
  }

  test("TDS on clique+tail returns the clique (clique recount per round)") {
    val res = SparkPeeling.run(spark, sg(TestGraphs.cliqueWithTail(5, 6)), TDS)
    assert(res.bestSet.toSeq == (0L until 5L))
    assert(math.abs(res.bestDensity - 2.0) < 1e-12)
  }

  test("kCLiDS-4 on clique+tail returns the clique") {
    val res = SparkPeeling.run(spark, sg(TestGraphs.cliqueWithTail(5, 4)), KCliDS(4))
    assert(res.bestSet.toSeq == (0L until 5L))
    assert(math.abs(res.bestDensity - 1.0) < 1e-12)
  }

  test("fraudarEdges matches the local FD preparation") {
    forAll(TestGraphs.genGraph(maxN = 10), n = 6) { g =>
      val e = SparkPeeling.fraudarEdges(sg(g).edges)
        .collect().map(r => ((r.getLong(0).toInt, r.getLong(1).toInt), r.getDouble(2))).toMap
      val p = FD.prepare(g)
      p.canonicalEdges.foreach { case (a, b, w) =>
        assert(math.abs(e((a, b)) - w) < 1e-12, s"edge ($a,$b)")
      }
    }
  }

  test("oracle: fraudar weights match DuckDB's ln-based expression") {
    val g = TestGraphs.paperExample
    val edges = sg(g).edges
    Oracle.assertEquivalent(
      SparkPeeling.fraudarEdges(edges).select($"src", $"dst", $"w"),
      """WITH deg AS (
        |  SELECT id, COUNT(*) AS d FROM (
        |    SELECT CAST(src AS BIGINT) AS id FROM e
        |    UNION ALL SELECT CAST(dst AS BIGINT) FROM e
        |  ) GROUP BY id)
        |SELECT CAST(e.src AS BIGINT) AS src, CAST(e.dst AS BIGINT) AS dst,
        |       1.0 / ln(greatest(ds.d, dd.d) + 5.0) AS w
        |FROM e JOIN deg ds ON CAST(e.src AS BIGINT) = ds.id
        |       JOIN deg dd ON CAST(e.dst AS BIGINT) = dd.id""".stripMargin,
      "e" -> edges)
  }

  test("oracle: per-vertex edge-sum peeling weights match DuckDB (DW)") {
    val g = TestGraphs.paperExample
    val edges = sg(g).edges
    val w = edges.select($"src".as("id"), $"w").union(edges.select($"dst".as("id"), $"w"))
      .groupBy("id").agg(sum("w").as("w"))
    Oracle.assertEquivalent(
      w,
      """SELECT id, SUM(w) AS w FROM (
        |  SELECT CAST(src AS BIGINT) AS id, CAST(w AS DOUBLE) AS w FROM e
        |  UNION ALL SELECT CAST(dst AS BIGINT), CAST(w AS DOUBLE) FROM e
        |) GROUP BY id""".stripMargin,
      "e" -> edges)
  }

  test("cross-engine: identical removal order and density on DG (exact)") {
    forAll(TestGraphs.genGraph(maxN = 12, weighted = false), n = 6) { g =>
      for ((gpo, lpo) <- Seq((false, false), (true, false), (true, true))) {
        val loc = DupinLocal.run(DG, g, localCfg(0.1, gpo, lpo))
        val spk = SparkPeeling.run(spark, sg(g), DG, sparkCfg(0.1, gpo, lpo))
        assert(spk.rounds == loc.rounds, s"rounds gpo=$gpo lpo=$lpo")
        assert(spk.bestDensity == loc.bestDensity, s"density gpo=$gpo lpo=$lpo")
        assert(spk.bestSet.map(_.toInt).toSeq == loc.bestSet.toSeq, s"set gpo=$gpo lpo=$lpo")
      }
    }
  }

  test("cross-engine: DW densities agree to 1e-9 (FP-order tolerance)") {
    forAll(TestGraphs.genGraph(maxN = 12), n = 6) { g =>
      for ((gpo, lpo) <- Seq((false, false), (true, true))) {
        val loc = DupinLocal.run(DW, g, localCfg(0.1, gpo, lpo))
        val spk = SparkPeeling.run(spark, sg(g), DW, sparkCfg(0.1, gpo, lpo))
        assert(math.abs(spk.bestDensity - loc.bestDensity) <
          1e-9 * math.max(1.0, loc.bestDensity), s"gpo=$gpo lpo=$lpo")
      }
    }
  }

  test("cross-engine: FD densities agree to 1e-9") {
    forAll(TestGraphs.genGraph(maxN = 10), n = 4) { g =>
      val loc = DupinLocal.run(FD, g, localCfg(0.1, false, false))
      val spk = SparkPeeling.run(spark, sg(g), FD, sparkCfg(0.1, false, false))
      assert(math.abs(spk.bestDensity - loc.bestDensity) <
        1e-9 * math.max(1.0, loc.bestDensity))
    }
  }

  test("cross-engine: TDS identical results (integer counts)") {
    forAll(TestGraphs.genGraph(maxN = 9, p = 0.6), n = 4) { g =>
      val loc = DupinLocal.run(TDS, g, localCfg(0.1, false, false))
      val spk = SparkPeeling.run(spark, sg(g), TDS, sparkCfg(0.1, false, false))
      assert(spk.bestDensity == loc.bestDensity)
      assert(spk.bestSet.map(_.toInt).toSeq == loc.bestSet.toSeq)
    }
  }

  test("Theorem 4.2 holds on the Spark engine (DW, brute-force opt)") {
    forAll(TestGraphs.genGraph(maxN = 9), n = 5) { g =>
      val (_, opt) = TestGraphs.bruteForceDensest(DW, g)
      val res = SparkPeeling.run(spark, sg(g), DW)
      assert(res.bestDensity >= opt / 2.2 - 1e-9)
    }
  }

  test("GPO on Spark records long-tail peels on a two-hump graph") {
    // dense block + long sparse tail → after the hump the global threshold
    // dominates and sweeps the tail quickly.
    val g = TestGraphs.cliqueWithTail(8, 60)
    val plain = SparkPeeling.run(spark, sg(g), DG, sparkCfg(0.1, false, false))
    val gpo = SparkPeeling.run(spark, sg(g), DG, sparkCfg(0.1, true, false))
    assert(gpo.rounds <= plain.rounds)
  }
}
