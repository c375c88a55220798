package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import scala.collection.mutable

/** Dupin's parallel peeling engine as iterative DataFrame jobs.
  *
  * One outer iteration = Algorithm 2's round, expressed in dataflow:
  *   1. peeling weights `w_u(S_{i-1})` — an aggregation over the cached
  *      active-edge DataFrame (edge metrics: incident-weight sums; clique
  *      metrics: [[SparkCliques]] self-join counts);
  *   2. `f`, `g`, and the threshold `τ` — global aggregates + driver math;
  *   3. the peel — filter `w ≤ τ`, anti-join the peeled ids out of the
  *      active vertex/edge DataFrames, `localCheckpoint` to cut lineage.
  * GPO (Alg. 3) threads `τ_max` through the driver loop; LPO (Alg. 4) runs
  * the trim loop (`w < max(τ_max, g)`) between rounds.
  *
  * The removal order is logged on the driver (peeled sets are collected
  * anyway to build the anti-join side), so the best snapshot S^p is
  * reconstructed exactly as in the local engine, which this implementation
  * is cross-checked against in tests.
  */
object SparkPeeling {

  final case class Config(
      eps: Double = 0.1,
      gpo: Boolean = false,
      lpo: Boolean = false,
      maxRounds: Int = 100000)

  final case class Result(
      bestSet: Array[Long],
      bestDensity: Double,
      rounds: Int,
      longTailPeels: Long,
      sparseTrims: Long,
      history: Vector[Double])

  /** Run a built-in metric on a property graph. */
  def run(spark: SparkSession, g: SparkGraph, metric: Metric,
          cfg: Config = Config()): Result = metric match {
    case DG =>
      runEdge(spark, g.vertices.withColumn("vw", lit(0.0)),
        g.edges.withColumn("w", lit(1.0)), 2, cfg)
    case DW =>
      runEdge(spark, g.vertices.withColumn("vw", lit(0.0)), g.edges, 2, cfg)
    case FD =>
      runEdge(spark, g.vertices, fraudarEdges(g.edges), 2, cfg)
    case TDS          => runClique(spark, g.vertices, g.edges, 3, cfg)
    case KCliDS(kk)   => runClique(spark, g.vertices, g.edges, kk, cfg)
  }

  /** Fraudar edge weights: `1/log(max(deg_src, deg_dst) + c)` with degrees
    * taken on the full graph (FD fixes them before peeling starts).
    */
  def fraudarEdges(edges: DataFrame): DataFrame = {
    val deg = edges.select(col("src").as("id")).union(edges.select(col("dst").as("id")))
      .groupBy("id").agg(count(lit(1)).as("deg"))
    edges
      .join(deg.select(col("id").as("src"), col("deg").as("ds")), "src")
      .join(deg.select(col("id").as("dst"), col("deg").as("dd")), "dst")
      .select(col("src"), col("dst"),
        (lit(1.0) / log(greatest(col("ds"), col("dd")) + lit(Metric.FraudarC))).as("w"))
  }

  /** Edge-sum peeling (DG/DW/FD and the user-defined facade metrics):
    * `w_u = vw_u + Σ_{(u,v)∈E[S]} w_uv`, `f = Σ vw + Σ w`.
    */
  def runEdge(spark: SparkSession, v0: DataFrame, e0: DataFrame, k: Int,
              cfg: Config): Result =
    loop(spark, v0, e0, k, cfg,
      weights = (v, e) => {
        val ew = e.select(col("src").as("id"), col("w"))
          .union(e.select(col("dst").as("id"), col("w")))
          .groupBy("id").agg(sum("w").as("ws"))
        v.join(ew, Seq("id"), "left")
          .select(col("id"), (col("vw") + coalesce(col("ws"), lit(0.0))).as("w"))
      },
      fOf = (v, e, _) => {
        val fv = v.agg(coalesce(sum("vw"), lit(0.0))).head.getDouble(0)
        val fe = e.agg(coalesce(sum("w"), lit(0.0))).head.getDouble(0)
        fv + fe
      })

  /** Clique-count peeling (TDS k=3, kCLiDS k=4): `w_u` = active k-cliques
    * through u, `f = Σ w_u / k`. Counts are recomputed per round on the
    * shrinking active edge set.
    */
  def runClique(spark: SparkSession, v0: DataFrame, e0: DataFrame, k: Int,
                cfg: Config): Result =
    loop(spark, v0, e0, k, cfg,
      weights = (v, e) =>
        v.join(SparkCliques.cliqueCounts(e, k), Seq("id"), "left")
          .select(col("id"), coalesce(col("cnt"), lit(0.0)).as("w")),
      fOf = (_, _, wDf) =>
        wDf.agg(coalesce(sum("w"), lit(0.0))).head.getDouble(0) / k)

  private def loop(spark: SparkSession, v0: DataFrame, e0: DataFrame, k: Int,
                   cfg: Config,
                   weights: (DataFrame, DataFrame) => DataFrame,
                   fOf: (DataFrame, DataFrame, DataFrame) => Double): Result = {
    import spark.implicits._
    var v = v0.select(col("id").cast("long"), col("vw").cast("double")).localCheckpoint(true)
    var e = e0.select(col("src").cast("long"), col("dst").cast("long"),
      col("w").cast("double")).localCheckpoint(true)
    var cnt = v.count()
    val order = new mutable.ArrayBuffer[Long]()
    val hist = Vector.newBuilder[Double]
    var bestDensity = Double.NegativeInfinity
    var bestCount = 0
    var tauMax = 0.0
    var rounds = 0
    var longTail = 0L
    var sparse = 0L

    def observe(): (DataFrame, Double, Double) = {
      val wDf = weights(v, e).localCheckpoint(true)
      val f = fOf(v, e, wDf)
      val g = if (cnt == 0) 0.0 else f / cnt
      hist += g
      if (g > bestDensity) { bestDensity = g; bestCount = order.size }
      (wDf, f, g)
    }

    def applyRemovals(ids: Array[Long]): Unit = {
      if (ids.isEmpty) return
      order ++= ids
      val peeled = ids.toSeq.toDF("pid")
      v = v.join(peeled, v("id") === peeled("pid"), "left_anti").localCheckpoint(true)
      e = e.join(peeled, e("src") === peeled("pid"), "left_anti")
      val peeled2 = ids.toSeq.toDF("pid2")
      e = e.join(peeled2, e("dst") === peeled2("pid2"), "left_anti").localCheckpoint(true)
      cnt -= ids.length
    }

    while (cnt > 0 && rounds < cfg.maxRounds) {
      rounds += 1
      val (wDf, _, g) = observe()
      if (cfg.gpo || cfg.lpo) tauMax = math.max(tauMax, g / (k * (1 + cfg.eps)))
      val base = k * (1 + cfg.eps) * g
      val tau = if (cfg.gpo || cfg.lpo) math.max(tauMax, base) else base
      var peeled = wDf.filter(col("w") <= tau).select("id", "w").collect()
      if (peeled.isEmpty) // FP-round-off guard: peel the arg-min
        peeled = wDf.orderBy(col("w")).limit(1).select("id", "w").collect()
      longTail += peeled.count(_.getDouble(1) > base)
      applyRemovals(peeled.map(_.getLong(0)))

      if (cfg.lpo) {
        var trimming = true
        while (trimming && cnt > 0) {
          val (wDf2, _, g2) = observe()
          tauMax = math.max(tauMax, g2 / (k * (1 + cfg.eps)))
          val tau2 = math.max(tauMax, g2)
          val trims = wDf2.filter(col("w") < tau2).select("id").collect().map(_.getLong(0))
          if (trims.isEmpty) trimming = false
          else { applyRemovals(trims); sparse += trims.length }
        }
      }
    }
    val remaining = if (cnt > 0) v.select("id").collect().map(_.getLong(0)) else Array.empty[Long]
    val best = (order.view.drop(bestCount) ++ remaining).toArray.sorted
    Result(best, bestDensity, rounds, longTail, sparse, hist.result())
  }
}
