package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.data.Dataset
import repro.local.LocalGraph

/** DataFrame property graph.
  *
  * Invariants: `vertices(id: Long, vw: Double)` with unique ids;
  * `edges(src: Long, dst: Long, w: Double)` undirected-canonical
  * (`src < dst`, no loops, one coalesced row per pair — parallel edges'
  * weights are summed, matching [[repro.local.LocalGraph.fromEdges]]).
  */
final case class SparkGraph(vertices: DataFrame, edges: DataFrame) {

  /** Collect into the local CSR substrate (ids must be dense [0, n)). */
  def toLocal: LocalGraph = {
    val vs = vertices.select(col("id").cast("long"), col("vw").cast("double")).collect()
    val n = vs.length
    val vw = new Array[Double](n)
    vs.foreach { r =>
      val id = r.getLong(0)
      require(id >= 0 && id < n, s"toLocal requires dense ids, got $id of $n")
      vw(id.toInt) = r.getDouble(1)
    }
    val es = edges.select(col("src").cast("long"), col("dst").cast("long"), col("w").cast("double"))
      .collect()
      .map(r => (r.getLong(0).toInt, r.getLong(1).toInt, r.getDouble(2)))
    LocalGraph.fromEdges(n, es.toIndexedSeq, vw)
  }
}

object SparkGraph {

  /** Canonicalize raw (possibly directed / duplicated / self-looped) edges
    * and build the graph; vertices are the union of endpoints plus any in
    * `rawVertices`, with vw defaulting to 0.
    */
  def apply(spark: SparkSession, rawEdges: DataFrame,
            rawVertices: Option[DataFrame] = None): SparkGraph = {
    val e = rawEdges
      .select(col("src").cast("long"), col("dst").cast("long"),
              coalesce(col("w"), lit(1.0)).cast("double").as("w"))
      .where(col("src") =!= col("dst"))
      .select(least(col("src"), col("dst")).as("src"),
              greatest(col("src"), col("dst")).as("dst"), col("w"))
      .groupBy("src", "dst").agg(sum("w").as("w"))
    val endpointIds = e.select(col("src").as("id")).union(e.select(col("dst").as("id"))).distinct()
    val v = rawVertices match {
      case Some(vs) =>
        val base = vs.select(col("id").cast("long"),
          coalesce(col("vw"), lit(0.0)).cast("double").as("vw"))
        endpointIds.join(base, Seq("id"), "left")
          .select(col("id"), coalesce(col("vw"), lit(0.0)).as("vw"))
          .union(base.join(endpointIds, Seq("id"), "left_anti"))
      case None => endpointIds.withColumn("vw", lit(0.0))
    }
    SparkGraph(v, e)
  }

  /** Lift the local CSR graph into DataFrames (ids stay dense). */
  def fromLocal(spark: SparkSession, g: LocalGraph): SparkGraph = {
    import spark.implicits._
    val v = (0 until g.n).map(u => (u.toLong, g.vw(u))).toDF("id", "vw")
    val e = g.canonicalEdges.toIndexedSeq
      .map { case (a, b, w) => (a.toLong, b.toLong, w) }.toDF("src", "dst", "w")
    SparkGraph(v, e)
  }

  /** Lift a registry dataset (edges are canonicalized/coalesced here). */
  def fromDataset(spark: SparkSession, d: Dataset): SparkGraph = {
    import spark.implicits._
    val raw = d.edges.map { case (a, b, w) => (a.toLong, b.toLong, w) }.toDF("src", "dst", "w")
    val vs = (0 until d.n).map(u => (u.toLong, d.vertexWeights(u))).toDF("id", "vw")
    apply(spark, raw, Some(vs))
  }
}
