package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Per-vertex triangle / 4-clique counts as DataFrame self-joins.
  *
  * Input edges must be undirected-canonical (`src < dst`), which makes the
  * enumeration orders `a < b < c (< d)` automatic so every clique is listed
  * exactly once. These counts are the peeling weights of TDS/kCLiDS in the
  * Spark engine; tests check them against brute force and a DuckDB SQL
  * oracle.
  */
object SparkCliques {

  /** Triangles (a<b<c) as a DataFrame with columns a, b, c. */
  def triangles(edges: DataFrame): DataFrame = {
    val ab = edges.select(col("src").as("a"), col("dst").as("b"))
    val bc = edges.select(col("src").as("b"), col("dst").as("c"))
    val ac = edges.select(col("src").as("a"), col("dst").as("c"))
    ab.join(bc, "b").join(ac, Seq("a", "c")).select("a", "b", "c")
  }

  /** 4-cliques (a<b<c<d) as a DataFrame with columns a, b, c, d. */
  def fourCliques(edges: DataFrame): DataFrame = {
    val cd = edges.select(col("src").as("c"), col("dst").as("d"))
    val ad = edges.select(col("src").as("a"), col("dst").as("d"))
    val bd = edges.select(col("src").as("b"), col("dst").as("d"))
    triangles(edges).join(cd, "c").join(ad, Seq("a", "d")).join(bd, Seq("b", "d"))
      .select("a", "b", "c", "d")
  }

  /** Per-vertex k-clique participation counts (id, cnt) for k in {3,4}.
    * Vertices in no clique are absent — callers coalesce to 0.
    */
  def cliqueCounts(edges: DataFrame, k: Int): DataFrame = {
    require(k == 3 || k == 4, s"k=$k unsupported")
    val cl = if (k == 3) triangles(edges) else fourCliques(edges)
    val cols = if (k == 3) Seq("a", "b", "c") else Seq("a", "b", "c", "d")
    cols.map(c => cl.select(col(c).as("id")))
      .reduce(_ union _)
      .groupBy("id").agg(count(lit(1)).cast("double").as("cnt"))
  }
}
