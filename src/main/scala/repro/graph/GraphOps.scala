package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** DataFrame-based graph primitives (Catalyst throughout).
  *
  * Conventions: a raw edge DataFrame has integer columns `src`, `dst`; the
  * canonical form additionally guarantees `src < dst`, no duplicates, and a
  * dense deterministic `edgeId` (row_number over (src, dst) order minus 1,
  * matching [[CompactGraph.fromEdges]] ids exactly).
  */
object GraphOps {

  /** Canonicalize a raw edge list: drop self-loops, orient `src < dst`,
    * de-duplicate, and assign dense deterministic edge ids.
    */
  def canonicalEdges(raw: DataFrame): DataFrame = {
    val oriented = raw
      .select(
        least(col("src"), col("dst")).cast("int").as("src"),
        greatest(col("src"), col("dst")).cast("int").as("dst"),
      )
      .where(col("src") =!= col("dst"))
      .distinct()
    oriented
      .withColumn("edgeId", row_number().over(Window.orderBy("src", "dst")) - 1)
      .select("edgeId", "src", "dst")
  }

  /** Per-vertex degree over canonical edges: columns (v, degree). */
  def degrees(edges: DataFrame): DataFrame =
    edges
      .select(col("src").as("v"))
      .unionAll(edges.select(col("dst").as("v")))
      .groupBy("v")
      .agg(count(lit(1)).as("degree"))

  /** Enumerate each triangle once as (a, b, c) with a < b < c.
    *
    * Standard oriented two-join: (a,b)⋈(b,c)⋈(a,c) over `src < dst` edges,
    * so every triangle appears exactly once.
    */
  def triangles(edges: DataFrame): DataFrame = {
    val e1 = edges.select(col("src").as("a"), col("dst").as("b"))
    val e2 = edges.select(col("src").as("b"), col("dst").as("c"))
    val e3 = edges.select(col("src").as("a"), col("dst").as("c"))
    e1.join(e2, "b").join(e3, Seq("a", "c")).select("a", "b", "c")
  }

  /** Per-edge support (triangle count) over canonical edges:
    * columns (edgeId, src, dst, support). Edges in no triangle get 0.
    */
  def support(edges: DataFrame): DataFrame = {
    val tris = triangles(edges)
    val sides = tris.select(col("a").as("src"), col("b").as("dst"))
      .unionAll(tris.select(col("b").as("src"), col("c").as("dst")))
      .unionAll(tris.select(col("a").as("src"), col("c").as("dst")))
    val counts = sides.groupBy("src", "dst").agg(count(lit(1)).as("cnt"))
    edges
      .join(counts, Seq("src", "dst"), "left")
      .select(
        col("edgeId"), col("src"), col("dst"),
        coalesce(col("cnt"), lit(0L)).as("support"),
      )
  }

  /** Graph-level statistics used by Table III: (vertices, edges, supMax). */
  def stats(spark: SparkSession, edges: DataFrame): (Long, Long, Long) = {
    val nV = edges.select(col("src").as("v")).unionAll(edges.select(col("dst").as("v")))
      .distinct().count()
    val nE = edges.count()
    val supMax = support(edges).agg(max("support")).head().getLong(0)
    (nV, nE, supMax)
  }
}
