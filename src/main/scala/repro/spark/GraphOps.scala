package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** DataFrame-level graph operations over edge lists `(src, dst)`.
  *
  * All operations are pure DataFrame transformations (Catalyst-planned
  * joins/aggregations); correctness is pinned by DuckDB-oracle tests that
  * run the equivalent SQL over the same edge table.
  */
object GraphOps {

  /** Canonical undirected edge list: self-loops dropped, duplicates (in
    * either orientation) collapsed, oriented `src < dst`.
    */
  def canonicalEdges(edges: DataFrame): DataFrame =
    edges
      .select(
        least(col("src"), col("dst")).as("src"),
        greatest(col("src"), col("dst")).as("dst"))
      .where(col("src") =!= col("dst"))
      .distinct()

  /** Both orientations of each canonical edge (adjacency view). */
  def symmetric(edges: DataFrame): DataFrame = {
    val c = canonicalEdges(edges)
    c.union(c.select(col("dst").as("src"), col("src").as("dst")))
  }

  /** Per-vertex degree: `(v, degree)`. Vertices only exist via edges, so
    * every row has `degree >= 1`.
    */
  def degrees(edges: DataFrame): DataFrame =
    symmetric(edges).groupBy(col("src").as("v")).agg(count(lit(1)).as("degree"))

  /** Per-edge triangle support `(src, dst, support)`: the number of common
    * neighbours of the endpoints. Edges in no triangle have `support = 0`
    * (kept via left join) — these are the paper's non-triangle edges
    * (Definition 8).
    */
  def edgeSupport(edges: DataFrame): DataFrame = {
    val canon = canonicalEdges(edges)
    val sym = symmetric(edges)
    val a = sym.select(col("src").as("u"), col("dst").as("w"))
    val b = sym.select(col("src").as("v"), col("dst").as("w"))
    val wedges = a.join(b, "w").where(col("u") < col("v"))
    val closed = wedges
      .join(canon, wedges("u") === canon("src") && wedges("v") === canon("dst"))
      .groupBy(col("src"), col("dst"))
      .agg(count(lit(1)).as("support"))
    canon
      .join(closed, Seq("src", "dst"), "left")
      .select(col("src"), col("dst"), coalesce(col("support"), lit(0L)).as("support"))
  }

  /** Total number of triangles in the graph. */
  def triangleCount(edges: DataFrame): Long = {
    val row = edgeSupport(edges).agg(sum(col("support")).as("s")).collect()(0)
    val total = if (row.isNullAt(0)) 0L else row.getLong(0)
    total / 3
  }

  /** Graph statistics used by Table 2: `(vertices, edges, maxDegree)`. */
  def basicStats(edges: DataFrame): (Long, Long, Long) = {
    val deg = degrees(edges).agg(
      count(lit(1)).as("n"),
      sum(col("degree")).as("twoM"),
      max(col("degree")).as("dmax")).collect()(0)
    (deg.getLong(0), deg.getLong(1) / 2, deg.getLong(2))
  }
}
