package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** An attributed graph per Definition 1 of the paper, held as two DataFrames.
  *
  * `nodes`: `id LONG, ntype STRING, text ARRAY<STRING>, num ARRAY<DOUBLE>`
  *   — `text` is the textual attribute set `A^t(v)`, `num` the numerical
  *   attribute vector `A^#(v)` (fixed dimensionality per graph).
  * `edges`: `src LONG, dst LONG, etype STRING` — undirected, stored once in
  *   canonical orientation (`src < dst`), no self loops, no duplicates.
  */
final case class AttributedGraph(nodes: DataFrame, edges: DataFrame) {

  def spark: SparkSession = nodes.sparkSession

  /** Both orientations of every undirected edge — the shape most per-node
    * aggregations (degree, frontier expansion) want.
    */
  def symmetricEdges: DataFrame =
    edges.select(col("src"), col("dst"))
      .union(edges.select(col("dst").as("src"), col("src").as("dst")))

  /** Per-node degree; nodes with no incident edge are absent (degree 0). */
  def degrees: DataFrame =
    symmetricEdges.groupBy(col("src").as("id")).agg(count(lit(1)).as("degree"))

  def nodeCount: Long = nodes.count()
  def edgeCount: Long = edges.count()

  /** Subgraph induced by a set of node ids (`ids` must have column `id`). */
  def induced(ids: DataFrame): AttributedGraph = {
    val keep = ids.select(col("id")).distinct()
    AttributedGraph(
      nodes.join(keep, Seq("id"), "left_semi"),
      edges
        .join(keep.withColumnRenamed("id", "src"), Seq("src"), "left_semi")
        .join(keep.withColumnRenamed("id", "dst"), Seq("dst"), "left_semi")
        .select("src", "dst", "etype"),
    )
  }

  /** Nodes of one type — the "target nodes" of a meta-path (§VI-A). */
  def nodesOfType(t: String): DataFrame = nodes.filter(col("ntype") === t)

  def cached(): AttributedGraph = {
    nodes.cache(); edges.cache()
    this
  }
}

object AttributedGraph {

  /** Build from driver-side rows; canonicalizes edge orientation and drops
    * self loops / duplicates. Intended for tests and synthetic generators.
    */
  def fromLocal(
      spark: SparkSession,
      nodeRows: Seq[(Long, String, Seq[String], Seq[Double])],
      edgeRows: Seq[(Long, Long, String)],
  ): AttributedGraph = {
    import spark.implicits._
    val nodes = nodeRows.toDF("id", "ntype", "text", "num")
    val edges = edgeRows
      .collect { case (a, b, t) if a != b => (math.min(a, b), math.max(a, b), t) }
      .distinct
      .toDF("src", "dst", "etype")
    AttributedGraph(nodes, edges)
  }

  /** Homogeneous convenience: one node type, untyped edges. */
  def homogeneous(
      spark: SparkSession,
      nodeRows: Seq[(Long, Seq[String], Seq[Double])],
      edgeRows: Seq[(Long, Long)],
  ): AttributedGraph =
    fromLocal(
      spark,
      nodeRows.map { case (id, t, n) => (id, "V", t, n) },
      edgeRows.map { case (a, b) => (a, b, "E") },
    )
}
