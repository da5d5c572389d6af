package repro.graph

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Meta-path machinery for heterogeneous graphs (§VI-A).
  *
  * A meta-path `P = t0 - t1 - … - tL` (t0 == tL) links two *target* nodes of
  * type `t0` through a chain of typed intermediate nodes; two target nodes
  * are `P`-neighbors if a path instance of `P` connects them. The projection
  * of `G` under `P` is the homogeneous graph on target nodes whose edges are
  * the `P`-neighbor pairs; a `(k,P)`-core of `G` is a k-core of the
  * projection. Computed with chained DataFrame joins over typed edges.
  */
object MetaPath {

  /** Typed symmetric edge view: `(src, stype, dst, dtype)` in both
    * orientations — heterogeneous edges are undirected here, and a hop of the
    * meta-path may traverse them either way.
    */
  private def typedSym(g: AttributedGraph): DataFrame = {
    val typed = g.nodes.select(col("id"), col("ntype"))
    val e = g.edges
      .join(typed.withColumnRenamed("id", "src").withColumnRenamed("ntype", "stype"), Seq("src"))
      .join(typed.withColumnRenamed("id", "dst").withColumnRenamed("ntype", "dtype"), Seq("dst"))
      .select("src", "stype", "dst", "dtype")
    e.union(e.select(col("dst").as("src"), col("dtype").as("stype"),
                     col("src").as("dst"), col("stype").as("dtype")))
  }

  /** `P`-neighbor pairs of target nodes: `(src, dst)` canonical, distinct,
    * no self loops. `path` is the node-type sequence, e.g. `Seq("A","P","A")`.
    */
  def pNeighborEdges(g: AttributedGraph, path: Seq[String]): DataFrame = {
    require(path.length >= 2 && path.head == path.last,
      s"meta-path must start and end on the target type: $path")
    val sym = typedSym(g).localCheckpoint(true)
    // chain: hop i goes from type path(i) to path(i+1)
    var cur = sym
      .filter(col("stype") === path(0) && col("dtype") === path(1))
      .select(col("src").as("start"), col("dst").as("cur"))
    for (i <- 1 until path.length - 1) {
      val hop = sym
        .filter(col("stype") === path(i) && col("dtype") === path(i + 1))
        .select(col("src").as("cur"), col("dst").as("next"))
      cur = cur.join(hop, Seq("cur"))
        .select(col("start"), col("next").as("cur"))
        .distinct()
        .localCheckpoint(true)
    }
    cur
      .filter(col("start") =!= col("cur"))
      .select(
        least(col("start"), col("cur")).as("src"),
        greatest(col("start"), col("cur")).as("dst"),
      )
      .distinct()
  }

  /** Homogeneous projection of `g` under `path`: target-type nodes (with
    * their attributes) plus `P`-neighbor edges. SEA and all baselines run
    * unmodified on this graph, realizing the paper's hetero extension.
    */
  def project(g: AttributedGraph, path: Seq[String]): AttributedGraph = {
    val targets = g.nodesOfType(path.head)
    val edges = pNeighborEdges(g, path).withColumn("etype", lit(path.mkString("-")))
    AttributedGraph(targets, edges)
  }
}
