package repro.graph

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Attribute-prioritized BFS (§V-A): starting from `q`, expand layer by
  * layer until at least `minSize` nodes are discovered; the final layer is
  * trimmed to the nodes with the smallest composite distance `f(·,q)`, which
  * realizes the paper's "preferentially expand from nodes having smaller
  * composite attribute distances" at dataflow granularity (whole-frontier
  * rounds instead of one-node-at-a-time expansion).
  */
object PriorityBfs {

  /** Node ids (`id`) of the neighborhood `G_q`. If fewer than `minSize`
    * nodes are reachable from `q`, all reachable nodes are returned.
    */
  def collectGq(g: AttributedGraph, fDf: DataFrame, q: Long, minSize: Long): DataFrame = {
    val spark = g.spark
    import spark.implicits._
    val sym = g.symmetricEdges.localCheckpoint(true)
    val f = fDf.select("id", "f").localCheckpoint(true)
    var visited = Seq(q).toDF("id").localCheckpoint(true)
    var visitedCount = 1L
    var frontier = visited
    var done = visitedCount >= minSize
    while (!done) {
      val next = sym
        .join(frontier.withColumnRenamed("id", "src"), Seq("src"), "left_semi")
        .select(col("dst").as("id")).distinct()
        .join(visited, Seq("id"), "left_anti")
        .localCheckpoint(true)
      val nextCount = next.count()
      if (nextCount == 0) done = true
      else if (visitedCount + nextCount <= minSize) {
        visited = visited.union(next).localCheckpoint(true)
        visitedCount += nextCount
        frontier = next
        done = visitedCount >= minSize
      } else {
        // Overshooting layer: keep only the lowest-f portion that fills G_q.
        val need = (minSize - visitedCount).toInt
        val trimmed = next.join(f, Seq("id"))
          .orderBy(col("f").asc, col("id").asc)
          .limit(need)
          .select("id")
        visited = visited.union(trimmed).localCheckpoint(true)
        visitedCount = minSize
        done = true
      }
    }
    visited
  }
}
