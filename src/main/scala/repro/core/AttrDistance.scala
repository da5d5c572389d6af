package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.graph.AttributedGraph

/** The paper's composite attribute distance (§II-A).
  *
  * `f(u,v) = γ·f^t(u,v) + (1−γ)·f^#(u,v)` where
  *  - `f^t` is the Jaccard *distance* `1 − |A^t(u)∩A^t(v)| / |A^t(u)∪A^t(v)|`
  *    (the paper writes the similarity but uses it as a distance — see
  *    DESIGN.md §5), and `0` when both sets are empty;
  *  - `f^#` is the mean Manhattan distance over min-max normalized (`Z(·)`)
  *    numerical attributes, and `0` when the graph has no numerical dims.
  *
  * Both a Catalyst (DataFrame) implementation and a driver-side mirror are
  * provided; tests assert they agree and cross-check against DuckDB SQL.
  */
object AttrDistance {

  /** Jaccard distance between two textual attribute sets. */
  def jaccard(a: Set[String], b: Set[String]): Double = {
    val union = (a ++ b).size
    if (union == 0) 0.0 else 1.0 - a.intersect(b).size.toDouble / union
  }

  /** Mean Manhattan distance over already-normalized numerical vectors. */
  def manhattan(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"dim mismatch ${a.length} vs ${b.length}")
    if (a.isEmpty) 0.0
    else {
      var s = 0.0; var i = 0
      while (i < a.length) { s += math.abs(a(i) - b(i)); i += 1 }
      s / a.length
    }
  }

  /** Composite distance over normalized attributes. */
  def composite(
      aText: Set[String], aNum: Array[Double],
      bText: Set[String], bNum: Array[Double],
      gamma: Double,
  ): Double = gamma * jaccard(aText, bText) + (1 - gamma) * manhattan(aNum, bNum)

  /** Per-dimension (min, range) of the numerical attributes of a graph,
    * computed distributively. `range` is clamped to ≥ 1e-12 so `Z(·)` never
    * divides by zero on constant dimensions.
    */
  def numStats(g: AttributedGraph): (Array[Double], Array[Double]) = {
    val dims = g.nodes.select(max(size(col("num")))).collect()(0).get(0) match {
      case null       => 0
      case i: Integer => i.toInt
      case i: Int     => i
    }
    if (dims <= 0) (Array.empty, Array.empty)
    else {
      val rows = g.nodes
        .select(posexplode(col("num")).as(Seq("dim", "x")))
        .groupBy("dim")
        .agg(min("x").as("mn"), max("x").as("mx"))
        .collect()
      val mins = Array.fill(dims)(0.0)
      val rngs = Array.fill(dims)(1.0)
      rows.foreach { r =>
        val d = r.getInt(0)
        mins(d) = r.getDouble(1)
        rngs(d) = math.max(r.getDouble(2) - r.getDouble(1), 1e-12)
      }
      (mins, rngs)
    }
  }

  /** `Z(·)`: min-max normalize a numerical vector with the given stats. */
  def normalize(num: Array[Double], mins: Array[Double], rngs: Array[Double]): Array[Double] = {
    val out = new Array[Double](num.length)
    var i = 0
    while (i < num.length) { out(i) = (num(i) - mins(i)) / rngs(i); i += 1 }
    out
  }

  /** Catalyst column computing the composite distance of each node row
    * (columns `text`, `num`) to the query attributes. Normalization stats are
    * baked in as literals.
    */
  def distanceColumn(
      qText: Set[String], qNumZ: Array[Double],
      mins: Array[Double], rngs: Array[Double],
      gamma: Double,
  ): Column = {
    val textD = {
      val inter = size(array_intersect(array_distinct(col("text")), typedLit(qText.toSeq)))
      val uni   = size(array_union(array_distinct(col("text")), typedLit(qText.toSeq)))
      when(uni === 0, lit(0.0)).otherwise(lit(1.0) - inter.cast("double") / uni.cast("double"))
    }
    val numD =
      if (qNumZ.isEmpty) lit(0.0)
      else {
        // Z-normalize the row's vector, then mean |z_u - z_q|.
        val z = zip_with(
          zip_with(col("num"), typedLit(mins.toSeq), (x, mn) => x - mn),
          typedLit(rngs.toSeq),
          (x, rg) => x / rg,
        )
        val diffs = zip_with(z, typedLit(qNumZ.toSeq), (a, b) => abs(a - b))
        aggregate(diffs, lit(0.0), (acc, x) => acc + x) / lit(qNumZ.length.toDouble)
      }
    lit(gamma) * textD + lit(1.0 - gamma) * numD
  }

  /** `(id, f)` for every node of `g`: the composite attribute distance to the
    * query node `q` (Definition 4's ingredient). Distributed computation.
    */
  def distanceToQuery(g: AttributedGraph, q: Long, gamma: Double): DataFrame = {
    val (mins, rngs) = numStats(g)
    val qRow = g.nodes.filter(col("id") === q).select("text", "num").collect()
    require(qRow.nonEmpty, s"query node $q not in graph")
    val qText = Option(qRow(0).getSeq[String](0)).map(_.toSet).getOrElse(Set.empty[String])
    val qNum  = Option(qRow(0).getSeq[Double](1)).map(_.toArray).getOrElse(Array.empty[Double])
    val qNumZ = normalize(qNum, mins, rngs)
    g.nodes.select(col("id"), distanceColumn(qText, qNumZ, mins, rngs, gamma).as("f"))
  }

  /** δ(H) over a set of distances-to-q (q itself excluded by the caller). */
  def deltaOf(fValues: Iterable[Double]): Double =
    if (fValues.isEmpty) 0.0 else fValues.sum / fValues.size
}
