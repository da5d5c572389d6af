package repro.eval

import scala.collection.mutable
import repro.graph.LocalGraph

/** Effectiveness metrics used by the evaluation section (§VII-A "Metrics"
  * and Table II's four attribute-cohesiveness measures).
  */
object Metrics {

  /** δ(H): mean composite distance to q over members ≠ q (Definition 4). */
  def delta(lg: LocalGraph, community: Set[Long], qId: Long, gamma: Double): Double = {
    val qIdx = lg.indexOf(qId)
    val others = community.filter(_ != qId).map(lg.indexOf)
    if (others.isEmpty) 0.0
    else others.iterator.map(i => lg.pairDistance(i, qIdx, gamma)).sum / others.size
  }

  /** Relative error `|δ* − δ| / δ` (Eq. 2); 0 when both are 0. */
  def relativeError(approx: Double, exact: Double): Double =
    if (exact == 0.0) { if (approx == 0.0) 0.0 else Double.PositiveInfinity }
    else math.abs(approx - exact) / exact

  /** VAC's metric: maximum pairwise composite distance within H ("Min-max"
    * column of Table II — smaller is better).
    */
  def minMaxPairwise(lg: LocalGraph, community: Set[Long], gamma: Double): Double = {
    val nodes = community.toArray.map(lg.indexOf)
    var worst = 0.0
    var i = 0
    while (i < nodes.length) {
      var j = i + 1
      while (j < nodes.length) {
        val d = lg.pairDistance(nodes(i), nodes(j), gamma)
        if (d > worst) worst = d
        j += 1
      }
      i += 1
    }
    worst
  }

  /** ATC's metric: attribute coverage `Σ_{a∈A^t(q)} |V_a ∩ V_H|²/|V_H|`
    * (larger is better).
    */
  def coverageScore(lg: LocalGraph, community: Set[Long], qId: Long): Double = {
    if (community.isEmpty) return 0.0
    val qAttrs = lg.text(lg.indexOf(qId))
    val counts = mutable.Map.empty[String, Int].withDefaultValue(0)
    community.foreach { id =>
      lg.text(lg.indexOf(id)).foreach(a => if (qAttrs.contains(a)) counts(a) += 1)
    }
    qAttrs.iterator.map(a => counts(a).toDouble * counts(a) / community.size).sum
  }

  /** ACQ's metric: fraction of q's textual attributes shared by *every*
    * community member (larger is better). See DESIGN.md §5 for the
    * normalization choice.
    */
  def sharedFraction(lg: LocalGraph, community: Set[Long], qId: Long): Double = {
    val qAttrs = lg.text(lg.indexOf(qId))
    if (qAttrs.isEmpty || community.isEmpty) return 0.0
    val shared = community.foldLeft(qAttrs)((acc, id) => acc.intersect(lg.text(lg.indexOf(id))))
    shared.size.toDouble / qAttrs.size
  }

  /** F1 of a community vs a ground-truth community (Table III / §VII-A
    * Remark).
    */
  def f1(community: Set[Long], truth: Set[Long]): Double = {
    if (community.isEmpty || truth.isEmpty) return 0.0
    val tp = community.intersect(truth).size.toDouble
    if (tp == 0) return 0.0
    val precision = tp / community.size
    val recall = tp / truth.size
    2 * precision * recall / (precision + recall)
  }

  /** 1-based standard-competition ranks ("1224", as Table II uses for ties),
    * in the direction given by `ascending` (true = smaller is better).
    */
  def ranks(values: Seq[Double], ascending: Boolean): Seq[Int] =
    values.map { v =>
      1 + values.count(x => if (ascending) x < v else x > v)
    }
}
