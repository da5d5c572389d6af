package repro.baselines

import scala.collection.mutable
import repro.core.ExactCSAG
import repro.graph.{CohesionModel, LocalGraph}

/** VAC baseline (Liu et al., ICDE'20): minimize the *maximum pairwise*
  * attribute distance inside the community (worst-case optimization — the
  * paper's Challenge I contrast: it overlooks per-node similarity to q).
  *
  *  - `run` is the approximate peel: repeatedly locate the most dissimilar
  *    pair and delete one of its endpoints (the one farther from q, never q
  *    itself) while the connected structure containing q survives; halt when
  *    the worst pair cannot be improved — mirroring Fig. 1(d)'s behaviour.
  *  - `runExact` (E-VAC) reuses the exact enumeration machinery with the
  *    min-max objective; exponential, so callers pass a state cap (the paper
  *    reports E-VAC "cannot finish within one week" on large graphs).
  */
object Vac {

  final case class Result(community: Set[Long], minMax: Double, elapsedMs: Double, capped: Boolean = false)

  def maxPairwise(lg: LocalGraph, alive: mutable.BitSet, gamma: Double): (Int, Int, Double) = {
    var bi = -1; var bj = -1; var bd = -1.0
    val nodes = alive.toArray
    var i = 0
    while (i < nodes.length) {
      var j = i + 1
      while (j < nodes.length) {
        val d = lg.pairDistance(nodes(i), nodes(j), gamma)
        if (d > bd) { bd = d; bi = nodes(i); bj = nodes(j) }
        j += 1
      }
      i += 1
    }
    (bi, bj, math.max(bd, 0.0))
  }

  def run(lg: LocalGraph, qIdx: Int, model: CohesionModel, gamma: Double): Result = {
    val t0 = System.nanoTime()
    var cur = model.maximal(lg, lg.allAlive, qIdx)
    if (cur.isEmpty)
      return Result(Set.empty, Double.NaN, (System.nanoTime() - t0) / 1e6)
    var halted = false
    while (!halted && cur.size > model.minCommunitySize) {
      val (u, v, _) = maxPairwise(lg, cur, gamma)
      if (u < 0) halted = true
      else {
        // Prefer deleting the endpoint farther from q; q is never deleted.
        val fu = lg.pairDistance(u, qIdx, gamma)
        val fv = lg.pairDistance(v, qIdx, gamma)
        val order =
          (if (fu >= fv) Seq(u, v) else Seq(v, u)).filter(_ != qIdx)
        val next = order.iterator.map { w =>
          val without = cur.clone(); without -= w
          model.maximal(lg, without, qIdx)
        }.find(c => c.nonEmpty && c(qIdx))
        next match {
          case Some(c) => cur = c
          case None    => halted = true // the worst pair cannot be improved
        }
      }
    }
    val (_, _, mm) = maxPairwise(lg, cur, gamma)
    Result(cur.iterator.map(lg.ids).toSet, mm, (System.nanoTime() - t0) / 1e6)
  }

  def runExact(
      lg: LocalGraph,
      qIdx: Int,
      model: CohesionModel,
      gamma: Double,
      stateCap: Long,
  ): Result = {
    val t0 = System.nanoTime()
    val f = Array.tabulate(lg.n)(i => lg.pairDistance(i, qIdx, gamma))
    // The min-max objective is evaluated on every explored state — memoize
    // the pairwise distances once instead of recomputing set intersections.
    val dist = Array.tabulate(lg.n, lg.n)((i, j) => lg.pairDistance(i, j, gamma))
    val objective: mutable.BitSet => Double = { alive =>
      val nodes = alive.toArray
      var worst = 0.0
      var i = 0
      while (i < nodes.length) {
        var j = i + 1
        while (j < nodes.length) {
          val d = dist(nodes(i))(nodes(j))
          if (d > worst) worst = d
          j += 1
        }
        i += 1
      }
      worst
    }
    val r = ExactCSAG.run(lg, qIdx, f, model,
      ExactCSAG.Pruning.OnlyP1, stateCap, Some(objective))
    Result(r.community, r.delta, (System.nanoTime() - t0) / 1e6, r.capped)
  }
}
