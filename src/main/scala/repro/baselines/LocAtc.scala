package repro.baselines

import scala.collection.mutable
import repro.graph.{CohesionModel, LocalGraph}

/** LocATC baseline (Huang & Lakshmanan, PVLDB'17 — local variant): maximize
  * the attribute-coverage score
  * `score(H) = Σ_{a ∈ A^t(q)} |V_a ∩ V_H|² / |V_H|`
  * over connected k-cores/k-trusses containing q, by greedy local peeling:
  * repeatedly remove the single node whose removal (after structure
  * maintenance) best improves the score; stop when no removal improves it.
  *
  * Like ATC it matches textual attributes by equality and is blind to
  * numerical attributes — the behavioural contrast the paper draws.
  */
object LocAtc {

  final case class Result(community: Set[Long], score: Double, elapsedMs: Double)

  def score(lg: LocalGraph, qIdx: Int, alive: mutable.BitSet): Double = {
    if (alive.isEmpty) return 0.0
    val qAttrs = lg.text(qIdx)
    if (qAttrs.isEmpty) return 0.0
    val counts = mutable.Map.empty[String, Int].withDefaultValue(0)
    alive.foreach { i =>
      lg.text(i).foreach(a => if (qAttrs.contains(a)) counts(a) += 1)
    }
    qAttrs.iterator.map(a => counts(a).toDouble * counts(a) / alive.size).sum
  }

  def run(lg: LocalGraph, qIdx: Int, model: CohesionModel, maxIters: Int = 256): Result = {
    val t0 = System.nanoTime()
    var cur = model.maximal(lg, lg.allAlive, qIdx)
    var curScore = score(lg, qIdx, cur)
    var improved = cur.nonEmpty
    var iters = 0
    while (improved && iters < maxIters) {
      improved = false
      iters += 1
      var bestNext: Option[mutable.BitSet] = None
      var bestScore = curScore
      cur.foreach { v =>
        if (v != qIdx) {
          val without = cur.clone(); without -= v
          val cand = model.maximal(lg, without, qIdx)
          if (cand.nonEmpty && cand(qIdx)) {
            val s = score(lg, qIdx, cand)
            if (s > bestScore + 1e-12) { bestScore = s; bestNext = Some(cand) }
          }
        }
      }
      bestNext.foreach { c => cur = c; curScore = bestScore; improved = true }
    }
    Result(cur.iterator.map(lg.ids).toSet, curScore, (System.nanoTime() - t0) / 1e6)
  }
}
