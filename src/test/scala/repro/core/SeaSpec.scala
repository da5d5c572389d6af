package repro.core

import scala.collection.mutable
import repro.{SparkSpec, TestGraphs}
import repro.eval.{Harness, Metrics}
import repro.graph.CoreModel
import repro.synthgraph.SynthGraph

class SeaSpec extends SparkSpec {

  private lazy val planted = SynthGraph.homogeneous(spark, SynthGraph.HomoSpec(
    name = "test", nCommunities = 5, communitySize = 30, intraDeg = 14, interDeg = 2,
    bridges = 3, seed = 900))

  private val baseCfg = Sea.Config(
    k = 5, gamma = 0.5, eps = 0.4, beta = 0.05, lambda = 0.5,
    e = 0.10, alpha = 0.05, maxRounds = 5, seed = 7)

  test("SEA returns a community containing q") {
    val r = Sea.run(planted.graph, 40L, baseCfg)
    assert(r.found)
    assert(r.community.contains(40L))
  }

  test("SEA community is a connected k-core (structure cohesiveness)") {
    val r = Sea.run(planted.graph, 40L, baseCfg)
    val lg = Harness.collectWhole(planted.graph)
    val alive = mutable.BitSet(r.community.map(lg.indexOf).toSeq: _*)
    alive.foreach(i => assert(lg.degreeWithin(i, alive) >= baseCfg.k, s"node $i"))
    assert(lg.componentOf(lg.indexOf(40L), alive) === alive)
  }

  test("SEA recovers (mostly) the planted annotated circle") {
    val r = Sea.run(planted.graph, 40L, baseCfg)
    val truth = planted.groundTruthOf(40L)
    assert(Metrics.f1(r.community, truth) > 0.6, s"f1 too low: ${Metrics.f1(r.community, truth)}")
  }

  test("SEA relative error vs Exact is small on the planted graph") {
    val q = 70L
    val exact = ExactCSAG.search(planted.graph, q, baseCfg.k, baseCfg.gamma,
      stateCap = 500_000L)
    val r = Sea.run(planted.graph, q, baseCfg)
    assert(r.found && exact.community.nonEmpty)
    val err = Metrics.relativeError(r.deltaStar, exact.delta)
    // e=10% guarantee at 95% confidence; allow slack for the single draw.
    assert(err <= 0.35, s"relative error $err (sea=${r.deltaStar}, exact=${exact.delta})")
  }

  test("SEA converged runs satisfy Theorem 11's bound on the MoE") {
    val r = Sea.run(planted.graph, 40L, baseCfg)
    if (r.converged) {
      assert(r.moe <= Blb.accuracyBound(r.deltaStar, baseCfg.e) + 1e-12)
    }
  }

  test("SEA reports per-round trace with at most maxRounds rounds") {
    val r = Sea.run(planted.graph, 40L, baseCfg)
    assert(r.rounds.nonEmpty)
    assert(r.rounds.size <= baseCfg.maxRounds)
    assert(r.rounds.map(_.round) === (1 to r.rounds.size))
  }

  test("SEA G_q respects the Hoeffding minimum size (capped by n)") {
    val r = Sea.run(planted.graph, 40L, baseCfg)
    val n = planted.graph.nodeCount
    val expected = Hoeffding.minGqSize(n, baseCfg.k + 1L, baseCfg.eps, baseCfg.beta)
    // the planted graph is connected, so the BFS reaches exactly the minimum
    assert(r.gqSize === math.min(expected, n))
  }

  test("SEA is deterministic in the seed") {
    val a = Sea.run(planted.graph, 40L, baseCfg)
    val b = Sea.run(planted.graph, 40L, baseCfg)
    assert(a.community === b.community)
    assert(a.deltaStar === b.deltaStar)
  }

  test("SEA with a looser error bound converges at least as fast") {
    val tight = Sea.run(planted.graph, 40L, baseCfg.copy(e = 0.02))
    val loose = Sea.run(planted.graph, 40L, baseCfg.copy(e = 0.25))
    assert(loose.rounds.size <= tight.rounds.size)
  }

  // ---- size-bounded CS (§VI-B) --------------------------------------------

  test("size-bounded SEA returns a community within [l,h]") {
    val r = Sea.run(planted.graph, 40L, baseCfg.copy(sizeBound = Some((8, 20))))
    if (r.found) {
      assert(r.community.size >= 8 && r.community.size <= 20,
        s"size ${r.community.size} outside [8,20]")
    }
  }

  test("size-bounded SEA with a wide bound behaves like unbounded") {
    val r = Sea.run(planted.graph, 40L, baseCfg.copy(sizeBound = Some((6, 1000))))
    assert(r.found)
  }

  // ---- k-truss model (§VI-C) ----------------------------------------------

  test("SEA-Truss returns a connected k-truss containing q") {
    val cfg = baseCfg.copy(k = 4, truss = true)
    val r = Sea.run(planted.graph, 40L, cfg)
    assert(r.found)
    assert(r.community.contains(40L))
    val lg = Harness.collectWhole(planted.graph)
    val alive = mutable.BitSet(r.community.map(lg.indexOf).toSeq: _*)
    // verify via the local truss model: the returned set must be its own
    // maximal connected k-truss
    val truss = new repro.graph.TrussModel(4).maximal(lg, alive, lg.indexOf(40L))
    assert(truss === alive)
  }

  // ---- heterogeneous graphs (§VI-A) ----------------------------------------

  test("SEA on a meta-path projection finds a target-node community") {
    val hetero = SynthGraph.heterogeneous(spark, SynthGraph.HeteroSpec(
      name = "t", targetType = "A", hubType = "P", nCommunities = 4,
      communitySize = 20, hubsPerCommunity = 50, targetsPerHub = 3, seed = 901))
    val proj = repro.graph.MetaPath.project(hetero.graph, Seq("A", "P", "A"))
    // e=0.02 forces the greedy refinement to actually peel the numerically
    // deviant periphery before returning.
    val r = Sea.run(proj, 30L, baseCfg.copy(k = 4, e = 0.02))
    assert(r.found)
    assert(r.community.contains(30L))
    // all members are target nodes (< nTargets = 80)
    assert(r.community.forall(_ < 80L))
    // min-δ communities trade recall for attribute tightness; on this tiny
    // 4-block graph the annotated circle holds 9 members, so F1 ≈ 0.5.
    assert(Metrics.f1(r.community, hetero.groundTruthOf(30L)) > 0.4)
  }

  test("SEA DataFrame BLB path is exercised when above the threshold") {
    val r = Sea.run(planted.graph, 40L, baseCfg.copy(dfBlbThreshold = 2))
    assert(r.found) // same pipeline, estimation via Blb.estimateDF
  }

  test("SEA on a graph where q has no k-core returns empty") {
    val lg = TestGraphs.local(6, Seq((0, 1), (1, 2), (2, 3), (3, 4), (4, 5)))
    val g = TestGraphs.toAttributed(spark, lg)
    val r = Sea.run(g, 0L, Sea.Config(k = 3, eps = 0.5, lambda = 1.0, maxRounds = 2))
    assert(!r.found)
    assert(!r.converged)
  }
}
