package repro.graph

import repro.{SparkSpec, TestGraphs}
import repro.core.AttrDistance

class PriorityBfsSpec extends SparkSpec {

  private def gq(lg: LocalGraph, q: Long, minSize: Long, gamma: Double = 0.5): Set[Long] = {
    val g = TestGraphs.toAttributed(spark, lg)
    val f = AttrDistance.distanceToQuery(g, q, gamma)
    PriorityBfs.collectGq(g, f, q, minSize).collect().map(_.getLong(0)).toSet
  }

  test("collectGq: always contains q") {
    val lg = TestGraphs.randomLocal(20, 0.2, seed = 1)
    assert(gq(lg, 0L, 5).contains(0L))
  }

  test("collectGq: returns exactly minSize nodes when reachable") {
    val lg = TestGraphs.randomLocal(40, 0.3, seed = 2)
    assert(gq(lg, 0L, 17).size === 17)
  }

  test("collectGq: returns all reachable nodes when minSize exceeds them") {
    val lg = TestGraphs.local(6, Seq((0, 1), (1, 2), (3, 4))) // component of 0 = {0,1,2}
    assert(gq(lg, 0L, 100) === Set(0L, 1L, 2L))
  }

  test("collectGq: layers before the last are kept whole (BFS order)") {
    // star: 0 at centre, leaves 1..9; asking for 4 nodes keeps q and trims leaves
    val lg = TestGraphs.local(10, (1 until 10).map(i => (0, i)))
    val got = gq(lg, 0L, 4)
    assert(got.size === 4)
    assert(got.contains(0L))
  }

  test("collectGq: the overshooting layer is trimmed by smallest f") {
    // path 0-1, 0-2 ... leaves have f equal to their attribute distance to 0;
    // TestGraphs.local gives node i the numeric i/(n-1) so f grows with id.
    val lg = TestGraphs.local(8, (1 until 8).map(i => (0, i)))
    val got = gq(lg, 0L, 4, gamma = 0.0)
    // the three smallest-f leaves are 1,2,3
    assert(got === Set(0L, 1L, 2L, 3L))
  }

  test("collectGq: minSize=1 returns just q") {
    val lg = TestGraphs.randomLocal(10, 0.3, seed = 3)
    assert(gq(lg, 0L, 1) === Set(0L))
  }

  test("collectGq: multi-round expansion on a long path") {
    val lg = TestGraphs.local(10, (0 until 9).map(i => (i, i + 1)))
    val got = gq(lg, 0L, 6)
    assert(got === (0L until 6L).toSet) // BFS from 0 walks the path in order
  }
}
