package repro.bench

import repro.SparkSpec

/** Table IV — effect of the three pruning strategies on Exact's runtime and
  * explored state count.
  */
class TableIVPruningBench extends SparkSpec {

  test("Table IV: pruning strategies on Exact") {
    val (text, rows) = Tables.tableIV(spark)
    println(text)
    val datasets = rows.map(_.dataset).distinct
    datasets.foreach { d =>
      def states(c: String) = rows.find(r => r.config == c && r.dataset == d).get
      // monotone state counts: each pruning strictly helps (Table IV shape)
      assert(states("Exact").states <= states("Exact\\P3").states + 1e-9, d)
      assert(states("Exact\\P3").states <= states("Exact\\P3+P2").states + 1e-9, d)
      assert(states("Exact\\P3+P2").states <= states("Exact w/o P").states + 1e-9, d)
      // the unpruned run must blow past everything else (capped = the paper's
      // ">8 days" entries) on at least the larger graphs
      assert(states("Exact w/o P").states >= states("Exact").states)
    }
    // P1 is the paper's most effective pruning: w/o P explodes vs P1-only
    val anyExplosion = datasets.exists { d =>
      val p1 = rows.find(r => r.config == "Exact\\P3+P2" && r.dataset == d).get
      val no = rows.find(r => r.config == "Exact w/o P" && r.dataset == d).get
      no.capped || no.states > p1.states * 5
    }
    assert(anyExplosion, "expected the unpruned enumeration to explode somewhere")
  }
}
