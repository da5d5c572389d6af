package repro.bench

import repro.SparkSpec

/** Table VI — case study: detailed per-round runtime information of
  * size-bounded SEA (δ*, MoE ε, |ΔS|, time, error).
  */
class TableVICaseStudyBench extends SparkSpec {

  test("Table VI: size-bounded SEA case study (imdb-lite)") {
    val (text, rows) = Tables.tableVI(spark)
    println(text)
    assert(rows.nonEmpty)
    val bounds = rows.map(_.bound).distinct
    assert(bounds.size === 2)
    bounds.foreach { b =>
      val rs = rows.filter(_.bound == b).sortBy(_.round)
      // at least one estimation round with a finite δ* and a finite error
      // against the size-bounded exact reference
      assert(rs.nonEmpty, s"no rounds for bound $b")
      assert(rs.exists(r => !r.deltaStar.isNaN), s"no estimate for bound $b")
      assert(rs.exists(r => !r.errorPct.isNaN), s"no error reference for bound $b")
      // the final round's candidate is a genuine refinement: its error is
      // bounded and no worse than the first round's
      val withErr = rs.filter(r => !r.errorPct.isNaN)
      assert(withErr.last.errorPct <= withErr.head.errorPct + 1e-9,
        s"bound $b errors ${withErr.map(_.errorPct)}")
      assert(withErr.last.errorPct < 100.0, s"bound $b final error ${withErr.last.errorPct}")
    }
    // error-based incremental sampling engages (ΔS > 0 somewhere)
    assert(rows.exists(_.deltaS > 0), "no incremental sampling round observed")
  }
}
