package repro.bench

import repro.SparkSpec

/** Table III — F1 score of each method's community vs the planted (HA-GT)
  * community of the query node.
  */
class TableIIIF1Bench extends SparkSpec {

  test("Table III: F1 vs planted ground truth") {
    val (text, rows) = Tables.tableIII(spark)
    println(text)
    val byName = rows.map(r => r.method -> r.scores).toMap
    val datasets = Seq("facebook-lite", "livejournal-lite", "orkut-lite", "amazon-lite")
    // SEA beats the equality-matching baselines on every dataset (paper:
    // SEA/Exact have the highest F1).
    datasets.foreach { d =>
      val sea = byName("SEA")(d)
      assert(!sea.isNaN && sea > 0.5, s"SEA F1 on $d: $sea")
      Seq("ACQ-Core").foreach { m =>
        val x = byName(m)(d)
        assert(x.isNaN || sea >= x - 0.05, s"SEA $sea vs $m $x on $d")
      }
    }
    // availability mirrors the paper: Exact absent on the two largest,
    // E-VAC only on facebook-lite
    assert(byName("Exact")("orkut-lite").isNaN)
    assert(byName("E-VAC-Core")("livejournal-lite").isNaN)
    assert(!byName("E-VAC-Core")("facebook-lite").isNaN)
  }
}
