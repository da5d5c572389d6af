package repro.bench

import repro.SparkSpec
import repro.synthgraph.Datasets

/** Table I — dataset statistics of the ten -lite analogues. */
class TableIStatsBench extends SparkSpec {

  test("Table I: dataset statistics") {
    val (text, rows) = Tables.tableI(spark)
    println(text)
    assert(rows.size === 10)
    // size ordering mirrors the paper: facebook < github < twitch < livejournal < twitter
    val homo = Datasets.homoNames.map(n => rows.find(_.name == n).get)
    homo.map(_.nodes).sliding(2).foreach { case Seq(a, b) => assert(a < b) }
    // heterogeneous graphs have > 1 node and edge type
    Datasets.heteroNames.foreach { n =>
      val r = rows.find(_.name == n).get
      assert(r.nTypes > 1 && r.eTypes > 1, n)
    }
    // homogeneous datasets support the benchmarked coreness (k=6); the
    // heterogeneous rows report the raw typed graph (as the paper does) —
    // their (k,P)-core structure lives in the meta-path projection and is
    // exercised by the Table V bench.
    homo.foreach(r => assert(r.kMax >= 6, s"${r.name} kMax=${r.kMax}"))
    Datasets.heteroNames.foreach { n =>
      assert(rows.find(_.name == n).get.kMax >= 2, n)
    }
  }
}
