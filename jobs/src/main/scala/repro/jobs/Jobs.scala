package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Tables

/** spark-submit entrypoints — one per reproduced table, e.g.
  * `spark-submit --class repro.jobs.TableIStats repro-jobs.jar`.
  */
object Jobs {
  def session(name: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
}

/** Table I — dataset statistics. */
object TableIStats {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table-i")
    println(Tables.tableI(spark)._1)
    spark.stop()
  }
}

/** Table II — attribute cohesiveness under four metrics. */
object TableIIMetrics {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table-ii")
    println(Tables.tableII(spark)._1)
    spark.stop()
  }
}

/** Table III — F1 vs planted ground-truth communities. */
object TableIIIF1 {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table-iii")
    println(Tables.tableIII(spark)._1)
    spark.stop()
  }
}

/** Table IV — effect of pruning strategies on Exact. */
object TableIVPrunings {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table-iv")
    println(Tables.tableIV(spark)._1)
    spark.stop()
  }
}

/** Table V — heterogeneous graphs, core- and truss-based methods. */
object TableVHetero {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table-v")
    println(Tables.tableV(spark)._1)
    spark.stop()
  }
}

/** Table VI — size-bounded SEA case study. */
object TableVICaseStudy {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("table-vi")
    println(Tables.tableVI(spark)._1)
    spark.stop()
  }
}
