package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Attribute-aware sampling (§V-A): nodes are drawn with probability
  * `P_s(v) ∝ 1 − f(v,q)` (Eq. 5). Fixed-size weighted sampling without
  * replacement is realized with the Efraimidis–Spirakis A-Res scheme as a
  * single DataFrame expression: key `rand^{1/w}`, take the top-|S| keys.
  */
object Sampling {

  /** Draw `size` node ids from `fDf` (`id`, `f`), always including `q`.
    * Weights are clamped to ≥ 1e-6 so f = 1 nodes stay sampleable.
    */
  def weightedSample(fDf: DataFrame, q: Long, size: Int, seed: Long): DataFrame = {
    val spark = fDf.sparkSession
    import spark.implicits._
    val qDf = Seq(q).toDF("id")
    if (size <= 1) return qDf
    val w = greatest(lit(1.0) - col("f"), lit(1e-6))
    val keyed = fDf
      .filter(col("id") =!= q)
      .withColumn("ares", pow(rand(seed), lit(1.0) / w))
    keyed
      .orderBy(col("ares").desc, col("id").asc)
      .limit(size - 1)
      .select("id")
      .union(qDf)
  }

  /** Incremental sampling (§V-C): draw `size` more ids from `fDf` excluding
    * the already-sampled `exclude` set.
    */
  def weightedSampleMore(
      fDf: DataFrame, exclude: DataFrame, size: Int, seed: Long,
  ): DataFrame = {
    val remaining = fDf.join(exclude.select("id"), Seq("id"), "left_anti")
    val w = greatest(lit(1.0) - col("f"), lit(1e-6))
    remaining
      .withColumn("ares", pow(rand(seed), lit(1.0) / w))
      .orderBy(col("ares").desc, col("id").asc)
      .limit(size)
      .select("id")
  }
}
