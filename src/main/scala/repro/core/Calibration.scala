package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Similarity-to-probability calibration (Section 5.1.2).
  *
  * Two-step method from the paper: (1) divide candidate pairs into `buckets`
  * contiguous buckets over their similarity value; (2) set each bucket's
  * probability to the ratio of true matches among a *labeled sample* of the
  * bucket (labels come from the gold evidence mapping, as in the paper's
  * setup). We Laplace-smooth with the bucket midpoint so empty buckets fall
  * back to the raw similarity, and clamp into (0, 1) so log-space scoring is
  * finite.
  */
object Calibration {

  val DefaultBuckets = 50
  val Eps = 0.002

  /** @param pairs         DataFrame(lid, rid, sim)
    * @param goldEvidence  DataFrame(lid, rid) of true matches (labels)
    * @param buckets       number of contiguous similarity buckets
    * @param labelFraction fraction of pairs whose label is revealed
    * @return DataFrame(lid, rid, sim, p)
    */
  def calibrate(
      pairs: DataFrame,
      goldEvidence: DataFrame,
      buckets: Int = DefaultBuckets,
      labelFraction: Double = 0.5,
      seed: Long = 42,
  ): DataFrame = {
    val withBucket = pairs.withColumn(
      "bucket",
      least(lit(buckets - 1), floor(col("sim") * buckets)).cast("int"),
    )
    val gold = goldEvidence.select(col("lid").as("g_lid"), col("rid").as("g_rid"))
      .withColumn("isTrue", lit(1.0))
    val labeled = withBucket
      .sample(withReplacement = false, labelFraction, seed)
      .join(gold, col("lid") === col("g_lid") && col("rid") === col("g_rid"), "left")
      .na.fill(0.0, Seq("isTrue"))
    val bucketProb = labeled
      .groupBy("bucket")
      .agg(sum("isTrue").as("trues"), count(lit(1)).as("cnt"))
      .withColumn("mid", (col("bucket") + 0.5) / buckets)
      .withColumn("p_raw", (col("trues") + col("mid")) / (col("cnt") + 1.0))
      .select(col("bucket").as("b2"), col("p_raw"))
    withBucket
      .join(bucketProb, col("bucket") === col("b2"), "left")
      .withColumn("p_fallback", (col("bucket") + 0.5) / buckets)
      .withColumn("p_unclamped", coalesce(col("p_raw"), col("p_fallback")))
      .withColumn("p", least(lit(1.0 - Eps), greatest(lit(Eps), col("p_unclamped"))))
      .select("lid", "rid", "sim", "p")
  }
}
