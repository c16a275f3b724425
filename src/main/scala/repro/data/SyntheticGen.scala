package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{Canonicalize, Provenance}

/** The synthetic data generator of Section 5.3.
  *
  * Both datasets share the schema `Table(id, match_attr, val)` and the query
  * `SELECT SUM(val) FROM Table`; the attribute match is
  * `(match_attr) ≡ (match_attr)`. Following the paper: (1) create n tuples
  * with random attribute values in both datasets — `match_attr` is a phrase
  * of 5 random words from a vocabulary of size v, `val` a random integer in
  * [1, 10]; (2) drop d percent of tuples (uniformly, independently per
  * side); (3) corrupt the `val` of d percent of tuples. All randomness is
  * hash-keyed on the tuple id, so the pair and its gold standard (derived
  * from the threaded `uid`) are reproducible.
  */
object SyntheticGen {

  final case class Config(n: Int, d: Double = 0.2, v: Int = 1000, seed: Long = 7)

  /** The base table before drops/corruptions: id, match_attr, val, uid. */
  def base(spark: SparkSession, cfg: Config): DataFrame = {
    val words = (0 until 5).map { k =>
      concat(lit("w"), pmod(hash(col("id") * 31 + lit(k), lit(cfg.seed)), lit(cfg.v)))
    }
    spark.range(cfg.n).select(
      col("id"),
      concat_ws(" ", words: _*).as("match_attr"),
      (pmod(hash(col("id"), lit(cfg.seed + 1)), lit(10)) + 1).cast("double").as("val"),
      col("id").cast("string").as("uid"),
    )
  }

  /** Builds the two disjoint datasets (side = 1 or 2). */
  def side(spark: SparkSession, cfg: Config, sideNo: Int): DataFrame = {
    require(sideNo == 1 || sideNo == 2)
    val b = base(spark, cfg)
    // Step 2: drop d/2 percent per side (d percent of tuples in total).
    val kept = b.filter(!Bart.dropped(col("id"), cfg.seed + 10 + sideNo, cfg.d / 2))
    // Step 3: corrupt d percent of (surviving) tuples, alternating the side
    // the corruption lands on by the tuple's hash parity.
    val corruptHere = Bart.flag(col("id"), cfg.seed + 20, cfg.d) &&
      (pmod(hash(col("id"), lit(cfg.seed + 21)), lit(2)) === lit(sideNo - 1))
    kept.withColumn(
      "val",
      when(corruptHere,
        (pmod(col("val").cast("long") - 1 + 1 + Bart.draw(col("id"), cfg.seed + 22, 9), lit(10)) + 1)
          .cast("double"))
        .otherwise(col("val")),
    )
  }

  /** Canonical relation of `SELECT SUM(val)` over one side. */
  def canonicalSide(spark: SparkSession, cfg: Config, sideNo: Int): DataFrame = {
    val prov = Provenance.relation(side(spark, cfg, sideNo), Provenance.Output.Sum("val"))
    Canonicalize.canonical(prov, Seq("match_attr"))
  }
}
