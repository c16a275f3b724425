package repro.data

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** Deterministic error-injection helpers, substituting for the BART system
  * the paper uses ("we further introduce ~5% random errors to both views
  * with the BART system"). Every decision is a pure function of a row key
  * and a seed, so the injected errors are reproducible and the gold
  * standard can be derived from the same expressions.
  */
object Bart {

  /** Bernoulli flag with the given rate, keyed on (col, seed). */
  def flag(key: Column, seed: Long, rate: Double): Column =
    pmod(hash(key, lit(seed)), lit(1000000)) < lit((rate * 1000000).toInt)

  /** A deterministic pseudo-random integer in [0, n). */
  def draw(key: Column, seed: Long, n: Int): Column =
    pmod(hash(key, lit(seed)), lit(n))

  /** Corrupts a numeric column at `rate`: adds a non-zero perturbation of
    * magnitude 1..9 × `step`, guaranteeing the value actually changes.
    */
  def corruptNumeric(value: Column, key: Column, seed: Long, rate: Double, step: Double = 1.0): Column =
    when(flag(key, seed, rate), value + (draw(key, seed + 1, 9) + 1) * lit(step))
      .otherwise(value)

  /** Tuple-drop predicate: keep rows where this is false. */
  def dropped(key: Column, seed: Long, rate: Double): Column = flag(key, seed, rate)
}
