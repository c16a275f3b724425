package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Provenance relations (Def. 2.3).
  *
  * For a query `Q = π_o σ_c(X)` the caller supplies `σ_c(X)` as a DataFrame
  * (X may be any join/union/subquery — Spark composes it) and the output
  * shape `o`. The provenance relation appends the impact column `I`: 1 for
  * non-aggregate and COUNT queries, the aggregated attribute's value for
  * SUM/AVG/MAX/MIN.
  */
object Provenance {

  /** The projection/aggregate `o` of the query. */
  sealed trait Output {
    /** AVG/MAX/MIN require a strict one-to-one mapping and are exempt from
      * canonical consolidation (Section 3.1).
      */
    def strict: Boolean = this match {
      case Output.Avg(_) | Output.Max(_) | Output.Min(_) => true
      case _                                             => false
    }
  }
  object Output {
    /** Plain projection — each result tuple contributes 1. */
    case object NonAggregate        extends Output
    case object Count               extends Output
    final case class Sum(col: String) extends Output
    final case class Avg(col: String) extends Output
    final case class Max(col: String) extends Output
    final case class Min(col: String) extends Output
  }

  /** Derives P(A…, I) from the filtered input σ_c(X). */
  def relation(filtered: DataFrame, output: Output): DataFrame = output match {
    case Output.NonAggregate | Output.Count => filtered.withColumn("I", lit(1.0))
    case Output.Sum(c)                      => filtered.withColumn("I", col(c).cast("double"))
    case Output.Avg(c)                      => filtered.withColumn("I", col(c).cast("double"))
    case Output.Max(c)                      => filtered.withColumn("I", col(c).cast("double"))
    case Output.Min(c)                      => filtered.withColumn("I", col(c).cast("double"))
  }
}
