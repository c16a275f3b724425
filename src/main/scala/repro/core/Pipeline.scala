package repro.core

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.Model._
import repro.core.Similarity.KeyAttr
import repro.eval.Gold

/** Stage-1 orchestration: canonical relations → candidate matches →
  * calibrated probabilities → an in-driver [[Model.Instance]], the gold
  * standard, and the id→key translation used by metrics.
  *
  * Spark does the heavy lifting (similarity join over provenance-scale data,
  * calibration group-bys); only the canonical relations and candidate match
  * list — orders of magnitude smaller than the raw datasets — are collected
  * for the stage-2 solver, mirroring the paper's CPLEX architecture.
  */
object Pipeline {

  final case class PreparedPair(
      inst: Instance,
      keyOf: Map[Long, (Int, String)],
      gold: Gold.GoldStandard,
      leftCanon: DataFrame,
      rightCanon: DataFrame,
      matchAttrs: Seq[String],
  ) {
    def stats: PairStats = PairStats(inst.t1.size, inst.t2.size, inst.matches.size)
  }

  final case class PairStats(t1: Int, t2: Int, nMatches: Int)

  /** Assigns a deterministic 0-based `cid` by sorting on the key columns. */
  def withCid(canon: DataFrame, matchAttrs: Seq[String]): DataFrame = {
    val w = Window.orderBy(matchAttrs.map(col) :+ col("I"): _*)
    canon.withColumn("cid", row_number().over(w).cast("long") - 1)
  }

  /** Full stage-1 preparation of one comparable query pair. */
  def prepare(
      leftCanon: DataFrame,
      rightCanon: DataFrame,
      attrs: Seq[KeyAttr],
      phi: Phi,
      params: Params = Params(),
      buckets: Int = Calibration.DefaultBuckets,
      labelFraction: Double = 0.5,
      seed: Long = 42,
      simFloor: Double = 0.0,
  ): PreparedPair = {
    val matchAttrs = attrs.map(_.name)
    val lc = withCid(leftCanon, matchAttrs).cache()
    val rc = withCid(rightCanon, matchAttrs).cache()

    // simFloor models the blocking step of practical linkage systems: pairs
    // below the floor never become candidates (zero-overlap pairs already
    // don't). 0.0 keeps every token-sharing pair.
    val simsAll = Similarity.candidatePairs(lc, rc, attrs)
    val sims = if (simFloor > 0.0) simsAll.filter(col("sim") >= simFloor) else simsAll
    val goldEvCid = lc.filter(col("uid").isNotNull)
      .select(col("cid").as("lid"), col("uid").as("l_uid"))
      .join(
        rc.filter(col("uid").isNotNull).select(col("cid").as("rid"), col("uid").as("r_uid")),
        col("l_uid") === col("r_uid"))
      .select("lid", "rid")
    val probs = Calibration.calibrate(sims, goldEvCid, buckets, labelFraction, seed)

    val gold = Gold.derive(lc, rc, matchAttrs, phi)

    def collectSide(df: DataFrame, side: Int, offset: Long): Vector[CTuple] = {
      // Any column beyond (cid, matchAttrs, I, uid) is an extra provenance
      // attribute carried for stage-3 summarization.
      val extras = df.columns.toSeq.diff(matchAttrs ++ Seq("cid", "I", "uid"))
      val cols = col("cid") +:
        (matchAttrs ++ extras).map(c => coalesce(col(c).cast("string"), lit(""))) :+
        col("I").cast("double")
      val iIdx = 1 + matchAttrs.size + extras.size
      df.select(cols: _*).collect().toVector.map { r =>
        val key = (1 to matchAttrs.size).map(r.getString)
        val extraVals = extras.indices.map(i => r.getString(1 + matchAttrs.size + i))
        CTuple(r.getLong(0) + offset, side, key, r.getDouble(iIdx),
          matchAttrs.zip(key).toMap ++ extras.zip(extraVals).toMap)
      }
    }
    val t1 = collectSide(lc, 1, 0L)
    val offset = t1.size.toLong
    val t2 = collectSide(rc, 2, offset)

    val matches = probs.select("lid", "rid", "p").collect().toVector
      .map { case Row(l: Long, r: Long, p: Double) => TupleMatch(l, r + offset, p) }
      .groupBy(m => (m.left, m.right)).values.map(_.maxBy(_.p)).toVector
      .sortBy(m => (m.left, m.right))

    val inst = Instance(t1, t2, matches, phi, params)
    val keyOf = (t1 ++ t2).map(t => t.id -> (t.side, t.key.mkString("|"))).toMap
    PreparedPair(inst, keyOf, gold, lc, rc, matchAttrs)
  }
}
