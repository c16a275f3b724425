package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec

class CalibrationSpec extends SparkSpec {

  test("bucket probability equals smoothed true ratio with full labels") {
    import spark.implicits._
    // 4 pairs in the same bucket (sim ∈ [0.80, 0.82)), 3 of them true.
    val pairs = Seq(
      (0L, 0L, 0.80), (1L, 1L, 0.81), (2L, 2L, 0.805), (3L, 3L, 0.815),
    ).toDF("lid", "rid", "sim")
    val gold = Seq((0L, 0L), (1L, 1L), (2L, 2L)).toDF("lid", "rid")
    val out = Calibration.calibrate(pairs, gold, buckets = 50, labelFraction = 1.0)
      .collect().map(r => (r.getLong(0), r.getDouble(3))).toMap
    // bucket = floor(0.8*50) = 40, mid = 40.5/50 = 0.81 → p = (3 + .81)/5.
    val expected = (3.0 + 0.81) / 5.0
    out.values.foreach(p => assert(math.abs(p - expected) < 1e-9))
  }

  test("unlabeled buckets fall back to the bucket midpoint") {
    import spark.implicits._
    val pairs = Seq((0L, 0L, 0.30)).toDF("lid", "rid", "sim")
    val gold = Seq.empty[(Long, Long)].toDF("lid", "rid")
    val out = Calibration.calibrate(pairs, gold, buckets = 50, labelFraction = 0.0)
    val p = out.head.getDouble(3)
    assert(math.abs(p - (15.5 / 50.0)) < 1e-9)
  }

  test("probabilities are clamped into (0, 1)") {
    import spark.implicits._
    val pairs = Seq((0L, 0L, 1.0), (1L, 1L, 0.0)).toDF("lid", "rid", "sim")
    val gold = Seq((0L, 0L)).toDF("lid", "rid")
    val ps = Calibration.calibrate(pairs, gold, labelFraction = 1.0)
      .select("p").collect().map(_.getDouble(0))
    assert(ps.forall(p => p > 0.0 && p < 1.0))
  }

  test("high-sim true matches calibrate high, low-sim false pairs low") {
    import spark.implicits._
    val truePairs = (0L until 30L).map(i => (i, i, 0.95))
    val falsePairs = (0L until 30L).map(i => (i, i + 100L, 0.1))
    val pairs = (truePairs ++ falsePairs).toDF("lid", "rid", "sim")
    val gold = (0L until 30L).map(i => (i, i)).toDF("lid", "rid")
    val out = Calibration.calibrate(pairs, gold, labelFraction = 1.0)
      .collect().map(r => ((r.getLong(0), r.getLong(1)), r.getDouble(3))).toMap
    truePairs.foreach { case (l, r, _) => assert(out((l, r)) > 0.9) }
    falsePairs.foreach { case (l, r, _) => assert(out((l, r)) < 0.2) }
  }

  test("labelFraction only affects the label sample, not the output pairs") {
    import spark.implicits._
    val pairs = (0L until 100L).map(i => (i, i, 0.5 + (i % 10) / 25.0)).toDF("lid", "rid", "sim")
    val gold = (0L until 50L).map(i => (i, i)).toDF("lid", "rid")
    val out = Calibration.calibrate(pairs, gold, labelFraction = 0.3)
    assert(out.count() == 100)
  }
}
