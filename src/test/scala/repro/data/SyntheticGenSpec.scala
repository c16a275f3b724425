package repro.data

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class SyntheticGenSpec extends SparkSpec {

  private val cfg = SyntheticGen.Config(n = 500, d = 0.2, v = 50, seed = 7)

  test("base table has n rows with 5-word phrases and val in [1,10]") {
    val b = SyntheticGen.base(spark, cfg)
    assert(b.count() == 500)
    val bad = b.filter(size(split(col("match_attr"), " ")) =!= 5 ||
      col("val") < 1 || col("val") > 10).count()
    assert(bad == 0)
  }

  test("generation is deterministic") {
    val a = SyntheticGen.side(spark, cfg, 1).collect().map(_.toString).sorted
    val b = SyntheticGen.side(spark, cfg, 1).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("drop rate is ~d/2 per side") {
    val n1 = SyntheticGen.side(spark, cfg, 1).count()
    val n2 = SyntheticGen.side(spark, cfg, 2).count()
    assert(n1 > 400 && n1 < 490, s"side1 kept $n1")
    assert(n2 > 400 && n2 < 490, s"side2 kept $n2")
  }

  test("~d of surviving tuples are corrupted, on exactly one side") {
    val b = SyntheticGen.base(spark, cfg).select(col("id"), col("val").as("orig"))
    def corrupted(sideNo: Int) = SyntheticGen.side(spark, cfg, sideNo)
      .join(b, "id").filter(col("val") =!= col("orig")).select("id")
    val c1 = corrupted(1).collect().map(_.getLong(0)).toSet
    val c2 = corrupted(2).collect().map(_.getLong(0)).toSet
    assert(c1.intersect(c2).isEmpty, "a tuple is corrupted on at most one side")
    val total = c1.size + c2.size
    assert(total > 500 * 0.10 && total < 500 * 0.30, s"corrupted $total")
  }

  test("SUM(val) query matches DuckDB on both sides (oracle)") {
    for (sideNo <- Seq(1, 2)) {
      val side = SyntheticGen.side(spark, cfg, sideNo)
      val got = side.agg(sum("val").cast("double").as("total"))
      Oracle.assertEquivalent(
        got,
        "SELECT CAST(SUM(CAST(val AS DOUBLE)) AS DOUBLE) AS total FROM t",
        "t" -> side.select("id", "val"),
      )
    }
  }

  test("query results actually disagree between the sides") {
    def total(s: Int) =
      SyntheticGen.side(spark, cfg, s).agg(sum("val")).head.getDouble(0)
    assert(total(1) != total(2))
  }

  test("canonical relation carries match_attr, I, uid") {
    val c = SyntheticGen.canonicalSide(spark, cfg, 1)
    assert(c.columns.toSet == Set("match_attr", "I", "uid"))
    assert(c.filter(col("uid").isNull).count() == 0)
  }
}
