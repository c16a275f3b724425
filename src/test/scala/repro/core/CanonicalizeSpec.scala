package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.Provenance.Output

class CanonicalizeSpec extends SparkSpec {

  private def majors = {
    import spark.implicits._
    Seq(
      ("accounting", "B.S."), ("cs", "B.A."), ("cs", "B.S."), ("ece", "B.S."),
      ("ee", "B.S."), ("management", "B.A."), ("design", "B.A."),
    ).toDF("program", "degree")
  }

  test("COUNT provenance gives impact 1 per tuple") {
    val p = Provenance.relation(majors, Output.Count)
    assert(p.count() == 7)
    assert(p.select(sum("I")).head.getDouble(0) == 7.0)
  }

  test("SUM provenance copies the aggregated column") {
    import spark.implicits._
    val d3 = Seq(("business", 2), ("engineering", 2), ("computer science", 1))
      .toDF("college", "num_bach")
    val p = Provenance.relation(d3, Output.Sum("num_bach"))
    assert(p.select(sum("I")).head.getDouble(0) == 5.0)
  }

  test("canonicalization consolidates duplicate keys and sums impacts (fig 3)") {
    val t = Canonicalize.canonical(Provenance.relation(majors, Output.Count), Seq("program"))
    assert(t.count() == 6)
    val cs = t.filter(col("program") === "cs").select("I").head.getDouble(0)
    assert(cs == 2.0)
  }

  test("canonicalization matches DuckDB group-by (oracle)") {
    val p = Provenance.relation(majors, Output.Count)
    val t = Canonicalize.canonical(p, Seq("program"))
      .select(col("program"), col("I").as("total"))
    Oracle.assertEquivalent(
      t,
      "SELECT program, CAST(SUM(CAST(I AS DOUBLE)) AS DOUBLE) AS total FROM prov GROUP BY program",
      "prov" -> p.select(col("program"), col("I")),
    )
  }

  test("strict mode (AVG/MAX/MIN) keeps every provenance tuple") {
    // fabricate a numeric column for the aggregate
    val p2 = Provenance.relation(majors.withColumn("len", length(col("degree"))), Output.Max("len"))
    assert(Output.Avg("x").strict && Output.Max("x").strict && Output.Min("x").strict)
    assert(!Output.Count.strict && !Output.Sum("x").strict && !Output.NonAggregate.strict)
    val t = Canonicalize.canonical(p2, Seq("program"), strict = true)
    assert(t.count() == 7, "no consolidation under strict queries")
  }

  test("uid column is threaded through when present, null otherwise") {
    import spark.implicits._
    val withUid = majors.withColumn("uid", concat(lit("u-"), col("program")))
    val t = Canonicalize.canonical(Provenance.relation(withUid, Output.Count), Seq("program"))
    assert(t.filter(col("uid").isNull).count() == 0)
    val t2 = Canonicalize.canonical(Provenance.relation(majors, Output.Count), Seq("program"))
    assert(t2.columns.contains("uid"))
    assert(t2.filter(col("uid").isNotNull).count() == 0)
  }

  test("canonical SUM query equals DuckDB on synthetic lineitem slice") {
    val li = repro.SynthData.lineitem(spark, sf = 0.001).limit(2000).cache()
    val p = Provenance.relation(li.filter(col("l_quantity") > 25), Output.Sum("l_extendedprice"))
    val t = Canonicalize.canonical(p, Seq("l_returnflag"))
      .select(col("l_returnflag"), round(col("I"), 2).as("total"))
    Oracle.assertEquivalent(
      t,
      "SELECT l_returnflag, ROUND(CAST(SUM(CAST(I AS DOUBLE)) AS DOUBLE), 2) AS total " +
        "FROM prov GROUP BY l_returnflag",
      "prov" -> p.select(col("l_returnflag"), col("I")),
    )
  }
}
