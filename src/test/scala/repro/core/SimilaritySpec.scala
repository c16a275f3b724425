package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.Similarity.KeyAttr

class SimilaritySpec extends SparkSpec {

  private def df(rows: Seq[(Long, String)], extra: Seq[(Long, Double)] = Seq.empty) = {
    import spark.implicits._
    val base = rows.toDF("cid", "name")
    if (extra.isEmpty) base
    else base.join(extra.toDF("cid", "num"), "cid")
  }

  test("pairs sharing no token are not candidates") {
    val l = df(Seq((0L, "computer science"), (1L, "fine arts")))
    val r = df(Seq((0L, "computer engineering"), (1L, "dance")))
    val pairs = Similarity.candidatePairs(l, r, Seq(KeyAttr("name")))
      .collect().map(x => (x.getLong(0), x.getLong(1))).toSet
    assert(pairs == Set((0L, 0L)))
  }

  test("token Jaccard values are exact") {
    val l = df(Seq((0L, "computer science")))
    val r = df(Seq((0L, "computer science"), (1L, "computer engineering")))
    val rows = Similarity.candidatePairs(l, r, Seq(KeyAttr("name")))
      .collect().map(x => ((x.getLong(0), x.getLong(1)), x.getDouble(2))).toMap
    assert(math.abs(rows((0L, 0L)) - 1.0) < 1e-9)
    assert(math.abs(rows((0L, 1L)) - 1.0 / 3.0) < 1e-9)
  }

  test("case and duplicate tokens are normalized") {
    val l = df(Seq((0L, "Food Food Science")))
    val r = df(Seq((0L, "food science")))
    val sim = Similarity.candidatePairs(l, r, Seq(KeyAttr("name"))).head.getDouble(2)
    assert(math.abs(sim - 1.0) < 1e-9)
  }

  test("numeric attribute uses 1/(1+d^2) and averages with text") {
    val l = df(Seq((0L, "alpha beta")), Seq((0L, 3.0)))
    val r = df(Seq((0L, "alpha beta")), Seq((0L, 5.0)))
    val sim = Similarity
      .candidatePairs(l, r, Seq(KeyAttr("name"), KeyAttr("num", numeric = true)))
      .head.getDouble(2)
    val expected = (1.0 + 1.0 / (1.0 + 4.0)) / 2.0
    assert(math.abs(sim - expected) < 1e-9)
  }

  test("agrees with a driver-side brute force on random phrases") {
    import spark.implicits._
    val rnd = new scala.util.Random(5)
    def phrase() = (0 until 3).map(_ => s"w${rnd.nextInt(12)}").mkString(" ")
    val lrows = (0L until 40L).map(i => (i, phrase()))
    val rrows = (0L until 40L).map(i => (i, phrase()))
    val got = Similarity
      .candidatePairs(lrows.toDF("cid", "name"), rrows.toDF("cid", "name"), Seq(KeyAttr("name")))
      .collect().map(x => ((x.getLong(0), x.getLong(1)), x.getDouble(2))).toMap
    def toks(s: String) = s.split(" ").toSet
    val expected = (for {
      (li, ls) <- lrows; (ri, rs) <- rrows
      inter = toks(ls).intersect(toks(rs)).size
      if inter > 0
    } yield ((li, ri), inter.toDouble / toks(ls).union(toks(rs)).size)).toMap
    assert(got.keySet == expected.keySet)
    expected.foreach { case (k, v) => assert(math.abs(got(k) - v) < 1e-9, s"pair $k") }
  }

  test("requires at least one text attribute") {
    val l = df(Seq((0L, "x")), Seq((0L, 1.0)))
    assertThrows[IllegalArgumentException](
      Similarity.candidatePairs(l, l, Seq(KeyAttr("num", numeric = true))))
  }
}
