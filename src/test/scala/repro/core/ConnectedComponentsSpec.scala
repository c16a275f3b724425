package repro.core

import repro.SparkSpec

class ConnectedComponentsSpec extends SparkSpec {

  private def run(n: Long, edges: Seq[(Long, Long)]): Map[Long, Long] = {
    import spark.implicits._
    val v = spark.range(n).toDF("id")
    val e = edges.toDF("src", "dst")
    ConnectedComponents.run(v, e).collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
  }

  test("isolated vertices are their own components") {
    val labels = run(4, Seq.empty)
    assert(labels == Map(0L -> 0L, 1L -> 1L, 2L -> 2L, 3L -> 3L))
  }

  test("a chain collapses to the minimum label") {
    val labels = run(5, Seq((0L, 1L), (1L, 2L), (2L, 3L), (3L, 4L)))
    assert(labels.values.toSet == Set(0L))
  }

  test("two components stay separate") {
    val labels = run(6, Seq((0L, 1L), (1L, 2L), (3L, 4L)))
    assert(labels(0L) == labels(1L) && labels(1L) == labels(2L))
    assert(labels(3L) == labels(4L))
    assert(labels(0L) != labels(3L))
    assert(labels(5L) == 5L)
  }

  test("agrees with union-find on a random graph") {
    val rnd = new scala.util.Random(77)
    val n = 200
    val edges = (0 until 150).map(_ => (rnd.nextInt(n).toLong, rnd.nextInt(n).toLong))
    val labels = run(n, edges)

    val uf = new Scoring.UnionFind((0L until n.toLong))
    edges.foreach { case (a, b) => uf.union(a, b) }
    val expected = (0L until n.toLong).groupBy(uf.find).values.map(_.toSet).toSet
    val got = (0L until n.toLong).groupBy(labels).values.map(_.toSet).toSet
    assert(got == expected)
  }
}
