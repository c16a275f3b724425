package repro.bench

import repro.SparkSpec
import repro.data.ImdbData
import repro.eval.Experiments

/** Figure 7: accuracy and efficiency on the IMDb query templates, averaged
  * over instantiations.
  *
  * Paper shape (Figures 7a–7c): EXPLAIN3D near-perfect (F ≈ 1.0) on both
  * explanations and evidence — IMDb's initial mapping is much cleaner than
  * the Academic one; THRESHOLD/RSWOOSH better than on Academic but below
  * EXPLAIN3D (< 0.8 F); RSWOOSH and unpartitioned EXPLAIN3D fail >10K-tuple
  * queries within 1hr, while BATCH partitioning scales with no accuracy
  * loss. We run a scaled generator (DESIGN.md), guard RSwoosh with the same
  * DNF rule, and average 2 instantiations per template.
  */
class Fig7ImdbBench extends SparkSpec {

  test("Figure 7: IMDb templates, all algorithms") {
    val cfg = ImdbData.Config(movies = 3000, actors = 3000, directors = 800)
    val runs = Experiments.imdb(spark, cfg, years = Seq(1985, 1997), genres = Seq("comedy", "drama"))
    runs.foreach(r => println(Experiments.render(r) + "\n"))

    val e3dF = runs.flatMap(_.results).filter(_.algorithm.startsWith("EXPLAIN3D-NOOPT"))
    val e3dAvgExpl = e3dF.map(_.explanation.f1).sum / e3dF.size
    val e3dAvgEvid = e3dF.map(_.evidence.f1).sum / e3dF.size
    println(f"EXPLAIN3D average over templates: explF1=$e3dAvgExpl%.3f evidF1=$e3dAvgEvid%.3f")
    assert(e3dAvgExpl >= 0.85, s"paper: near-perfect accuracy; got $e3dAvgExpl")
    assert(e3dAvgEvid >= 0.9, s"paper: near-perfect evidence; got $e3dAvgEvid")

    // Batch partitioning loses little to nothing vs NOOPT (Fig 7a/7b claim).
    val batch = runs.flatMap(_.results).filter(_.algorithm.startsWith("EXPLAIN3D-BATCH"))
    val batchAvg = batch.map(_.explanation.f1).sum / batch.size
    assert(batchAvg >= e3dAvgExpl - 0.05, s"partitioning must not cost accuracy: $batchAvg vs $e3dAvgExpl")

    // Threshold trails EXPLAIN3D on evidence F in the aggregate: typo'd
    // titles/names land in mixed mid-probability buckets it discards.
    val thr = runs.flatMap(_.results).filter(_.algorithm == "THRESHOLD-0.9")
    val thrAvg = thr.map(_.evidence.f1).sum / thr.size
    assert(thrAvg < e3dAvgEvid, s"threshold $thrAvg must trail explain3d $e3dAvgEvid")
  }
}
