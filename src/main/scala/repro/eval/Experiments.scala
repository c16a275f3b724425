package repro.eval

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.baselines._
import repro.core.{ExplainSolver, Pipeline, Summarize}
import repro.core.Model.Phi
import repro.core.Similarity.KeyAttr
import repro.data._

/** Shared experiment drivers behind the evaluation artifacts (Figures 4,
  * 6, 7, 8). Both the spark-submit jobs and the bench suites call these so
  * the printed tables are identical.
  */
object Experiments {

  /** The evaluated algorithm roster of Section 5.1.3. RSwoosh is quadratic
    * in the canonical size (driver-side ER loop) and, like the paper's run,
    * does not finish on the larger IMDb instances — `rswooshMaxTuples`
    * bounds where we attempt it (beyond that it is reported as DNF).
    */
  final case class Roster(
      solverCfg: ExplainSolver.Config = ExplainSolver.Config(),
      batchSizes: Seq[Int] = Seq(100),
      rswooshMaxTuples: Int = 4000,
  ) {
    def algorithms: Seq[Algorithm] =
      Seq(FormalExp(15), RSwoosh(0.75), Threshold(0.9), Greedy, ExactCover) ++
        batchSizes.map(b => Explain3DBatch(b, solverCfg)) :+ Explain3DNoOpt(solverCfg)
  }

  final case class PairRun(
      pairName: String,
      prepareMillis: Long,
      stats: Pipeline.PairStats,
      results: Seq[Harness.AlgoResult],
      skipped: Seq[String],
  )

  /** Prepares a pair and runs the full roster on it. */
  def runPair(
      name: String,
      leftCanon: DataFrame,
      rightCanon: DataFrame,
      attrs: Seq[KeyAttr],
      phi: Phi,
      roster: Roster,
      simFloor: Double = 0.0,
  ): PairRun = {
    val t0 = System.nanoTime()
    val pair = Pipeline.prepare(leftCanon, rightCanon, attrs, phi, simFloor = simFloor)
    val prepMs = (System.nanoTime() - t0) / 1000000
    val nT = pair.inst.t1.size + pair.inst.t2.size
    val (run, skip) = roster.algorithms.partition {
      case _: RSwoosh => nT <= roster.rswooshMaxTuples
      case _          => true
    }
    PairRun(name, prepMs, pair.stats, run.map(a => Harness.run(a, pair, name)),
      skip.map(_.name))
  }

  def render(r: PairRun): String = {
    val header =
      s"== ${r.pairName}: |T1|=${r.stats.t1} |T2|=${r.stats.t2} " +
        s"|M_tuple|=${r.stats.nMatches} (match generation ${r.prepareMillis}ms)"
    val rows = r.results.map(_.row)
    val skipped = r.skipped.map(n => f"${r.pairName}%-12s $n%-22s  DNF (exceeds size guard, cf. Fig 7)")
    (header +: rows ++: skipped).mkString("\n")
  }

  // ---------------------------------------------------------------- Fig 6

  /** Academic-pair canonical relations with unified match-attr name. */
  def academicPair(spark: SparkSession, cfg: AcademicData.Config): (DataFrame, DataFrame) = {
    val left = AcademicData.leftCanonical(spark, cfg).withColumnRenamed("Major", "name")
    val right = AcademicData.rightCanonical(spark, cfg).withColumnRenamed("Program", "name")
    (left, right)
  }

  /** Blocking floor used for the Academic pairs: majors are 3-token names,
    * so suffix-only or single-field-only overlaps (Jaccard ≈ 0.2) are not
    * plausible candidates; this keeps |M_tuple| near the paper's scale
    * (169/607) instead of thousands of noise pairs.
    */
  val AcademicSimFloor = 0.4

  def academic(spark: SparkSession, roster: Roster = Roster()): Seq[PairRun] =
    Seq(AcademicData.UMass, AcademicData.OSU).map { cfg =>
      val (l, r) = academicPair(spark, cfg)
      runPair(s"${cfg.univName}-NCES", l, r, Seq(KeyAttr("name")), Phi.LessGeneral, roster,
        simFloor = AcademicSimFloor)
    }

  // ---------------------------------------------------------------- Fig 7

  /** Runs the 10 IMDb templates at the given instantiations and averages
    * per (template, algorithm), as the paper does over 10 instantiations.
    */
  def imdb(
      spark: SparkSession,
      cfg: ImdbData.Config,
      years: Seq[Int],
      genres: Seq[String],
      roster: Roster = Roster(),
  ): Seq[PairRun] = {
    val v = ImdbData.views(spark, cfg)
    val perTemplate = scala.collection.mutable.Map.empty[String, Vector[PairRun]]
    for ((year, genre) <- years.zip(genres)) {
      for (q <- ImdbQueries.all(v, year, genre)) {
        val template = q.name.takeWhile(_ != '(')
        val run = runPair(q.name, q.left, q.right, q.attrs, q.phi, roster)
        perTemplate(template) = perTemplate.getOrElse(template, Vector.empty) :+ run
      }
    }
    perTemplate.toSeq.sortBy(t => (t._1.length, t._1)).map { case (template, runs) =>
      val byAlgo = runs.flatMap(_.results).groupBy(_.algorithm)
      val averaged = byAlgo.toSeq.sortBy(_._1).map { case (_, rs) => Harness.average(template, rs) }
      PairRun(
        template,
        runs.map(_.prepareMillis).sum / runs.size,
        Pipeline.PairStats(
          runs.map(_.stats.t1).sum / runs.size,
          runs.map(_.stats.t2).sum / runs.size,
          runs.map(_.stats.nMatches).sum / runs.size),
        averaged,
        runs.flatMap(_.skipped).distinct,
      )
    }
  }

  // ---------------------------------------------------------------- Fig 8

  final case class SyntheticPoint(
      n: Int, d: Double, v: Int,
      algorithm: String, solveMillis: Long, explF1: Double, evidF1: Double, proved: Boolean)

  /** One Fig-8 measurement: solve time (match generation excluded, as in the
    * paper) of NOOPT and the given batch sizes on one generator setting.
    */
  def syntheticPoint(
      spark: SparkSession,
      cfg: SyntheticGen.Config,
      batchSizes: Seq[Int],
      solverCfg: ExplainSolver.Config,
  ): Seq[SyntheticPoint] = {
    val pair = Pipeline.prepare(
      SyntheticGen.canonicalSide(spark, cfg, 1),
      SyntheticGen.canonicalSide(spark, cfg, 2),
      Seq(KeyAttr("match_attr")), Phi.Equiv)
    val algos: Seq[(String, Algorithm)] =
      ("NOOPT" -> Explain3DNoOpt(solverCfg)) +:
        batchSizes.map(b => s"BATCH-$b" -> Explain3DBatch(b, solverCfg))
    algos.map { case (nm, a) =>
      val t0 = System.nanoTime()
      val e = a.derive(pair.inst)
      val ms = (System.nanoTime() - t0) / 1000000
      val explF1 = Metrics.prf(Metrics.explanationItems(e, pair.keyOf), pair.gold.explanations).f1
      val evidF1 = Metrics.prf(Metrics.evidenceItems(e, pair.keyOf), pair.gold.evidence).f1
      SyntheticPoint(cfg.n, cfg.d, cfg.v, nm, ms, explF1, evidF1, proved = true)
    }
  }

  def renderSynthetic(points: Seq[SyntheticPoint]): String =
    points.map { p =>
      f"n=${p.n}%-6d d=${p.d}%.1f v=${p.v}%-6d ${p.algorithm}%-12s " +
        f"solve=${p.solveMillis}%6dms  explF1=${p.explF1}%.3f evidF1=${p.evidF1}%.3f"
    }.mkString("\n")

  // ---------------------------------------------------------------- Fig 4

  /** Figure 4-style statistics for one pair, including |E| → |E_S|. */
  def statsRow(
      name: String,
      leftCanon: DataFrame,
      rightCanon: DataFrame,
      attrs: Seq[KeyAttr],
      phi: Phi,
      leftProv: Long,
      rightProv: Long,
      solverCfg: ExplainSolver.Config = ExplainSolver.Config(),
      simFloor: Double = 0.0,
  ): String = {
    val pair = Pipeline.prepare(leftCanon, rightCanon, attrs, phi, simFloor = simFloor)
    val sol = ExplainSolver.solve(pair.inst, solverCfg)
    val e = sol.explanations
    val nE = e.delta.size + e.values.size
    // Stage 3: summarize over the matching-attribute view of the tuples.
    val targetIds = e.explanationTupleIds
    val targets = pair.inst.tupleById.collect { case (id, t) if targetIds.contains(id) => t.attrs }.toSeq
    val others = pair.inst.tupleById.collect { case (id, t) if !targetIds.contains(id) => t.attrs }.toSeq
    val summary = Summarize.summarize(targets, others)
    f"$name%-12s |P|=$leftProv/$rightProv |T|=${pair.inst.t1.size}/${pair.inst.t2.size} " +
      f"|M|=${pair.inst.matches.size} |M*|=${e.evidence.size} |E|=$nE -> |E_S|=${summary.size}"
  }
}
