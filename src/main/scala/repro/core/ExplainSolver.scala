package repro.core

import repro.core.Model._
import scala.collection.mutable.ArrayBuffer

/** Production stage-2 solver: exact branch-and-bound over the EXP-3D
  * objective (Problem 1), equivalent to solving the paper's MILP with CPLEX
  * (validated in tests against brute-force enumeration of the MILP built by
  * [[MilpBuilder]]).
  *
  * Structure exploited: in a valid mapping (Def. 3.2) at least one side has
  * degree ≤ 1, so every connected component of the *selected* mapping is a
  * star whose hub is on the uncapped side. With match variables fixed, the
  * optimal value-based explanations have closed form — a balanced star keeps
  * all impacts (cost b per tuple), an unbalanced star changes exactly one
  * impact (one c, rest b), and an unmatched kept tuple must refine its impact
  * to 0. An unmatched tuple therefore costs `max(costDelete, zeroCost)`.
  * The search branches only on match selection, with constraint propagation
  * on degree caps and an optimistic per-leaf bound.
  *
  * Node/time caps make large instances return the best incumbent with
  * `proved = false` — exactly the behaviour that motivates the paper's
  * smart-partitioning optimizer.
  */
object ExplainSolver {

  /** @param nodeCap     branch-and-bound node budget *per connected
    *                     component* (the global budget is the time limit)
    * @param timeLimitMs wall-clock budget for the whole solve
    */
  final case class Config(nodeCap: Long = 5_000_000L, timeLimitMs: Long = 120_000L)

  def solve(inst: Instance, config: Config = Config()): Solution = {
    require(
      inst.matches.map(m => (m.left, m.right)).distinct.size == inst.matches.size,
      "duplicate (left,right) pairs in matches — dedupe keeping max p upstream")
    val deadline = System.nanoTime() + config.timeLimitMs * 1000000L

    // Orient so leaves are on a capped side: for ⊒ hubs are T1 tuples.
    val hubSide = if (inst.phi == Phi.MoreGeneral) 1 else 2
    val hubsCapped = inst.phi == Phi.Equiv

    // Split into connected components of the candidate bipartite graph; each
    // is an independent subproblem (presolve step of any MILP solver).
    val uf = new Scoring.UnionFind(inst.tupleById.keys)
    inst.matches.foreach(m => uf.union(m.left, m.right))
    val tuplesByComp = inst.tupleById.values.toSeq.groupBy(t => uf.find(t.id))
    val matchesByComp = inst.matches.groupBy(m => uf.find(m.left))

    var totalLogProb = 0.0
    var proved = true
    val delta = Set.newBuilder[Long]
    val values = Map.newBuilder[Long, ValueChange]
    val evidence = Set.newBuilder[(Long, Long)]

    val p = inst.params
    def unmatchedCost(t: CTuple): Double = {
      val zeroCost = if (t.impact == 0.0) p.costKeep else p.costChange
      math.max(p.costDelete, zeroCost)
    }
    def emitUnmatched(t: CTuple): Unit = {
      // Mirror unmatchedCost exactly: keep-at-zero is free only when the
      // impact is already 0 AND keeping beats deleting (α near 0.5 can make
      // deletion cheaper than even an unchanged keep).
      val zeroCost = if (t.impact == 0.0) p.costKeep else p.costChange
      if (p.costDelete >= zeroCost) delta += t.id
      else if (t.impact != 0.0) values += t.id -> ValueChange(t.id, t.impact, 0.0)
    }

    for ((root, tuples) <- tuplesByComp.toSeq.sortBy(_._1)) {
      val ms = matchesByComp.getOrElse(root, Vector.empty)
      if (ms.isEmpty) {
        // Singleton (or matchless) tuples: closed form.
        tuples.foreach { t => totalLogProb += unmatchedCost(t); emitUnmatched(t) }
      } else {
        val comp = new Component(tuples.toVector, ms, hubSide, hubsCapped, p)
        val res = comp.solve(config.nodeCap, deadline)
        proved &&= res.proved
        totalLogProb += res.logProb
        // Decode this component's incumbent.
        val selected = res.selectedEdges
        val matchedTuples = scala.collection.mutable.Set.empty[Long]
        selected.foreach { case (l, r) => evidence += ((l, r)); matchedTuples += l; matchedTuples += r }
        // Stars: group selected edges by hub; unbalanced → change hub impact.
        val hubOf: ((Long, Long)) => Long = if (hubSide == 1) _._1 else _._2
        val leafOf: ((Long, Long)) => Long = if (hubSide == 1) _._2 else _._1
        selected.groupBy(hubOf).foreach { case (hub, es) =>
          val leafSum = es.iterator.map(e => inst.tupleById(leafOf(e)).impact).sum
          val hubImp = inst.tupleById(hub).impact
          if (math.abs(leafSum - hubImp) > 1e-9)
            values += hub -> ValueChange(hub, hubImp, leafSum)
        }
        tuples.foreach(t => if (!matchedTuples.contains(t.id)) emitUnmatched(t))
      }
    }

    val e = ExplanationSet(delta.result(), values.result(), evidence.result())
    Solution(e, totalLogProb, proved)
  }

  private final case class CompResult(
      logProb: Double,
      selectedEdges: Vector[(Long, Long)],
      proved: Boolean,
      nodesUsed: Long,
  )

  /** Branch-and-bound over one connected component. */
  private final class Component(
      tuples: Vector[CTuple],
      ms: Vector[TupleMatch],
      hubSide: Int,
      hubsCapped: Boolean,
      p: Params,
  ) {
    private val nT = tuples.size
    private val idxOf = tuples.iterator.map(_.id).zipWithIndex.toMap
    private val isHub = tuples.map(_.side == hubSide).toArray
    private val impact = tuples.map(_.impact).toArray
    private val uCost = tuples.map { t =>
      math.max(p.costDelete, if (t.impact == 0.0) p.costKeep else p.costChange)
    }.toArray
    private val b = p.costKeep
    private val c = p.costChange

    private val nE = ms.size
    private val eLeaf = new Array[Int](nE)
    private val eHub = new Array[Int](nE)
    private val eGain = new Array[Double](nE)
    locally {
      var i = 0
      while (i < nE) {
        val m = ms(i)
        val (hubId, leafId) = if (hubSide == 1) (m.left, m.right) else (m.right, m.left)
        eLeaf(i) = idxOf(leafId); eHub(i) = idxOf(hubId)
        eGain(i) = math.log(m.p) - math.log(1 - m.p)
        i += 1
      }
    }
    private val edgesAt: Array[Array[Int]] = {
      val bufs = Array.fill(nT)(new ArrayBuffer[Int])
      for (e <- 0 until nE) { bufs(eLeaf(e)) += e; bufs(eHub(e)) += e }
      bufs.map(_.toArray)
    }

    // Search state.
    private val eState = new Array[Byte](nE) // 0 undecided, 1 selected, 2 rejected
    private val selectedNow = new ArrayBuffer[Int] // currently selected edges (stack)
    private val leafSel = Array.fill(nT)(-1) // selected edge of a leaf, -1 = none
    private val hubCount = new Array[Int](nT)
    private val hubLeafSum = new Array[Double](nT)
    // f = objective value if every undecided edge were rejected.
    private var f = ms.iterator.map(m => math.log(1 - m.p)).sum +
      tuples.indices.iterator.map(uCost).sum

    private def hubTerm(h: Int): Double =
      if (hubCount(h) == 0) uCost(h)
      else {
        val penalty = if (math.abs(hubLeafSum(h) - impact(h)) > 1e-9) b - c else 0.0
        b * (hubCount(h) + 1) - penalty
      }

    private def pen(h: Int): Double =
      if (hubCount(h) > 0 && math.abs(hubLeafSum(h) - impact(h)) > 1e-9) b - c else 0.0

    private val allNonNeg = impact.forall(_ >= 0.0)

    /** Selects edge e, returning the list of edges force-rejected. */
    private def select(e: Int): (ArrayBuffer[Int], Double) = {
      val l = eLeaf(e); val h = eHub(e)
      val fBefore = f
      f += eGain(e)
      f -= uCost(l) // leaf joins a star; its b is inside hubTerm's count
      f -= hubTerm(h)
      eState(e) = 1
      selectedNow += e
      leafSel(l) = e
      hubCount(h) += 1
      hubLeafSum(h) += impact(l)
      f += hubTerm(h)
      val forced = new ArrayBuffer[Int]
      for (o <- edgesAt(l) if eState(o) == 0) { eState(o) = 2; forced += o }
      if (hubsCapped) for (o <- edgesAt(h) if eState(o) == 0) { eState(o) = 2; forced += o }
      (forced, fBefore)
    }

    private def undoSelect(e: Int, undo: (ArrayBuffer[Int], Double)): Unit = {
      val l = eLeaf(e); val h = eHub(e)
      undo._1.foreach(o => eState(o) = 0)
      eState(e) = 0
      selectedNow.dropRightInPlace(1)
      leafSel(l) = -1
      hubCount(h) -= 1
      hubLeafSum(h) -= impact(l)
      f = undo._2
    }

    /** Optimistic improvement achievable from the current state: per capped
      * leaf with remaining capacity, the best undecided edge's gain plus the
      * largest tuple-cost lifts it could unlock.
      */
    private def bound(): Double = {
      var extra = 0.0
      var l = 0
      while (l < nT) {
        if (!isHub(l) && leafSel(l) < 0) {
          var bestE = 0.0
          val es = edgesAt(l)
          var i = 0
          while (i < es.length) {
            val e = es(i)
            if (eState(e) == 0) {
              val h = eHub(e)
              if (!hubsCapped || hubCount(h) == 0) {
                // First leaf joining a hub: Δf = gain + (b−u(l)) + (b−u(h)) − pen'
                // where the new penalty pen' is exactly known under ≡ (the
                // star is that single edge) and provably unavoidable when
                // impacts are non-negative and the leaf already overshoots
                // the hub. Joining an existing star: Δf ≤ gain + (b−u(l)) +
                // pen(h) (at best an unbalanced star becomes balanced).
                // Anything looser creates phantom gains that defeat pruning.
                val hubLift =
                  if (hubCount(h) == 0) {
                    val unavoidablePen =
                      if (hubsCapped) { if (math.abs(impact(l) - impact(h)) > 1e-9) b - c else 0.0 }
                      else if (allNonNeg && impact(l) > impact(h) + 1e-9) b - c
                      else 0.0
                    (b - uCost(h)) - unavoidablePen
                  } else pen(h)
                val g = eGain(e) + (b - uCost(l)) + hubLift
                if (g > bestE) bestE = g
              }
            }
            i += 1
          }
          extra += bestE
        }
        l += 1
      }
      f + extra
    }

    /** Picks the most promising selectable undecided edge, or -1. */
    private def pickBranch(): Int = {
      var best = -1
      var bestG = 0.0
      var e = 0
      while (e < nE) {
        if (eState(e) == 0 && leafSel(eLeaf(e)) < 0 &&
            (!hubsCapped || hubCount(eHub(e)) == 0)) {
          val g = eGain(e) + (b - uCost(eLeaf(e)))
          if (best == -1 || g > bestG) { best = e; bestG = g }
        }
        e += 1
      }
      best
    }

    def solve(nodeCap: Long, deadline: Long): CompResult = {
      var bestF = Double.NegativeInfinity
      var bestSel: Vector[(Long, Long)] = Vector.empty
      var nodes = 0L
      var capped = false

      // O(|selection|), not O(|E|): incumbents improve on every select of
      // the initial dive, so a full edge scan here dominates large solves.
      def snapshot(): Vector[(Long, Long)] =
        selectedNow.iterator.map { e => val m = ms(e); (m.left, m.right) }.toVector

      def dfs(): Unit = {
        nodes += 1
        // Record the incumbent before budget checks so a capped component
        // still returns its best completion (never -inf).
        if (f > bestF + 1e-12) { bestF = f; bestSel = snapshot() }
        if (nodes > nodeCap || (nodes % 256 == 0 && System.nanoTime() > deadline)) {
          capped = true
          return
        }
        if (bound() <= bestF + 1e-12) return
        val e = pickBranch()
        if (e < 0) return
        val undo = select(e)
        dfs()
        undoSelect(e, undo)
        if (capped) return
        eState(e) = 2
        dfs()
        eState(e) = 0
      }

      // Deep components can recurse to |E| frames; run on a big-stack thread.
      val runner = new Thread(null, () => dfs(), "explain-solver", 256L * 1024 * 1024)
      runner.setDaemon(true)
      runner.start()
      runner.join()
      CompResult(bestF, bestSel, proved = !capped, nodesUsed = nodes)
    }
  }
}
