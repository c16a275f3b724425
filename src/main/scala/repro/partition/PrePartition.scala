package repro.partition

import repro.core.Model.{Instance, TupleMatch}
import scala.collection.mutable

/** Pre-partitioning (Algorithm 2): merge tuples connected by
  * high-probability matches (p ≥ θ_h) into coarse nodes, then aggregate the
  * remaining match weights between coarse nodes using the paper's
  * reweighting: `w = p·R` for p ≥ θ_h, `p/R` for p ≤ θ_l, else `p`. This is
  * the extra coarsening level on top of the multilevel partitioner that
  * makes large-R instances cheap to partition and guarantees the partitioner
  * never cuts a high-probability match.
  */
object PrePartition {

  final case class Config(thetaL: Double = 0.1, thetaH: Double = 0.9, r: Double = 100.0) {
    require(thetaL < thetaH, "θ_l must be below θ_h")
    def weight(p: Double): Double =
      if (p >= thetaH) p * r else if (p <= thetaL) p / r else p
  }

  /** A coarse node: the merged tuples and their count (the balancing size). */
  final case class CoarseNode(members: Vector[Long]) {
    def size: Int = members.size
  }

  final case class CoarseGraph(
      nodes: Vector[CoarseNode],
      edges: Map[(Int, Int), Double], // (minNode, maxNode) -> aggregated weight
      nodeOf: Map[Long, Int],         // tuple id -> coarse node index
  )

  def run(inst: Instance, cfg: Config = Config()): CoarseGraph =
    run(inst.tupleById.keys.toVector, inst.matches, cfg)

  def run(tupleIds: Vector[Long], matches: Vector[TupleMatch], cfg: Config): CoarseGraph = {
    // Union-find merge over high-probability matches (FindHighProbTuplesDFS
    // in the paper — union-find is the iterative equivalent).
    val parent = mutable.Map.empty[Long, Long]
    tupleIds.foreach(id => parent(id) = id)
    def find(x: Long): Long = {
      var r = x
      while (parent(r) != r) r = parent(r)
      var c = x
      while (parent(c) != r) { val n = parent(c); parent(c) = r; c = n }
      r
    }
    matches.foreach { m =>
      if (m.p >= cfg.thetaH) {
        val (ra, rb) = (find(m.left), find(m.right))
        if (ra != rb) parent(ra) = rb
      }
    }

    val roots = tupleIds.map(find).distinct.sorted
    val nodeIdx = roots.zipWithIndex.toMap
    val members = Array.fill(roots.size)(Vector.newBuilder[Long])
    tupleIds.foreach(id => members(nodeIdx(find(id))) += id)
    val nodeOf = tupleIds.iterator.map(id => id -> nodeIdx(find(id))).toMap

    // Aggregate edge weights between distinct coarse nodes.
    val edges = mutable.Map.empty[(Int, Int), Double]
    matches.foreach { m =>
      val a = nodeOf(m.left); val b = nodeOf(m.right)
      if (a != b) {
        val key = if (a < b) (a, b) else (b, a)
        edges(key) = edges.getOrElse(key, 0.0) + cfg.weight(m.p)
      }
    }
    CoarseGraph(members.map(b => CoarseNode(b.result())).toVector, edges.toMap, nodeOf)
  }
}
