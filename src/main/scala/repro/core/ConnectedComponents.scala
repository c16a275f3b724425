package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Connected components of the bipartite match graph as iterative DataFrame
  * dataflow (Section 4 motivates components as the lossless decomposition
  * of stage 2).
  *
  * Borůvka-style contraction: every round each component adopts the minimum
  * label among itself and its neighbouring components, followed by a
  * pointer-jumping pass (label := label of label) that collapses chains, so
  * the number of rounds is O(log n) rather than O(diameter).
  * `localCheckpoint` truncates the growing lineage each round. Used for
  * graph statistics and the NOOPT decomposition analysis; the in-driver
  * solver uses union-find over the (small) collected canonical graph.
  */
object ConnectedComponents {

  /** @param vertices DataFrame with an `id` column
    * @param edges    DataFrame with `src`, `dst` columns (undirected)
    * @return DataFrame(id, component) — component = min vertex id reachable
    */
  def run(vertices: DataFrame, edges: DataFrame, maxIter: Int = 30): DataFrame = {
    val sym = edges.select(col("src"), col("dst"))
      .union(edges.select(col("dst").as("src"), col("src").as("dst")))
      .distinct()
      .localCheckpoint(true)

    var labels = vertices.select(col("id"), col("id").as("component")).localCheckpoint(true)
    var iter = 0
    var converged = false
    while (!converged && iter < maxIter) {
      // Component label of each edge endpoint.
      val lSrc = labels.select(col("id").as("src"), col("component").as("cSrc"))
      val lDst = labels.select(col("id").as("dst"), col("component").as("cDst"))
      val compEdges = sym.join(lSrc, "src").join(lDst, "dst")
        .select(col("cSrc"), col("cDst"))
        .filter(col("cSrc") =!= col("cDst"))
      if (compEdges.isEmpty) converged = true
      else {
        // Each component adopts the min neighbouring component label…
        val minNb = compEdges.groupBy(col("cSrc").as("comp"))
          .agg(min("cDst").as("nbMin"))
          .filter(col("nbMin") < col("comp"))
        val mapped = labels
          .join(minNb, labels("component") === minNb("comp"), "left")
          .select(col("id"), coalesce(col("nbMin"), col("component")).as("component"))
        // …then one pointer-jumping pass collapses label chains.
        val asMap = mapped.select(col("id").as("mid"), col("component").as("mcomp"))
        labels = mapped
          .join(asMap, mapped("component") === asMap("mid"), "left")
          .select(mapped("id"), coalesce(col("mcomp"), mapped("component")).as("component"))
          .localCheckpoint(true)
        iter += 1
      }
    }
    labels
  }
}
