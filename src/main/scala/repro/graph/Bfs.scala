package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Frontier-expansion breadth-first traversal — the dataflow rendition of the
  * paper's Algorithm 2 query loop. Works over any directed adjacency
  * DataFrame with columns (src, dst, u, v, w); index-based queries pass the
  * pre-filtered index entries so only community edges are ever touched
  * (the "optimal retrieval" property).
  */
object Bfs {
  import Bipartite._

  /** Canonical edges (u, v, w) of the subgraph reachable from startGid.
    * Returns empty when startGid has no outgoing adjacency rows.
    */
  def subgraphFrom(spark: SparkSession, adj0: DataFrame, startGid: Long,
                   maxIter: Int = 100000): DataFrame = {
    import spark.implicits._
    val adj = cp(adj0.select(col("src"), col("dst"), col(U), col(V), col(W)))
    var visited = cp(Seq(startGid).toDF("gid"))
    var frontier = visited
    var acc = adj.select(col(U), col(V), col(W)).limit(0)
    var it = 0
    var frontierSize = 1L
    while (frontierSize > 0) {
      it += 1
      require(it <= maxIter, s"Bfs did not converge within $maxIter iterations")
      val hits = cp(adj.join(frontier, adj("src") === frontier("gid"), "left_semi"))
      acc = cp(acc.unionByName(hits.select(col(U), col(V), col(W))))
      val nbrs = hits.select(col("dst").as("gid")).distinct()
      frontier = cp(nbrs.join(visited, Seq("gid"), "left_anti"))
      frontierSize = frontier.count()
      if (frontierSize > 0) visited = cp(visited.unionByName(frontier))
    }
    cp(acc.distinct())
  }
}
