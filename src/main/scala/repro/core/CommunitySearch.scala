package repro.core

import org.apache.spark.sql.DataFrame
import repro.graph.{Bfs, Bipartite, Peel}

/** The three (alpha,beta)-community retrieval algorithms compared in Fig 8:
  *
  *  - Q_o   — online: peel the whole graph to the (alpha,beta)-core, then
  *            extract q's component (Ding et al. CIKM'17 [16]);
  *  - Q_v   — bicore-index based: vertex set from I_v, traversal over the
  *            original adjacency (Liu et al. WWW'19 [15]);
  *  - Q_opt — I_delta based, touching only the answer's edges (this paper).
  *
  * All return the canonical edge list (u, v, w) of C_{alpha,beta}(q).
  */
object CommunitySearch {
  import Bipartite._

  /** Q_o: full online peeling followed by component extraction. */
  def online(edges0: DataFrame, qGid: Long, alpha: Int, beta: Int): DataFrame = {
    val spark = edges0.sparkSession
    val core = Peel.core(edges0, alpha, beta)
    if (!containsGid(core, qGid)) emptyEdges(spark)
    else Bfs.subgraphFrom(spark, sym(core), qGid)
  }

  /** Q_v: see [[BicoreIndex.query]]. */
  def viaBicore(edges: DataFrame, idx: BicoreIndex, qGid: Long, alpha: Int, beta: Int): DataFrame =
    BicoreIndex.query(edges, idx, qGid, alpha, beta)

  /** Q_opt: see [[DeltaIndex.query]]. */
  def viaDelta(idx: DeltaIndex, qGid: Long, alpha: Int, beta: Int): DataFrame =
    DeltaIndex.query(idx, qGid, alpha, beta)

  /** Query via a basic index I_bs^alpha / I_bs^beta. */
  def viaBasic(idx: BasicIndex, qGid: Long, alpha: Int, beta: Int): DataFrame =
    BasicIndexes.query(idx, qGid, alpha, beta)
}
