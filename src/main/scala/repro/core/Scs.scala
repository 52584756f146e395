package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.graph.{Bfs, Bipartite, ConnectedComponents, Peel}

/** Significant (alpha,beta)-community search algorithms (paper §IV).
  *
  * All take the retrieved (alpha,beta)-community (or, for SCS-Baseline, the
  * whole graph) and return Some(edges of R) — the unique connected subgraph
  * containing q that satisfies the degree constraints and maximizes the
  * minimum edge weight — or None when q is not in the (alpha,beta)-core.
  */
object Scs {
  import Bipartite._

  /** SCS-Peel (Algorithm 4). Precondition: `community0` is C_{alpha,beta}(q)
    * — connected, contains q, satisfies the degree constraints.
    *
    * Each round deletes the batch of minimum-weight edges and cascade-peels;
    * the working graph is always q's component of an (alpha,beta)-core, so
    * when q first fails, the start-of-round graph IS the answer (the paper's
    * S ∪ C recovery step).
    */
  def peel(community0: DataFrame, qGid: Long, alpha: Int, beta: Int): Option[DataFrame] = {
    val spark = community0.sparkSession
    var c = cp(normalize(community0))
    if (c.isEmpty || !containsGid(c, qGid)) return None
    var result: Option[DataFrame] = None
    while (result.isEmpty) {
      val r = c.agg(min(col(W)), max(col(W))).head
      val (wMin, wMax) = (r.getDouble(0), r.getDouble(1))
      if (wMin == wMax) result = Some(c) // all weights equal: return C (paper remark)
      else {
        val next = Peel.core(c.filter(col(W) =!= wMin), alpha, beta)
        if (!containsGid(next, qGid)) result = Some(c)
        else c = cp(Bfs.subgraphFrom(spark, sym(next), qGid))
      }
    }
    result
  }

  /** SCS-Binary (paper §IV-B remark): binary search over the distinct weight
    * levels for the largest threshold t where q stays in the (alpha,beta)-core
    * of {w >= t}; R is then q's component of that core.
    */
  def binary(community0: DataFrame, qGid: Long, alpha: Int, beta: Int): Option[DataFrame] = {
    val spark = community0.sparkSession
    val c = cp(normalize(community0))
    if (c.isEmpty || !containsGid(c, qGid)) return None
    val levels = c.select(W).distinct().collect().map(_.getDouble(0)).sorted
    def coreAt(i: Int): DataFrame = Peel.core(c.filter(col(W) >= levels(i)), alpha, beta)
    var lo = 0 // level 0 keeps everything; q in core by precondition
    var hi = levels.length - 1
    while (lo < hi) {
      val mid = (lo + hi + 1) / 2
      if (containsGid(coreAt(mid), qGid)) lo = mid else hi = mid - 1
    }
    Some(Bfs.subgraphFrom(spark, sym(coreAt(lo)), qGid))
  }

  /** SCS-Expand (Algorithm 5) over `source0` = C_{alpha,beta}(q);
    * SCS-Baseline is the same engine over the whole graph. Edges are inserted
    * in decreasing weight batches; connected components are maintained
    * incrementally (the union-find analog is seeded min-label propagation);
    * full peel-checks are pruned by Lemma 7, Lemma 8 and the geometric
    * (epsilon = 2) growth schedule.
    */
  def expandFrom(source0: DataFrame, qGid: Long, alpha: Int, beta: Int,
                 epsilon: Double = 2.0): Option[DataFrame] = {
    val spark = source0.sparkSession
    val source = cp(normalize(source0))
    if (source.isEmpty) return None
    val levels = source.select(W).distinct().collect().map(_.getDouble(0))
      .sorted(Ordering[Double].reverse)

    var gStar = source.limit(0)
    var labels: Option[DataFrame] = None
    var preSize = 0L
    var lastSeen = -1L

    def check(force: Boolean): Option[DataFrame] = {
      val lab = labels.getOrElse(return None)
      val qRows = lab.filter(col("gid") === qGid).collect()
      if (qRows.isEmpty) return None
      val compId = qRows(0).getLong(1)
      val members = lab.filter(col("comp") === compId).select(col("gid").as("ugid"))
      // Components are vertex-closed, so filtering by the upper endpoint
      // suffices to select C*'s edges.
      val cStar = cp(gStar.join(members, gidU(col(U)) === col("ugid"), "left_semi"))
      val szRow = cStar.agg(count(lit(1)), countDistinct(col(U)), countDistinct(col(V))).head
      val (nE, nU, nL) = (szRow.getLong(0), szRow.getLong(1), szRow.getLong(2))
      if (nE == lastSeen && !force) return None // C* unchanged since last look
      lastSeen = nE
      if (!force) {
        // Lemma 7: |E(C*)| - |U(C*)| - |L(C*)| >= alpha*beta - alpha - beta.
        if (nE - nU - nL < alpha.toLong * beta - alpha - beta) return None
        // Lemma 8: >= beta upper vertices of degree >= alpha, >= alpha lower
        // vertices of degree >= beta, and q meets its own side's bound.
        val cU = degreesU(cStar).filter(col("deg") >= alpha).count()
        val cL = degreesL(cStar).filter(col("deg") >= beta).count()
        val qDeg =
          if (isUGid(qGid)) degreesU(cStar).filter(col(U) === qGid / 2)
          else degreesL(cStar).filter(col(V) === qGid / 2)
        val qRowsD = qDeg.collect()
        val qOk = qRowsD.nonEmpty &&
          qRowsD(0).getInt(1) >= (if (isUGid(qGid)) alpha else beta)
        if (!(cU >= beta && cL >= alpha && qOk)) return None
        // Geometric check schedule (epsilon = 2).
        if (nE < preSize * epsilon) return None
      }
      preSize = nE
      val peeled = Peel.core(cStar, alpha, beta)
      if (!containsGid(peeled, qGid)) None
      else peel(Bfs.subgraphFrom(spark, sym(peeled), qGid), qGid, alpha, beta)
    }

    for (lvl <- levels) {
      gStar = cp(gStar.unionByName(source.filter(col(W) === lvl)))
      labels = Some(ConnectedComponents.seededLabels(gStar, labels))
      check(force = false) match {
        case Some(r) => return Some(r)
        case None    =>
      }
    }
    check(force = true) // all edges inserted: the final check is exact
  }

  /** SCS-Expand: expansion restricted to the (alpha,beta)-community. */
  def expand(community: DataFrame, qGid: Long, alpha: Int, beta: Int,
             epsilon: Double = 2.0): Option[DataFrame] =
    expandFrom(community, qGid, alpha, beta, epsilon)

  /** SCS-Baseline: expansion over the whole graph — no two-step framework, so
    * the search space is q's component of G rather than C_{alpha,beta}(q).
    */
  def baseline(allEdges: DataFrame, qGid: Long, alpha: Int, beta: Int): Option[DataFrame] =
    expandFrom(allEdges, qGid, alpha, beta)
}
