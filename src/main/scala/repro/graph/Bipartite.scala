package repro.graph

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** Schema and encoding conventions for weighted bipartite edge lists.
  *
  * An edge DataFrame has columns `u: long` (upper-layer id), `v: long`
  * (lower-layer id) and `w: double` (edge weight). Upper and lower ids are
  * independent namespaces; whenever both layers must share one id space
  * (offsets, components, BFS) we gid-encode: `gid(u) = 2u`, `gid(v) = 2v+1`.
  */
object Bipartite {
  val U = "u"
  val V = "v"
  val W = "w"

  def gidOfU(id: Long): Long = 2L * id
  def gidOfL(id: Long): Long = 2L * id + 1L
  def isUGid(gid: Long): Boolean = gid % 2 == 0

  def gidU(c: Column): Column = c * 2
  def gidL(c: Column): Column = c * 2 + 1

  /** Coerce an edge DataFrame to the canonical (u: long, v: long, w: double). */
  def normalize(edges: DataFrame): DataFrame =
    edges.select(col(U).cast("long").as(U), col(V).cast("long").as(V), col(W).cast("double").as(W))

  /** Eagerly materialize and cut lineage — mandatory inside fixpoint loops,
    * otherwise every iteration replays the whole history of joins.
    */
  def cp(df: DataFrame): DataFrame = df.localCheckpoint()

  def degreesU(edges: DataFrame): DataFrame =
    edges.groupBy(U).agg(count(lit(1)).cast("int").as("deg"))

  def degreesL(edges: DataFrame): DataFrame =
    edges.groupBy(V).agg(count(lit(1)).cast("int").as("deg"))

  /** alpha_max: the largest alpha with a nonempty (alpha,1)-core — equals the
    * maximum upper-layer degree (peeling at beta=1 never cascades).
    */
  def alphaMax(edges: DataFrame): Int =
    if (edges.isEmpty) 0
    else degreesU(edges).agg(max("deg")).head.getInt(0)

  /** beta_max: the largest beta with a nonempty (1,beta)-core. */
  def betaMax(edges: DataFrame): Int =
    if (edges.isEmpty) 0
    else degreesL(edges).agg(max("deg")).head.getInt(0)

  final case class Stats(nU: Long, nL: Long, nE: Long)

  def stats(edges: DataFrame): Stats = {
    val r = edges
      .agg(countDistinct(col(U)).as("nu"), countDistinct(col(V)).as("nl"), count(lit(1)).as("ne"))
      .head
    Stats(r.getLong(0), r.getLong(1), r.getLong(2))
  }

  /** Symmetric gid-encoded adjacency: one row per edge direction, carrying the
    * original endpoints and weight so traversals can emit canonical edges.
    */
  def sym(edges: DataFrame): DataFrame = {
    val e = normalize(edges)
    val fwd = e.select(gidU(col(U)).as("src"), gidL(col(V)).as("dst"), col(U), col(V), col(W))
    val bwd = e.select(gidL(col(V)).as("src"), gidU(col(U)).as("dst"), col(U), col(V), col(W))
    fwd.unionByName(bwd)
  }

  /** All vertex gids present in the edge set. */
  def vertexGids(edges: DataFrame): DataFrame = {
    val e = normalize(edges)
    e.select(gidU(col(U)).as("gid")).union(e.select(gidL(col(V)).as("gid"))).distinct()
  }

  /** Collect a (small) edge DataFrame as tuples — the bridge to the sequential
    * oracle (`repro.local`) and the driver-side biclique heuristic.
    */
  def collectEdges(edges: DataFrame): Vector[(Long, Long, Double)] =
    normalize(edges).collect().toVector.map(r => (r.getLong(0), r.getLong(1), r.getDouble(2)))

  /** Membership test: is the gid-encoded vertex present in the edge set? */
  def containsGid(edges: DataFrame, gid: Long): Boolean = {
    val e = normalize(edges)
    val cond =
      if (isUGid(gid)) col(U) === lit(gid / 2)
      else col(V) === lit(gid / 2)
    !e.filter(cond).isEmpty
  }

  /** Empty canonical edge DataFrame. */
  def emptyEdges(spark: org.apache.spark.sql.SparkSession): DataFrame = {
    import org.apache.spark.sql.types._
    spark.createDataFrame(
      spark.sparkContext.emptyRDD[org.apache.spark.sql.Row],
      StructType(Seq(
        StructField(U, LongType), StructField(V, LongType), StructField(W, DoubleType))))
  }
}
