package repro.graph

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.local.LocalBipartite
import LocalBipartite.{gidL, gidU}

/** Connected-component label propagation and BFS subgraph extraction vs the
  * sequential oracle, with a DuckDB recursive-CTE reachability cross-check.
  */
class ComponentsSpec extends SparkSpec {
  import TestGraphs._

  private def labelsMap(edges: Vector[(Long, Long, Double)]): Map[Long, Long] =
    ConnectedComponents.labels(toDF(spark, edges))
      .collect().map(r => r.getLong(0) -> r.getLong(1)).toMap

  test("labels equal min-gid components on fixtures") {
    for (edges <- Seq(fig2, k33Pendant, path, star, twoBlocks)) {
      assert(labelsMap(edges) == LocalBipartite(edges).components)
    }
  }

  test("labels on random graphs") {
    for (seed <- 1 to 3) {
      val g = random(6, 6, 0.25, seed) // sparse: several components
      assert(labelsMap(g) == LocalBipartite(g).components, s"seed=$seed")
    }
  }

  test("seeded labels converge to the same fixpoint as unseeded") {
    val all = toDF(spark, twoBlocks)
    val part = toDF(spark, twoBlocks.filter(_._3 >= 2.0))
    val seed = ConnectedComponents.labels(part)
    val got = ConnectedComponents.seededLabels(all, Some(seed))
      .collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    assert(got == LocalBipartite(twoBlocks).components)
  }

  test("componentEdges extracts exactly q's component") {
    val cut = twoBlocks.filter(_._3 != 1.0)
    val df = toDF(spark, cut)
    val got = edgeSet(ConnectedComponents.componentEdges(df, gidU(1)))
    val exp = LocalBipartite(cut).componentOf(gidU(1)).edges.toSet
    assert(got == exp)
    assert(got.size == 4)
    // from a lower vertex of the other block
    val got2 = edgeSet(ConnectedComponents.componentEdges(df, gidL(3)))
    assert(got2 == LocalBipartite(cut).componentOf(gidL(3)).edges.toSet)
  }

  test("componentEdges of an absent vertex is empty") {
    assert(ConnectedComponents.componentEdges(toDF(spark, path), gidU(42)).isEmpty)
  }

  test("BFS component agrees with DuckDB recursive-CTE reachability") {
    val cut = twoBlocks.filter(_._3 != 1.0)
    val df = toDF(spark, cut)
    val got = ConnectedComponents.componentEdges(df, gidU(1))
    // DuckDB: transitive closure from gid(u1)=2 over the doubled adjacency,
    // then edges with a reachable endpoint.
    Oracle.assertEquivalent(
      got.select(col("u"), col("v"), col("w")),
      """
      WITH RECURSIVE adj AS (
        SELECT CAST(u AS BIGINT)*2 AS src, CAST(v AS BIGINT)*2+1 AS dst FROM edges
        UNION ALL
        SELECT CAST(v AS BIGINT)*2+1, CAST(u AS BIGINT)*2 FROM edges
      ), reach AS (
        SELECT CAST(2 AS BIGINT) AS gid
        UNION
        SELECT adj.dst FROM reach JOIN adj ON adj.src = reach.gid
      )
      SELECT CAST(u AS BIGINT) AS u, CAST(v AS BIGINT) AS v, CAST(w AS DOUBLE) AS w
      FROM edges
      WHERE CAST(u AS BIGINT)*2 IN (SELECT gid FROM reach)
      """,
      "edges" -> df)
  }

  test("Bfs over filtered adjacency only returns qualifying edges") {
    val df = toDF(spark, fig2)
    val adj = Bipartite.sym(df).filter(col("w") >= 5.0)
    val got = edgeSet(Bfs.subgraphFrom(spark, adj, gidU(3)))
    val exp = LocalBipartite(fig2.filter(_._3 >= 5.0)).componentOf(gidU(3)).edges.toSet
    assert(got == exp)
    assert(got.forall(_._3 >= 5.0))
  }
}
