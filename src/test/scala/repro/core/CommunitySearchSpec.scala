package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.local.LocalBipartite
import LocalBipartite.{gidL, gidU}

/** Equivalence of the three retrieval algorithms (Q_o = Q_v = Q_opt = oracle)
  * and DuckDB audits of the returned community's degree constraints.
  */
class CommunitySearchSpec extends SparkSpec {
  import TestGraphs._

  private lazy val fig2Df = toDF(spark, fig2)
  private lazy val fig2Local = LocalBipartite(fig2)
  private lazy val iDelta = DeltaIndex.build(fig2Df)
  private lazy val iV = BicoreIndex.build(fig2Df)

  test("Q_o equals the oracle community") {
    for ((a, b) <- Seq((1, 1), (2, 2), (3, 3), (2, 1)); q <- Seq(gidU(3), gidL(2))) {
      val got = edgeSet(CommunitySearch.online(fig2Df, q, a, b))
      assert(got == fig2Local.community(q, a, b).edges.toSet, s"q=$q ($a,$b)")
    }
  }

  test("Q_o = Q_v = Q_opt on fig2 across parameters") {
    for ((a, b) <- Seq((1, 2), (2, 2), (2, 3), (3, 3), (3, 2)); q <- Seq(gidU(1), gidU(3))) {
      val qo = edgeSet(CommunitySearch.online(fig2Df, q, a, b))
      val qv = edgeSet(CommunitySearch.viaBicore(fig2Df, iV, q, a, b))
      val qopt = edgeSet(CommunitySearch.viaDelta(iDelta, q, a, b))
      assert(qo == qv, s"Qo!=Qv q=$q ($a,$b)")
      assert(qo == qopt, s"Qo!=Qopt q=$q ($a,$b)")
    }
  }

  test("all three algorithms agree on a random graph") {
    val edges = random(7, 7, 0.45, seed = 21)
    val df = toDF(spark, edges)
    val idxD = DeltaIndex.build(df)
    val idxV = BicoreIndex.build(df)
    val g = LocalBipartite(edges)
    for ((a, b) <- Seq((2, 2), (1, 3), (3, 1)); q <- Seq(gidU(2), gidL(3))) {
      val exp = g.community(q, a, b).edges.toSet
      assert(edgeSet(CommunitySearch.online(df, q, a, b)) == exp, s"Qo q=$q ($a,$b)")
      assert(edgeSet(CommunitySearch.viaBicore(df, idxV, q, a, b)) == exp, s"Qv q=$q ($a,$b)")
      assert(edgeSet(CommunitySearch.viaDelta(idxD, q, a, b)) == exp, s"Qopt q=$q ($a,$b)")
    }
  }

  test("two-block graph: community stays within q's component") {
    val cut = twoBlocks.filter(_._3 != 1.0)
    val df = toDF(spark, cut)
    val idx = DeltaIndex.build(df)
    val got = edgeSet(DeltaIndex.query(idx, gidU(1), 2, 2))
    assert(got == Set((1L, 1L, 4.0), (1L, 2L, 4.0), (2L, 1L, 4.0), (2L, 2L, 3.0)))
    val got2 = edgeSet(DeltaIndex.query(idx, gidU(3), 2, 2))
    assert(got2 == cut.filter(e => e._1 >= 3).toSet)
  }

  test("returned community satisfies the degree constraints (DuckDB audit)") {
    val c = CommunitySearch.viaDelta(iDelta, gidU(3), 2, 2)
    // violations must be empty on both engines
    val sparkViolations = repro.graph.Bipartite
      .degreesU(c).filter(col("deg") < 2).select(col("u").as("x"))
      .unionByName(
        repro.graph.Bipartite.degreesL(c).filter(col("deg") < 2).select(col("v").as("x")))
    Oracle.assertEquivalent(
      sparkViolations,
      """SELECT CAST(u AS BIGINT) AS x FROM c GROUP BY u HAVING count(*) < 2
         UNION ALL
         SELECT CAST(v AS BIGINT) AS x FROM c GROUP BY v HAVING count(*) < 2""",
      "c" -> c)
    assert(sparkViolations.isEmpty)
  }
}
