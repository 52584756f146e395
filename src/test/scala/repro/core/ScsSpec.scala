package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestGraphs}
import repro.local.{LocalBipartite, LocalScs}
import LocalBipartite.{gidL, gidU}

/** SCS-Peel / SCS-Expand / SCS-Baseline / SCS-Binary vs the sequential
  * semantic oracle, plus structural audits of the result.
  */
class ScsSpec extends SparkSpec {
  import TestGraphs._

  private lazy val fig2Df = toDF(spark, fig2)
  private lazy val fig2Idx = DeltaIndex.build(fig2Df)

  private def run(edges: Vector[(Long, Long, Double)], idx: DeltaIndex, qGid: Long,
                  a: Int, b: Int): Seq[(String, Option[Set[(Long, Long, Double)]])] = {
    val df = toDF(spark, edges)
    val community = DeltaIndex.query(idx, qGid, a, b)
    Seq(
      "peel" -> Scs.peel(community, qGid, a, b).map(edgeSet),
      "expand" -> Scs.expand(community, qGid, a, b).map(edgeSet),
      "binary" -> Scs.binary(community, qGid, a, b).map(edgeSet),
      "baseline" -> Scs.baseline(df, qGid, a, b).map(edgeSet),
    )
  }

  test("fig2: the significant (2,2)-community of u3 is the paper's example block") {
    val results = run(fig2, fig2Idx, gidU(3), 2, 2)
    results.foreach { case (name, res) =>
      assert(res.contains(fig2ScU3), s"$name returned $res")
    }
  }

  test("fig2: all algorithms match the oracle on more parameters") {
    val g = LocalBipartite(fig2)
    for ((q, a, b) <- Seq((gidU(1), 2, 2), (gidL(1), 2, 2), (gidU(2), 3, 3), (gidU(1), 2, 1))) {
      val exp = LocalScs.semantic(g, q, a, b).map(_.edges.toSet)
      run(fig2, fig2Idx, q, a, b).foreach { case (name, res) =>
        assert(res == exp, s"$name q=$q ($a,$b): $res vs $exp")
      }
    }
  }

  test("q outside the core: every algorithm returns None") {
    run(fig2, fig2Idx, gidU(5), 2, 2).foreach { case (name, res) =>
      assert(res.isEmpty, s"$name returned $res")
    }
  }

  test("all-equal weights: peel returns the community immediately") {
    val eq = k33Pendant.map { case (u, v, _) => (u, v, 3.0) }
    val df = toDF(spark, eq)
    val idx = DeltaIndex.build(df)
    val community = DeltaIndex.query(idx, gidU(1), 2, 2)
    val r = Scs.peel(community, gidU(1), 2, 2)
    assert(r.map(edgeSet).contains(LocalBipartite(eq).core(2, 2).edges.toSet))
  }

  test("two-block graph: SC of u1 lives in the high-weight block") {
    val df = toDF(spark, twoBlocks)
    val idx = DeltaIndex.build(df)
    val exp = Set((1L, 1L, 4.0), (1L, 2L, 4.0), (2L, 1L, 4.0), (2L, 2L, 3.0))
    run(twoBlocks, idx, gidU(1), 2, 2).foreach { case (name, res) =>
      assert(res.contains(exp), s"$name returned $res")
    }
  }

  test("random graphs: Spark algorithms match the sequential oracle") {
    for (seed <- Seq(31, 32)) {
      val edges = random(6, 6, 0.5, seed)
      val df = toDF(spark, edges)
      val idx = DeltaIndex.build(df)
      val g = LocalBipartite(edges)
      for ((q, a, b) <- Seq((gidU(1), 2, 2), (gidL(1), 2, 2))) {
        val exp = LocalScs.semantic(g, q, a, b).map(_.edges.toSet)
        run(edges, idx, q, a, b).foreach { case (name, res) =>
          assert(res == exp, s"seed=$seed $name q=$q ($a,$b)")
        }
      }
    }
  }

  test("result audit: connectivity, degrees and min-weight maximality (DuckDB)") {
    val community = DeltaIndex.query(fig2Idx, gidU(3), 2, 2)
    val r = Scs.peel(community, gidU(3), 2, 2).get
    // degree constraints audit in DuckDB: zero violations
    val viol = repro.graph.Bipartite.degreesU(r).filter(col("deg") < 2)
      .select(col("u").as("x"))
      .unionByName(repro.graph.Bipartite.degreesL(r).filter(col("deg") < 2)
        .select(col("v").as("x")))
    Oracle.assertEquivalent(
      viol,
      """SELECT CAST(u AS BIGINT) AS x FROM r GROUP BY u HAVING count(*) < 2
         UNION ALL
         SELECT CAST(v AS BIGINT) AS x FROM r GROUP BY v HAVING count(*) < 2""",
      "r" -> r)
    // significance: the min weight in R matches DuckDB's
    Oracle.assertEquivalent(
      r.agg(min(col("w")).as("f")),
      "SELECT min(CAST(w AS DOUBLE)) AS f FROM r",
      "r" -> r)
    // R is connected and contains q
    val comp = repro.graph.ConnectedComponents.labels(r)
      .select("comp").distinct().count()
    assert(comp == 1)
    assert(repro.graph.Bipartite.containsGid(r, gidU(3)))
  }

  test("expansion with epsilon=1 agrees (checks every component change)") {
    val df = toDF(spark, twoBlocks)
    val idx = DeltaIndex.build(df)
    val community = DeltaIndex.query(idx, gidU(1), 2, 2)
    val r = Scs.expand(community, gidU(1), 2, 2, epsilon = 1.0)
    assert(r.map(edgeSet).contains(
      Set((1L, 1L, 4.0), (1L, 2L, 4.0), (2L, 1L, 4.0), (2L, 2L, 3.0))))
  }

  test("baseline on a disconnected graph never crosses components") {
    val cut = twoBlocks.filter(_._3 != 1.0)
    val df = toDF(spark, cut)
    val r = Scs.baseline(df, gidU(4), 2, 2)
    assert(r.map(edgeSet).contains(cut.filter(_._1 >= 3).toSet))
  }
}
