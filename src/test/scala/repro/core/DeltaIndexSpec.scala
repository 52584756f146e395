package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestGraphs}
import repro.graph.Bipartite
import repro.local.LocalBipartite
import LocalBipartite.{gidL, gidU}

/** I_delta construction (Algorithm 3) and Q_opt (Algorithm 2 over I_delta)
  * vs the sequential oracle.
  */
class DeltaIndexSpec extends SparkSpec {
  import TestGraphs._

  private lazy val fig2Df = toDF(spark, fig2)
  private lazy val fig2Idx = DeltaIndex.build(fig2Df)
  private lazy val fig2Local = LocalBipartite(fig2)

  test("delta equals the oracle degeneracy") {
    assert(fig2Idx.delta == fig2Local.degeneracy)
    assert(fig2Idx.delta == 3)
  }

  test("part-a entries store exactly the (tau,tau)-core adjacency with offsets >= tau") {
    for (tau <- 1 to fig2Idx.delta) {
      val off = fig2Local.alphaOffsets(tau)
      val expected = (for {
        (u, v, w) <- fig2
        if off.getOrElse(gidU(u), 0) >= tau && off.getOrElse(gidL(v), 0) >= tau
        row <- Seq((gidU(u), gidL(v), off(gidL(v))), (gidL(v), gidU(u), off(gidU(u))))
      } yield row).toSet
      val got = fig2Idx.entries
        .filter(col("part") === "a" && col("tau") === tau)
        .select("src", "dst", "off")
        .collect().map(r => (r.getLong(0), r.getLong(1), r.getInt(2))).toSet
      assert(got == expected, s"tau=$tau")
    }
  }

  test("part-b entries keep only neighbors with beta-offset strictly above tau") {
    for (tau <- 1 to fig2Idx.delta) {
      val off = fig2Local.betaOffsets(tau)
      val expected = (for {
        (u, v, w) <- fig2
        pair <- Seq((gidU(u), gidL(v)), (gidL(v), gidU(u)))
        if off.getOrElse(pair._1, 0) >= tau && off.getOrElse(pair._2, 0) > tau
      } yield (pair._1, pair._2, off(pair._2))).toSet
      val got = fig2Idx.entries
        .filter(col("part") === "b" && col("tau") === tau)
        .select("src", "dst", "off")
        .collect().map(r => (r.getLong(0), r.getLong(1), r.getInt(2))).toSet
      assert(got == expected, s"tau=$tau")
    }
  }

  test("vertex offset lookups match the oracle") {
    for (tau <- 1 to fig2Idx.delta; x <- Seq(gidU(1), gidU(3), gidU(5), gidL(1), gidL(4))) {
      assert(fig2Idx.alphaOffsetOf(x, tau) == fig2Local.alphaOffsets(tau).getOrElse(x, 0),
        s"alpha x=$x tau=$tau")
      assert(fig2Idx.betaOffsetOf(x, tau) == fig2Local.betaOffsets(tau).getOrElse(x, 0),
        s"beta x=$x tau=$tau")
    }
  }

  test("Q_opt returns the (alpha,beta)-community: alpha<=beta branch") {
    for ((a, b) <- Seq((1, 1), (1, 3), (2, 2), (2, 4), (3, 3))) {
      val got = edgeSet(DeltaIndex.query(fig2Idx, gidU(3), a, b))
      val exp = fig2Local.community(gidU(3), a, b).edges.toSet
      assert(got == exp, s"(a,b)=($a,$b)")
    }
  }

  test("Q_opt returns the (alpha,beta)-community: alpha>beta branch") {
    for ((a, b) <- Seq((2, 1), (3, 1), (3, 2), (4, 2))) {
      val got = edgeSet(DeltaIndex.query(fig2Idx, gidU(1), a, b))
      val exp = fig2Local.community(gidU(1), a, b).edges.toSet
      assert(got == exp, s"(a,b)=($a,$b)")
    }
  }

  test("Q_opt from a lower-layer query vertex") {
    for ((a, b) <- Seq((2, 2), (1, 2), (2, 1))) {
      val got = edgeSet(DeltaIndex.query(fig2Idx, gidL(1), a, b))
      val exp = fig2Local.community(gidL(1), a, b).edges.toSet
      assert(got == exp, s"(a,b)=($a,$b)")
    }
  }

  test("Q_opt empty cases: q outside core; min(a,b) beyond delta") {
    assert(DeltaIndex.query(fig2Idx, gidU(5), 2, 2).isEmpty)   // pendant
    assert(DeltaIndex.query(fig2Idx, gidU(1), 4, 4).isEmpty)   // > delta both
    assert(DeltaIndex.query(fig2Idx, gidU(999), 1, 1).isEmpty) // absent vertex
  }

  test("index on a random graph: queries across the grid match the oracle") {
    val edges = random(6, 6, 0.5, seed = 9)
    val idx = DeltaIndex.build(toDF(spark, edges))
    val g = LocalBipartite(edges)
    assert(idx.delta == g.degeneracy)
    for ((a, b) <- Seq((1, 2), (2, 1), (2, 2), (3, 3), (1, 4)); q <- Seq(gidU(1), gidL(2))) {
      val got = edgeSet(DeltaIndex.query(idx, q, a, b))
      val exp = g.community(q, a, b).edges.toSet
      assert(got == exp, s"q=$q (a,b)=($a,$b)")
    }
  }

  test("entry count is bounded by 2 * delta * 2m (Lemma 5 shape)") {
    val m = fig2.size.toLong
    assert(fig2Idx.entryCount <= 2L * fig2Idx.delta * 2L * m)
  }

  test("withWeights re-targets the structural index to a new weighting") {
    val reweighted = fig2.map { case (u, v, w) => (u, v, w * 10 + u + v) }
    val idx2 = DeltaIndex.withWeights(fig2Idx, toDF(spark, reweighted))
    assert(idx2.delta == fig2Idx.delta)
    assert(idx2.entryCount == fig2Idx.entryCount)
    val got = edgeSet(DeltaIndex.query(idx2, gidU(3), 2, 2))
    val exp = LocalBipartite(reweighted).community(gidU(3), 2, 2).edges.toSet
    assert(got == exp)
  }

  test("empty graph builds an empty index") {
    val idx = DeltaIndex.build(fig2Df.limit(0))
    assert(idx.delta == 0)
    assert(idx.entryCount == 0)
  }
}
