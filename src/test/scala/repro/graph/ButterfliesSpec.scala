package repro.graph

import repro.{SparkSpec, TestGraphs}
import repro.local.LocalBipartite

/** Butterfly support counting and k-bitruss peeling vs the oracle. */
class ButterfliesSpec extends SparkSpec {
  import TestGraphs._

  private def supportMap(edges: Vector[(Long, Long, Double)]): Map[(Long, Long), Long] =
    Butterflies.support(toDF(spark, edges))
      .collect().map(r => (r.getLong(0), r.getLong(1)) -> r.getLong(2)).toMap

  private def fullSupport(edges: Vector[(Long, Long, Double)]): Map[(Long, Long), Long] = {
    // Spark omits zero-support edges from the grouped result; fill them in.
    val base = edges.map { case (u, v, _) => (u, v) -> 0L }.toMap
    base ++ supportMap(edges)
  }

  test("K33 support: every edge in 4 butterflies") {
    val k33 = (for { u <- 1L to 3L; v <- 1L to 3L } yield (u, v, 1.0)).toVector
    assert(fullSupport(k33).values.toSet == Set(4L))
  }

  test("path has no butterflies") {
    assert(fullSupport(path).values.forall(_ == 0L))
  }

  test("support matches the oracle on fixtures") {
    for (edges <- Seq(fig2, k33Pendant, twoBlocks)) {
      assert(fullSupport(edges) == LocalBipartite(edges).butterflySupport)
    }
  }

  test("support matches the oracle on random graphs") {
    for (seed <- 1 to 3) {
      val g = random(6, 6, 0.5, seed)
      assert(fullSupport(g) == LocalBipartite(g).butterflySupport, s"seed=$seed")
    }
  }

  test("bitruss peeling matches the oracle") {
    for ((edges, k) <- Seq((k33Pendant, 4L), (fig2, 2L), (twoBlocks, 1L))) {
      val got = edgeSet(Butterflies.bitruss(toDF(spark, edges), k))
      val exp = LocalBipartite(edges).bitruss(k).edges.toSet
      assert(got == exp, s"k=$k")
    }
  }

  test("bitruss at huge k is empty") {
    assert(Butterflies.bitruss(toDF(spark, fig2), 1000L).isEmpty)
  }
}
