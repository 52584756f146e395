package repro.graph

import repro.{SparkSpec, TestGraphs}
import repro.local.LocalBipartite

/** The distributed h-index offset fixpoints vs the definitional sequential
  * oracle — the central correctness check for everything index-related.
  */
class OffsetsSpec extends SparkSpec {
  import TestGraphs._

  private def offsetsMap(df: org.apache.spark.sql.DataFrame): Map[Long, Int] =
    df.collect().map(r => r.getLong(0) -> r.getInt(1)).toMap

  private def checkAlpha(edges: Vector[(Long, Long, Double)], alpha: Int): Unit = {
    val got = offsetsMap(Offsets.alphaOffsets(toDF(spark, edges), alpha))
    val exp = LocalBipartite(edges).alphaOffsets(alpha)
    // the oracle omits zero offsets; Spark reports every vertex
    assert(got.filter(_._2 > 0) == exp, s"alpha=$alpha")
    got.filter(_._2 == 0).keys.foreach(x => assert(!exp.contains(x)))
  }

  private def checkBeta(edges: Vector[(Long, Long, Double)], beta: Int): Unit = {
    val got = offsetsMap(Offsets.betaOffsets(toDF(spark, edges), beta))
    val exp = LocalBipartite(edges).betaOffsets(beta)
    assert(got.filter(_._2 > 0) == exp, s"beta=$beta")
    got.filter(_._2 == 0).keys.foreach(x => assert(!exp.contains(x)))
  }

  test("fig2 alpha-offsets, alpha in 1..4") {
    (1 to 4).foreach(a => checkAlpha(fig2, a))
  }

  test("fig2 beta-offsets, beta in 1..4") {
    (1 to 4).foreach(b => checkBeta(fig2, b))
  }

  test("k33+pendant offsets") {
    checkAlpha(k33Pendant, 1); checkAlpha(k33Pendant, 3)
    checkBeta(k33Pendant, 1); checkBeta(k33Pendant, 3)
  }

  test("path and star offsets (cascade-heavy shapes)") {
    checkAlpha(path, 1); checkAlpha(path, 2)
    checkBeta(path, 2)
    checkAlpha(star, 6); checkBeta(star, 1)
  }

  test("random graphs offsets") {
    for (seed <- 1 to 3) {
      val g = random(7, 7, 0.4, seed)
      checkAlpha(g, 2)
      checkBeta(g, 2)
    }
  }

  test("vectorized all-tau offsets equal the per-tau fixpoints") {
    for (edges <- Seq(fig2, twoBlocks, random(7, 7, 0.45, 8))) {
      val df = toDF(spark, edges)
      val g = LocalBipartite(edges)
      val taus = 4
      val gotA = Offsets.alphaOffsetsAll(df, taus).collect()
        .map(r => r.getLong(0) -> r.getSeq[Int](1)).toMap
      val gotB = Offsets.betaOffsetsAll(df, taus).collect()
        .map(r => r.getLong(0) -> r.getSeq[Int](1)).toMap
      for (t <- 1 to taus) {
        val expA = g.alphaOffsets(t)
        val expB = g.betaOffsets(t)
        gotA.foreach { case (gid, offs) =>
          assert(offs(t - 1) == expA.getOrElse(gid, 0), s"alpha gid=$gid t=$t")
        }
        gotB.foreach { case (gid, offs) =>
          assert(offs(t - 1) == expB.getOrElse(gid, 0), s"beta gid=$gid t=$t")
        }
      }
    }
  }

  test("core numbers equal the local (tau,tau)-core membership maxima") {
    val df = toDF(spark, fig2)
    val got = offsetsMap(Offsets.coreNumbers(df).select("gid", "core"))
    val g = LocalBipartite(fig2)
    val d = g.degeneracy
    // vertex core number = max tau such that x is in the (tau,tau)-core
    val exp = g.vertices.map { x =>
      x -> (1 to d).filter(t => g.core(t, t).contains(x)).maxOption.getOrElse(0)
    }.toMap
    assert(got == exp)
  }

  test("degeneracy matches the oracle on every fixture") {
    for (edges <- Seq(fig2, k33Pendant, path, star, twoBlocks)) {
      assert(Offsets.degeneracy(toDF(spark, edges)) == LocalBipartite(edges).degeneracy)
    }
  }

  test("degeneracy on random graphs") {
    for (seed <- 4 to 6) {
      val g = random(6, 8, 0.45, seed)
      assert(Offsets.degeneracy(toDF(spark, g)) == LocalBipartite(g).degeneracy, s"seed=$seed")
    }
  }
}
