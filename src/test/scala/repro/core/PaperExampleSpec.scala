package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.graph.{Bipartite, Offsets}
import repro.local.LocalBipartite
import LocalBipartite.{gidL, gidU}

/** The paper's Figure 2 running example at its true scale (~2000 edges):
  * a lower hub v1 adjacent to u1..u999, an upper hub u1 adjacent to ~1000
  * lower pendants, and a small weighted dense block. Validates the running
  * claims: delta = 3, the (3,3)-community of u1 (Example 2/3), the 4-edge
  * significant (2,2)-community of u3 (Example 1 / Fig 2), and the index-size
  * blowup of the basic indexes that motivates I_delta.
  */
class PaperExampleSpec extends SparkSpec {

  // v1 hub over u1..u999; u1 hub over v5..v999; dense block on u1..u4 x v1..v3
  // (u1,v1) is part of both hubs; weights make SC(u3, 2, 2) the 4-edge block.
  private val edges: Vector[(Long, Long, Double)] = {
    val vHub = (2L to 999L).filterNot(i => i == 3 || i == 4)
      .map(i => (i, 1L, 1.0)) // u2, u5..u999 -> v1
    val uHub = (5L to 999L).map(j => (1L, j, 1.0)) // u1 -> v5..v999
    val block = Vector(
      (1L, 1L, 2.0), (1L, 2L, 1.0), (1L, 3L, 2.0), (1L, 4L, 1.0),
      (2L, 2L, 2.0), (2L, 3L, 3.0),
      (3L, 2L, 5.0), (3L, 3L, 1.0),
      (4L, 2L, 5.0))
    // u3, u4 rate v1 high: the significant block of Example 1
    val hot = Vector((3L, 1L, 5.0), (4L, 1L, 5.0))
    (vHub ++ uHub).toVector ++ block ++ hot
  }

  private lazy val df = Bipartite.cp(TestGraphs.toDF(spark, edges))
  private lazy val local = LocalBipartite(edges)

  test("graph shape: ~2000 edges, two hubs") {
    assert(edges.size > 1990 && edges.size < 2010)
    assert(local.degree(gidL(1)) == 999) // v1 hub
    assert(local.degree(gidU(1)) == 999) // u1 hub
  }

  test("degeneracy is 3, as in the paper's example") {
    assert(Offsets.degeneracy(df) == 3)
    assert(local.degeneracy == 3)
  }

  test("the (3,3)-community of u1 is the complete block u1-u3 x v1-v3") {
    val idx = DeltaIndex.build(df)
    val got = TestGraphs.edgeSet(DeltaIndex.query(idx, gidU(1), 3, 3))
      .map(e => (e._1, e._2))
    val exp = (for { u <- 1L to 3L; v <- 1L to 3L } yield (u, v)).toSet
    assert(got == exp)
  }

  test("the significant (2,2)-community of u3 has exactly 4 edges") {
    val idx = DeltaIndex.build(df)
    val community = DeltaIndex.query(idx, gidU(3), 2, 2)
    // the (2,2)-community is much bigger than the answer (the paper's point:
    // SCS must shed nearly all of C to reach the 4-edge block)
    assert(community.count() >= 10)
    val r = Scs.peel(community, gidU(3), 2, 2).get
    val got = TestGraphs.edgeSet(r)
    assert(got == Set((3L, 1L, 5.0), (3L, 2L, 5.0), (4L, 1L, 5.0), (4L, 2L, 5.0)))
    val viaExpand = Scs.expand(community, gidU(3), 2, 2).get
    assert(TestGraphs.edgeSet(viaExpand) == got)
  }

  test("basic-index blowup: full I_bs sizes dwarf I_delta (the paper's motivation)") {
    val ibsAlpha = IndexSizes.basicAlphaFullEntries(df) // ~2 * 999^2 from u1
    val ibsBeta = IndexSizes.basicBetaFullEntries(df)   // ~2 * 999^2 from v1
    val idelta = DeltaIndex.build(df).entryCount
    assert(ibsAlpha > 1000000L)
    assert(ibsBeta > 1000000L)
    assert(idelta < ibsAlpha / 50, s"idelta=$idelta ibsAlpha=$ibsAlpha")
    assert(idelta < ibsBeta / 50, s"idelta=$idelta ibsBeta=$ibsBeta")
  }

  test("alpha_max/beta_max equal the hub degrees") {
    assert(Bipartite.alphaMax(df) == 999)
    assert(Bipartite.betaMax(df) == 999)
  }
}
