package repro.bench

import repro.SparkSpec
import repro.exp.{Datasets, Tables}

/** Paper Figs 10/11 (rendered as a table) — index construction time and
  * index size for I_v, I_delta and the basic indexes.
  *
  * Shape to reproduce: I_v (vertex info only) is the smallest; I_delta is
  * close to I_v in build time and far smaller than the FULL basic indexes
  * (whose exact entry counts are analytic — 2*sum(deg^2) — mirroring the
  * paper's "expected size" for builds beyond the time limit).
  */
class IndexBench extends SparkSpec {

  test("Fig 10/11 as table: index build time and size") {
    val specs = Seq(Datasets.byName("BS"), Datasets.byName("GH"))
    val rows = Tables.indexTable(spark, specs, basicCap = 3)
    println("==== Fig 10/11 (index construction time and size) ====")
    println(Tables.printIndexTable(rows))

    rows.foreach { r =>
      assert(r.ivEntries > 0 && r.idEntries > 0, r.name)
      // I_v stores vertex info only: smaller than the edge-entry indexes
      assert(r.ivEntries < r.idEntries, s"${r.name}: Iv ${r.ivEntries} !< Id ${r.idEntries}")
      // I_delta is much smaller than the full basic indexes on skewed graphs
      assert(r.idEntries < r.ibsAlphaFull,
        s"${r.name}: Id ${r.idEntries} !< full IbsA ${r.ibsAlphaFull}")
      assert(r.idEntries < r.ibsBetaFull,
        s"${r.name}: Id ${r.idEntries} !< full IbsB ${r.ibsBetaFull}")
      // the materialized basic slice (3 of alpha_max taus) already carries
      // a sizable fraction of I_delta's total entry count
      assert(r.ibsAlphaEntries > 0, r.name)
    }
  }
}
