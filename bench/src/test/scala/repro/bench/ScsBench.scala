package repro.bench

import repro.SparkSpec
import repro.exp.{Datasets, Tables}

/** Paper Figs 12/13 (rendered as a table) — significant-community search:
  * SCS-Baseline vs SCS-Peel vs SCS-Expand across datasets and parameters.
  *
  * Shape to reproduce: both two-step algorithms beat SCS-Baseline (whose
  * search space is q's component of the whole graph); at small alpha/beta
  * SCS-Expand tends to win, at large alpha/beta SCS-Peel catches up
  * (the paper's Fig 13 crossover).
  */
class ScsBench extends SparkSpec {

  test("Fig 12 as table: SCS algorithms across datasets") {
    val specs = Seq(Datasets.byName("BS"), Datasets.byName("GH"))
    val rows = Tables.scsTable(spark, specs, nQueries = 2)
    println("==== Fig 12 (SCS query time across datasets) ====")
    println(Tables.printScsTable(rows))

    rows.foreach { r =>
      assert(r.nQueries > 0, r.name)
      assert(r.peelMs < r.baselineMs, s"${r.name}: peel ${r.peelMs} !< baseline ${r.baselineMs}")
      assert(r.expandMs < r.baselineMs, s"${r.name}: expand ${r.expandMs} !< baseline ${r.baselineMs}")
    }
  }

  test("Fig 13 as table: varying alpha=beta on the BS analog") {
    val edges = Datasets.generate(spark, Datasets.byName("BS"))
    val delta = repro.graph.Offsets.degeneracy(edges)
    val params = Seq(math.max(1, delta / 2), delta).distinct
    val rows = params.map(p => Tables.scsRowFor(s"BS a=b=$p", edges, p, p, nQueries = 2))
    println("==== Fig 13 (SCS query time varying alpha=beta, BS analog) ====")
    println(Tables.printScsTable(rows))
    rows.foreach { r =>
      assert(r.peelMs > 0 && r.expandMs > 0 && r.baselineMs > 0, r.name)
    }
  }
}
