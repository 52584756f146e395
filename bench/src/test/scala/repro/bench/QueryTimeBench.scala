package repro.bench

import repro.SparkSpec
import repro.exp.{Datasets, Tables}

/** Paper Fig 8 (rendered as a table) — (alpha,beta)-community retrieval time
  * for Q_o (online peeling), Q_v (bicore index) and Q_opt (I_delta) at
  * alpha = beta = 0.7*delta.
  *
  * Shape to reproduce: Q_opt is the fastest on every dataset — it touches only
  * the answer's edges, while Q_v re-scans the full edge list against the
  * vertex set and Q_o peels the whole graph per query.
  */
class QueryTimeBench extends SparkSpec {

  test("Fig 8 as table: Q_o vs Q_v vs Q_opt") {
    val rows = Tables.queryTimeTable(spark, Datasets.small, nQueries = 2)
    println("==== Fig 8 (community retrieval time) ====")
    println(Tables.printQueryTimeTable(rows))

    rows.foreach { r =>
      assert(r.nQueries > 0, r.name)
      assert(r.qoptMs > 0 && r.qvMs > 0 && r.qoMs > 0, r.name)
      // the headline claim: Q_opt beats the online algorithm
      assert(r.qoptMs < r.qoMs, s"${r.name}: Qopt ${r.qoptMs} !< Qo ${r.qoMs}")
    }
    // and beats Q_v on average across datasets (per-dataset can be noisy at
    // this scale; the paper's gap grows with graph size)
    val avgOpt = rows.map(_.qoptMs).sum / rows.size
    val avgV = rows.map(_.qvMs).sum / rows.size
    assert(avgOpt < avgV, s"avg Qopt $avgOpt !< avg Qv $avgV")
  }
}
