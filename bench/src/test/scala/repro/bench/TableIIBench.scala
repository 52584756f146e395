package repro.bench

import repro.SparkSpec
import repro.exp.Tables

/** Paper Table II — query-result statistics of the five community models on
  * the ML-analog "comedy" subgraph (paper: q = 6778, alpha = beta = 45 on
  * 25M-edge MovieLens; here delta-proportional parameters on the analog).
  *
  * Shape to reproduce: SC has the highest average AND minimum rating, a
  * moderate community size, and low Jaccard similarity to every other model;
  * the (alpha,beta)-core / bitruss / C4* communities are much larger with
  * lower minimum ratings; C4* has tiny M_avg (no structure cohesiveness).
  */
class TableIIBench extends SparkSpec {

  test("Table II: model statistics on the ML-analog comedy subgraph") {
    val rows = Tables.tableII(spark)
    println("==== Table II (query-result statistics) ====")
    println(Tables.printTableII(rows))

    val byModel = rows.map(r => r.model -> r).toMap
    val sc = byModel("SC")
    val core = byModel("(a,b)-core")
    assert(sc.nU > 0 && sc.nL > 0, "SC must be nonempty")
    assert(sc.simPct == 100.0)
    // SC maximizes the minimum rating among all models
    rows.filter(_.model != "SC").filter(_.nU > 0).foreach { r =>
      assert(sc.rMin >= r.rMin, s"${r.model} rMin=${r.rMin} > SC ${sc.rMin}")
    }
    // SC's average rating beats the structure-only models (paper's key claim)
    Seq("(a,b)-core", "bitruss").map(byModel).filter(_.nU > 0).foreach { r =>
      assert(sc.rAvg > r.rAvg, s"${r.model} rAvg=${r.rAvg} >= SC ${sc.rAvg}")
    }
    // SC is a (weight-filtered) subset of the core community
    assert(sc.nU <= core.nU && sc.nL <= core.nL)
    // other models overlap SC only partially
    rows.filter(r => r.model != "SC" && r.nU > 0).foreach { r =>
      assert(r.simPct < 100.0, s"${r.model} should differ from SC")
    }
  }
}
