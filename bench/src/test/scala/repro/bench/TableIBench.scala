package repro.bench

import repro.SparkSpec
import repro.exp.{Datasets, Tables}

/** Paper Table I — dataset summary (|E|, |U|, |L|, delta, alpha_max,
  * beta_max, |R_{delta,delta}|) over the 11 synthetic KONECT analogs.
  * Paper reference values are printed next to ours; EXPERIMENTS.md records
  * the comparison.
  */
class TableIBench extends SparkSpec {

  test("Table I: dataset summary across the 11 analogs") {
    val rows = Tables.tableI(spark)
    println("==== Table I (dataset summary) ====")
    println(Tables.printTableI(rows))

    assert(rows.size == 11)
    val byName = rows.map(r => r.name -> r).toMap
    rows.foreach { r =>
      assert(r.nE > 0 && r.delta >= 1, r.name)
      // alpha_max/beta_max are max layer degrees >= delta by definition
      assert(r.alphaMax >= r.delta && r.betaMax >= r.delta, r.name)
      // |R_dd| is nonempty (delta is the largest tau with nonempty core)
      assert(r.rDD > 0, r.name)
      // delta <= sqrt(2m) bound (paper: delta bounded by sqrt(m))
      assert(r.delta <= math.sqrt(2.0 * r.nE) + 1, r.name)
    }
    // shape: ML is the densest analog and carries the largest degeneracy
    val mlDelta = byName("ML").delta
    assert(rows.forall(_.delta <= mlDelta), s"ML should have max delta: $rows")
    // shape: the small analogs (BS, GH) stay clearly below the large ones
    // (exact pairwise ordering wobbles with the generator's dedup)
    val smallMax = Seq("BS", "GH").map(byName(_).nE).max
    val largeMin = Seq("PA", "ML", "DUI", "EN", "DTI").map(byName(_).nE).min
    assert(smallMax < largeMin, s"size separation violated: $smallMax vs $largeMin")
  }
}
