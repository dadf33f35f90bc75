package repro.bench

import repro.exp.Experiments

/** Companion data for Figure 7: aggregation time under the four pruning
  * variants (NoThrsh / LocalThrsh / GlobalThrsh / AllThrsh) and θ ∈ {3, 4}.
  * Runs on reduced SFs with a raised search budget so NoThrsh actually pays
  * for its missing pruning instead of just hitting the budget.
  */
class PruningBench extends BenchBase {

  test("Figure 7: pruning-variant aggregation times") {
    warmedUp()
    val small = Experiments.benchDatasets(authorSf = 0.02, addressSf = 0.04, journalSf = 0.04)
    val table = Experiments.pruning(spark, small)
    report(table)

    // paper: AllThrsh fastest, NoThrsh slowest (up to an order of magnitude)
    val rows = table.linesIterator.drop(2).map(_.trim.split("\\s+")).filter(_.length == 6).toVector
    val no   = rows.map(_(2).toDouble).sum
    val loc  = rows.map(_(3).toDouble).sum
    val glob = rows.map(_(4).toDouble).sum
    val all  = rows.map(_(5).toDouble).sum
    assert(all <= no, s"AllThrsh ($all) should not exceed NoThrsh ($no)")
    assert(math.min(loc, glob) <= no * 1.1,
      s"single-threshold variants should not exceed NoThrsh (no=$no loc=$loc glob=$glob)")
  }
}
