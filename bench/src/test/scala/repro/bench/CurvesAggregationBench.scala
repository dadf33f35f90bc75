package repro.bench

import repro.exp.Experiments

/** Companion data for Figures 3-5: precision/recall/MCC of merging
  * duplicates vs the number of confirmed groups, per aggregation method.
  */
class CurvesAggregationBench extends BenchBase {

  test("Figures 3-5: merging quality by aggregation method and budget") {
    warmedUp()
    val table = Experiments.curvesAggregation(spark, specs)
    report(table)

    // shape assertions per the paper:
    //  - at the full budget, BothAgg recall beats NoAgg (bulk confirmation),
    //  - NoAgg precision is perfect (rules confirmed one by one),
    //  - BothAgg MCC is competitive with the best of the other methods.
    val rows = table.linesIterator.drop(2).map(_.trim.split("\\s+")).filter(_.length == 6).toVector
    def metric(ds: String, m: String, budget: Int, col: Int): Double =
      rows.find(r => r(0) == ds && r(1) == m && r(2) == budget.toString).get(col).toDouble
    for (spec <- specs) {
      val noAggRec  = metric(spec.name, "NoAgg", 100, 4)
      val bothRec   = metric(spec.name, "BothAgg", 100, 4)
      val noAggPrec = metric(spec.name, "NoAgg", 100, 3)
      assert(bothRec > noAggRec, s"${spec.name}: BothAgg recall $bothRec <= NoAgg $noAggRec")
      assert(noAggPrec > 0.95, s"${spec.name}: NoAgg precision $noAggPrec")
      val bothMcc = metric(spec.name, "BothAgg", 100, 5)
      val others  = Seq("NoAgg", "StructAgg", "TransAgg").map(m => metric(spec.name, m, 100, 5))
      assert(bothMcc >= others.max - 0.12,
        s"${spec.name}: BothAgg MCC $bothMcc vs others $others")
    }
  }
}
