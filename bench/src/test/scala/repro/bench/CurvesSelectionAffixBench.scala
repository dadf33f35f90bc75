package repro.bench

import repro.exp.Experiments

/** Companion data for Figures 6 and 8: recall of merging by direction
  * selection method (Fig 6) and with/without the affix functions (Fig 8).
  */
class CurvesSelectionAffixBench extends BenchBase {

  test("Figures 6 and 8: recall by selection method and affix functions") {
    warmedUp()
    val table = Experiments.curvesSelectionAffix(spark, specs)
    report(table)

    val rows = table.linesIterator.drop(2).map(_.trim.split("\\s+")).filter(_.length == 4).toVector
    def recall(ds: String, v: String): Double =
      rows.find(r => r(0) == ds && r(1) == v).get(3).toDouble
    // paper: BestDir highest recall, RevDir lowest; Affix >= NoAffix
    val totBest = specs.map(s => recall(s.name, "BestDir")).sum
    val totRev  = specs.map(s => recall(s.name, "RevDir")).sum
    val totAff  = specs.map(s => recall(s.name, "Affix")).sum
    val totNoAf = specs.map(s => recall(s.name, "NoAffix")).sum
    assert(totBest >= totRev, s"BestDir ($totBest) should beat RevDir ($totRev)")
    assert(totAff >= totNoAf, s"Affix ($totAff) should beat NoAffix ($totNoAf)")
  }
}
