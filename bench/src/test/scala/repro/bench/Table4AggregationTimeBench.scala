package repro.bench

import repro.exp.Experiments

/** Reproduces Table 4 (aggregation time per method, plus NoAffix/Affix). */
class Table4AggregationTimeBench extends BenchBase {

  test("Table 4: aggregation time by method") {
    warmedUp()
    val table = Experiments.table4(spark, specs)
    report(table)

    // shape assertions against the paper's Table 4:
    //  - NoAgg and StructAgg are (near) free, TransAgg >> BothAgg,
    //  - Affix (= BothAgg default) is faster than NoAffix.
    val lines = table.linesIterator.toVector
    def row(m: String): Seq[Double] =
      lines.find(_.startsWith(m)).get.split("\\s+").drop(1).map(_.toDouble).toSeq
    val noAgg  = row("NoAgg")
    val struct = row("StructAgg")
    val trans  = row("TransAgg")
    val both   = row("BothAgg")
    val noAffix = row("NoAffix")
    val affix   = row("Affix")
    for (i <- specs.indices) {
      assert(noAgg(i) <= both(i), s"NoAgg should be cheapest (${specs(i).name})")
      assert(struct(i) <= both(i), s"StructAgg should be cheaper than BothAgg (${specs(i).name})")
      assert(trans(i) > both(i), s"TransAgg should exceed BothAgg (${specs(i).name})")
    }
    // affix speedup holds in aggregate (the paper: 544s -> 142s on JournalTitle)
    assert(affix.sum < noAffix.sum * 1.1,
      s"Affix (${affix.sum}) should not be slower than NoAffix (${noAffix.sum})")
  }
}
