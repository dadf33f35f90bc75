package repro.bench

import repro.exp.Experiments

/** Reproduces Table 5 (MC golden-record precision before/after). */
class Table5TruthDiscoveryBench extends BenchBase {

  test("Table 5: MC precision improvement") {
    warmedUp()
    val table = Experiments.table5(spark, specs)
    report(table)

    val lines = table.linesIterator.toVector
    def row(tag: String): Seq[Double] =
      lines.find(_.startsWith(tag)).get.split("\\s+").drop(1).map(_.toDouble).toSeq
    val before = row("before")
    val after  = row("after")
    for (i <- specs.indices)
      assert(after(i) > before(i),
        s"${specs(i).name}: MC precision must improve (${before(i)} -> ${after(i)})")
    // The paper's biggest jump is on JournalTitle (.335 -> .840)
    val j = specs.indexWhere(_.name == "JournalTitle")
    assert(after(j) - before(j) > 0.2, s"JournalTitle improvement too small: ${before(j)} -> ${after(j)}")
  }
}
