package repro.bench

import repro.data.ConsolidationGen
import repro.exp.Experiments

/** Reproduces Table 6 (dataset details) on the synthetic stand-ins. */
class Table6DatasetBench extends BenchBase {

  test("Table 6: dataset details") {
    val table = Experiments.table6(spark, specs)
    report(table)

    // shape assertions against the paper's Table 6 proportions
    val stats = specs.map(s => s.name -> ConsolidationGen.stats(spark, s.gen(spark, s.sf))).toMap
    assert(stats("AuthorList").avgSize > stats("Address").avgSize)
    assert(stats("Address").avgSize > stats("JournalTitle").avgSize)
    assert(stats("JournalTitle").clusters > stats("Address").clusters)
    assert(stats("AuthorList").avgSize > 15 && stats("AuthorList").avgSize < 45)
    assert(stats("JournalTitle").avgSize > 1.4 && stats("JournalTitle").avgSize < 2.4)
    assert(stats("Address").avgSize > 3.5 && stats("Address").avgSize < 9.0)
  }
}
