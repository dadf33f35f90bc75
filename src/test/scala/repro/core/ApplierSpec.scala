package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.lang.{ConstantStr, Label}

/** Local (single-cluster) tests of Section 6 application semantics. */
class ApplierSpec extends AnyFunSuite {

  /** Build decisions by running selection + grouping-free (NoAgg) confirm. */
  private def noAggDecisions(values: Seq[String], approve: (String, String) => Boolean,
                             cluster: Long = 1): (Vector[Decision], Set[String]) = {
    val catalog = Rules.clusterRules(cluster, values)
    val trans   = Selection.select(catalog.keys.toSeq, BestDir)
    val groups  = trans.zipWithIndex.map { case (tr, i) =>
      RuleGroup(s"g$i", None, None, Vector(tr))
    }
    val ranked = Grouping.rank(groups, catalog)
    val judge  = new RuleJudge { def isTrue(a: String, b: String) = approve(a, b) }
    val (ds, _) = Expert.confirmAll(ranked, catalog, judge, budget = 100, method = NoAgg)
    (ds, catalog.keysIterator.map(Applier.keyString).toSet)
  }

  test("single approved rule merges two variants") {
    val values = Seq("9 St", "9th St")
    val (ds, keys) = noAggDecisions(values, (a, b) => Set(a, b) == Set("9", "9th"))
    val out = Applier.applyCluster(1, Map(1L -> "9 St", 2L -> "9th St"), ds, keys)
    assert(out(1L) == out(2L))
  }

  test("no decisions leaves values unchanged") {
    val records = Map(1L -> "a b", 2L -> "a c")
    assert(Applier.applyCluster(1, records, Vector.empty, _ => true) == records)
  }

  test("Section 6 H&M example: chained rule maintenance") {
    // cluster {H & M, H and M, H &amp; M}; approving & <-> and triggers
    // re-derivation so the updated value can merge with the third variant.
    val values = Seq("H & M", "H and M", "H &amp; M")
    val (ds, keys) = noAggDecisions(values, (a, b) =>
      Set(Set("&", "and"), Set("&", "&amp;"), Set("and", "&amp;")).contains(Set(a, b)))
    val records = Map(1L -> "H & M", 2L -> "H and M", 3L -> "H &amp; M")
    val out = Applier.applyCluster(1, records, ds, keys)
    assert(out.values.toSet.size == 1, out)
  }

  test("Table 1 -> Table 2: Dewitt addresses converge") {
    val v1 = "9 St, 02141 Wisconsin"
    val v2 = "9th St, 02141 WI"
    val v3 = "9 Street, 02141 WI"
    val judge: (String, String) => Boolean = (a, b) => {
      val ok = Set(Set("9", "9th"), Set("St,", "Street,"), Set("Wisconsin", "WI"),
        Set("9 St,", "9th Street,"), Set("9 Street,", "9th St,"), Set("9 St,", "9 Street,"),
        Set(v1, v2), Set(v1, v3), Set(v2, v3))
      ok.contains(Set(a, b))
    }
    val (ds, keys) = noAggDecisions(Seq(v1, v2, v3), judge)
    val out = Applier.applyCluster(1, Map(1L -> v1, 2L -> v2, 3L -> v3), ds, keys)
    assert(out.values.toSet.size == 1, out)
  }

  test("unapproved rules are not applied") {
    val values = Seq("9 St", "9th Ave")
    val (ds, keys) = noAggDecisions(values, (_, _) => false)
    assert(ds.isEmpty)
    val records = Map(1L -> "9 St", 2L -> "9th Ave")
    assert(Applier.applyCluster(1, records, ds, keys) == records)
  }

  test("adoption: a newly generated rule joins an approved program group") {
    // Decision: a BothAgg group whose program is ConstantStr("st") with
    // struct l -> l; rule street <-> st was a member. After some other change
    // creates a new rule strasse <-> st (not in the initial catalog), it must
    // be adopted and applied in the same direction.
    val path: Vector[Label] = Vector(ConstantStr("st"))
    val d = Decision(
      rank = 0, method = BothAgg,
      structKey = Some(Structure.ofTransformation("street", "st")),
      path = Some(path),
      memberDirs = Map(RuleKey.of("street", "st") -> (Trans("street", "st").lhs == RuleKey.of("street", "st").a)),
      forward = true)
    val records = Map(1L -> "strasse x", 2L -> "st x")
    // initialKeys does NOT contain strasse<->st, so adoption is allowed
    val out = Applier.applyCluster(1, records, Vector(d), _ => false)
    assert(out(1L) == "st x")
    assert(out(2L) == "st x")
  }

  test("initial-catalog rules are not adopted by other groups") {
    val path: Vector[Label] = Vector(ConstantStr("st"))
    val d = Decision(0, BothAgg,
      Some(Structure.ofTransformation("street", "st")), Some(path),
      memberDirs = Map.empty, forward = true)
    val records = Map(1L -> "strasse x", 2L -> "st x")
    val initialKeys = Set(Applier.keyString(RuleKey.of("strasse", "st")))
    val out = Applier.applyCluster(1, records, Vector(d), initialKeys.contains)
    assert(out == records) // key existed initially and was not a member
  }

  test("reverse direction replaces rhs with lhs") {
    val values = Seq("9 St", "9th St")
    val catalog = Rules.clusterRules(1, values)
    val key = RuleKey.of("9", "9th")
    val d = Decision(0, NoAgg, None, None,
      memberDirs = Map(key -> true), forward = false) // replace "9th" with "9"
    val keys = catalog.keysIterator.map(Applier.keyString).toSet
    val out = Applier.applyCluster(1, Map(1L -> "9 St", 2L -> "9th St"), Vector(d), keys)
    assert(out.values.toSet == Set("9 St"))
  }

  test("termination on potentially cyclic rules") {
    // a <-> b approved in both orientations as separate decisions would
    // oscillate; passes/apps caps must terminate.
    val key = RuleKey.of("aa", "bb")
    val d1 = Decision(0, NoAgg, None, None, Map(key -> true), forward = true)
    val d2 = Decision(1, NoAgg, None, None, Map(key -> true), forward = false)
    val out = Applier.applyCluster(1, Map(1L -> "aa x", 2L -> "bb x"), Vector(d1, d2), _ => true)
    assert(out.size == 2) // terminated
  }

  test("singleton cluster untouched") {
    val records = Map(1L -> "lonely")
    val d = Decision(0, NoAgg, None, None, Map(RuleKey.of("a", "b") -> true), forward = true)
    assert(Applier.applyCluster(1, records, Vector(d), _ => true) == records)
  }
}
