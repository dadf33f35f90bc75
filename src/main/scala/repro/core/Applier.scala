package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.lang.PathCheck
import scala.collection.mutable

/** Applying approved matching-rule groups to the clusters (Section 6),
  * including the incremental maintenance the paper describes: after a value
  * changes, its matching rules are re-derived against the rest of the
  * cluster, and newly generated rules that fall into an already-approved
  * group are applied directly.
  */
object Applier {

  /** Passes over the decision list (a later application can spawn a rule
    * adoptable by an earlier decision); bounded for termination.
    */
  private val MaxPasses = 4

  /** Max single-rule applications per cluster per pass; safety valve. */
  private val MaxAppsPerPass = 500

  /** Apply the decisions to one cluster. `initialKeys` is the set of rule
    * keys that existed in the initial catalog: those only apply through the
    * group they were assigned to (`memberDirs`), while *new* keys may be
    * adopted by any approved group whose criteria they satisfy.
    */
  def applyCluster(cluster: Long, records: Map[Long, String],
                   decisions: Seq[Decision],
                   initialKeys: String => Boolean): Map[Long, String] = {
    if (decisions.isEmpty || records.size < 2) return records
    val state = mutable.HashMap.from(records)

    // Per-pair rule cache; invalidated for pairs touching a changed value.
    val pairCache = mutable.HashMap.empty[(String, String), Vector[MatchingRule]]
    def pairRules(v1: String, v2: String): Vector[MatchingRule] = {
      val k = if (v1 <= v2) (v1, v2) else (v2, v1)
      pairCache.getOrElseUpdate(k, Rules.pairRules(cluster, k._1, k._2))
    }

    def currentRules(): Vector[MatchingRule] = {
      val vs  = state.values.toVector.distinct.sorted
      val acc = mutable.HashMap.empty[RuleKey, MatchingRule]
      for (i <- vs.indices; j <- (i + 1) until vs.length; r <- pairRules(vs(i), vs(j)))
        acc.updateWith(r.key) {
          case Some(prev) => Some(prev.merge(r))
          case None       => Some(r)
        }
      acc.values.toVector.sortBy(r => (r.key.a, r.key.b))
    }

    // Adoption decisions are stable for a given (rule, decision) pair.
    val adoptCache = mutable.HashMap.empty[(RuleKey, Int), Option[Boolean]]
    def adopt(key: RuleKey, d: Decision): Option[Boolean] =
      adoptCache.getOrElseUpdate((key, d.rank), {
        def matches(lhs: String, rhs: String): Boolean = d.method match {
          case NoAgg     => false
          case StructAgg => d.structKey.contains(Structure.ofTransformation(lhs, rhs))
          case TransAgg  => d.path.exists(p => PathCheck.consistent(p, lhs, rhs))
          case BothAgg =>
            d.structKey.contains(Structure.ofTransformation(lhs, rhs)) &&
              d.path.exists(p => PathCheck.consistent(p, lhs, rhs))
        }
        if (matches(key.a, key.b)) Some(true)
        else if (matches(key.b, key.a)) Some(false)
        else None
      })

    def directionFor(key: RuleKey, d: Decision): Option[Boolean] =
      d.memberDirs.get(key).orElse {
        if (initialKeys(key.a + "" + key.b)) None else adopt(key, d)
      }

    def applyDecision(d: Decision): Boolean = {
      var changedAny = false
      var continue   = true
      var apps       = 0
      while (continue && apps < MaxAppsPerPass) {
        continue = false
        val rules = currentRules()
        val hit = rules.iterator.flatMap { rule =>
          directionFor(rule.key, d).iterator.map(dirAIsLhs => (rule, dirAIsLhs))
        }.flatMap { case (rule, dirAIsLhs) =>
          // forward: replace lhs occurrences with rhs
          val replaceAOccs = if (d.forward) dirAIsLhs else !dirAIsLhs
          val occs = if (replaceAOccs) rule.occA else rule.occB
          val repl = if (replaceAOccs) rule.key.b else rule.key.a
          occs.toVector.sortBy(o => (o.value, o.p)).iterator
            .map(o => (o, Tokens.applyReplacement(o.value, o.p, o.q, repl)))
            .find { case (o, nv) => nv != o.value }
        }.nextOption()

        hit.foreach { case (occ, newValue) =>
          for ((rid, v) <- state if v == occ.value) state(rid) = newValue
          pairCache.filterInPlace { case ((x, y), _) => x != occ.value && y != occ.value }
          changedAny = true
          continue = true
          apps += 1
        }
      }
      changedAny
    }

    var pass    = 0
    var changed = true
    while (changed && pass < MaxPasses) {
      changed = false
      for (d <- decisions.sortBy(_.rank)) if (applyDecision(d)) changed = true
      pass += 1
    }
    state.toMap
  }

  /** Distributed application: one task per cluster group.
    * `clusters` has columns (cluster LONG, recordId LONG, value STRING).
    */
  def applyAll(spark: SparkSession, clusters: DataFrame,
               decisions: Seq[Decision], initialKeys: Set[String]): DataFrame = {
    import spark.implicits._
    val bcDecisions = spark.sparkContext.broadcast(decisions.toVector)
    val bcKeys      = spark.sparkContext.broadcast(initialKeys)
    clusters
      .select("cluster", "recordId", "value").as[(Long, Long, String)]
      .groupByKey(_._1)
      .flatMapGroups { (cid, it) =>
        val records = it.map { case (_, rid, v) => rid -> v }.toMap
        val updated = applyCluster(cid, records, bcDecisions.value, bcKeys.value.contains)
        updated.iterator.map { case (rid, v) => (cid, rid, v) }
      }
      .toDF("cluster", "recordId", "value")
  }

  /** Encode a rule key for the broadcast initial-keys set. */
  def keyString(k: RuleKey): String = k.a + "" + k.b
}
