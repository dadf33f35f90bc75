package repro.core

import org.apache.spark.sql.SparkSession
import repro.core.lang.{Label, PathCheck, Pivot, PivotConfig}

/** Aggregation methods compared in Section 7.1. */
sealed trait AggMethod extends Serializable
case object NoAgg     extends AggMethod
case object StructAgg extends AggMethod
case object TransAgg  extends AggMethod
case object BothAgg   extends AggMethod

/** A group of matching rules presented to the expert in bulk (Steps 3–4).
  * `structKey`/`path` describe the grouping criteria used, so newly generated
  * rules can be adopted into an approved group later (Section 6).
  */
final case class RuleGroup(
    id: String,
    structKey: Option[String],
    path: Option[Vector[Label]],
    members: Vector[Trans],
)

object Grouping {

  /** Aggregate the selected transformations into rule groups.
    *
    * BothAgg distributes the per-structure-group pivot search across Spark
    * tasks; TransAgg is a single pool (a single task) — this is exactly why
    * the paper's Table 4 shows TransAgg an order of magnitude slower.
    */
  def group(spark: SparkSession, trans: Seq[Trans], method: AggMethod,
            cfg: PivotConfig): Vector[RuleGroup] = method match {

    case NoAgg =>
      trans.sortBy(tr => (tr.lhs, tr.rhs)).toVector.map { tr =>
        RuleGroup(s"rule:${tr.lhs}${tr.rhs}", None, None, Vector(tr))
      }

    case StructAgg =>
      trans.groupBy(_.structKey).toVector.sortBy(_._1).map { case (sk, ms) =>
        RuleGroup(s"struct:$sk", Some(sk), None, ms.toVector.sortBy(tr => (tr.lhs, tr.rhs)))
      }

    case TransAgg => pivotGroups(spark, trans, cfg, byStructure = false)

    case BothAgg => pivotGroups(spark, trans, cfg, byStructure = true)
  }

  /** Distributed pivot grouping: partition the pool (by structure, or not),
    * run the pivot-path search per partition inside executor tasks, collect
    * the group descriptors to the driver.
    */
  private def pivotGroups(spark: SparkSession, trans: Seq[Trans],
                          cfg: PivotConfig, byStructure: Boolean): Vector[RuleGroup] = {
    import spark.implicits._

    val globalFreq = Pivot.constTermFreq(trans.map(_.lhs), cfg.graph.maxConstTermLen)
    val bcFreq     = spark.sparkContext.broadcast(globalFreq)
    val bcCfg      = spark.sparkContext.broadcast(cfg)

    val ds = spark.createDataset(trans.map(tr => (tr.lhs, tr.rhs)).toVector)

    // rows: (poolKey, pathKey, serializedPath, lhs, rhs)
    val grouped = ds
      .groupByKey { case (lhs, rhs) =>
        if (byStructure) Structure.ofTransformation(lhs, rhs) else ""
      }
      .flatMapGroups { (poolKey, it) =>
        val pool   = it.map { case (l, r) => Trans(l, r) }.toVector
        val groups = Pivot.groupByPrograms(pool, bcCfg.value, bcFreq.value)
        groups.iterator.flatMap { g =>
          val ser = serializePath(g.path)
          g.members.iterator.map(m => (poolKey, g.pathKey, ser, m.lhs, m.rhs))
        }
      }

    // The shuffled byte size of the pools is tiny, so AQE would coalesce all
    // structure groups into one task and serialize the CPU-bound pivot
    // searches; keep the partitions so pools run in parallel.
    val coalesceKey = "spark.sql.adaptive.coalescePartitions.enabled"
    val prev = spark.conf.getOption(coalesceKey)
    val rows =
      try {
        spark.conf.set(coalesceKey, "false")
        grouped.collect()
      } finally prev match {
        case Some(v) => spark.conf.set(coalesceKey, v)
        case None    => spark.conf.unset(coalesceKey)
      }

    rows.groupBy(r => (r._1, r._2)).toVector.sortBy(_._1).map { case ((poolKey, pathKey), ms) =>
      val path = deserializePath(ms.head._3)
      RuleGroup(
        id = s"prog:${poolKey.length}:$poolKey:$pathKey",
        structKey = if (byStructure) Some(poolKey) else None,
        path = Some(path),
        members = ms.toVector.map(r => Trans(r._4, r._5)).sortBy(tr => (tr.lhs, tr.rhs)),
      )
    }
  }

  def serializePath(path: Vector[Label]): Array[Byte] = {
    val bos = new java.io.ByteArrayOutputStream()
    val oos = new java.io.ObjectOutputStream(bos)
    oos.writeObject(path); oos.close()
    bos.toByteArray
  }

  def deserializePath(bytes: Array[Byte]): Vector[Label] = {
    val ois = new java.io.ObjectInputStream(new java.io.ByteArrayInputStream(bytes))
    try ois.readObject().asInstanceOf[Vector[Label]] finally ois.close()
  }

  /** Rank groups by aggregate frequency, descending (Section 6): the sum of
    * member rule frequencies, where a rule's frequency is the larger of its
    * two replacement-set sizes.
    */
  def rank(groups: Seq[RuleGroup], catalog: Map[RuleKey, MatchingRule]): Vector[RuleGroup] =
    groups.toVector.sortBy { g =>
      (-g.members.map(m => catalog.get(m.key).map(_.frequency).getOrElse(0)).sum, g.id)
    }
}
