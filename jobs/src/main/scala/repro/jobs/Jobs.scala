package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.Experiments

/** Shared session setup for the spark-submit entrypoints. Mirrors the test
  * harness: local master, broadcast joins disabled so the shuffle paths are
  * exercised.
  */
object Jobs {
  def session(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  /** Datasets at the SF multiplier passed as the job's first argument. */
  def specs(args: Array[String]): Seq[Experiments.DatasetSpec] = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    Experiments.benchDatasets().map(s => s.copy(sf = s.sf * scale))
  }
}

/** spark-submit entrypoint reproducing Table 6 (dataset details). */
object Table6Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-table6")
    println(Experiments.table6(spark, Jobs.specs(args)))
    spark.stop()
  }
}

/** spark-submit entrypoint reproducing Table 4 (aggregation time). */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-table4")
    Experiments.warmup(spark)
    println(Experiments.table4(spark, Jobs.specs(args)))
    spark.stop()
  }
}

/** spark-submit entrypoint reproducing Table 5 (MC precision before/after). */
object Table5Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-table5")
    Experiments.warmup(spark)
    println(Experiments.table5(spark, Jobs.specs(args)))
    spark.stop()
  }
}

/** spark-submit entrypoint reproducing Table 7 (selection-method times). */
object Table7Job {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-table7")
    Experiments.warmup(spark)
    println(Experiments.table7(spark, Jobs.specs(args)))
    spark.stop()
  }
}

/** spark-submit entrypoint for the Figure 3-5 companion data. */
object CurvesJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-curves")
    Experiments.warmup(spark)
    println(Experiments.curvesAggregation(spark, Jobs.specs(args)))
    println(Experiments.curvesSelectionAffix(spark, Jobs.specs(args)))
    spark.stop()
  }
}

/** spark-submit entrypoint for the Figure 7 companion data. */
object PruningJob {
  def main(args: Array[String]): Unit = {
    val spark = Jobs.session("repro-pruning")
    Experiments.warmup(spark)
    val small = Experiments.benchDatasets(authorSf = 0.02, addressSf = 0.04, journalSf = 0.04)
    println(Experiments.pruning(spark, small))
    spark.stop()
  }
}
