package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Truth-discovery substrate: majority consensus (MC). For each cluster the
  * golden value is the most frequent attribute value; a frequency tie means
  * MC cannot produce a golden value (Section 7.5) — the golden column is
  * NULL in that case.
  */
object Consensus {

  /** `clusters`: (cluster LONG, recordId LONG, value STRING) →
    * (cluster LONG, golden STRING nullable).
    */
  def majority(spark: SparkSession, clusters: DataFrame): DataFrame = {
    val counts = clusters.groupBy("cluster", "value").agg(count(lit(1)).as("cnt"))
    val w      = Window.partitionBy("cluster")
    counts
      .withColumn("maxCnt", max(col("cnt")).over(w))
      .where(col("cnt") === col("maxCnt"))
      .groupBy("cluster")
      .agg(
        when(count(lit(1)) === 1, min(col("value"))).otherwise(lit(null)).as("golden")
      )
  }
}
