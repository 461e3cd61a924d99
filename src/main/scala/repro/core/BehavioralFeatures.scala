package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Phi_Beh: aggregated behavioral features over the decision history H
  * (Section III-A, "Aggregated features"): confidence aggregates, decision
  * times, and the number of changed matching decisions — all as plain
  * relational aggregations so they are oracle-checkable.
  */
object BehavioralFeatures {

  val names: Vector[String] = Vector(
    "beh_count", "beh_distinctCorr", "beh_mindChanges",
    "beh_avgConf", "beh_stdConf", "beh_minConf", "beh_maxConf",
    "beh_avgTime", "beh_maxTime", "beh_stdTime", "beh_totalTime",
    "beh_confSlope", "beh_gapSlope",
  )

  /** One row per matcher, one column per feature. Slopes are least-squares
    * trends of confidence (and inter-decision gap) over the decision index
    * — computed relationally as cov(seq, y) / var(seq).
    */
  def features(decisions: DataFrame): DataFrame = {
    val w = Window.partitionBy("matcherId").orderBy("seq")
    val withGap = decisions
      .withColumn("gap", col("ts") - lag("ts", 1).over(w))

    def slope(y: String): org.apache.spark.sql.Column = {
      val cov = avg(col("seq") * col(y)) - avg("seq") * avg(col(y))
      val varSeq = avg(col("seq") * col("seq")) - avg("seq") * avg("seq")
      when(varSeq > 0, cov / varSeq).otherwise(0.0)
    }

    withGap.groupBy("matcherId").agg(
      count(lit(1)).cast("double").as("beh_count"),
      countDistinct(col("aIdx"), col("bIdx")).cast("double").as("beh_distinctCorr"),
      (count(lit(1)) - countDistinct(col("aIdx"), col("bIdx")))
        .cast("double").as("beh_mindChanges"),
      avg("conf").as("beh_avgConf"),
      coalesce(stddev_samp(col("conf")), lit(0.0)).as("beh_stdConf"),
      min("conf").as("beh_minConf"),
      max("conf").as("beh_maxConf"),
      coalesce(avg("gap"), lit(0.0)).as("beh_avgTime"),
      coalesce(max("gap"), lit(0.0)).as("beh_maxTime"),
      coalesce(stddev_samp(col("gap")), lit(0.0)).as("beh_stdTime"),
      (max("ts") - min("ts")).as("beh_totalTime"),
      slope("conf").as("beh_confSlope"),
      coalesce(slope("gap"), lit(0.0)).as("beh_gapSlope"),
    )
  }
}
