package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Phi_Mou: aggregated movement features over the mouse map G, following
  * the crowd-behavior literature the paper cites (Rzeszotarski & Kittur;
  * Goyal et al.): path length, per-event-type counts, screen-position
  * statistics and speed.
  */
object MouseFeatures {

  val names: Vector[String] = Vector(
    "mou_total", "mou_moves", "mou_lefts", "mou_rights", "mou_scrolls",
    "mou_scrollRatio", "mou_totalLength", "mou_avgX", "mou_avgY",
    "mou_stdX", "mou_stdY", "mou_totalTime", "mou_avgSpeed",
  )

  /** One row per matcher, one column per feature. Path length is the sum
    * of Euclidean steps between consecutive events in time order.
    */
  def features(mouse: DataFrame): DataFrame = {
    val w = Window.partitionBy("matcherId").orderBy("ts", "x", "y")
    val withStep = mouse
      .withColumn("dx", col("x") - lag("x", 1).over(w))
      .withColumn("dy", col("y") - lag("y", 1).over(w))
      .withColumn("step", sqrt(col("dx") * col("dx") + col("dy") * col("dy")))

    def cnt(kind: String) =
      sum(when(col("kind") === kind, 1L).otherwise(0L)).cast("double")

    withStep.groupBy("matcherId").agg(
      count(lit(1)).cast("double").as("mou_total"),
      cnt(MouseKinds.Move).as("mou_moves"),
      cnt(MouseKinds.Left).as("mou_lefts"),
      cnt(MouseKinds.Right).as("mou_rights"),
      cnt(MouseKinds.Scroll).as("mou_scrolls"),
      (cnt(MouseKinds.Scroll) / count(lit(1))).as("mou_scrollRatio"),
      coalesce(sum("step"), lit(0.0)).as("mou_totalLength"),
      avg("x").as("mou_avgX"),
      avg("y").as("mou_avgY"),
      coalesce(stddev_samp(col("x")), lit(0.0)).as("mou_stdX"),
      coalesce(stddev_samp(col("y")), lit(0.0)).as("mou_stdY"),
      (max("ts") - min("ts")).as("mou_totalTime"),
      (coalesce(sum("step"), lit(0.0)) / (max("ts") - min("ts") + lit(1.0)))
        .as("mou_avgSpeed"),
    )
  }
}
