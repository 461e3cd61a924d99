package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.synth.StudyData

/** Cached per-study Spark state shared by every fold of an experiment:
  * the decision/mouse/reference DataFrames, per-matcher measures, base
  * features and heat maps — none of which depend on the train/test split.
  */
final class StudyHandle(val spark: SparkSession, val study: StudyData) {

  val decisions: DataFrame = study.decisionsDf(spark).cache()
  val mouse: DataFrame = study.mouseDf(spark).cache()
  val reference: DataFrame = study.referenceDf(spark).cache()
  val warmup: DataFrame = study.warmupDf(spark).cache()

  val matcherIds: Vector[Long] = study.traits.map(_.matcherId)

  /** Histories grouped per matcher (decision order), for window slicing. */
  lazy val historyByMatcher: Map[Long, Vector[Decision]] =
    study.decisions.groupBy(_.matcherId).view.mapValues(_.sortBy(_.seq)).toMap

  lazy val mouseByMatcher: Map[Long, Vector[MouseEvent]] =
    study.mouse.groupBy(_.matcherId).view.mapValues(_.sortBy(_.ts)).toMap

  /** Main-task measures per matcher (Section II-B). */
  lazy val measures: Map[Long, MatcherMeasures] =
    Measures.compute(spark, decisions, reference, study.task.reference.size)
      .map(m => m.matcherId -> m).toMap

  /** Warm-up measures per matcher, for the Qual. Test / Self-Assess
    * baselines (Section IV-B2).
    */
  lazy val warmupMeasures: Map[Long, MatcherMeasures] = {
    import spark.implicits._
    val ref = study.warmupTask.reference.toDF()
    Measures.compute(spark, warmup, ref, study.warmupTask.reference.size)
      .map(m => m.matcherId -> m).toMap
  }

  /** Phi_LRSM + Phi_Beh + Phi_Mou for the full matchers of this study. */
  lazy val baseFeatures: FeatureTable =
    StudyHandle.baseFeatures(decisions, mouse, study.task.nA, study.task.nB)

  /** Down-sampled heat maps per (matcher, event type). */
  lazy val heatMaps: Map[(Long, String), Array[Array[Double]]] =
    HeatMap.build(spark, mouse, study.task.screenW, study.task.screenH)

  /** Mean reported confidence per matcher (the Conf baseline's score). */
  lazy val meanConf: Map[Long, Double] =
    decisions.groupBy("matcherId").agg(avg("conf").as("c")).collect()
      .map(r => r.getAs[Long]("matcherId") -> r.getAs[Double]("c")).toMap
}

object StudyHandle {

  /** Joins the three aggregated feature sets into one driver-side table.
    * Exposed so sub-matcher entity DataFrames reuse the same extraction.
    */
  def baseFeatures(decisions: DataFrame, mouse: DataFrame, nA: Int, nB: Int): FeatureTable = {
    val lrsm = Predictors.features(decisions, nA, nB)
    val beh = BehavioralFeatures.features(decisions)
    val mou = MouseFeatures.features(mouse)
    val joined = lrsm.join(beh, Seq("matcherId"), "outer")
      .join(mou, Seq("matcherId"), "outer")
    val names = Predictors.names ++ BehavioralFeatures.names ++ MouseFeatures.names
    val rows = joined.na.fill(0.0).collect().map { r =>
      r.getAs[Long]("matcherId") -> names.map(n => r.getAs[Double](n)).toArray
    }.toMap
    FeatureTable(names, rows)
  }
}
