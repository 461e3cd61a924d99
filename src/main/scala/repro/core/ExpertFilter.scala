package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.ml.{Standardizer, TrainedModel}
import repro.synth.StudyData

/** Section IV-F: using the identified experts to improve the matching
  * outcome. This is the distributed ETL filtering stage of the paper's
  * contribution: a broadcast scoring UDF marks each matcher expert or not,
  * non-expert correspondences are filtered out, and the surviving expert
  * matrices are fused by vote aggregation into a final match.
  */
object ExpertFilter {

  /** Mean population quality of a matcher subset: (P, R, Res, |Cal|).
    * `no_filter` is the full population; lower |Cal| is better.
    */
  def measureStats(measures: Map[Long, MatcherMeasures], ids: Iterable[Long])
      : (Double, Double, Double, Double) = {
    val ms = ids.map(measures).toSeq
    require(ms.nonEmpty, "empty matcher subset")
    (ms.map(_.precision).sum / ms.size,
      ms.map(_.recall).sum / ms.size,
      ms.map(_.resolution).sum / ms.size,
      ms.map(m => math.abs(m.calibration)).sum / ms.size)
  }

  /** Applies a trained MExI as a broadcast scoring UDF over a feature
    * DataFrame, returning (matcherId, isExpert) — expert means positive on
    * all four characteristics, the selection used in Figure 10.
    */
  def scoreMatchers(spark: SparkSession, features: Map[Long, Array[Double]],
                    std: Standardizer, models: Array[(String, TrainedModel)]): DataFrame = {
    import spark.implicits._
    val bc = spark.sparkContext.broadcast((std, models))
    val score = udf { (fs: Seq[Double]) =>
      val (s, ms) = bc.value
      val x = s.transform(fs.toArray)
      ms.forall(_._2.predict(x))
    }
    features.toSeq.map { case (id, f) => (id, f.toSeq) }
      .toDF("matcherId", "features")
      .withColumn("isExpert", score(col("features")))
      .select("matcherId", "isExpert")
  }

  /** Fuses the matrices of the selected matchers into one final match:
    * keep every pair selected by at least `voteFrac` of them (vote
    * aggregation after the expert filter).
    */
  def fusedMatch(decisions: DataFrame, selected: Set[Long], voteFrac: Double): DataFrame = {
    require(selected.nonEmpty, "cannot fuse an empty matcher set")
    val k = selected.size
    val votesNeeded = math.max(1.0, math.ceil(voteFrac * k))
    MatrixOps.sigma(decisions.where(col("matcherId").isInCollection(selected.toSeq)))
      .groupBy("aIdx", "bIdx")
      .agg(countDistinct("matcherId").as("votes"))
      .where(col("votes") >= votesNeeded)
      .select("aIdx", "bIdx")
  }

  /** Precision/recall of a fused match against the reference. */
  def fusedQuality(fused: DataFrame, reference: DataFrame, refSize: Long): (Double, Double) = {
    val n = fused.count()
    val hit = fused.join(reference, Seq("aIdx", "bIdx")).count()
    (if (n == 0) 0.0 else hit.toDouble / n,
      if (refSize == 0) 0.0 else hit.toDouble / refSize)
  }

  /** First `k` decisions of every matcher, with the mouse stream cut at the
    * k-th decision's timestamp — the "early identification" input of
    * Figure 11 (k = 30, half the median decision count).
    */
  def truncateStudy(study: StudyData, k: Int): StudyData = {
    val byMatcher = study.decisions.groupBy(_.matcherId)
    val truncated = byMatcher.view.mapValues(_.sortBy(_.seq).take(k)).toMap
    val cutoff = truncated.view.mapValues(h => h.lastOption.map(_.ts).getOrElse(0.0)).toMap
    study.copy(
      decisions = study.decisions.filter(d => d.seq < k),
      mouse = study.mouse.filter(e => e.ts <= cutoff.getOrElse(e.matcherId, 0.0)),
    )
  }
}
