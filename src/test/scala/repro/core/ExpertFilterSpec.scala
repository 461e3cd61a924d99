package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.ml.{ConstantModel, Standardizer}
import repro.synth.MatcherSim

class ExpertFilterSpec extends SparkSpec {
  import spark.implicits._

  private val measures = Map(
    1L -> MatcherMeasures(1L, 0.8, 0.6, 0.5, 0.01, 0.1),
    2L -> MatcherMeasures(2L, 0.4, 0.2, -0.1, 0.5, -0.3),
    3L -> MatcherMeasures(3L, 0.6, 0.4, 0.3, 0.1, 0.2),
  )

  test("measureStats averages P, R, Res and |Cal|") {
    val (p, r, res, cal) = ExpertFilter.measureStats(measures, Seq(1L, 2L))
    assert(math.abs(p - 0.6) < 1e-12)
    assert(math.abs(r - 0.4) < 1e-12)
    assert(math.abs(res - 0.2) < 1e-12)
    assert(math.abs(cal - 0.2) < 1e-12) // (|0.1| + |-0.3|) / 2
  }

  test("measureStats on an empty subset is rejected") {
    intercept[IllegalArgumentException](ExpertFilter.measureStats(measures, Seq.empty))
  }

  test("scoreMatchers applies the broadcast model UDF per matcher") {
    val feats = Map(1L -> Array(10.0), 2L -> Array(-10.0))
    val std = Standardizer.fit(feats.values.toSeq)
    // Threshold model: positive standardized feature -> expert on all labels.
    val m = repro.ml.LogisticModel(Array(5.0, 0.0))
    val models = Array.fill(Labels.Count)(("LogReg", m: repro.ml.TrainedModel))
    val scored = ExpertFilter.scoreMatchers(spark, feats, std, models).collect()
      .map(r => r.getAs[Long]("matcherId") -> r.getAs[Boolean]("isExpert")).toMap
    assert(scored(1L) === true)
    assert(scored(2L) === false)
  }

  test("scoreMatchers requires all four labels to declare an expert") {
    val feats = Map(1L -> Array(10.0))
    val std = Standardizer.fit(Seq(Array(0.0), Array(20.0)))
    val models: Array[(String, repro.ml.TrainedModel)] = Array(
      ("c", ConstantModel(1.0)), ("c", ConstantModel(1.0)),
      ("c", ConstantModel(1.0)), ("c", ConstantModel(0.0)))
    val scored = ExpertFilter.scoreMatchers(spark, feats, std, models).collect()
    assert(scored.head.getAs[Boolean]("isExpert") === false)
  }

  private def voteDecisions = Seq(
    Decision(1L, 0, 0, 0, 0.9, 1.0),
    Decision(2L, 0, 0, 0, 0.8, 1.0),
    Decision(3L, 0, 0, 0, 0.7, 1.0),
    Decision(1L, 1, 1, 1, 0.9, 2.0),
    Decision(2L, 1, 2, 2, 0.8, 2.0),
  ).toDF()

  test("fusedMatch keeps pairs reaching the vote threshold") {
    val fused = ExpertFilter.fusedMatch(voteDecisions, Set(1L, 2L, 3L), voteFrac = 0.5)
      .collect().map(r => (r.getAs[Int]("aIdx"), r.getAs[Int]("bIdx"))).toSet
    assert(fused === Set((0, 0))) // (1,1) and (2,2) have one vote of three
  }

  test("fusedMatch only counts the selected matchers") {
    val fused = ExpertFilter.fusedMatch(voteDecisions, Set(1L), voteFrac = 0.5)
      .collect().map(r => (r.getAs[Int]("aIdx"), r.getAs[Int]("bIdx"))).toSet
    assert(fused === Set((0, 0), (1, 1)))
  }

  test("fusedQuality computes precision and recall against the reference") {
    val fused = Seq((0, 0), (5, 5)).toDF("aIdx", "bIdx")
    val ref = Seq(RefPair(0, 0), RefPair(1, 1), RefPair(2, 2), RefPair(3, 3)).toDF()
    val (p, r) = ExpertFilter.fusedQuality(fused, ref, refSize = 4)
    assert(p === 0.5 && r === 0.25)
  }

  test("oracle: vote aggregation agrees with DuckDB") {
    val d = voteDecisions.cache()
    val sparkDf = ExpertFilter.fusedMatch(d, Set(1L, 2L, 3L), 0.5)
      .select(col("aIdx").cast("string").as("aidx"),
        col("bIdx").cast("string").as("bidx"))
    Oracle.assertEquivalent(
      sparkDf,
      """SELECT aIdx AS aidx, bIdx AS bidx FROM (
        |  SELECT aIdx, bIdx, COUNT(DISTINCT matcherId) votes
        |  FROM (SELECT *, ROW_NUMBER() OVER (
        |          PARTITION BY matcherId, aIdx, bIdx
        |          ORDER BY CAST(ts AS DOUBLE) DESC) rn FROM decisions)
        |  WHERE rn = 1 AND CAST(conf AS DOUBLE) > 0
        |  GROUP BY aIdx, bIdx)
        |WHERE votes >= 2""".stripMargin,
      "decisions" -> d,
    )
  }

  test("truncateStudy keeps the first k decisions and trims the mouse") {
    val study = MatcherSim.poStudy(nMatchers = 4, seed = 3L)
    val cut = ExpertFilter.truncateStudy(study, k = 10)
    val byM = cut.decisions.groupBy(_.matcherId)
    byM.values.foreach(h => assert(h.size <= 10))
    // No mouse event after a matcher's 10th decision.
    val cutoff = byM.view.mapValues(_.map(_.ts).max).toMap
    cut.mouse.foreach(e => assert(e.ts <= cutoff(e.matcherId) + 1e-9))
    // Traits and tasks are preserved.
    assert(cut.task === study.task)
    assert(cut.traits === study.traits)
  }

  test("truncateStudy leaves short histories untouched") {
    val study = MatcherSim.poStudy(nMatchers = 2, seed = 4L)
    val n = study.decisions.count(_.matcherId == 0L)
    val cut = ExpertFilter.truncateStudy(study, k = 1000)
    assert(cut.decisions.count(_.matcherId == 0L) === n)
  }
}
