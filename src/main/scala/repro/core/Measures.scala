package repro.core

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.functions._
import repro.ml.Stats

/** The four expertise measures of Section II-B, computed per matcher as a
  * distributed aggregation over the decision history and reference match.
  */
object Measures {

  /** Per-matcher measures:
    *   - P (Eq. 2)  = |sigma ∩ M^e+| / |sigma| over the final matrix;
    *   - R (Eq. 3)  = |sigma ∩ M^e+| / |M^e+|;
    *   - Res (Eq. 4) = Goodman–Kruskal gamma between final-entry confidence
    *     and correctness, with its significance p-value;
    *   - Cal (Eq. 5) = mean *history* confidence − P (the paper averages
    *     over H, not over the final matrix — see Example 1).
    *
    * The gamma statistic needs all of a matcher's (conf, correct) pairs at
    * once, so it is computed inside a per-matcher aggregation over
    * `collect_list` — the rest are plain relational aggregates.
    */
  def compute(spark: SparkSession, decisions: DataFrame, reference: DataFrame,
              refSize: Long): Seq[MatcherMeasures] = {
    val finalMx = MatrixOps.withCorrect(
      MatrixOps.finalMatrix(decisions).where(col("conf") > 0.0), reference)

    val quant = finalMx.groupBy("matcherId").agg(
      count(lit(1)).as("nSigma"),
      sum(when(col("correct"), 1L).otherwise(0L)).as("nCorrect"),
      collect_list(struct(col("conf"), col("correct"))).as("pairs"),
    )
    val histConf = decisions.groupBy("matcherId")
      .agg(avg("conf").as("meanHistConf"))

    val joined = quant.join(histConf, Seq("matcherId")).collect()
    joined.toIndexedSeq.map { r =>
      val id = r.getAs[Long]("matcherId")
      val nSigma = r.getAs[Long]("nSigma")
      val nCorrect = r.getAs[Long]("nCorrect")
      val pairs = r.getAs[scala.collection.Seq[Row]]("pairs").toSeq
        .map(p => (p.getAs[Double]("conf"), p.getAs[Boolean]("correct")))
      val p = if (nSigma == 0) 0.0 else nCorrect.toDouble / nSigma
      val rec = if (refSize == 0) 0.0 else nCorrect.toDouble / refSize
      val (gamma, pv) = Stats.gammaTest(pairs.map(_._1), pairs.map(_._2))
      MatcherMeasures(id, p, rec, gamma, pv, r.getAs[Double]("meanHistConf") - p)
    }
  }

  /** Labels for a set of matchers under train-derived thresholds. */
  def characterize(ms: Seq[MatcherMeasures], t: Thresholds): Map[Long, Array[Boolean]] =
    ms.map(m => m.matcherId -> MatcherMeasures.labels(m, t)).toMap
}
