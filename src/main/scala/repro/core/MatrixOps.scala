package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Matching-matrix construction and match (sigma) extraction as DataFrame
  * transformations (Section II-A2, Eq. 1).
  */
object MatrixOps {

  /** Eq. 1: the matching matrix holds the latest confidence per element
    * pair. Input: a decision-history DataFrame (matcherId, seq, aIdx, bIdx,
    * conf, ts); output: one row per (matcherId, aIdx, bIdx) with the
    * confidence of the most recent decision. Ties on ts break by seq.
    */
  def finalMatrix(decisions: DataFrame): DataFrame = {
    val w = Window.partitionBy("matcherId", "aIdx", "bIdx")
      .orderBy(col("ts").desc, col("seq").desc)
    decisions
      .withColumn("rn", row_number().over(w))
      .where(col("rn") === 1)
      .select("matcherId", "aIdx", "bIdx", "conf", "ts", "seq")
  }

  /** The match sigma: non-zero entries of the final matrix. */
  def sigma(decisions: DataFrame): DataFrame =
    finalMatrix(decisions).where(col("conf") > 0.0)

  /** Tags each final-matrix entry with membership in the reference match
    * M^e+ (column `correct`). `reference` has columns (aIdx, bIdx).
    */
  def withCorrect(finalMx: DataFrame, reference: DataFrame): DataFrame = {
    val ref = reference.select(col("aIdx"), col("bIdx"), lit(true).as("correct"))
    finalMx.join(ref, Seq("aIdx", "bIdx"), "left")
      .withColumn("correct", coalesce(col("correct"), lit(false)))
  }

  /** Consensus pi per element pair: the number of matchers (in the given
    * population — the training set, per Section III-B) whose final matrix
    * includes the pair. Output columns: aIdx, bIdx, consensus.
    */
  def consensus(decisions: DataFrame): DataFrame =
    sigma(decisions)
      .groupBy("aIdx", "bIdx")
      .agg(countDistinct("matcherId").as("consensus"))
}
