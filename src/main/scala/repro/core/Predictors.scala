package repro.core

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.functions._
import repro.ml.{Pca, Stats}

/** Phi_LRSM: matching predictors computed over a matcher's matching matrix
  * (Sagi & Gal VLDBJ'13; Gal et al. TKDE'19 "learning to rerank").
  *
  * Precision-leaning predictors (dominants, best-pair averages, binary
  * matching weight) and recall/uncertainty-leaning predictors (matrix
  * norms, binarization error, PCA variance ratios) are both included, as
  * the paper uses the former for the Precision label and the latter for
  * Thoroughness (Section III-A).
  *
  * The per-matcher computation needs the whole (sparse) matrix at once, so
  * it runs as a scoring UDF over `collect_list(struct(aIdx, bIdx, conf))`
  * — the "UDF scoring before aggregation" layer of this reproduction.
  */
object Predictors {

  val names: Vector[String] = Vector(
    "lrsm_nSigma", "lrsm_rowCov", "lrsm_colCov",
    "lrsm_avgConf", "lrsm_maxConf", "lrsm_stdConf",
    "lrsm_dom", "lrsm_bpm", "lrsm_bbm", "lrsm_conflicts",
    "lrsm_norm1", "lrsm_norm2", "lrsm_normsinf",
    "lrsm_mcd", "lrsm_pca1", "lrsm_pca2",
  )

  /** Pure kernel: predictor vector for one matcher's non-zero entries. */
  def fromEntries(entries: Seq[(Int, Int, Double)], nA: Int, nB: Int): Array[Double] = {
    if (entries.isEmpty) return new Array[Double](names.length)
    val confs = entries.map(_._3)
    val rows = entries.map(_._1).distinct
    val cols = entries.map(_._2).distinct
    val rowMax = entries.groupBy(_._1).view.mapValues(_.map(_._3).max).toMap
    val colMax = entries.groupBy(_._2).view.mapValues(_.map(_._3).max).toMap

    val dom = entries.count { case (a, b, c) =>
      c >= rowMax(a) && c >= colMax(b)
    }.toDouble / entries.length
    val bpm = rowMax.values.sum / rowMax.size

    // Greedy 1:1 bipartite matching by descending confidence.
    var usedA = Set.empty[Int]; var usedB = Set.empty[Int]
    var bbmWeight = 0.0
    entries.sortBy(-_._3).foreach { case (a, b, c) =>
      if (!usedA(a) && !usedB(b)) { usedA += a; usedB += b; bbmWeight += c }
    }
    val bbm = bbmWeight / entries.length

    // 1:1-constraint violations: entries sharing a row or column with
    // another entry. Coherent (near-injective) matrices are what careful
    // matchers produce; conflicts signal imprecision.
    val rowCount = entries.groupBy(_._1).view.mapValues(_.size).toMap
    val colCount = entries.groupBy(_._2).view.mapValues(_.size).toMap
    val conflicts = entries.count { case (a, b, _) =>
      rowCount(a) > 1 || colCount(b) > 1
    }.toDouble / entries.length

    val rowSums = entries.groupBy(_._1).view.mapValues(_.map(_._3).sum)
    val colSums = entries.groupBy(_._2).view.mapValues(_.map(_._3).sum)
    val norm1 = colSums.values.max
    val normInf = rowSums.values.max
    val norm2 = math.sqrt(confs.map(c => c * c).sum)
    val mcd = confs.map(c => math.abs(c - math.round(c))).sum / confs.length

    // PCA over the dense occupied-rows x occupied-cols submatrix.
    val colIndex = cols.sorted.zipWithIndex.toMap
    val byRow = entries.groupBy(_._1)
    val dense = rows.sorted.map { a =>
      val arr = new Array[Double](cols.length)
      byRow(a).foreach { case (_, b, c) => arr(colIndex(b)) = c }
      arr
    }
    val (pca1, pca2) =
      if (dense.length < 2 || cols.length < 2) (1.0, 0.0)
      else (Pca.varianceRatio(dense, 1), Pca.varianceRatio(dense, 2))

    Array(
      entries.length.toDouble,
      rows.length.toDouble / nA,
      cols.length.toDouble / nB,
      Stats.mean(confs), confs.max, Stats.stddev(confs),
      dom, bpm, bbm, conflicts,
      norm1, norm2, normInf,
      mcd, pca1, pca2,
    )
  }

  /** DataFrame stage: one row per matcher with one column per predictor.
    * `decisions` is a history DataFrame; the matrix is first materialized
    * via Eq. 1, then scored by the predictor UDF.
    */
  def features(decisions: DataFrame, nA: Int, nB: Int): DataFrame = {
    val score = udf { (entries: Seq[Row]) =>
      fromEntries(entries.map(r => (r.getInt(0), r.getInt(1), r.getDouble(2))), nA, nB)
    }
    val grouped = MatrixOps.sigma(decisions)
      .groupBy("matcherId")
      .agg(collect_list(struct(col("aIdx"), col("bIdx"), col("conf"))).as("entries"))
      .withColumn("f", score(col("entries")))
    names.zipWithIndex.foldLeft(grouped.select(col("matcherId"), col("f"))) {
      case (df, (n, i)) => df.withColumn(n, col("f").getItem(i))
    }.drop("f")
  }
}
