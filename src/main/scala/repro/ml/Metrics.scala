package repro.ml

/** Accuracy measures of the paper's Section IV-B3. */
object Metrics {

  /** Single-characteristic accuracy (Eq. 6): fraction of matchers whose
    * predicted label for class `c` equals the true label.
    */
  def singleAccuracy(truth: Seq[Array[Boolean]], pred: Seq[Array[Boolean]], c: Int): Double = {
    require(truth.length == pred.length && truth.nonEmpty, "label set mismatch")
    truth.zip(pred).count { case (t, p) => t(c) == p(c) }.toDouble / truth.length
  }

  /** Multi-label accuracy (Eq. 7): mean Jaccard of predicted vs true
    * positive-label sets. An empty union contributes 1 (perfect agreement
    * on "no expertise at all"), matching the usual Jaccard convention for
    * multi-label accuracy.
    */
  def multiLabelAccuracy(truth: Seq[Array[Boolean]], pred: Seq[Array[Boolean]]): Double = {
    require(truth.length == pred.length && truth.nonEmpty, "label set mismatch")
    val per = truth.zip(pred).map { case (t, p) =>
      require(t.length == p.length, "label arity mismatch")
      val inter = t.indices.count(i => t(i) && p(i))
      val union = t.indices.count(i => t(i) || p(i))
      if (union == 0) 1.0 else inter.toDouble / union
    }
    per.sum / per.length
  }
}
