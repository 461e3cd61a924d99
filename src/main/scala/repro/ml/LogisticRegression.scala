package repro.ml

/** L2-regularized logistic regression trained with full-batch Adam
  * (eta = .001, beta1 = .9, beta2 = .999 — the paper's optimizer settings).
  */
final case class LogisticRegression(
    epochs: Int = 400,
    lr: Double = 0.05,
    l2: Double = 1e-3,
) extends Classifier {
  override def name: String = "LogReg"

  override def train(xs: Seq[Array[Double]], ys: Seq[Boolean], seed: Long): TrainedModel = {
    require(xs.nonEmpty && xs.length == ys.length, "bad training data")
    if (ys.forall(identity) || !ys.exists(identity))
      return ConstantModel(ys.count(identity).toDouble / ys.length)
    val d = xs.head.length
    val w = new Array[Double](d + 1) // last slot is the bias
    val grad = new Array[Double](d + 1)
    val adam = new repro.nn.Adam(d + 1, lr)
    val n = xs.length
    for (_ <- 0 until epochs) {
      java.util.Arrays.fill(grad, 0.0)
      var i = 0
      while (i < n) {
        val x = xs(i)
        val p = sigmoid(dot(w, x))
        val err = p - (if (ys(i)) 1.0 else 0.0)
        var j = 0
        while (j < d) { grad(j) += err * x(j) / n; j += 1 }
        grad(d) += err / n
        i += 1
      }
      var j = 0
      while (j < d) { grad(j) += l2 * w(j); j += 1 }
      adam.step(w, grad)
    }
    LogisticModel(w.clone())
  }

  private def dot(w: Array[Double], x: Array[Double]): Double = {
    var s = w(x.length); var j = 0
    while (j < x.length) { s += w(j) * x(j); j += 1 }
    s
  }
  private def sigmoid(z: Double): Double = 1.0 / (1.0 + math.exp(-z))
}

final case class LogisticModel(w: Array[Double]) extends TrainedModel {
  override def proba(x: Array[Double]): Double = {
    require(x.length == w.length - 1, "dim mismatch")
    var s = w(x.length); var j = 0
    while (j < x.length) { s += w(j) * x(j); j += 1 }
    1.0 / (1.0 + math.exp(-s))
  }
}
