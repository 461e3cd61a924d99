package repro.ml

/** A fitted binary classifier: maps a feature vector to P(label = true). */
trait TrainedModel extends Serializable {
  def proba(x: Array[Double]): Double
  def predict(x: Array[Double]): Boolean = proba(x) >= 0.5
}

/** A trainable binary classifier. Training is deterministic in `seed`. */
trait Classifier extends Serializable {
  def name: String
  def train(xs: Seq[Array[Double]], ys: Seq[Boolean], seed: Long): TrainedModel
}

/** Constant-probability model — the fallback when training labels are
  * single-class (a degenerate fold); also useful in tests.
  */
final case class ConstantModel(p: Double) extends TrainedModel {
  override def proba(x: Array[Double]): Double = p
}
