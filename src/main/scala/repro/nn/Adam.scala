package repro.nn

/** Adam optimizer (Kingma & Ba) with the paper's settings:
  * eta = 0.001, beta1 = 0.9, beta2 = 0.999 (Section IV-B).
  * One instance owns the moment buffers for a single flat parameter vector.
  */
final class Adam(
    dim: Int,
    lr: Double = 0.001,
    beta1: Double = 0.9,
    beta2: Double = 0.999,
    eps: Double = 1e-8,
) extends Serializable {
  private val m = new Array[Double](dim)
  private val v = new Array[Double](dim)
  private var t = 0

  /** In-place update of `w` from `grad`; both must have length `dim`. */
  def step(w: Array[Double], grad: Array[Double]): Unit = {
    require(w.length == dim && grad.length == dim, "Adam dim mismatch")
    t += 1
    val bc1 = 1.0 - math.pow(beta1, t)
    val bc2 = 1.0 - math.pow(beta2, t)
    var i = 0
    while (i < dim) {
      m(i) = beta1 * m(i) + (1 - beta1) * grad(i)
      v(i) = beta2 * v(i) + (1 - beta2) * grad(i) * grad(i)
      w(i) -= lr * (m(i) / bc1) / (math.sqrt(v(i) / bc2) + eps)
      i += 1
    }
  }
}
