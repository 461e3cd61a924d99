package repro.ml

/** CART-style binary classification tree with Gini impurity.
  *
  * `featureSubset` (if set) draws that many candidate features uniformly at
  * each split — the randomization used by [[RandomForest]].
  */
final case class DecisionTree(
    maxDepth: Int = 6,
    minLeaf: Int = 2,
    featureSubset: Option[Int] = None,
) extends Classifier {
  override def name: String = "DecisionTree"

  override def train(xs: Seq[Array[Double]], ys: Seq[Boolean], seed: Long): TrainedModel = {
    require(xs.nonEmpty && xs.length == ys.length, "bad training data")
    val rnd = new java.util.Random(seed)
    TreeModel(grow(xs.toIndexedSeq, ys.toIndexedSeq, xs.indices.toArray, 0, rnd))
  }

  private def gini(pos: Int, n: Int): Double = {
    if (n == 0) return 0.0
    val p = pos.toDouble / n
    2.0 * p * (1.0 - p)
  }

  private def grow(xs: IndexedSeq[Array[Double]], ys: IndexedSeq[Boolean],
                   idx: Array[Int], depth: Int, rnd: java.util.Random): TreeNode = {
    val pos = idx.count(ys)
    val prob = pos.toDouble / idx.length
    if (depth >= maxDepth || idx.length < 2 * minLeaf || pos == 0 || pos == idx.length)
      return Leaf(prob)

    val d = xs.head.length
    val feats: Seq[Int] = featureSubset match {
      case Some(k) =>
        val all = rnd.ints(0, d).distinct().limit(math.min(k, d).toLong).toArray
        all.toIndexedSeq
      case None => 0 until d
    }

    var bestGain = 1e-12
    var bestFeat = -1
    var bestThr = 0.0
    val parentImp = gini(pos, idx.length)
    for (f <- feats) {
      val sorted = idx.sortBy(xs(_)(f))
      var leftPos = 0
      for (k <- 0 until sorted.length - 1) {
        if (ys(sorted(k))) leftPos += 1
        val vLo = xs(sorted(k))(f); val vHi = xs(sorted(k + 1))(f)
        if (vHi > vLo && k + 1 >= minLeaf && sorted.length - k - 1 >= minLeaf) {
          val nL = k + 1; val nR = sorted.length - nL
          val imp = (nL * gini(leftPos, nL) + nR * gini(pos - leftPos, nR)) / sorted.length
          val gain = parentImp - imp
          if (gain > bestGain) {
            bestGain = gain; bestFeat = f; bestThr = (vLo + vHi) / 2.0
          }
        }
      }
    }
    if (bestFeat < 0) return Leaf(prob)
    val (l, r) = idx.partition(xs(_)(bestFeat) <= bestThr)
    if (l.isEmpty || r.isEmpty) return Leaf(prob)
    Split(bestFeat, bestThr, grow(xs, ys, l, depth + 1, rnd), grow(xs, ys, r, depth + 1, rnd))
  }
}

sealed trait TreeNode extends Serializable
final case class Leaf(p: Double) extends TreeNode
final case class Split(feat: Int, thr: Double, left: TreeNode, right: TreeNode) extends TreeNode

final case class TreeModel(root: TreeNode) extends TrainedModel {
  override def proba(x: Array[Double]): Double = {
    @annotation.tailrec
    def walk(n: TreeNode): Double = n match {
      case Leaf(p)                => p
      case Split(f, t, l, r)      => walk(if (x(f) <= t) l else r)
    }
    walk(root)
  }
}
