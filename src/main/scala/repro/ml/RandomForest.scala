package repro.ml

/** Random forest: bagged CART trees with sqrt(d) feature subsampling.
  * The probability is the mean of per-tree leaf probabilities.
  */
final case class RandomForest(
    nTrees: Int = 60,
    maxDepth: Int = 6,
    minLeaf: Int = 2,
) extends Classifier {
  override def name: String = "RandomForest"

  override def train(xs: Seq[Array[Double]], ys: Seq[Boolean], seed: Long): TrainedModel = {
    require(xs.nonEmpty && xs.length == ys.length, "bad training data")
    if (ys.forall(identity) || !ys.exists(identity))
      return ConstantModel(ys.count(identity).toDouble / ys.length)
    val xi = xs.toIndexedSeq; val yi = ys.toIndexedSeq
    val d = xs.head.length
    val k = math.max(1, math.round(math.sqrt(d.toDouble)).toInt)
    val rnd = new java.util.Random(seed)
    val trees = (0 until nTrees).map { t =>
      val bootRnd = new java.util.Random(rnd.nextLong())
      val idx = Array.fill(xi.length)(bootRnd.nextInt(xi.length))
      val bx = idx.toIndexedSeq.map(xi)
      val by = idx.toIndexedSeq.map(yi)
      DecisionTree(maxDepth, minLeaf, Some(k)).train(bx, by, bootRnd.nextLong())
    }
    ForestModel(trees.toVector)
  }
}

final case class ForestModel(trees: Vector[TrainedModel]) extends TrainedModel {
  override def proba(x: Array[Double]): Double =
    trees.map(_.proba(x)).sum / trees.length
}
