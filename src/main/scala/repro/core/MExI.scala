package repro.core

import org.apache.spark.sql.SparkSession
import repro.ml.{Metrics, ModelSelection, Standardizer, TrainedModel}
import repro.nn.Cnn

/** The MExI learning framework (Section III): feature extraction with
  * sub-matcher augmentation, late-fusion neural features, per-label
  * classifier selection, and the accuracy evaluation of Section IV-B3.
  */
object MExI {

  /** Window-size recipes of the paper's three variants (Section IV-B1):
    * MExI_0 (no augmentation), MExI_50 (windows of 50 decisions) and
    * MExI_70 (windows of 30, 40, ..., 70 decisions).
    */
  val VariantNone: Seq[Int] = Seq.empty
  val Variant50: Seq[Int] = Seq(50)
  val Variant70: Seq[Int] = Seq(30, 40, 50, 60, 70)

  /** One sub-matcher: `size` consecutive decisions of `matcherId` starting
    * at decision index `start`, exposed under the synthetic `entityId`.
    */
  final case class WindowSpec(entityId: Long, matcherId: Long, start: Int, size: Int)

  /** Accuracy row of tables II/III. */
  final case class Accuracies(aP: Double, aR: Double, aRes: Double,
                              aCal: Double, aML: Double) {
    def toSeq: Seq[Double] = Seq(aP, aR, aRes, aCal, aML)
  }

  /** Everything `fit` needs: feature rows with labels for the training
    * and test matchers, plus the trained CNNs so callers can share them
    * across variants of the same fold. `nLstmTrainSeqs` records how many
    * sequences (matchers + sub-matchers) the LSTMs saw — the knob the
    * augmentation variants turn.
    */
  final case class Prepared(
      names: Vector[String],
      trainIds: Vector[Long],
      testIds: Vector[Long],
      features: FeatureTable,
      trainLabels: Map[Long, Array[Boolean]],
      testLabels: Map[Long, Array[Boolean]],
      thresholds: Thresholds,
      cnns: Map[(String, Int), Cnn],
      nLstmTrainSeqs: Int,
  )

  /** A fitted MExI: per-label (classifier name, model) over standardized
    * features, with its test predictions and accuracies.
    */
  final case class FitResult(
      predictions: Map[Long, Array[Boolean]],
      accuracies: Accuracies,
      models: Array[(String, TrainedModel)],
      standardizer: Standardizer,
      names: Vector[String],
  )

  /** Sub-matcher windows for the given sizes (stride = 3 decisions, full
    * windows only). Matchers shorter than a size contribute no window of
    * that size — they still participate as full matchers.
    */
  val WindowStride = 3

  def windows(histories: Map[Long, Vector[Decision]], matcherIds: Seq[Long],
              sizes: Seq[Int], idBase: Long = 1000000L): Vector[WindowSpec] = {
    val out = Vector.newBuilder[WindowSpec]
    var next = idBase
    for (m <- matcherIds; size <- sizes) {
      val n = histories.get(m).map(_.length).getOrElse(0)
      var start = 0
      while (start + size <= n) {
        out += WindowSpec(next, m, start, size)
        next += 1
        start += WindowStride
      }
    }
    out.result()
  }

  /** Materializes sub-matcher histories/mouse-streams under their entity
    * ids. Decision `seq` restarts at 0 inside a window; timestamps stay
    * absolute (features only use gaps and spans). Mouse events are those
    * within the window's time range.
    */
  def sliceEntities(specs: Seq[WindowSpec],
                    histories: Map[Long, Vector[Decision]],
                    mouse: Map[Long, Vector[MouseEvent]])
      : (Vector[Decision], Vector[MouseEvent]) = {
    val decs = Vector.newBuilder[Decision]
    val mice = Vector.newBuilder[MouseEvent]
    for (s <- specs) {
      val h = histories(s.matcherId).slice(s.start, s.start + s.size)
      h.zipWithIndex.foreach { case (d, i) =>
        decs += d.copy(matcherId = s.entityId, seq = i)
      }
      val t0 = h.head.ts; val t1 = h.last.ts
      mouse.getOrElse(s.matcherId, Vector.empty).foreach { e =>
        if (e.ts >= t0 - 1e-9 && e.ts <= t1 + 1e-9) mice += e.copy(matcherId = s.entityId)
      }
    }
    (decs.result(), mice.result())
  }

  /** Builds the full training/testing feature tables and labels for one
    * experiment split.
    *
    * @param trainH      study providing the training matchers
    * @param testH       study providing the test matchers (same handle for
    *                    the 5-fold PO experiment; the OAEI handle for IIb)
    * @param windowSizes sub-matcher recipe (VariantNone/50/70)
    * @param sharedCnns  CNNs trained earlier on the same fold, if any —
    *                    they only depend on (trainIds, labels), not on the
    *                    augmentation variant
    */
  def prepare(spark: SparkSession,
              trainH: StudyHandle, trainIds: Vector[Long],
              testH: StudyHandle, testIds: Vector[Long],
              windowSizes: Seq[Int],
              cfg: NeuralFeatures.Config = NeuralFeatures.Config(),
              sharedCnns: Option[Map[(String, Int), Cnn]] = None,
              seed: Long = 1234L): Prepared = {
    import org.apache.spark.sql.functions.col
    import spark.implicits._

    // Measures, thresholds (train population only), labels.
    val trainMeasures = trainIds.map(trainH.measures)
    val thresholds = Thresholds.fromTrain(trainMeasures)
    val trainMatcherLabels = Measures.characterize(trainMeasures, thresholds)
    val testLabels = Measures.characterize(testIds.map(testH.measures), thresholds)

    // Sub-matcher entities: per the paper, the augmentation windows exist
    // "to ensure sufficient data for a deep network" and are used only
    // during training — they feed the LSTMs, not the final classifier.
    val specs = windows(trainH.historyByMatcher, trainIds, windowSizes)
    val (subDecs, _) = sliceEntities(specs, trainH.historyByMatcher, trainH.mouseByMatcher)
    val subDecsDf = subDecs.toDF().cache()

    // Labels of sub-matchers come from their own sub-history against the
    // train thresholds (the measures are defined on any history).
    val subLabels: Map[Long, Array[Boolean]] =
      if (specs.isEmpty) Map.empty
      else Measures.characterize(
        Measures.compute(spark, subDecsDf, trainH.reference, trainH.study.task.reference.size),
        thresholds)

    // Consensus over the training matchers' final matrices (Section III-B).
    val trainDecsDf = trainH.decisions.where(col("matcherId").isInCollection(trainIds)).cache()
    val consensus = MatrixOps.consensus(trainDecsDf).cache()

    // Base features of the train/test matchers from the study caches.
    val base: FeatureTable = FeatureTable(trainH.baseFeatures.names,
      trainH.baseFeatures.rows.view.filterKeys(trainIds.toSet).toMap ++
        testH.baseFeatures.rows.view.filterKeys(testIds.toSet).toMap)

    // Sequences for the LSTMs: train matchers + sub-matchers with the
    // train-fold consensus. Consensus is unsupervised (it never touches
    // the reference match), so test matchers on a *different* task use
    // the agreement within their own population — feeding the PO-trained
    // LSTM a pi channel on the same scale instead of all-zeros.
    val nTrain = trainIds.size
    val seqTrain = SeqFeatures.sequences(trainDecsDf, consensus, nTrain) ++
      (if (specs.isEmpty) Map.empty
       else SeqFeatures.sequences(subDecsDf, consensus, nTrain))
    val testDecsDf = testH.decisions.where(col("matcherId").isInCollection(testIds))
    val seqTest =
      if (testH eq trainH) SeqFeatures.sequences(testDecsDf, consensus, nTrain)
      else SeqFeatures.sequences(testDecsDf, MatrixOps.consensus(testDecsDf), testIds.size)
    val seqs = seqTrain ++ seqTest

    // Neural models: LSTMs on matchers + windows; CNNs on training
    // matchers only (shared across variants of the same fold).
    val lstmTrainIds = trainIds ++ specs.map(_.entityId)
    val lstmLabels = trainMatcherLabels ++ subLabels
    val lstms = NeuralFeatures.trainLstms(seqTrain, lstmLabels, lstmTrainIds, cfg, seed)
    val cnns = sharedCnns.getOrElse(
      NeuralFeatures.trainCnns(trainH.heatMaps, trainMatcherLabels, trainIds, cfg, seed))

    def mapsOf(id: Long) = if (trainIds.contains(id)) trainH.heatMaps else testH.heatMaps

    val allIds = trainIds ++ testIds
    val neural = FeatureTable(
      NeuralFeatures.seqNames ++ NeuralFeatures.spaNames,
      allIds.map { id =>
        id -> (NeuralFeatures.seqVector(lstms, seqs.getOrElse(id, IndexedSeq.empty)) ++
          NeuralFeatures.spaVector(cnns, mapsOf(id), id))
      }.toMap)

    subDecsDf.unpersist(); trainDecsDf.unpersist(); consensus.unpersist()

    Prepared(base.names ++ neural.names, trainIds, testIds,
      base ++ neural, trainMatcherLabels, testLabels, thresholds, cnns,
      nLstmTrainSeqs = lstmTrainIds.size)
  }

  /** Trains the per-label binary-relevance classifiers over the selected
    * feature groups and evaluates on the test matchers.
    */
  def fit(p: Prepared, groups: Set[String] = FeatureTable.AllGroups,
          seed: Long = 99L): FitResult = {
    val table = p.features.select(groups)
    val std = Standardizer.fit(p.trainIds.map(table.vector))
    val trainX = p.trainIds.map(id => std.transform(table.vector(id))).toIndexedSeq
    val testX = p.testIds.map(id => std.transform(table.vector(id))).toIndexedSeq

    val models = Array.tabulate(Labels.Count) { l =>
      val y = p.trainIds.map(id => p.trainLabels(id)(l)).toIndexedSeq
      ModelSelection.selectAndTrain(trainX, y, seed = seed + l)
    }
    val preds = p.testIds.zipWithIndex.map { case (id, i) =>
      id -> models.map(_._2.predict(testX(i)))
    }.toMap
    FitResult(preds, evaluate(preds, p.testLabels), models, std, table.names)
  }

  /** Accuracies of a prediction set against ground-truth labels. */
  def evaluate(pred: Map[Long, Array[Boolean]],
               truth: Map[Long, Array[Boolean]]): Accuracies = {
    val ids = truth.keys.toVector.sorted
    val t = ids.map(truth)
    val q = ids.map(pred)
    Accuracies(
      Metrics.singleAccuracy(t, q, Labels.Precise),
      Metrics.singleAccuracy(t, q, Labels.Thorough),
      Metrics.singleAccuracy(t, q, Labels.Correlated),
      Metrics.singleAccuracy(t, q, Labels.Calibrated),
      Metrics.multiLabelAccuracy(t, q),
    )
  }
}
