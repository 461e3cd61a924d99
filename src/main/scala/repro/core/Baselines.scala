package repro.core

import repro.ml.Stats

/** The seven baselines of Section IV-B2. Each returns per-matcher
  * predictions over the same four labels MExI predicts.
  */
object Baselines {

  /** Rand: uniformly random labels. */
  def rand(testIds: Seq[Long], seed: Long): Map[Long, Array[Boolean]] = {
    val rnd = new java.util.Random(seed)
    testIds.map(id => id -> Array.fill(Labels.Count)(rnd.nextBoolean())).toMap
  }

  /** Rand_Freq: labels drawn with the training-set marginal frequency. */
  def randFreq(trainLabels: Iterable[Array[Boolean]], testIds: Seq[Long],
               seed: Long): Map[Long, Array[Boolean]] = {
    require(trainLabels.nonEmpty, "empty training labels")
    val n = trainLabels.size
    val freq = Array.tabulate(Labels.Count)(l =>
      trainLabels.count(_(l)).toDouble / n)
    val rnd = new java.util.Random(seed)
    testIds.map(id =>
      id -> Array.tabulate(Labels.Count)(l => rnd.nextDouble() < freq(l))).toMap
  }

  /** Conf (Oyama et al.): trust the reported confidence — a matcher whose
    * mean confidence exceeds the training median is declared expert on
    * every dimension.
    */
  def conf(meanConf: Map[Long, Double], trainIds: Seq[Long],
           testIds: Seq[Long]): Map[Long, Array[Boolean]] = {
    val thr = Stats.percentile(trainIds.map(meanConf), 50)
    testIds.map { id =>
      val e = meanConf(id) > thr
      id -> Array.fill(Labels.Count)(e)
    }.toMap
  }

  /** Qual. Test (Zhang et al.): judge each dimension from the warm-up
    * phase performance, using the train-population thresholds. The warm-up
    * sample is too small for a significance test, so resolution uses the
    * threshold alone.
    */
  def qualTest(warmupMeasures: Map[Long, MatcherMeasures], testIds: Seq[Long],
               t: Thresholds): Map[Long, Array[Boolean]] =
    testIds.map { id =>
      val m = warmupMeasures(id)
      id -> Array(
        m.precision > t.dP,
        m.recall > t.dR,
        m.resolution > t.dRes,
        math.abs(m.calibration) < t.dCal,
      )
    }.toMap

  /** Self-Assess (Gadiraju et al.): the paper's pre-selection rule —
    * |Cal| < 0.2 and P > 0.6 during the warm-up marks an expert (on every
    * dimension).
    */
  def selfAssess(warmupMeasures: Map[Long, MatcherMeasures],
                 testIds: Seq[Long]): Map[Long, Array[Boolean]] =
    testIds.map { id =>
      val m = warmupMeasures(id)
      val e = math.abs(m.calibration) < 0.2 && m.precision > 0.6
      id -> Array.fill(Labels.Count)(e)
    }.toMap
}
