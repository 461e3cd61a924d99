package repro.core

import repro.SparkSpec

class SeqFeaturesSpec extends SparkSpec {
  import spark.implicits._

  private def decisions = Seq(
    Decision(1L, 0, 0, 0, 0.9, 10.0),
    Decision(1L, 1, 1, 1, 0.5, 40.0),
    Decision(1L, 2, 2, 2, 0.3, 130.0),
  ).toDF()

  private def consensus = Seq((0, 0, 5L), (1, 1, 1L)).toDF("aIdx", "bIdx", "consensus")

  test("sequences are ordered by decision index with 3 channels") {
    val s = SeqFeatures.sequences(decisions, consensus, nTrainMatchers = 10)(1L)
    assert(s.length === 3)
    assert(s.forall(_.length === SeqFeatures.FeatureDim))
    assert(s.map(_(0)).toSeq === Seq(0.9, 0.5, 0.3))
  }

  test("gap channel is the clipped, normalized inter-decision time") {
    val s = SeqFeatures.sequences(decisions, consensus, 10)(1L)
    assert(s(0)(1) === 0.0)                         // first decision: no gap
    assert(math.abs(s(1)(1) - 30.0 / 60.0) < 1e-12) // 30s gap
    assert(s(2)(1) === 1.0)                         // 90s clipped to 60
  }

  test("consensus channel normalizes by the training population") {
    val s = SeqFeatures.sequences(decisions, consensus, 10)(1L)
    assert(math.abs(s(0)(2) - 0.5) < 1e-12)
    assert(math.abs(s(1)(2) - 0.1) < 1e-12)
    assert(s(2)(2) === 0.0) // pair unseen by the training population
  }

  test("multiple matchers are returned separately") {
    val two = decisions.union(Seq(Decision(2L, 0, 0, 0, 0.7, 1.0)).toDF())
    val m = SeqFeatures.sequences(two, consensus, 10)
    assert(m.keySet === Set(1L, 2L))
    assert(m(2L).length === 1)
  }
}
