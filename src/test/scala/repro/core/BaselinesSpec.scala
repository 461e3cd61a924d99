package repro.core

import org.scalatest.funsuite.AnyFunSuite

class BaselinesSpec extends AnyFunSuite {
  private val ids = (1L to 200L).toVector

  test("rand is deterministic in the seed and covers all ids") {
    val a = Baselines.rand(ids, 7)
    val b = Baselines.rand(ids, 7)
    assert(a.keySet === ids.toSet)
    assert(ids.forall(id => a(id).toSeq === b(id).toSeq))
    assert(Baselines.rand(ids, 8).exists { case (id, v) => v.toSeq != a(id).toSeq })
  }

  test("randFreq approximates the training marginals") {
    val trainLabels = Seq.fill(80)(Array(true, false, true, false)) ++
      Seq.fill(20)(Array(false, false, true, false))
    val p = Baselines.randFreq(trainLabels, ids, 3)
    val f0 = ids.count(id => p(id)(0)).toDouble / ids.size
    assert(f0 > 0.65 && f0 < 0.95) // expected 0.8
    assert(ids.count(id => p(id)(1)) === 0)
    assert(ids.count(id => p(id)(2)) === ids.size)
  }

  test("conf thresholds at the train median and applies to all labels") {
    val meanConf = Map(1L -> 0.2, 2L -> 0.4, 3L -> 0.6, 4L -> 0.8, 5L -> 0.9)
    val pred = Baselines.conf(meanConf, trainIds = Seq(1L, 2L, 3L), testIds = Seq(4L, 5L, 1L))
    assert(pred(4L).forall(identity) && pred(5L).forall(identity))
    assert(pred(1L).forall(!_))
  }

  test("qualTest judges each dimension from warm-up measures") {
    val wm = Map(
      1L -> MatcherMeasures(1L, 0.9, 0.8, 0.7, 0.01, 0.05),
      2L -> MatcherMeasures(2L, 0.2, 0.1, -0.3, 0.5, 0.4),
    )
    val t = Thresholds(0.5, 0.5, 0.3, 0.2)
    val pred = Baselines.qualTest(wm, Seq(1L, 2L), t)
    assert(pred(1L).toSeq === Seq(true, true, true, true))
    assert(pred(2L).toSeq === Seq(false, false, false, false))
  }

  test("qualTest ignores significance (tiny warm-up sample)") {
    val wm = Map(1L -> MatcherMeasures(1L, 0.9, 0.8, 0.9, 0.99, 0.0))
    val pred = Baselines.qualTest(wm, Seq(1L), Thresholds(0.5, 0.5, 0.3, 0.2))
    assert(pred(1L)(Labels.Correlated))
  }

  test("selfAssess applies the paper's pre-selection rule") {
    val wm = Map(
      1L -> MatcherMeasures(1L, 0.7, 0.5, 0.0, 1.0, 0.1),   // P>.6, |Cal|<.2
      2L -> MatcherMeasures(2L, 0.7, 0.5, 0.0, 1.0, 0.3),   // |Cal| too big
      3L -> MatcherMeasures(3L, 0.5, 0.5, 0.0, 1.0, 0.1),   // P too low
    )
    val pred = Baselines.selfAssess(wm, Seq(1L, 2L, 3L))
    assert(pred(1L).forall(identity))
    assert(pred(2L).forall(!_))
    assert(pred(3L).forall(!_))
  }
}
