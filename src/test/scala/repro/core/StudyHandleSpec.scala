package repro.core

import repro.SparkSpec
import repro.synth.MatcherSim

class StudyHandleSpec extends SparkSpec {

  private lazy val study = MatcherSim.poStudy(nMatchers = 12, seed = 21L)
  private lazy val handle = new StudyHandle(spark, study)

  test("measures cover every matcher") {
    assert(handle.measures.keySet === handle.matcherIds.toSet)
    handle.measures.values.foreach { m =>
      assert(m.precision >= 0.0 && m.precision <= 1.0)
      assert(m.recall >= 0.0 && m.recall <= 1.0)
      assert(m.resolution >= -1.0 && m.resolution <= 1.0)
    }
  }

  test("warm-up measures cover every matcher") {
    assert(handle.warmupMeasures.keySet === handle.matcherIds.toSet)
  }

  test("base features cover every matcher with all three aggregate sets") {
    val t = handle.baseFeatures
    assert(t.rows.keySet === handle.matcherIds.toSet)
    assert(t.names ===
      Predictors.names ++ BehavioralFeatures.names ++ MouseFeatures.names)
    t.rows.values.foreach(v => assert(v.forall(x => !x.isNaN && !x.isInfinity)))
  }

  test("histories are sorted by decision order") {
    handle.historyByMatcher.values.foreach { h =>
      assert(h.map(_.seq) === (0 until h.size))
    }
  }

  test("heat maps exist for every matcher's move events") {
    handle.matcherIds.foreach { id =>
      assert(handle.heatMaps.contains((id, MouseKinds.Move)))
    }
  }

  test("mean confidence agrees with the driver-side computation") {
    val byM = study.decisions.groupBy(_.matcherId)
    handle.matcherIds.foreach { id =>
      val exp = byM(id).map(_.conf).sum / byM(id).size
      assert(math.abs(handle.meanConf(id) - exp) < 1e-9)
    }
  }

  test("measures match a driver-side recomputation of P") {
    val byM = study.decisions.groupBy(_.matcherId)
    handle.matcherIds.foreach { id =>
      val finals = byM(id).groupBy(d => (d.aIdx, d.bIdx)).values.map(_.maxBy(_.ts))
      val p = finals.count(d =>
        study.task.referenceSet.contains(RefPair(d.aIdx, d.bIdx))).toDouble / finals.size
      assert(math.abs(handle.measures(id).precision - p) < 1e-9)
    }
  }
}
