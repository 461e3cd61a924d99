package repro.synth

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{MouseKinds, RefPair}
import repro.ml.Stats

/** Driver-side validation of the human-matcher simulator: determinism,
  * structural invariants, and — crucially — that the latent traits
  * actually cause the behaviors the paper attributes to them (so the
  * learning problem is well-posed; see DESIGN.md section 2).
  */
class MatcherSimSpec extends AnyFunSuite {
  private val study = MatcherSim.poStudy(nMatchers = 60, seed = 7L)
  private val task = study.task
  private val byMatcher = study.decisions.groupBy(_.matcherId)

  private def precisionOf(id: Long): Double = {
    val h = byMatcher(id)
    val finalEntries = h.groupBy(d => (d.aIdx, d.bIdx)).values.map(_.maxBy(_.ts))
    val correct = finalEntries.count(d => task.referenceSet.contains(RefPair(d.aIdx, d.bIdx)))
    correct.toDouble / finalEntries.size
  }

  test("study generation is deterministic in the seed") {
    val a = MatcherSim.poStudy(nMatchers = 5, seed = 3L)
    val b = MatcherSim.poStudy(nMatchers = 5, seed = 3L)
    assert(a.decisions === b.decisions)
    assert(a.mouse === b.mouse)
    assert(a.warmupDecisions === b.warmupDecisions)
  }

  test("different seeds produce different studies") {
    val a = MatcherSim.poStudy(nMatchers = 5, seed = 3L)
    val b = MatcherSim.poStudy(nMatchers = 5, seed = 4L)
    assert(a.decisions !== b.decisions)
  }

  test("every matcher has traits, decisions, mouse events and a warm-up") {
    val ids = study.traits.map(_.matcherId).toSet
    assert(ids.size === 60)
    assert(study.decisions.map(_.matcherId).toSet === ids)
    assert(study.mouse.map(_.matcherId).toSet === ids)
    assert(study.warmupDecisions.map(_.matcherId).toSet === ids)
  }

  test("decision counts match the sampled trait") {
    for (t <- study.traits) {
      assert(byMatcher(t.matcherId).size === t.nDecisions)
    }
  }

  test("confidences stay within [0.05, 1]") {
    assert(study.decisions.forall(d => d.conf >= 0.05 && d.conf <= 1.0))
  }

  test("decision element indices are within the task bounds") {
    assert(study.decisions.forall(d => d.aIdx >= 0 && d.aIdx < task.nA &&
      d.bIdx >= 0 && d.bIdx < task.nB))
  }

  test("timestamps strictly increase within a history") {
    for ((_, h) <- byMatcher) {
      val sorted = h.sortBy(_.seq)
      assert(sorted.zip(sorted.tail).forall { case (a, b) => b.ts > a.ts })
    }
  }

  test("seq numbers are consecutive from zero") {
    for ((_, h) <- byMatcher) {
      assert(h.sortBy(_.seq).map(_.seq) === (0 until h.size))
    }
  }

  test("warm-up histories have 10 decisions on the warm-up task") {
    val byM = study.warmupDecisions.groupBy(_.matcherId)
    assert(byM.values.forall(_.size === 10))
    assert(study.warmupDecisions.forall(d =>
      d.aIdx < study.warmupTask.nA && d.bIdx < study.warmupTask.nB))
  }

  test("mouse events are time-sorted with in-screen coordinates") {
    val byM = study.mouse.groupBy(_.matcherId)
    for ((_, es) <- byM) {
      assert(es.zip(es.tail).forall { case (a, b) => b.ts >= a.ts })
    }
    assert(study.mouse.forall(e => e.x >= 0 && e.x <= task.screenW &&
      e.y >= 0 && e.y <= task.screenH))
    assert(study.mouse.forall(e => MouseKinds.All.contains(e.kind)))
  }

  test("every matcher emits all four event kinds in plausible proportions") {
    val byM = study.mouse.groupBy(_.matcherId)
    for ((_, es) <- byM) {
      val kinds = es.groupBy(_.kind).view.mapValues(_.size).toMap
      assert(kinds.getOrElse(MouseKinds.Move, 0) > kinds.getOrElse(MouseKinds.Scroll, 0))
      assert(kinds.getOrElse(MouseKinds.Left, 0) > 0, "one click per decision")
    }
  }

  test("left clicks equal the number of decisions") {
    val clicks = study.mouse.filter(_.kind == MouseKinds.Left).groupBy(_.matcherId)
    for (t <- study.traits) {
      assert(clicks(t.matcherId).size === t.nDecisions)
    }
  }

  // --- causal links: traits -> measures ---

  test("skill q drives realized precision (corr > 0.6)") {
    val qs = study.traits.map(_.q)
    val ps = study.traits.map(t => precisionOf(t.matcherId))
    assert(Stats.pearson(qs, ps) > 0.6, s"corr=${Stats.pearson(qs, ps)}")
  }

  test("metacognitive sensitivity rho drives resolution (corr > 0.4)") {
    val gs = study.traits.map { t =>
      val h = byMatcher(t.matcherId)
      val finals = h.groupBy(d => (d.aIdx, d.bIdx)).values.map(_.maxBy(_.ts)).toSeq
      val correct = finals.map(d => task.referenceSet.contains(RefPair(d.aIdx, d.bIdx)))
      Stats.gammaTest(finals.map(_.conf), correct)._1
    }
    assert(Stats.pearson(study.traits.map(_.rho), gs) > 0.4)
  }

  test("bias drives calibration (corr > 0.6)") {
    val cals = study.traits.map { t =>
      val h = byMatcher(t.matcherId)
      Stats.mean(h.map(_.conf)) - precisionOf(t.matcherId)
    }
    assert(Stats.pearson(study.traits.map(_.bias), cals) > 0.6)
  }

  test("scroll rate anti-correlates with rho (the uncertainty signal)") {
    val rates = study.traits.map { t =>
      val es = study.mouse.filter(_.matcherId == t.matcherId)
      es.count(_.kind == MouseKinds.Scroll).toDouble / es.size
    }
    assert(Stats.pearson(study.traits.map(_.rho), rates) < -0.5)
  }

  test("skilled matchers visit the schema panes more (heat-map signal)") {
    // Schema panes live in the top third of the screen.
    val topShare = study.traits.map { t =>
      val moves = study.mouse.filter(e => e.matcherId == t.matcherId &&
        e.kind == MouseKinds.Move)
      moves.count(_.y < task.screenH * 0.4).toDouble / moves.size
    }
    assert(Stats.pearson(study.traits.map(_.q), topShare) > 0.3)
  }

  test("population marginals are in the paper's ballpark (Fig. 8/9)") {
    val big = MatcherSim.poStudy(nMatchers = 106, seed = 42L)
    val byM = big.decisions.groupBy(_.matcherId)
    val ps = big.traits.map { t =>
      val finals = byM(t.matcherId).groupBy(d => (d.aIdx, d.bIdx)).values.map(_.maxBy(_.ts))
      finals.count(d => big.task.referenceSet.contains(RefPair(d.aIdx, d.bIdx))).toDouble / finals.size
    }
    val rs = big.traits.map { t =>
      val finals = byM(t.matcherId).groupBy(d => (d.aIdx, d.bIdx)).values.map(_.maxBy(_.ts))
      finals.count(d => big.task.referenceSet.contains(RefPair(d.aIdx, d.bIdx))).toDouble /
        big.task.reference.size
    }
    val meanP = Stats.mean(ps); val meanR = Stats.mean(rs)
    assert(meanP > 0.40 && meanP < 0.70, s"mean precision $meanP (paper: .55)")
    assert(meanR > 0.20 && meanR < 0.50, s"mean recall $meanR (paper: .33)")
    val precise = ps.count(_ > 0.5).toDouble / ps.size
    val thorough = rs.count(_ > 0.5).toDouble / rs.size
    assert(precise > 0.3 && precise < 0.75, s"precise fraction $precise (paper: .53)")
    assert(thorough < 0.45, s"thorough fraction $thorough (paper: .15)")
  }

  test("OAEI study uses shifted ids and its own task") {
    val o = MatcherSim.oaeiStudy(nMatchers = 10, seed = 9L)
    assert(o.traits.forall(_.matcherId >= 1000L))
    assert(o.task.name === "OAEI")
  }
}
