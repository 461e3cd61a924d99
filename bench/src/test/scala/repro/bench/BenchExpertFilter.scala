package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Experiments, ExpertFilter, StudyHandle}

/** Section IV-F (Figures 10-11 as tables): quality of the matchers each
  * selector keeps, the fused-match quality after filtering, and the early
  * identification variant (first 30 decisions — half the median).
  */
class BenchExpertFilter extends AnyFunSuite {
  import BenchState._

  private lazy val cvPred = artifacts.flatMap(_.fit50.predictions).toMap
  private lazy val thresholds = artifacts.head.p50.thresholds
  private lazy val fullRows = Experiments.utilization(spark, po, cvPred, thresholds)

  private lazy val earlyRows = {
    val truncated = new StudyHandle(spark,
      ExpertFilter.truncateStudy(po.study, k = 30))
    val pred = Experiments.earlyPredictions(spark, po, truncated, artifacts, cfg)
    Experiments.utilization(spark, po, pred, thresholds)
  }

  private def rowOf(rows: Vector[Experiments.UtilizationRow], m: String) =
    rows.find(_.method == m).getOrElse(sys.error(s"missing $m"))

  test("Fig. 10 (as table): print expert-utilization quality") {
    println(Experiments.formatUtilization(
      "Fig. 10: quality of selected matchers (full histories)", fullRows))
    assert(fullRows.size === 5)
  }

  test("shape: MExI experts beat the unfiltered population on all four measures") {
    val m = rowOf(fullRows, "MExI"); val all = rowOf(fullRows, "no_filter")
    assert(m.p > all.p, s"precision ${m.p} vs ${all.p}")
    assert(m.r > all.r, s"recall ${m.r} vs ${all.r}")
    assert(m.res > all.res, s"resolution ${m.res} vs ${all.res}")
    assert(m.absCal < all.absCal, s"|Cal| ${m.absCal} vs ${all.absCal}")
  }

  test("shape: MExI experts beat the crowdsourcing baselines on precision") {
    val m = rowOf(fullRows, "MExI")
    Seq("Conf", "Qual. Test", "Self-Assess").foreach { b =>
      assert(m.p >= rowOf(fullRows, b).p - 1e-9, s"vs $b")
    }
  }

  test("shape: expert filtering improves the fused match") {
    val m = rowOf(fullRows, "MExI"); val all = rowOf(fullRows, "no_filter")
    assert(m.fusedP >= all.fusedP, s"fused precision ${m.fusedP} vs ${all.fusedP}")
  }

  test("Fig. 11 (as table): print early-identification quality") {
    println(Experiments.formatUtilization(
      "Fig. 11: quality of early-identified matchers (first 30 decisions)", earlyRows))
    assert(earlyRows.size === 5)
  }

  test("shape: early-identified MExI experts still beat no_filter") {
    val m = rowOf(earlyRows, "MExI"); val all = rowOf(earlyRows, "no_filter")
    assert(m.p > all.p)
    assert(m.res > all.res)
    assert(m.absCal < all.absCal)
    // The simulated population has only ~3 all-four experts, so the early
    // selection is 1-2 matchers and its recall column is a coin toss;
    // allow slack there (the paper reports "slightly inferior" too).
    assert(m.r >= all.r - 0.08)
  }

  test("shape: early identification is at most slightly worse than full") {
    assert(rowOf(earlyRows, "MExI").p >= rowOf(fullRows, "MExI").p - 0.15)
  }
}
