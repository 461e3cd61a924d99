package repro.synth

import org.scalatest.funsuite.AnyFunSuite
import repro.core.RefPair

class MatchingTaskSpec extends AnyFunSuite {

  test("PO task has the paper's schema dimensions (142 x 46)") {
    val t = MatchingTask.po()
    assert(t.nA === 142 && t.nB === 46)
    assert(t.reference.size === 80)
  }

  test("OAEI task has the paper's ontology dimensions (121 x 109)") {
    val t = MatchingTask.oaei()
    assert(t.nA === 121 && t.nB === 109)
  }

  test("warm-up task is Thalia-sized (9-12 attributes)") {
    val t = MatchingTask.warmup()
    assert(t.nA === 12 && t.nB === 9)
    assert(t.reference.size === 8)
  }

  test("reference pairs are in bounds with distinct rows") {
    for (t <- Seq(MatchingTask.po(), MatchingTask.oaei(), MatchingTask.warmup())) {
      assert(t.reference.forall(p => p.aIdx < t.nA && p.bIdx < t.nB))
      assert(t.reference.map(_.aIdx).distinct.size === t.reference.size)
    }
  }

  test("difficulty covers every reference pair with values in (0, 1]") {
    val t = MatchingTask.po()
    assert(t.reference.forall(p => t.difficulty.contains(p)))
    assert(t.difficulty.values.forall(d => d > 0.0 && d <= 1.0))
  }

  test("hard fraction controls the low-difficulty mix") {
    val t = MatchingTask.make("X", 100, 50, 40, hardFraction = 0.5, seed = 9)
    val hard = t.difficulty.values.count(_ < 0.7)
    assert(hard > 8 && hard < 32) // ~50% of 40 with sampling noise
  }

  test("decoys never collide with the reference match") {
    for (t <- Seq(MatchingTask.po(), MatchingTask.oaei())) {
      assert(t.decoys.forall(d => !t.referenceSet.contains(d)))
    }
  }

  test("decoys share the row of a reference pair") {
    val t = MatchingTask.po()
    val refRows = t.reference.map(_.aIdx).toSet
    assert(t.decoys.forall(d => refRows.contains(d.aIdx)))
  }

  test("task generation is deterministic in the seed") {
    assert(MatchingTask.po(seed = 5L) === MatchingTask.po(seed = 5L))
    assert(MatchingTask.po(seed = 5L) !== MatchingTask.po(seed = 6L))
  }

  test("oversized reference is rejected") {
    intercept[IllegalArgumentException](
      MatchingTask.make("bad", 10, 5, refSize = 11, hardFraction = 0.1, seed = 1))
  }

  test("reference membership helper matches the vector") {
    val t = MatchingTask.warmup()
    assert(t.reference.forall(t.referenceSet.contains))
    assert(!t.referenceSet.contains(RefPair(-1, -1)))
  }
}
