package repro.core

import org.scalatest.funsuite.AnyFunSuite

class ExperimentsSpec extends AnyFunSuite {

  test("foldSplits partitions the ids into k disjoint test folds") {
    val ids = (1L to 106L).toVector
    val splits = Experiments.foldSplits(ids, 5, seed = 7)
    assert(splits.size === 5)
    val allTest = splits.flatMap(_._2)
    assert(allTest.sorted === ids)
    splits.foreach { case (train, test) =>
      assert((train.toSet intersect test.toSet).isEmpty)
      assert((train ++ test).toSet === ids.toSet)
      assert(test.size === 21 || test.size === 22)
    }
  }

  test("foldSplits is deterministic in the seed") {
    val ids = (1L to 20L).toVector
    assert(Experiments.foldSplits(ids, 4, 3) === Experiments.foldSplits(ids, 4, 3))
    assert(Experiments.foldSplits(ids, 4, 3) !== Experiments.foldSplits(ids, 4, 4))
  }

  test("accuracy table formatting includes every method and metric header") {
    val rows = Vector(
      Experiments.TableRow("MExI_50", MExI.Accuracies(0.98, 0.93, 0.81, 0.87, 0.68)))
    val s = Experiments.formatAccuracyTable("T", rows)
    assert(s.contains("MExI_50"))
    assert(s.contains("A_ML"))
    assert(s.contains("0.98") && s.contains("0.68"))
  }

  test("utilization table formatting includes fused-match columns") {
    val rows = Vector(Experiments.UtilizationRow("MExI", 3, 0.8, 0.5, 0.7, 0.1, 0.9, 0.4))
    val s = Experiments.formatUtilization("U", rows)
    assert(s.contains("fusedP") && s.contains("0.90") && s.contains("0.40"))
  }
}
