package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {
  private val t = Seq(
    Array(true, false, true, false),
    Array(true, true, false, false),
  )

  test("singleAccuracy is perfect on identical labels") {
    for (c <- 0 until 4) assert(Metrics.singleAccuracy(t, t, c) === 1.0)
  }

  test("singleAccuracy counts per-class agreement") {
    val p = Seq(
      Array(true, true, true, false),   // class 1 wrong
      Array(false, true, false, false), // class 0 wrong
    )
    assert(Metrics.singleAccuracy(t, p, 0) === 0.5)
    assert(Metrics.singleAccuracy(t, p, 1) === 0.5)
    assert(Metrics.singleAccuracy(t, p, 2) === 1.0)
    assert(Metrics.singleAccuracy(t, p, 3) === 1.0)
  }

  test("multiLabelAccuracy is mean Jaccard (Eq. 7)") {
    val p = Seq(
      Array(true, true, true, false),   // inter 2, union 3 -> 2/3
      Array(true, true, false, false),  // identical -> 1
    )
    assert(math.abs(Metrics.multiLabelAccuracy(t, p) - (2.0 / 3 + 1.0) / 2) < 1e-12)
  }

  test("multiLabelAccuracy: disjoint positives give 0") {
    val a = Seq(Array(true, false, false, false))
    val b = Seq(Array(false, true, false, false))
    assert(Metrics.multiLabelAccuracy(a, b) === 0.0)
  }

  test("multiLabelAccuracy: both empty positive sets count as agreement") {
    val a = Seq(Array(false, false, false, false))
    assert(Metrics.multiLabelAccuracy(a, a) === 1.0)
  }

  test("metrics reject mismatched sizes") {
    intercept[IllegalArgumentException](Metrics.singleAccuracy(t, t.take(1), 0))
    intercept[IllegalArgumentException](Metrics.multiLabelAccuracy(Seq.empty, Seq.empty))
  }
}
