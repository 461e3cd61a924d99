package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class PcaSpec extends AnyFunSuite {

  test("jacobi recovers the diagonal of a diagonal matrix") {
    val a = Array(Array(3.0, 0.0), Array(0.0, 1.0))
    val ev = Pca.jacobiEigenvalues(a).sorted
    assert(math.abs(ev(0) - 1.0) < 1e-9 && math.abs(ev(1) - 3.0) < 1e-9)
  }

  test("jacobi solves a known symmetric 2x2") {
    // [[2,1],[1,2]] has eigenvalues 1 and 3.
    val ev = Pca.jacobiEigenvalues(Array(Array(2.0, 1.0), Array(1.0, 2.0))).sorted
    assert(math.abs(ev(0) - 1.0) < 1e-9 && math.abs(ev(1) - 3.0) < 1e-9)
  }

  test("rank-1 data puts all variance on the first component") {
    val rows = (1 to 10).map(i => Array(i.toDouble, 2.0 * i))
    assert(math.abs(Pca.varianceRatio(rows, 1) - 1.0) < 1e-9)
    assert(Pca.varianceRatio(rows, 2) < 1e-9)
  }

  test("isotropic data splits variance evenly") {
    val rows = Seq(
      Array(1.0, 0.0), Array(-1.0, 0.0), Array(0.0, 1.0), Array(0.0, -1.0))
    assert(math.abs(Pca.varianceRatio(rows, 1) - 0.5) < 1e-9)
    assert(math.abs(Pca.varianceRatio(rows, 2) - 0.5) < 1e-9)
  }

  test("variance ratios sum to at most 1 and are ordered") {
    val rnd = new java.util.Random(3)
    val rows = Seq.fill(30)(Array.fill(4)(rnd.nextGaussian()))
    val r = (1 to 4).map(Pca.varianceRatio(rows, _))
    assert(r.sum <= 1.0 + 1e-9)
    assert(r.zip(r.tail).forall { case (a, b) => a >= b - 1e-9 })
  }

  test("zero-variance data yields ratio 0") {
    val rows = Seq(Array(1.0, 1.0), Array(1.0, 1.0))
    assert(Pca.varianceRatio(rows, 1) === 0.0)
  }

  test("eigenvalues of empty data are rejected") {
    intercept[IllegalArgumentException](Pca.eigenvalues(Seq.empty))
  }
}
