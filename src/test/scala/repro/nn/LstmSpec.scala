package repro.nn

import org.scalatest.funsuite.AnyFunSuite

class LstmSpec extends AnyFunSuite {

  private def numericGrad(net: Lstm, xs: IndexedSeq[Array[Double]], y: Boolean,
                          j: Int, h: Double = 1e-5): Double = {
    val orig = net.params(j)
    def lossAt(v: Double): Double = {
      net.params(j) = v
      val p = net.predict(xs)
      val l = if (y) -math.log(p + 1e-12) else -math.log(1 - p + 1e-12)
      l
    }
    val l1 = lossAt(orig + h); val l0 = lossAt(orig - h)
    net.params(j) = orig
    (l1 - l0) / (2 * h)
  }

  test("BPTT gradient matches numerical gradient") {
    val net = new Lstm(dIn = 2, dH = 3, seed = 1)
    val rnd = new java.util.Random(2)
    val xs = IndexedSeq.fill(5)(Array(rnd.nextGaussian(), rnd.nextGaussian()))
    val grad = net.gradientOf(xs, y = true)
    // Check a spread of parameter indices across Wx, Wh, b, Wout, bout.
    val idxs = Seq(0, 7, net.nParams / 3, net.nParams / 2, net.nParams - 5, net.nParams - 1)
    for (j <- idxs) {
      val ng = numericGrad(net, xs, y = true, j)
      assert(math.abs(grad(j) - ng) < 1e-4,
        s"param $j: analytic ${grad(j)} vs numeric $ng")
    }
  }

  test("BPTT gradient matches numerics for the negative class too") {
    val net = new Lstm(dIn = 1, dH = 2, seed = 3)
    val xs = IndexedSeq(Array(0.7), Array(-0.2), Array(0.4))
    val grad = net.gradientOf(xs, y = false)
    for (j <- 0 until net.nParams by math.max(1, net.nParams / 10)) {
      val ng = numericGrad(net, xs, y = false, j)
      assert(math.abs(grad(j) - ng) < 1e-4, s"param $j")
    }
  }

  test("training reduces cross-entropy loss") {
    val rnd = new java.util.Random(5)
    val data = (0 until 60).map { _ =>
      val y = rnd.nextBoolean()
      val mean = if (y) 0.8 else 0.2
      val xs = IndexedSeq.fill(8)(Array(mean + rnd.nextGaussian() * 0.1))
      (xs, y)
    }
    val net = new Lstm(dIn = 1, dH = 4, seed = 6)
    val before = net.loss(data)
    net.fit(data, epochs = 12)
    assert(net.loss(data) < before)
  }

  test("LSTM learns to classify sequences by their mean") {
    val rnd = new java.util.Random(7)
    def mk(y: Boolean) = {
      val mean = if (y) 0.75 else 0.25
      (IndexedSeq.fill(10)(Array(mean + rnd.nextGaussian() * 0.1)), y)
    }
    val train = (0 until 80).map(i => mk(i % 2 == 0))
    val net = new Lstm(dIn = 1, dH = 6, seed = 8)
    net.fit(train, epochs = 20)
    val test = (0 until 40).map(i => mk(i % 2 == 1))
    val acc = test.count { case (xs, y) => (net.predict(xs) >= 0.5) == y }.toDouble / test.size
    assert(acc > 0.85, s"accuracy $acc")
  }

  test("LSTM can use temporal order, not just the mean") {
    // Label = whether the LAST element is high; means are identical.
    val rnd = new java.util.Random(9)
    def mk(y: Boolean) = {
      val base = IndexedSeq.fill(6)(Array(rnd.nextDouble()))
      val tail = if (y) Array(0.95) else Array(0.05)
      (base :+ tail, y)
    }
    val train = (0 until 100).map(i => mk(i % 2 == 0))
    val net = new Lstm(dIn = 1, dH = 6, seed = 10)
    net.fit(train, epochs = 25)
    val test = (0 until 40).map(i => mk(i % 2 == 1))
    val acc = test.count { case (xs, y) => (net.predict(xs) >= 0.5) == y }.toDouble / test.size
    assert(acc > 0.85, s"accuracy $acc")
  }

  test("prediction is deterministic and in [0, 1]") {
    val net = new Lstm(dIn = 2, dH = 3, seed = 11)
    val xs = IndexedSeq(Array(0.1, 0.2), Array(0.3, 0.4))
    val p = net.predict(xs)
    assert(p >= 0.0 && p <= 1.0)
    assert(p === net.predict(xs))
  }

  test("empty sequences are rejected") {
    val net = new Lstm(dIn = 1)
    intercept[IllegalArgumentException](net.predict(IndexedSeq.empty))
  }
}
