package repro.nn

import org.scalatest.funsuite.AnyFunSuite

class CnnSpec extends AnyFunSuite {
  private val H = 10
  private val W = 12

  private def blob(left: Boolean, rnd: java.util.Random): Array[Array[Double]] = {
    val img = Array.ofDim[Double](H, W)
    val cx = if (left) W / 4 else 3 * W / 4
    val cy = H / 2
    for (_ <- 0 until 25) {
      val x = math.max(0, math.min(W - 1, cx + rnd.nextGaussian() * 1.5)).toInt
      val y = math.max(0, math.min(H - 1, cy + rnd.nextGaussian() * 1.5)).toInt
      img(y)(x) = math.min(1.0, img(y)(x) + 0.34)
    }
    img
  }

  private def numericGrad(net: Cnn, img: Array[Array[Double]], y: Boolean,
                          j: Int, h: Double = 1e-5): Double = {
    val orig = net.params(j)
    def lossAt(v: Double): Double = {
      net.params(j) = v
      val p = net.predict(img)
      if (y) -math.log(p + 1e-12) else -math.log(1 - p + 1e-12)
    }
    val l1 = lossAt(orig + h); val l0 = lossAt(orig - h)
    net.params(j) = orig
    (l1 - l0) / (2 * h)
  }

  test("backprop gradient matches numerical gradient") {
    val net = new Cnn(H, W, nFilters = 2, seed = 1)
    val rnd = new java.util.Random(2)
    val img = Array.fill(H)(Array.fill(W)(rnd.nextDouble()))
    val grad = net.gradientOf(img, y = true)
    for (j <- 0 until net.nParams by math.max(1, net.nParams / 25)) {
      val ng = numericGrad(net, img, y = true, j)
      assert(math.abs(grad(j) - ng) < 1e-4, s"param $j: ${grad(j)} vs $ng")
    }
  }

  test("training reduces loss") {
    val rnd = new java.util.Random(3)
    val data = (0 until 40).map(i => (blob(i % 2 == 0, rnd), i % 2 == 0))
    val net = new Cnn(H, W, nFilters = 2, seed = 4)
    val before = net.loss(data)
    net.fit(data, epochs = 10)
    assert(net.loss(data) < before)
  }

  test("CNN separates left-blob from right-blob images") {
    val rnd = new java.util.Random(5)
    val train = (0 until 80).map(i => (blob(i % 2 == 0, rnd), i % 2 == 0))
    val net = new Cnn(H, W, nFilters = 3, seed = 6)
    net.fit(train, epochs = 20)
    val test = (0 until 40).map(i => (blob(i % 2 == 1, rnd), i % 2 == 1))
    val acc = test.count { case (img, y) => (net.predict(img) >= 0.5) == y }.toDouble / test.size
    assert(acc > 0.85, s"accuracy $acc")
  }

  test("prediction is deterministic and in [0, 1]") {
    val net = new Cnn(H, W, seed = 7)
    val img = Array.fill(H)(Array.fill(W)(0.3))
    val p = net.predict(img)
    assert(p >= 0.0 && p <= 1.0 && p === net.predict(img))
  }

  test("wrong image dimensions are rejected") {
    val net = new Cnn(H, W)
    intercept[IllegalArgumentException](net.predict(Array.fill(3)(Array.fill(3)(0.0))))
  }

  test("tiny grids are rejected at construction") {
    intercept[IllegalArgumentException](new Cnn(2, 2))
  }
}
