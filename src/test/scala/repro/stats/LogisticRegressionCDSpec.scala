package repro.stats

import repro.SparkSpec

class LogisticRegressionCDSpec extends SparkSpec {

  private def separable(n: Int, seed: Int): (Array[Array[Double]], Array[Int]) = {
    val rnd = new scala.util.Random(seed)
    val rows = Array.fill(n) {
      val y = rnd.nextInt(2)
      val x0 = (if (y == 1) 2.0 else -2.0) + rnd.nextGaussian() * 0.5
      val x1 = rnd.nextGaussian()
      (Array(x0, x1), y)
    }
    (rows.map(_._1), rows.map(_._2))
  }

  test("fits a separable 2-feature problem to high accuracy") {
    val (xs, ys) = separable(300, 1)
    val m = LogisticRegressionCD.fit(xs, ys)
    assert(LogisticRegressionCD.accuracy(m, xs, ys) > 0.95)
  }

  test("informative feature receives the dominant coefficient") {
    val (xs, ys) = separable(400, 2)
    val m = LogisticRegressionCD.fit(xs, ys)
    assert(math.abs(m.weights(0)) > 3 * math.abs(m.weights(1)),
      s"w=${m.weights.toSeq}")
  }

  test("intercept captures class imbalance") {
    val xs = Array.fill(200)(Array(0.0))
    val ys = Array.fill(200)(1).zipWithIndex.map { case (_, i) => if (i < 180) 1 else 0 }
    val m = LogisticRegressionCD.fit(xs, ys)
    assert(m.intercept > 0.5) // P(y=1) = 0.9 → positive intercept
    assert(m.score(Array(0.0)) > 0.8)
  }

  test("score is a probability in (0,1)") {
    val (xs, ys) = separable(100, 3)
    val m = LogisticRegressionCD.fit(xs, ys)
    xs.foreach { x =>
      val s = m.score(x)
      assert(s > 0.0 && s < 1.0)
    }
  }

  test("predict thresholds score at 0.5") {
    val m = LogisticModel(Array(1.0), 0.0)
    assert(m.predict(Array(3.0)) == 1)
    assert(m.predict(Array(-3.0)) == 0)
  }

  test("regularisation shrinks coefficients") {
    val (xs, ys) = separable(300, 4)
    val loose = LogisticRegressionCD.fit(xs, ys, lambda = 1e-5)
    val tight = LogisticRegressionCD.fit(xs, ys, lambda = 1.0)
    assert(math.abs(tight.weights(0)) < math.abs(loose.weights(0)))
  }

  test("deterministic: same data → same model") {
    val (xs, ys) = separable(150, 5)
    val m1 = LogisticRegressionCD.fit(xs, ys)
    val m2 = LogisticRegressionCD.fit(xs, ys)
    assert(m1.weights.sameElements(m2.weights) && m1.intercept == m2.intercept)
  }

  test("handles constant (useless) features without blowing up") {
    val rnd = new scala.util.Random(6)
    val xs = Array.fill(100)(Array(1.0, rnd.nextGaussian()))
    val ys = xs.map(x => if (x(1) > 0) 1 else 0)
    val m = LogisticRegressionCD.fit(xs, ys)
    assert(LogisticRegressionCD.accuracy(m, xs, ys) > 0.9)
    assert(!m.weights.exists(_.isNaN))
  }

  test("recovers a known XOR-free linear rule on 5 features") {
    val rnd = new scala.util.Random(7)
    val trueW = Array(1.5, -2.0, 0.0, 0.5, 0.0)
    val xs = Array.fill(600)(Array.fill(5)(rnd.nextGaussian()))
    val ys = xs.map { x =>
      val z = trueW.zip(x).map { case (w, v) => w * v }.sum
      if (1.0 / (1.0 + math.exp(-z)) > rnd.nextDouble()) 1 else 0
    }
    val m = LogisticRegressionCD.fit(xs, ys, lambda = 1e-4)
    // Signs of the informative coefficients recovered.
    assert(m.weights(0) > 0 && m.weights(1) < 0 && m.weights(3) > 0)
    // Irrelevant features stay small relative to informative ones.
    assert(math.abs(m.weights(2)) < math.abs(m.weights(1)))
  }

  test("accuracy of empty data is 0") {
    assert(LogisticRegressionCD.accuracy(LogisticModel(Array(1.0), 0.0), Array.empty, Array.empty) == 0.0)
  }

  test("rejects empty training input") {
    intercept[IllegalArgumentException] {
      LogisticRegressionCD.fit(Array.empty, Array.empty)
    }
  }
}
