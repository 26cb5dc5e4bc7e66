package repro.stats

/** L2-regularised logistic regression fitted by cyclic coordinate descent
  * (§III-D step 2 — the paper optimises each coefficient by coordinate
  * descent, citing Hsieh et al.; any CD optimiser of the same convex loss
  * reaches the same optimum).
  *
  * Minimises  (1/n)·Σ log(1 + exp(−y·(w·x + b)))  +  λ‖w‖²  with y ∈ {−1,+1},
  * via per-coordinate Newton steps with a conservative curvature bound
  * (|σ'(z)| ≤ ¼), cycling until the sweep-level coefficient change is small.
  */
final case class LogisticModel(weights: Array[Double], intercept: Double) {
  def score(x: Array[Double]): Double = {
    var z = intercept; var i = 0
    while (i < weights.length) { z += weights(i) * x(i); i += 1 }
    1.0 / (1.0 + math.exp(-z))
  }
  def predict(x: Array[Double]): Int = if (score(x) >= 0.5) 1 else 0
}

object LogisticRegressionCD {

  /** Fit on rows x(i) with labels y(i) ∈ {0, 1}. */
  def fit(xs: Array[Array[Double]], ys: Array[Int],
          lambda: Double = 1e-4, maxSweeps: Int = 200, tol: Double = 1e-6): LogisticModel = {
    require(xs.length == ys.length && xs.nonEmpty, "need non-empty aligned data")
    val n = xs.length
    val d = xs(0).length
    val w = new Array[Double](d)
    var b = 0.0
    val yy = ys.map(y => if (y == 1) 1.0 else -1.0)
    // margins m(i) = y_i * (w·x_i + b), maintained incrementally.
    val margins = new Array[Double](n)
    var i = 0
    while (i < n) { margins(i) = 0.0; i += 1 }

    def sigmaNeg(m: Double): Double = 1.0 / (1.0 + math.exp(m)) // σ(−m)

    var sweep = 0
    var converged = false
    while (sweep < maxSweeps && !converged) {
      var maxDelta = 0.0
      // Intercept coordinate (unregularised).
      var g = 0.0
      i = 0
      while (i < n) { g += -yy(i) * sigmaNeg(margins(i)); i += 1 }
      g /= n
      val stepB = -g / 0.25
      val db = clip(stepB)
      if (db != 0.0) {
        b += db
        i = 0
        while (i < n) { margins(i) += yy(i) * db; i += 1 }
        maxDelta = math.max(maxDelta, math.abs(db))
      }
      // Feature coordinates.
      var j = 0
      while (j < d) {
        var gj = 0.0
        var hj = 0.0
        i = 0
        while (i < n) {
          val s = sigmaNeg(margins(i))
          gj += -yy(i) * xs(i)(j) * s
          hj += xs(i)(j) * xs(i)(j) * 0.25
          i += 1
        }
        gj = gj / n + 2 * lambda * w(j)
        hj = hj / n + 2 * lambda
        val dw = clip(-gj / math.max(hj, 1e-12))
        if (dw != 0.0) {
          w(j) += dw
          i = 0
          while (i < n) { margins(i) += yy(i) * xs(i)(j) * dw; i += 1 }
          maxDelta = math.max(maxDelta, math.abs(dw))
        }
        j += 1
      }
      converged = maxDelta < tol
      sweep += 1
    }
    LogisticModel(w, b)
  }

  // Trust-region style step clipping keeps the quadratic approximation honest.
  private def clip(step: Double): Double = math.max(-2.0, math.min(2.0, step))

  /** Classification accuracy of a model on a labelled set. */
  def accuracy(model: LogisticModel, xs: Array[Array[Double]], ys: Array[Int]): Double = {
    if (xs.isEmpty) return 0.0
    val correct = xs.indices.count(i => model.predict(xs(i)) == ys(i))
    correct.toDouble / xs.length
  }
}
