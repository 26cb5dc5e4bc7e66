package repro.stats

/** Empirical complementary-CDF weights (Eq. 2).
  *
  * The paper weights each observed distance D by 1 − P(d ≤ D) over the
  * distribution R_t of all retrieved distances of that evidence type for that
  * target attribute. A literal empirical CCDF gives weight 0 to the largest
  * observation (and to a sole candidate), which would zero Eq. 1's
  * denominator; we use the midpoint-adjusted estimator
  *
  *   w(D) = ( #{d > D} + ½·#{d = D} ) / N,   clamped to [ε, 1]
  *
  * which preserves the ordering and spread of the paper's weights while
  * keeping every weight strictly positive (DESIGN.md §2, stats).
  */
object Ccdf {

  val Epsilon = 1e-3

  /** Weights for a batch of distances from one distribution R_t. */
  def weights(distances: Seq[Double]): Seq[Double] = {
    val n = distances.size
    if (n == 0) return Seq.empty
    val sorted = distances.sorted
    distances.map { d =>
      val gt = n - upperBound(sorted, d)
      val eq = upperBound(sorted, d) - lowerBound(sorted, d)
      math.max(Epsilon, (gt + 0.5 * eq) / n)
    }
  }

  /** First index with value ≥ d. */
  def lowerBound(sorted: Seq[Double], d: Double): Int = {
    var lo = 0; var hi = sorted.size
    while (lo < hi) { val mid = (lo + hi) >>> 1; if (sorted(mid) < d) lo = mid + 1 else hi = mid }
    lo
  }

  /** First index with value > d. */
  def upperBound(sorted: Seq[Double], d: Double): Int = {
    var lo = 0; var hi = sorted.size
    while (lo < hi) { val mid = (lo + hi) >>> 1; if (sorted(mid) <= d) lo = mid + 1 else hi = mid }
    lo
  }
}
