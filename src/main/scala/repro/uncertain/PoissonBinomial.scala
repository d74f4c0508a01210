package repro.uncertain

/** Exact distribution of the number of successes among independent
  * non-identical Bernoulli trials — the probability kernel behind the
  * (k,η)-core [40] and (k,γ)-truss [41] baselines.
  */
object PoissonBinomial {

  /** pmf(j) = Pr[#successes = j], j = 0..n, by the standard O(n^2) DP. */
  def pmf(probs: Array[Double]): Array[Double] = {
    val n = probs.length
    val dp = new Array[Double](n + 1)
    dp(0) = 1.0
    var i = 0
    while (i < n) {
      val p = probs(i)
      var j = i + 1
      while (j >= 1) {
        dp(j) = dp(j) * (1 - p) + dp(j - 1) * p
        j -= 1
      }
      dp(0) *= (1 - p)
      i += 1
    }
    dp
  }

  /** Pr[#successes >= k]. */
  def tailGeq(probs: Array[Double], k: Int): Double = {
    if (k <= 0) return 1.0
    if (k > probs.length) return 0.0
    val d = pmf(probs)
    var s = 0.0
    var j = k
    while (j <= probs.length) { s += d(j); j += 1 }
    math.min(1.0, s)
  }

  /** Largest k with Pr[#successes >= k] >= eta (0 if none). */
  def maxKWithTail(probs: Array[Double], eta: Double): Int = {
    val d = pmf(probs)
    var tail = 0.0
    var k = probs.length
    while (k >= 1) {
      tail += d(k)
      if (tail >= eta) return k
      k -= 1
    }
    0
  }
}
