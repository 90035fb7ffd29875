package repro.prob

/** Exact Poisson-binomial distribution via the paper's dynamic program.
  *
  * For a triangle Δ with 4-clique "apexes" z_1..z_c, the support random
  * variable is ζ = Σ_i E_i with independent Bernoulli indicators
  * E_i ~ Bernoulli(Pr(E_i)) (Section 5.1, Eq. 7). This object computes the
  * pmf Pr[ζ = k] exactly: X(S, k, j) = Pr(E_j)·X(S, k-1, j-1) +
  * (1-Pr(E_j))·X(S, k, j-1). The same DP serves the probabilistic core and
  * truss baselines (vertex degree / edge support are also Poisson-binomials).
  */
object PoissonBinomial {

  /** Exact pmf of ζ = Σ Bernoulli(probs(i)); returns array of length
    * probs.length + 1 with entry k = Pr[ζ = k]. O(c²) time, O(c) space.
    */
  def pmf(probs: Array[Double]): Array[Double] = {
    val c = probs.length
    val dp = new Array[Double](c + 1)
    dp(0) = 1.0
    var j = 0
    while (j < c) {
      val p = probs(j)
      // iterate k downwards so dp(k-1) is still the j-1 column
      var k = j + 1
      while (k >= 1) {
        dp(k) = p * dp(k - 1) + (1 - p) * dp(k)
        k -= 1
      }
      dp(0) = (1 - p) * dp(0)
      j += 1
    }
    dp
  }

  /** Tail Pr[ζ ≥ k] for all k in 0..c, from the exact pmf. */
  def tail(probs: Array[Double]): Array[Double] = {
    val m   = pmf(probs)
    val out = new Array[Double](m.length)
    var acc = 0.0
    var k   = m.length - 1
    while (k >= 0) { acc += m(k); out(k) = acc; k -= 1 }
    out
  }

  /** κ score (Section 5.1): the largest k with
    * existProb · Pr[ζ ≥ k] ≥ θ, or -1 if even k = 0 fails
    * (i.e. the item itself exists with probability < θ).
    */
  def kappa(existProb: Double, probs: Array[Double], theta: Double): Int = {
    if (existProb < theta) return -1
    // Pr[ζ ≥ 0] = 1, so k = 0 always qualifies once existProb ≥ θ.
    val t = tail(probs)
    var k = probs.length
    while (k > 0 && existProb * t(k) < theta) k -= 1
    k
  }

  /** κ with the paper's O(κ·c) cost: run the DP with the count dimension
    * capped at kCap (maintaining only Pr[ζ = 0..kCap−1] plus the lumped
    * tail mass), and double kCap until the answer is strictly below the
    * cap. Pr[ζ ≥ k] = 1 − Σ_{j<k} Pr[ζ = j] needs only the capped pmf.
    */
  def kappaFast(existProb: Double, probs: Array[Double], theta: Double): Int = {
    if (existProb < theta) return -1
    val c = probs.length
    if (c == 0) return 0
    var kCap = 4
    while (true) {
      val cap = math.min(kCap, c)
      // dp(j) = Pr[ζ = j] for j < cap (tail mass ≥ cap is implicit)
      val dp = new Array[Double](cap)
      dp(0) = 1.0
      var i = 0
      while (i < c) {
        val p = probs(i)
        var k = math.min(i + 1, cap - 1)
        while (k >= 1) { dp(k) = p * dp(k - 1) + (1 - p) * dp(k); k -= 1 }
        dp(0) = (1 - p) * dp(0)
        i += 1
      }
      // find the largest k ≤ cap with existProb·(1 − Pr[ζ < k]) ≥ θ
      var cdf  = 0.0
      var best = 0
      var k    = 1
      var fail = false
      while (k <= cap && !fail) {
        cdf += dp(k - 1)
        if (existProb * math.max(0.0, 1.0 - cdf) >= theta) best = k else fail = true
        k += 1
      }
      if (best < cap || cap == c) return best
      kCap *= 2
    }
    0 // unreachable
  }

  /** Mean μ = Σ p_i of the Poisson-binomial. */
  def mean(probs: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < probs.length) { s += probs(i); i += 1 }
    s
  }

  /** Variance σ² = Σ p_i (1 − p_i). */
  def variance(probs: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < probs.length) { val p = probs(i); s += p * (1 - p); i += 1 }
    s
  }
}
