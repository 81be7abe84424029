package repro.core

/** Periodograms: the vanilla FFT periodogram (Eq. 5) and the robust
  * Huber M-periodogram (Eq. 6–7) solved per frequency by ADMM.
  *
  * For level-j data the exact M-estimate is only computed on the octave
  * band [N'/2^{j+1}, N'/2^j] and spliced with the vanilla periodogram
  * elsewhere — the paper's own speed-up; the splice is scale-consistent
  * because the sum-of-squares M-periodogram equals the vanilla
  * periodogram exactly.
  */
object HuberPeriodogram {

  /** Vanilla periodogram P_k = |X_k|²/n, full range k = 0..n−1. */
  def vanilla(x: Array[Double]): Array[Double] = {
    val n    = x.length
    val spec = FFT.forward(x)
    Array.tabulate(n) { k =>
      val re = spec(2 * k); val im = spec(2 * k + 1)
      (re * re + im * im) / n
    }
  }

  /** Huber M-periodogram at a single frequency index k of an n-point
    * series: P^M_k = (n/4)·‖β̂‖² with
    * β̂ = argmin Σ_t γ_ζ(φ_t β − x_t), φ_t = [cos(2πkt/n), sin(2πkt/n)].
    *
    * ADMM with z = φβ − x: closed-form 2×2 normal-equation β-step, Huber
    * prox z-step, scaled dual u. Warm-started at the least-squares
    * (vanilla DFT) solution.
    */
  def huberAtK(x: Array[Double], k: Int, zeta: Double, rho: Double = 1.0,
               maxIter: Int = 50, tol: Double = 1e-8): Double = {
    val n = x.length
    val cos = new Array[Double](n)
    val sin = new Array[Double](n)
    // Incremental rotation instead of n trig calls; renormalized per step
    // is unnecessary at n ≲ 10^4.
    val wRe = math.cos(2 * math.Pi * k / n)
    val wIm = math.sin(2 * math.Pi * k / n)
    var cRe = 1.0; var cIm = 0.0
    var t = 0
    while (t < n) {
      cos(t) = cRe; sin(t) = cIm
      val nRe = cRe * wRe - cIm * wIm
      cIm = cRe * wIm + cIm * wRe
      cRe = nRe
      t += 1
    }
    // Precompute φᵀφ (2×2, SPD away from k = 0 and Nyquist).
    var scc = 0.0; var scs = 0.0; var sss = 0.0
    t = 0
    while (t < n) { scc += cos(t) * cos(t); scs += cos(t) * sin(t); sss += sin(t) * sin(t); t += 1 }
    val det = scc * sss - scs * scs
    if (det <= 1e-12) { // degenerate regressor (k = 0 or n/2): fall back
      var s = 0.0; t = 0
      while (t < n) { s += x(t) * (if (k == 0) 1.0 else cos(t)); t += 1 }
      return s * s / n
    }
    // Least-squares warm start.
    var b1 = 0.0; var b2 = 0.0
    var rx1 = 0.0; var rx2 = 0.0
    t = 0
    while (t < n) { rx1 += cos(t) * x(t); rx2 += sin(t) * x(t); t += 1 }
    b1 = (sss * rx1 - scs * rx2) / det
    b2 = (scc * rx2 - scs * rx1) / det

    val z = new Array[Double](n)
    val u = new Array[Double](n)
    t = 0
    while (t < n) { z(t) = cos(t) * b1 + sin(t) * b2 - x(t); t += 1 }

    var it = 0
    var moved = Double.MaxValue
    while (it < maxIter && moved > tol) {
      // β-step: (φᵀφ) β = φᵀ (x + z − u)
      var r1 = 0.0; var r2 = 0.0
      t = 0
      while (t < n) {
        val target = x(t) + z(t) - u(t)
        r1 += cos(t) * target; r2 += sin(t) * target
        t += 1
      }
      val nb1 = (sss * r1 - scs * r2) / det
      val nb2 = (scc * r2 - scs * r1) / det
      moved = math.hypot(nb1 - b1, nb2 - b2)
      b1 = nb1; b2 = nb2
      // z-step (Huber prox) and dual update. Convergence is judged on BOTH
      // β and z movement: β alone can stall for an iteration while the
      // dual is still accumulating, which would stop ADMM far from the
      // optimum.
      t = 0
      while (t < n) {
        val res = cos(t) * b1 + sin(t) * b2 - x(t)
        val v   = res + u(t)
        val nz  = RobustStats.huberProx(v, zeta, rho)
        val dz  = math.abs(nz - z(t))
        if (dz > moved) moved = dz
        z(t) = nz
        u(t) = v - nz
        t += 1
      }
      it += 1
    }
    n / 4.0 * (b1 * b1 + b2 * b2)
  }

  /** Half-range periodogram (indices 0..n/2) with the exact Huber
    * M-estimate on `exactBand` (inclusive index range) and the vanilla
    * periodogram elsewhere.
    */
  def spliced(x: Array[Double], exactBand: (Int, Int), zeta: Double,
              maxIter: Int = 50): Array[Double] = {
    val n    = x.length
    val half = n / 2
    val out  = vanilla(x).take(half + 1)
    val lo   = math.max(1, exactBand._1)
    val hi   = math.min(half, exactBand._2)
    var k = lo
    while (k <= hi) {
      out(k) = huberAtK(x, k, zeta, maxIter = maxIter)
      k += 1
    }
    out
  }

  /** Exact Huber M-periodogram at every index 0..n/2 (used by ablations). */
  def huberFull(x: Array[Double], zeta: Double, maxIter: Int = 50): Array[Double] =
    spliced(x, (1, x.length / 2), zeta, maxIter)
}
