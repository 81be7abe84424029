package repro.numerics

/** Complex polynomial root finding via the Durand–Kerner (Weierstrass)
  * simultaneous iteration.
  *
  * Needed as a substrate for Daubechies filter generation (spectral
  * factorization of the Daubechies half-band polynomial). Coefficients are
  * real in that use case but the solver works on complex polynomials.
  */
object PolyRoots {

  /** Minimal complex value type (Spark's classpath has no public complex). */
  final case class C(re: Double, im: Double) {
    def +(o: C): C = C(re + o.re, im + o.im)
    def -(o: C): C = C(re - o.re, im - o.im)
    def *(o: C): C = C(re * o.re - im * o.im, re * o.im + im * o.re)
    def /(o: C): C = {
      val d = o.re * o.re + o.im * o.im
      C((re * o.re + im * o.im) / d, (im * o.re - re * o.im) / d)
    }
    def abs: Double = math.hypot(re, im)
  }

  object C {
    val zero: C = C(0, 0)
    val one: C  = C(1, 0)
    def real(x: Double): C = C(x, 0)
  }

  /** Evaluate a polynomial with coefficients `coeffs` (coeffs(i) multiplies
    * z^i) at complex point z, by Horner's rule.
    */
  def eval(coeffs: Array[Double], z: C): C = {
    var acc = C.zero
    var i   = coeffs.length - 1
    while (i >= 0) { acc = acc * z + C.real(coeffs(i)); i -= 1 }
    acc
  }

  /** All complex roots of the polynomial with real coefficients
    * `coeffs` (coeffs(i) multiplies z^i, highest coefficient non-zero).
    *
    * Durand–Kerner from staggered initial guesses on a non-real circle;
    * iterates until the max update is below `tol` or `maxIter` is hit.
    */
  def roots(coeffs: Array[Double], tol: Double = 1e-13, maxIter: Int = 2000): Array[C] = {
    require(coeffs.length >= 2, "need degree >= 1")
    val n     = coeffs.length - 1
    val lead  = coeffs(n)
    require(math.abs(lead) > 0, "leading coefficient must be non-zero")
    val monic = coeffs.map(_ / lead)

    // Initial guesses: points on a circle of radius r, rotated off the real
    // axis so real-rooted polynomials still converge.
    val r  = 1.0 + monic.dropRight(1).map(math.abs).maxOption.getOrElse(0.0)
    val zs = Array.tabulate(n) { i =>
      val th = 2 * math.Pi * i / n + 0.4
      C(r * math.cos(th), r * math.sin(th))
    }

    var it    = 0
    var delta = Double.MaxValue
    while (it < maxIter && delta > tol) {
      delta = 0.0
      var i = 0
      while (i < n) {
        var denom = C.one
        var j     = 0
        while (j < n) {
          if (j != i) denom = denom * (zs(i) - zs(j))
          j += 1
        }
        val step = eval(monic, zs(i)) / denom
        zs(i) = zs(i) - step
        if (step.abs > delta) delta = step.abs
        i += 1
      }
      it += 1
    }
    zs
  }
}
