package repro.core

import org.jtransforms.fft.DoubleFFT_1D

/** FFT substrate: thin, convention-pinning wrapper over JTransforms
  * (shipped in /opt/spark/jars).
  *
  * Conventions (standard DSP):
  *   forward:  X_k = Σ_t x_t e^{-i 2π k t / n}   (no scaling)
  *   inverse:  x_t = (1/n) Σ_k X_k e^{+i 2π k t / n}
  *
  * Arbitrary lengths are supported (JTransforms uses mixed-radix +
  * Bluestein internally); the test suite cross-checks against a naive
  * O(n²) DFT for prime, odd and power-of-two lengths.
  */
object FFT {

  /** Forward DFT of a real signal. Returns interleaved complex
    * [re0, im0, re1, im1, ...] of length 2n.
    */
  def forward(x: Array[Double]): Array[Double] = {
    val n = x.length
    val a = new Array[Double](2 * n)
    var i = 0
    while (i < n) { a(2 * i) = x(i); i += 1 }
    new DoubleFFT_1D(n).complexForward(a)
    a
  }

  /** Inverse DFT of an interleaved complex spectrum; returns the real part
    * (caller guarantees the spectrum is conjugate-symmetric up to noise).
    */
  def inverseReal(spec: Array[Double]): Array[Double] = {
    val a = spec.clone()
    val n = a.length / 2
    new DoubleFFT_1D(n).complexInverse(a, true)
    Array.tabulate(n)(i => a(2 * i))
  }

  /** Naive O(n²) DFT — test oracle only. */
  def naiveForward(x: Array[Double]): Array[Double] = {
    val n   = x.length
    val out = new Array[Double](2 * n)
    var k   = 0
    while (k < n) {
      var re = 0.0; var im = 0.0
      var t  = 0
      while (t < n) {
        val ang = -2 * math.Pi * k * t / n
        re += x(t) * math.cos(ang)
        im += x(t) * math.sin(ang)
        t += 1
      }
      out(2 * k) = re; out(2 * k + 1) = im
      k += 1
    }
    out
  }
}
