package repro.wavelet

/** Decimated orthonormal DWT (pyramid algorithm, circular boundary).
  *
  * Substrate for the Wavelet-Fisher baseline (Almasri 2011), which applies
  * Fisher's test to each level's detail coefficients. Input is truncated to
  * a multiple of 2^J so every level halves exactly.
  */
object DWT {

  /** `details(j-1)` holds level-j detail coefficients (length N/2^j);
    * `approx` holds the final approximation coefficients.
    */
  final case class Decomposition(details: Array[Array[Double]], approx: Array[Double])

  def transform(x: Array[Double], levels: Int, p: Int = 4): Decomposition = {
    val g = Daubechies.scaling(p)
    val h = Daubechies.wavelet(p)
    val l1 = g.length
    val usable = (x.length >> levels) << levels
    require(usable >= l1, s"series too short for $levels DWT levels")
    var v = x.take(usable)
    val details = Array.ofDim[Array[Double]](levels)
    var j = 0
    while (j < levels) {
      val half = v.length / 2
      val wj = new Array[Double](half)
      val vj = new Array[Double](half)
      var t = 0
      while (t < half) {
        var sw = 0.0
        var sv = 0.0
        var l  = 0
        while (l < l1) {
          val idx = Math.floorMod(2 * t + 1 - l, v.length)
          sw += h(l) * v(idx)
          sv += g(l) * v(idx)
          l += 1
        }
        wj(t) = sw; vj(t) = sv
        t += 1
      }
      details(j) = wj
      v = vj
      j += 1
    }
    Decomposition(details, v)
  }
}
