package repro.forecast

/** TBATS substitute for the downstream forecasting study (Table 6): a
  * multi-seasonal harmonic regression — Fourier terms for each supplied
  * period plus a linear trend — fit by ridge-regularized least squares.
  *
  * Why this substitution is faithful: Table 6 uses the forecaster only to
  * translate a *detected period set* into out-of-sample error. Like TBATS,
  * harmonic regression under-fits structurally when a true period is
  * missing from the set and wastes degrees of freedom on false periods, so
  * the ranking across detection algorithms is preserved (DESIGN.md §4).
  */
object HarmonicForecaster {

  final case class Model(periods: Seq[Int], harmonics: Seq[Int], coefs: Array[Double]) {
    def predict(t: Double): Double = {
      var y = coefs(0) + coefs(1) * t
      var c = 2
      periods.zip(harmonics).foreach { case (p, hk) =>
        var k = 1
        while (k <= hk) {
          val w = 2 * math.Pi * k * t / p
          y += coefs(c) * math.cos(w) + coefs(c + 1) * math.sin(w)
          c += 2
          k += 1
        }
      }
      y
    }
  }

  /** Fit on `train` (t = 0..n−1) with K = min(3, p/2) harmonics per period. */
  def fit(train: Array[Double], periods: Seq[Int], ridge: Double = 1e-4): Model = {
    val usable = periods.distinct.filter(p => p >= 2 && p <= train.length).sorted
    val harm   = usable.map(p => math.min(3, p / 2))
    val dim    = 2 + 2 * harm.sum
    val n      = train.length
    // Design matrix row for time t.
    def row(t: Int): Array[Double] = {
      val r = new Array[Double](dim)
      r(0) = 1.0; r(1) = t.toDouble / n // scaled trend for conditioning
      var c = 2
      usable.zip(harm).foreach { case (p, hk) =>
        var k = 1
        while (k <= hk) {
          val w = 2 * math.Pi * k * t / p
          r(c) = math.cos(w); r(c + 1) = math.sin(w)
          c += 2
          k += 1
        }
      }
      r
    }
    // Normal equations with ridge; solved by Gaussian elimination with
    // partial pivoting (dim is tiny: ≤ ~2 + 6·|periods|).
    val ata = Array.ofDim[Double](dim, dim)
    val atb = new Array[Double](dim)
    var t = 0
    while (t < n) {
      val r = row(t)
      var i = 0
      while (i < dim) {
        atb(i) += r(i) * train(t)
        var j = 0
        while (j < dim) { ata(i)(j) += r(i) * r(j); j += 1 }
        i += 1
      }
      t += 1
    }
    var d = 0
    while (d < dim) { ata(d)(d) += ridge * n; d += 1 }
    val coefsScaled = solve(ata, atb)
    // Undo the trend scaling so predict() can use raw t.
    val coefs = coefsScaled.clone()
    coefs(1) = coefsScaled(1) / n
    Model(usable, harm, coefs)
  }

  /** Forecast `horizon` points following a train set of length `n0`. */
  def forecast(model: Model, n0: Int, horizon: Int): Array[Double] =
    Array.tabulate(horizon)(h => model.predict((n0 + h).toDouble))

  private def solve(a: Array[Array[Double]], b: Array[Double]): Array[Double] = {
    val n = b.length
    val m = a.map(_.clone())
    val x = b.clone()
    var col = 0
    while (col < n) {
      var piv = col
      var r = col + 1
      while (r < n) { if (math.abs(m(r)(col)) > math.abs(m(piv)(col))) piv = r; r += 1 }
      val tmp = m(col); m(col) = m(piv); m(piv) = tmp
      val tb = x(col); x(col) = x(piv); x(piv) = tb
      val p = m(col)(col)
      require(math.abs(p) > 1e-12, "singular normal matrix")
      r = col + 1
      while (r < n) {
        val f = m(r)(col) / p
        var c = col
        while (c < n) { m(r)(c) -= f * m(col)(c); c += 1 }
        x(r) -= f * x(col)
        r += 1
      }
      col += 1
    }
    val out = new Array[Double](n)
    var i = n - 1
    while (i >= 0) {
      var s = x(i)
      var j = i + 1
      while (j < n) { s -= m(i)(j) * out(j); j += 1 }
      out(i) = s / m(i)(i)
      i -= 1
    }
    out
  }
}

/** Forecast error metrics. */
object Metrics {
  def rmse(pred: Array[Double], actual: Array[Double]): Double = {
    require(pred.length == actual.length)
    math.sqrt(pred.indices.map(i => math.pow(pred(i) - actual(i), 2)).sum / pred.length)
  }
  def mae(pred: Array[Double], actual: Array[Double]): Double = {
    require(pred.length == actual.length)
    pred.indices.map(i => math.abs(pred(i) - actual(i))).sum / pred.length
  }
}
