package repro.core

/** Peak detection for ACF sequences (Palshikar 2009, spike function S1).
  *
  * For each point the spike score is the mean of the maximum rises over the
  * k left and k right neighbours; points whose score exceeds
  * mean + h·stddev of the positive scores are kept, then peaks closer than
  * `k` apart are pruned keeping the taller one.
  */
object PeakDetection {

  /** Indices of detected peaks in `x`, restricted to [from, until). */
  def peaks(x: Array[Double], k: Int = 3, h: Double = 1.0,
            from: Int = 0, until: Int = -1): Array[Int] = {
    val n  = x.length
    val hi = if (until < 0) n else math.min(until, n)
    if (hi - from < 3) return Array.empty
    val score = new Array[Double](n)
    var i = from
    while (i < hi) {
      var left  = Double.NegativeInfinity
      var right = Double.NegativeInfinity
      var j = 1
      while (j <= k) {
        if (i - j >= 0) left = math.max(left, x(i) - x(i - j))
        if (i + j < n) right = math.max(right, x(i) - x(i + j))
        j += 1
      }
      if (left == Double.NegativeInfinity) left = right
      if (right == Double.NegativeInfinity) right = left
      score(i) = 0.5 * (left + right)
      i += 1
    }
    val pos = (from until hi).map(score).filter(_ > 0)
    if (pos.isEmpty) return Array.empty
    val m  = pos.sum / pos.size
    val sd = math.sqrt(pos.map(v => (v - m) * (v - m)).sum / pos.size)
    // ≥ not >: with a single positive score sd = 0 and the lone true peak
    // must still qualify.
    val thresh = m + h * sd
    val cands = (from until hi).filter { i =>
      score(i) >= thresh &&
      (i == 0 || x(i) >= x(i - 1)) && (i == n - 1 || x(i) >= x(i + 1))
    }
    // Prune peaks within k of each other, keeping the taller.
    val kept = scala.collection.mutable.ArrayBuffer.empty[Int]
    cands.foreach { c =>
      if (kept.nonEmpty && c - kept.last <= k) {
        if (x(c) > x(kept.last)) { kept.remove(kept.length - 1); kept += c }
      } else kept += c
    }
    kept.toArray
  }
}
