package repro.baselines

import repro.core.{ACF, HuberPeriodogram}
import scala.util.Random

/** AUTOPERIOD baseline (Vlachos, Yu & Castelli 2005): periodogram "power
  * threshold" from permuted sequences selects candidate period hills; each
  * candidate is validated on the ACF — it must lie on a *hill* (rising
  * then falling ACF segment) — and refined to the local ACF maximum.
  */
class AutoPeriod(nPermutations: Int = 100, percentile: Double = 0.99, seed: Long = 7)
    extends Detrended("AUTOPERIOD") {

  protected def detectDetrended(x: Array[Double]): Seq[Int] = {
    val n     = x.length
    val pHalf = HuberPeriodogram.vanilla(x).take(n / 2 + 1)
    val acf   = ACF.biased(x)
    // Permutation power threshold: shuffling destroys periodic structure
    // while preserving the marginal distribution; the chosen percentile of
    // the shuffled max-power distribution separates signal from noise bins.
    val rnd = new Random(seed)
    val maxima = Array.fill(nPermutations) {
      val sh = rnd.shuffle(x.toVector).toArray
      val ps = HuberPeriodogram.vanilla(sh)
      var mx = 0.0
      var k  = 1
      while (k <= n / 2) { mx = math.max(mx, ps(k)); k += 1 }
      mx
    }
    java.util.Arrays.sort(maxima)
    val thresh = maxima(math.min(nPermutations - 1, (percentile * nPermutations).toInt))
    candidatesValidated(pHalf, acf, n, thresh)
  }

  /** Candidate bins above `thresh`, hill-validated and refined on the ACF. */
  def candidatesValidated(pHalf: Array[Double], acf: Array[Double], n: Int,
                          thresh: Double): Seq[Int] = {
    val cands = (2 until pHalf.length)
      .filter(pHalf(_) > thresh)
      .sortBy(k => -pHalf(k))
      .map(k => n.toDouble / k)
    val out = scala.collection.mutable.ArrayBuffer.empty[Int]
    cands.foreach { c =>
      hillValidate(acf, c, n).foreach { refined =>
        if (!out.exists(o => math.abs(o - refined) <= math.max(1, 0.05 * refined)))
          out += refined
      }
    }
    out.filter(p => p >= 2 && p <= n / 2).toSeq
  }

  /** A candidate is kept iff it lies on an ACF hill: within the candidate's
    * periodogram-resolution window, the two-segment line fit around the
    * window argmax must rise then fall (the original paper's criterion);
    * the refined period is that argmax.
    */
  def hillValidate(acf: Array[Double], candidate: Double, n: Int): Option[Int] = {
    val k  = math.max(2, math.round(n / candidate).toInt)
    val lo = math.max(2, math.floor(n.toDouble / (k + 1)).toInt)
    val hi = math.min(acf.length - 2, math.ceil(n.toDouble / (k - 1)).toInt)
    if (hi - lo < 2) return None
    val seg   = (lo to hi).toArray
    val tStar = seg.maxBy(acf(_))
    if (tStar == lo || tStar == hi) return None
    val left  = slope(seg.filter(_ <= tStar), acf)
    val right = slope(seg.filter(_ >= tStar), acf)
    if (left > 0 && right < 0) Some(tStar) else None
  }

  private def slope(idx: Array[Int], acf: Array[Double]): Double = {
    if (idx.length < 2) return 0.0
    val xm = idx.sum.toDouble / idx.length
    val ym = idx.map(acf(_)).sum / idx.length
    var num = 0.0; var den = 0.0
    idx.foreach { i => num += (i - xm) * (acf(i) - ym); den += (i - xm) * (i - xm) }
    if (den > 0) num / den else 0.0
  }
}

object AutoPeriod extends AutoPeriod(100, 0.99, 7)
