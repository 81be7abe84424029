package repro.synth

import scala.util.Random
import TimeSeriesGen._

/** Evaluation corpora (Sec. 4.1): one labelled `Series` per evaluated time
  * series. Public/proprietary datasets are substituted by synthetic
  * generators with the documented structure — see DESIGN.md §4.
  */
object Datasets {

  /** A labelled series: `cond` names the corpus/condition for grouping. */
  final case class Series(id: Long, cond: String, values: Array[Double], truth: Array[Int])

  /** Synthetic single-period corpus (Table 1): sin wave, T = 100, N = 1000. */
  def singlePeriodSin(count: Int, sigma2: Double, eta: Double, seed: Long = 11,
                      n: Int = 1000): Seq[Series] = {
    val cond = f"sin1(s2=$sigma2%.1f,eta=$eta%.2f)"
    (0 until count).map { i =>
      Series(i, cond, synthetic(n, Seq(100), Sin, sigma2, eta, seed + i), Array(100))
    }
  }

  /** Synthetic multi-period corpus (Tables 2/3/5/7/8): T = {20, 50, 100}. */
  def multiPeriod(count: Int, form: Waveform, sigma2: Double, eta: Double,
                  seed: Long = 23, n: Int = 1000): Seq[Series] = {
    val fname = form.toString.toLowerCase
    val cond  = f"$fname%s3(s2=$sigma2%.1f,eta=$eta%.2f,n=$n%d)"
    (0 until count).map { i =>
      Series(i, cond, synthetic(n, Seq(20, 50, 100), form, sigma2, eta, seed + i),
             Array(20, 50, 100))
    }
  }

  /** CRAN-like single-period corpus (82 series, period 4–52, length
    * 64–3024, mixed waveforms, mild noise/outliers) — see DESIGN.md §4.
    */
  def cranLike(count: Int = 82, seed: Long = 31): Seq[Series] = {
    val rnd = new Random(seed)
    (0 until count).map { i =>
      val period = 4 + rnd.nextInt(49) // 4..52
      val cycles = 4 + rnd.nextInt(40)
      val n      = math.min(3024, math.max(64, period * cycles))
      val form   = Seq(Sin, Square, Triangle)(rnd.nextInt(3))
      val sigma2 = 0.05 + 0.2 * rnd.nextDouble()
      val eta    = if (rnd.nextDouble() < 0.5) 0.0 else 0.02
      Series(i, "cran-like",
             synthetic(n, Seq(period), form, sigma2, eta, seed * 1000 + i, trendAmp = 5.0),
             Array(period))
    }
  }

  /** Yahoo-A3/A4-like corpus: N = 1680, T = {12, 24, 168}. A4 adds a trend
    * changepoint and heavier outliers (the A4 benchmark has changepoints).
    */
  def yahooLike(count: Int, a4: Boolean, seed: Long = 47): Seq[Series] = {
    val n = 1680
    val cond = if (a4) "yahoo-a4-like" else "yahoo-a3-like"
    (0 until count).map { i =>
      val rnd = new Random(seed + 100L * i + (if (a4) 1 else 0))
      val sig = periodicSignal(n, Seq(12, 24, 168), Sin, rnd)
      val amp = 1.0 + rnd.nextDouble()
      val nz  = awgn(n, 0.2, rnd)
      val base = Array.tabulate(n)(t => amp * sig(t) + nz(t))
      val withTrend =
        if (a4) {
          val cp = n / 3 + rnd.nextInt(n / 3)
          Array.tabulate(n)(t => base(t) + (if (t >= cp) 3.0 else 0.0) + 0.002 * t)
        } else Array.tabulate(n)(t => base(t) + 0.001 * t)
      val x = addOutliers(withTrend, if (a4) 0.02 else 0.01, rnd)
      Series(i, cond, x, Array(12, 24, 168))
    }
  }

  /** Alibaba-cloud-like substitutes (Table 4): one series per dataset with
    * the documented length, period(s) and pathology. Data-5/6 get block
    * missing data (10.5% / 20.5%) linearly interpolated before detection.
    */
  def alibabaLike(seed: Long = 71): Seq[Series] = {
    def gen(id: Long, cond: String, n: Int, periods: Seq[Int], sigma2: Double,
            eta: Double, form: Waveform, missFrac: Double = 0.0): Series = {
      val rnd  = new Random(seed + id)
      var x    = synthetic(n, periods, form, sigma2, eta, seed * 100 + id, trendAmp = 6.0)
      if (missFrac > 0) {
        // A few contiguous missing blocks totalling missFrac of the series.
        val nBlocks  = 4
        val blockLen = math.max(2, (missFrac * n / nBlocks).toInt)
        val blocks = (0 until nBlocks).map { b =>
          (1 + rnd.nextInt(math.max(2, n - blockLen - 2)), blockLen)
        }
        x = blockMissingInterpolated(x, blocks)
      }
      Series(id, cond, x, periods.toArray)
    }
    Seq(
      gen(1, "Data-1 Database RT (T=720)",     4320, Seq(720),  0.3, 0.03, Sin),
      gen(2, "Data-2 File Exchange (T=288)",   4032, Seq(288),  0.2, 0.02, Square),
      gen(3, "Data-3 Flink TPS (T=144)",       1008, Seq(144),  0.3, 0.05, Sin),
      gen(4, "Data-4 Job Count (T=24,168)",    1008, Seq(24, 168), 0.2, 0.03, Sin),
      gen(5, "Data-5 CPU (T=1440, miss=10.5%)", 7200, Seq(1440), 0.4, 0.05, Sin, 0.105),
      gen(6, "Data-6 CPU (T=1440, miss=20.5%)", 7200, Seq(1440), 0.4, 0.05, Sin, 0.205),
    )
  }
}
