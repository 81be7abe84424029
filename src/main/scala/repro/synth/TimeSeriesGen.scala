package repro.synth

import scala.util.Random

/** Synthetic time-series generators for the paper's evaluation protocol
  * (Sec. 4.1.2): sin/square/triangle multi-period signals of unit
  * amplitude, a triangle trend of amplitude 10, additive white Gaussian
  * noise of variance σ²_n, and outliers injected at ratio η.
  * All generation is deterministic in the seed.
  */
object TimeSeriesGen {

  sealed trait Waveform
  case object Sin      extends Waveform
  case object Square   extends Waveform
  case object Triangle extends Waveform

  /** One cycle-position sample of the unit-amplitude waveform. `phase` in
    * [0, 1) is the position within the cycle.
    */
  def wave(form: Waveform, phase: Double): Double = form match {
    case Sin      => math.sin(2 * math.Pi * phase)
    case Square   => if (phase < 0.5) 1.0 else -1.0
    case Triangle => // rises 0→1 over first quarter, 1→−1 over half, −1→0 last quarter
      val p = phase
      if (p < 0.25) 4 * p
      else if (p < 0.75) 2.0 - 4 * p
      else 4 * p - 4.0
  }

  /** Sum of unit-amplitude periodic components with random phases. */
  def periodicSignal(n: Int, periods: Seq[Int], form: Waveform, rnd: Random): Array[Double] = {
    val phases = periods.map(_ => rnd.nextDouble())
    Array.tabulate(n) { t =>
      periods.zip(phases).map { case (p, ph) =>
        wave(form, ((t.toDouble / p) + ph) % 1.0)
      }.sum
    }
  }

  /** Triangle trend of amplitude `amp`: one rise-and-fall across the series
    * (the paper adds "a triangle signal with amplitude of 10 as trend").
    */
  def triangleTrend(n: Int, amp: Double): Array[Double] =
    Array.tabulate(n) { t =>
      val p = t.toDouble / n
      amp * (if (p < 0.5) 2 * p else 2 - 2 * p)
    }

  def awgn(n: Int, sigma2: Double, rnd: Random): Array[Double] =
    Array.fill(n)(rnd.nextGaussian() * math.sqrt(sigma2))

  /** Inject outliers in place at ratio η: spikes of magnitude U(5, 10) with
    * random sign (matches the spike scale of the paper's Fig. 3a).
    */
  def addOutliers(x: Array[Double], eta: Double, rnd: Random): Array[Double] = {
    val out = x.clone()
    val k   = math.round(eta * x.length).toInt
    var i   = 0
    while (i < k) {
      val idx = rnd.nextInt(x.length)
      val mag = 5.0 + 5.0 * rnd.nextDouble()
      out(idx) += (if (rnd.nextBoolean()) mag else -mag)
      i += 1
    }
    out
  }

  /** The paper's full synthetic recipe: periodic components + triangle
    * trend + AWGN(σ²_n) + outliers(η).
    */
  def synthetic(n: Int, periods: Seq[Int], form: Waveform,
                sigma2: Double, eta: Double, seed: Long,
                trendAmp: Double = 10.0): Array[Double] = {
    val rnd = new Random(seed)
    val sig = periodicSignal(n, periods, form, rnd)
    val tr  = triangleTrend(n, trendAmp)
    val nz  = awgn(n, sigma2, rnd)
    val base = Array.tabulate(n)(t => sig(t) + tr(t) + nz(t))
    addOutliers(base, eta, rnd)
  }

  /** Remove a block of values and linearly interpolate over it (the paper's
    * Data-5/6 treatment of missing data).
    */
  def blockMissingInterpolated(x: Array[Double], blocks: Seq[(Int, Int)]): Array[Double] = {
    val out = x.clone()
    blocks.foreach { case (start, len) =>
      val s = math.max(1, start)
      val e = math.min(x.length - 2, start + len - 1)
      if (e >= s) {
        val a = out(s - 1)
        val b = out(e + 1)
        var i = s
        while (i <= e) {
          out(i) = a + (b - a) * (i - s + 1).toDouble / (e - s + 2)
          i += 1
        }
      }
    }
    out
  }
}
