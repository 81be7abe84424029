package repro.synth

import org.scalatest.funsuite.AnyFunSuite
import TimeSeriesGen._
import scala.util.Random

class TimeSeriesGenSpec extends AnyFunSuite {

  test("wave: sin endpoints and symmetry") {
    assert(math.abs(wave(Sin, 0.0)) < 1e-12)
    assert(math.abs(wave(Sin, 0.25) - 1.0) < 1e-12)
    assert(math.abs(wave(Sin, 0.75) + 1.0) < 1e-12)
  }

  test("wave: square is ±1 with half duty cycle") {
    assert(wave(Square, 0.1) == 1.0 && wave(Square, 0.6) == -1.0)
  }

  test("wave: triangle hits ±1 at quarter points and 0 at ends") {
    assert(math.abs(wave(Triangle, 0.0)) < 1e-12)
    assert(math.abs(wave(Triangle, 0.25) - 1.0) < 1e-12)
    assert(math.abs(wave(Triangle, 0.5)) < 1e-12)
    assert(math.abs(wave(Triangle, 0.75) + 1.0) < 1e-12)
  }

  for (form <- Seq(Sin, Square, Triangle)) {
    test(s"$form periodic signal actually repeats with its period") {
      val rnd = new Random(1)
      val x = periodicSignal(400, Seq(40), form, rnd)
      (0 until 360).foreach(t => assert(math.abs(x(t) - x(t + 40)) < 1e-9))
    }
  }

  test("multi-period signal is the sum of its components") {
    val x = periodicSignal(600, Seq(20, 50), Sin, new Random(2))
    // period lcm(20, 50) = 100
    (0 until 500).foreach(t => assert(math.abs(x(t) - x(t + 100)) < 1e-9))
  }

  test("triangleTrend peaks at amp in the middle, 0 at ends") {
    val tr = triangleTrend(100, 10.0)
    assert(math.abs(tr(0)) < 1e-12 && math.abs(tr(50) - 10.0) < 1e-9)
  }

  test("awgn variance close to σ²") {
    val x = awgn(20000, 2.0, new Random(3))
    val v = x.map(v => v * v).sum / x.length
    assert(v > 1.8 && v < 2.2, s"var $v")
  }

  test("addOutliers changes ≈ η·N points by ≥5") {
    val base = Array.fill(1000)(0.0)
    val out = addOutliers(base, 0.1, new Random(4))
    val changed = out.count(v => math.abs(v) >= 5.0 - 1e-9)
    assert(changed >= 85 && changed <= 100, s"$changed outliers") // collisions possible
  }

  test("synthetic is deterministic in the seed") {
    val a = synthetic(500, Seq(20, 50), Square, 1.0, 0.1, seed = 5)
    val b = synthetic(500, Seq(20, 50), Square, 1.0, 0.1, seed = 5)
    assert(a.sameElements(b))
    val c = synthetic(500, Seq(20, 50), Square, 1.0, 0.1, seed = 6)
    assert(!a.sameElements(c))
  }

  test("blockMissingInterpolated is linear across the gap") {
    val x = Array.tabulate(100)(_.toDouble)
    val y = blockMissingInterpolated(x, Seq((10, 20)))
    // Linear data interpolates back to itself.
    x.indices.foreach(i => assert(math.abs(y(i) - x(i)) < 1e-9))
  }

  test("blockMissingInterpolated flattens structure inside the gap") {
    val x = Array.tabulate(200)(t => math.sin(2 * math.Pi * t / 10.0))
    val y = blockMissingInterpolated(x, Seq((50, 40)))
    val insideVar = (52 to 86).map(i => y(i) - y(i - 1)).map(d => d * d).sum
    val outsideVar = (110 to 144).map(i => y(i) - y(i - 1)).map(d => d * d).sum
    assert(insideVar < 0.01 * outsideVar)
  }
}

class DatasetsSpec extends AnyFunSuite {

  test("singlePeriodSin: count, length, truth") {
    val s = Datasets.singlePeriodSin(10, 0.1, 0.01)
    assert(s.size == 10)
    assert(s.forall(_.values.length == 1000))
    assert(s.forall(_.truth.toSeq == Seq(100)))
    assert(s.map(_.id).distinct.size == 10)
  }

  test("multiPeriod conditions are named distinctly per waveform/severity") {
    val a = Datasets.multiPeriod(2, TimeSeriesGen.Sin, 0.1, 0.01)
    val b = Datasets.multiPeriod(2, TimeSeriesGen.Square, 0.1, 0.01)
    val c = Datasets.multiPeriod(2, TimeSeriesGen.Sin, 1.0, 0.1)
    assert(Set(a.head.cond, b.head.cond, c.head.cond).size == 3)
  }

  test("cranLike: 82 series with periods in 4..52 and ≥2 cycles each") {
    val s = Datasets.cranLike()
    assert(s.size == 82)
    s.foreach { ser =>
      val p = ser.truth.head
      assert(p >= 4 && p <= 52)
      assert(ser.values.length >= 2 * p, s"series ${ser.id}: len ${ser.values.length} period $p")
      assert(ser.values.length <= 3024)
    }
  }

  test("yahooLike: 1680 points, truth {12,24,168}") {
    val s = Datasets.yahooLike(5, a4 = true)
    assert(s.forall(_.values.length == 1680))
    assert(s.forall(_.truth.toSeq == Seq(12, 24, 168)))
  }

  test("yahoo A3 and A4 differ (changepoint)") {
    val a3 = Datasets.yahooLike(1, a4 = false).head.values
    val a4 = Datasets.yahooLike(1, a4 = true).head.values
    assert(!a3.sameElements(a4))
  }

  test("alibabaLike: six datasets with documented lengths and periods") {
    val s = Datasets.alibabaLike()
    assert(s.size == 6)
    assert(s.map(_.values.length).toSeq == Seq(4320, 4032, 1008, 1008, 7200, 7200))
    assert(s(0).truth.toSeq == Seq(720))
    assert(s(3).truth.toSeq == Seq(24, 168))
    assert(s(4).truth.toSeq == Seq(1440) && s(5).truth.toSeq == Seq(1440))
  }

  test("generation is deterministic") {
    val a = Datasets.yahooLike(3, a4 = false)
    val b = Datasets.yahooLike(3, a4 = false)
    a.zip(b).foreach { case (x, y) => assert(x.values.sameElements(y.values)) }
  }
}
