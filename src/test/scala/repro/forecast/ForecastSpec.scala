package repro.forecast

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class ForecastSpec extends AnyFunSuite {

  test("fits and extrapolates a pure sine almost exactly") {
    val n = 400
    val full = Array.tabulate(n + 100)(t => math.sin(2 * math.Pi * t / 50.0))
    val model = HarmonicForecaster.fit(full.take(n), Seq(50))
    val pred = HarmonicForecaster.forecast(model, n, 100)
    val err = Metrics.rmse(pred, full.slice(n, n + 100))
    assert(err < 0.01, s"rmse $err")
  }

  test("multi-seasonal fit captures both periods") {
    val n = 800
    val full = Array.tabulate(n + 168)(t =>
      math.sin(2 * math.Pi * t / 24.0) + 0.5 * math.sin(2 * math.Pi * t / 168.0))
    val model = HarmonicForecaster.fit(full.take(n), Seq(24, 168))
    val pred = HarmonicForecaster.forecast(model, n, 168)
    assert(Metrics.rmse(pred, full.slice(n, n + 168)) < 0.05)
  }

  test("missing a true period hurts forecast error (Table 6's mechanism)") {
    val rnd = new Random(1)
    val n = 840
    val full = Array.tabulate(n + 168)(t =>
      math.sin(2 * math.Pi * t / 24.0) + math.sin(2 * math.Pi * t / 168.0) + 0.1 * rnd.nextGaussian())
    val goodM = HarmonicForecaster.fit(full.take(n), Seq(24, 168))
    val badM  = HarmonicForecaster.fit(full.take(n), Seq(24))
    val good = Metrics.rmse(HarmonicForecaster.forecast(goodM, n, 168), full.slice(n, n + 168))
    val bad  = Metrics.rmse(HarmonicForecaster.forecast(badM, n, 168), full.slice(n, n + 168))
    assert(good < bad, s"good $good vs bad $bad")
  }

  test("a false extra period costs little on long trains (regularized dof)") {
    val rnd = new Random(2)
    val n = 840
    val full = Array.tabulate(n + 168)(t => math.sin(2 * math.Pi * t / 24.0) + 0.1 * rnd.nextGaussian())
    val exact = HarmonicForecaster.fit(full.take(n), Seq(24))
    val extra = HarmonicForecaster.fit(full.take(n), Seq(24, 37))
    val e1 = Metrics.rmse(HarmonicForecaster.forecast(exact, n, 168), full.slice(n, n + 168))
    val e2 = Metrics.rmse(HarmonicForecaster.forecast(extra, n, 168), full.slice(n, n + 168))
    assert(e2 < 3 * e1 + 0.2, s"extra-period blowup: $e1 vs $e2")
  }

  test("captures a linear trend") {
    val n = 300
    val full = Array.tabulate(n + 50)(t => 0.05 * t + 2.0)
    val model = HarmonicForecaster.fit(full.take(n), Seq.empty)
    val pred = HarmonicForecaster.forecast(model, n, 50)
    assert(Metrics.rmse(pred, full.slice(n, n + 50)) < 0.05)
  }

  test("invalid periods are dropped, not fit") {
    val model = HarmonicForecaster.fit(Array.tabulate(100)(_.toDouble), Seq(1, 500, 24))
    assert(model.periods == Seq(24))
  }

  test("metrics: rmse and mae on known vectors") {
    val p = Array(1.0, 2.0, 3.0)
    val a = Array(1.0, 4.0, 3.0)
    assert(math.abs(Metrics.rmse(p, a) - math.sqrt(4.0 / 3)) < 1e-12)
    assert(math.abs(Metrics.mae(p, a) - 2.0 / 3) < 1e-12)
  }

  test("metrics reject mismatched lengths") {
    intercept[IllegalArgumentException] { Metrics.rmse(Array(1.0), Array(1.0, 2.0)) }
  }
}
