package repro.bench

import repro.eval.Tables

/** Tables 7 & 8 — runtime and F1 vs series length (500 / 1000 / 2000).
  *
  * Paper Table 7 (avg seconds, MacBook i5):
  *   Siegel .003/.008/.013  AUTOPERIOD .014/.023/.046
  *   Wavelet-Fisher .004/.006/.012   RobustPeriod .142/.146/.300
  * Paper Table 8 (F1):
  *   Siegel .79/.79/.52  AUTOPERIOD .79/.25/.15
  *   Wavelet-Fisher .50/.50/.41  RobustPeriod .99/.99/.97
  */
class Table7and8Bench extends BenchBase {

  private lazy val (runtimeDf, f1Df) =
    Tables.table7and8(spark, math.min(benchCount, 50))

  private lazy val runtimes = runtimeDf.collect()
    .map(r => (r.getString(0), r.getString(1)) -> r.getDouble(2)).toMap
  private lazy val metrics = metricMap(f1Df)

  private def cond(n: Int) = s"sin3(s2=0.1,eta=0.01,n=$n)"
  private val lengths = Seq(500, 1000, 2000)
  private val algos = Seq("Siegel", "AUTOPERIOD", "Wavelet-Fisher", "RobustPeriod")

  test("Table 7: print measured runtimes vs paper") {
    banner("Table 7: average runtime (ms) vs length")
    row("algo", "n=500", "n=1000", "n=2000")
    algos.foreach { a =>
      row(a, runtimes((cond(500), a)), runtimes((cond(1000), a)), runtimes((cond(2000), a)))
    }
    println("paper (s): Siegel .003/.008/.013 | AUTOPERIOD .014/.023/.046 | " +
      "Wavelet-Fisher .004/.006/.012 | RobustPeriod .142/.146/.300")
  }

  test("Table 8: print measured F1 vs paper") {
    banner("Table 8: F1 (±2%) vs length")
    row("algo", "n=500", "n=1000", "n=2000")
    algos.foreach { a =>
      row(a, metrics((cond(500), a, 0.02))._3, metrics((cond(1000), a, 0.02))._3,
        metrics((cond(2000), a, 0.02))._3)
    }
    println("paper (±0%): Siegel .79/.79/.52 | AUTOPERIOD .79/.25/.15 | " +
      "Wavelet-Fisher .50/.50/.41 | RobustPeriod .99/.99/.97")
  }

  test("RobustPeriod costs more than the cheap baselines but stays under 2 s/series") {
    lengths.foreach { n =>
      val rp = runtimes((cond(n), "RobustPeriod"))
      assert(rp > runtimes((cond(n), "Siegel")), s"n=$n: RobustPeriod unexpectedly cheap")
      assert(rp < 2000.0, s"n=$n: RobustPeriod too slow ($rp ms)")
    }
  }

  test("RobustPeriod F1 stays high at every length (paper ≥ .97)") {
    lengths.foreach { n =>
      assert(metrics((cond(n), "RobustPeriod", 0.02))._3 >= 0.85, s"n=$n")
    }
  }

  test("RobustPeriod degrades least from n=500 to n=2000") {
    def drop(a: String) =
      metrics((cond(500), a, 0.02))._3 - metrics((cond(2000), a, 0.02))._3
    val rpDrop = drop("RobustPeriod")
    assert(rpDrop <= 0.1, s"RobustPeriod dropped $rpDrop")
  }
}
