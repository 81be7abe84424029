package repro.bench

import repro.eval.Tables

/** Table 5 — ablations on synthetic sin data, σ²=2, η=0.2.
  *
  * Paper (precision / recall / F1):
  *           ±0%                      ±2%
  *   Huber-Fisher      .91/.30/.46    .89/.30/.45
  *   Huber-Siegel-ACF  .09/.28/.13    .25/.55/.31
  *   NR-RobustPeriod   .71/.60/.64    .96/.79/.85
  *   RobustPeriod      .76/.70/.72    .98/.91/.93
  */
class Table5Bench extends BenchBase {

  private lazy val metrics = metricMap(Tables.table5(spark, benchCount))

  private val cond  = "sin3(s2=2.0,eta=0.20,n=1000)"
  private val algos = Seq("Huber-Fisher", "Huber-Siegel-ACF", "NR-RobustPeriod", "RobustPeriod")

  test("Table 5: print measured vs paper") {
    banner("Table 5: ablations on severe synthetic sin")
    row("algo", "p±0%", "r±0%", "f1±0%", "p±2%", "r±2%", "f1±2%")
    algos.foreach { a =>
      val (p0, r0, f0, _) = metrics((cond, a, 0.0))
      val (p2, r2, f2, _) = metrics((cond, a, 0.02))
      row(a, p0, r0, f0, p2, r2, f2)
    }
    println("paper: Huber-Fisher .91/.30/.46 .89/.30/.45 | Huber-Siegel-ACF .09/.28/.13 .25/.55/.31 | " +
      "NR-RobustPeriod .71/.60/.64 .96/.79/.85 | RobustPeriod .76/.70/.72 .98/.91/.93")
  }

  test("full RobustPeriod beats every ablation on F1 at ±2%") {
    val rp = metrics((cond, "RobustPeriod", 0.02))._3
    algos.filterNot(_ == "RobustPeriod").foreach { a =>
      assert(rp >= metrics((cond, a, 0.02))._3 - 0.03, s"$a beats full pipeline")
    }
  }

  test("Huber-Fisher recall is capped by single-period output (paper: .30)") {
    assert(metrics((cond, "Huber-Fisher", 0.02))._2 <= 0.45)
  }

  test("NR-RobustPeriod trails the robust pipeline under severe outliers") {
    val rp = metrics((cond, "RobustPeriod", 0.02))._3
    val nr = metrics((cond, "NR-RobustPeriod", 0.02))._3
    assert(nr <= rp + 0.03, s"NR $nr vs robust $rp")
  }
}
