package repro.numerics

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class BandedSpec extends AnyFunSuite {

  /** Dense Gaussian elimination oracle. */
  private def denseSolve(a: Array[Array[Double]], b: Array[Double]): Array[Double] = {
    val n = b.length
    val m = a.map(_.clone()); val x = b.clone()
    for (c <- 0 until n) {
      val piv = (c until n).maxBy(r => math.abs(m(r)(c)))
      val t = m(c); m(c) = m(piv); m(piv) = t
      val tb = x(c); x(c) = x(piv); x(piv) = tb
      for (r <- c + 1 until n) {
        val f = m(r)(c) / m(c)(c)
        for (cc <- c until n) m(r)(cc) -= f * m(c)(cc)
        x(r) -= f * x(c)
      }
    }
    val out = new Array[Double](n)
    for (i <- n - 1 to 0 by -1) {
      var s = x(i)
      for (j <- i + 1 until n) s -= m(i)(j) * out(j)
      out(i) = s / m(i)(i)
    }
    out
  }

  private def randomSpdBanded(n: Int, bw: Int, rnd: Random): (Array[Array[Double]], Array[Array[Double]]) = {
    // A = Bᵀ B + n·I restricted to the band (diagonally dominant → SPD).
    val dense = Array.ofDim[Double](n, n)
    for (i <- 0 until n; j <- math.max(0, i - bw) to math.min(n - 1, i + bw)) {
      if (j >= i) {
        val v = if (i == j) n + 2.0 + rnd.nextDouble() else rnd.nextDouble() - 0.5
        dense(i)(j) = v; dense(j)(i) = v
      }
    }
    val band = Array.tabulate(bw + 1, n) { (d, i) =>
      if (i + d < n) dense(i)(i + d) else 0.0
    }
    (dense, band)
  }

  for (n <- Seq(4, 10, 50, 200); bw <- Seq(1, 2, 3)) {
    test(s"banded solve matches dense solve (n=$n, bw=$bw)") {
      val rnd = new Random(n * 31 + bw)
      val (dense, band) = randomSpdBanded(n, bw, rnd)
      val b = Array.fill(n)(rnd.nextDouble() * 4 - 2)
      val got = Banded.solve(band, b)
      val exp = denseSolve(dense, b)
      got.indices.foreach(i => assert(math.abs(got(i) - exp(i)) < 1e-8,
        s"mismatch at $i: ${got(i)} vs ${exp(i)}"))
    }
  }

  test("identity solve returns rhs") {
    val band = Array(Array.fill(5)(1.0), Array.fill(5)(0.0))
    val b = Array(1.0, 2.0, 3.0, 4.0, 5.0)
    assert(Banded.solve(band, b).toSeq == b.toSeq)
  }

  test("non-SPD matrix rejected") {
    val band = Array(Array(1.0, -5.0), Array(2.0, 0.0))
    intercept[IllegalArgumentException] { Banded.solve(band, Array(1.0, 1.0)) }
  }

  test("residual ‖Ax − b‖ is tiny for a large pentadiagonal system") {
    val n = 2000
    val rnd = new Random(9)
    val (dense, band) = randomSpdBanded(n, 2, rnd)
    val b = Array.fill(n)(rnd.nextGaussian())
    val x = Banded.solve(band, b)
    var worst = 0.0
    for (i <- 0 until n) {
      var s = 0.0
      for (j <- math.max(0, i - 2) to math.min(n - 1, i + 2)) s += dense(i)(j) * x(j)
      worst = math.max(worst, math.abs(s - b(i)))
    }
    assert(worst < 1e-8, s"residual $worst")
  }
}
