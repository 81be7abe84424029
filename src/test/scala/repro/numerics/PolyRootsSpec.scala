package repro.numerics

import org.scalatest.funsuite.AnyFunSuite
import repro.numerics.PolyRoots.C

class PolyRootsSpec extends AnyFunSuite {

  private def assertRootsMatch(coeffs: Array[Double], expected: Seq[Double], tol: Double = 1e-8): Unit = {
    val rs = PolyRoots.roots(coeffs)
    expected.foreach { e =>
      assert(rs.exists(r => math.abs(r.re - e) < tol && math.abs(r.im) < tol),
             s"missing root $e in ${rs.mkString(",")}")
    }
  }

  test("quadratic with real roots 2 and 3") {
    assertRootsMatch(Array(6.0, -5.0, 1.0), Seq(2.0, 3.0))
  }

  test("quadratic with complex roots ±i") {
    val rs = PolyRoots.roots(Array(1.0, 0.0, 1.0))
    assert(rs.exists(r => math.abs(r.im - 1) < 1e-8 && math.abs(r.re) < 1e-8))
    assert(rs.exists(r => math.abs(r.im + 1) < 1e-8 && math.abs(r.re) < 1e-8))
  }

  test("cubic (x-1)(x-2)(x-4)") {
    assertRootsMatch(Array(-8.0, 14.0, -7.0, 1.0), Seq(1.0, 2.0, 4.0))
  }

  test("repeated-ish close roots still found") {
    // (x - 1)(x - 1.001)
    val rs = PolyRoots.roots(Array(1.001, -2.001, 1.0), tol = 1e-12, maxIter = 5000)
    assert(rs.forall(r => math.abs(r.re - 1.0) < 0.01 && math.abs(r.im) < 0.01))
  }

  test("non-monic leading coefficient handled") {
    assertRootsMatch(Array(-12.0, 10.0, -2.0).map(_ * 1.0), Seq(2.0, 3.0))
  }

  for (deg <- 2 to 8) {
    test(s"degree-$deg polynomial with roots 1..$deg: residuals near zero") {
      // Build Π (x - k) by convolution.
      var coeffs = Array(1.0)
      (1 to deg).foreach { k =>
        val next = new Array[Double](coeffs.length + 1)
        for (i <- coeffs.indices) { next(i) += -k * coeffs(i); next(i + 1) += coeffs(i) }
        coeffs = next
      }
      val rs = PolyRoots.roots(coeffs, maxIter = 5000)
      rs.foreach { r =>
        val v = PolyRoots.eval(coeffs, r)
        assert(v.abs < 1e-4, s"residual ${v.abs} at root $r (deg $deg)")
      }
    }
  }

  test("eval Horner correctness") {
    // p(x) = 1 + 2x + 3x²  at x = 2 → 17
    val v = PolyRoots.eval(Array(1.0, 2.0, 3.0), C(2, 0))
    assert(math.abs(v.re - 17.0) < 1e-12 && math.abs(v.im) < 1e-12)
  }

  test("complex arithmetic sanity") {
    val a = C(1, 2); val b = C(3, -1)
    val p = a * b
    assert(math.abs(p.re - 5) < 1e-12 && math.abs(p.im - 5) < 1e-12)
    val q = p / b
    assert(math.abs(q.re - a.re) < 1e-12 && math.abs(q.im - a.im) < 1e-12)
  }
}
