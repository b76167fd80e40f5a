package repro.core

import org.scalatest.funsuite.AnyFunSuite

class NormalQuantilesSpec extends AnyFunSuite {

  test("known quantiles of the standard normal") {
    assert(math.abs(NormalQuantiles.inverseCdf(0.5)) < 1e-9)
    assert(math.abs(NormalQuantiles.inverseCdf(0.975) - 1.959964) < 1e-5)
    assert(math.abs(NormalQuantiles.inverseCdf(0.8413447) - 1.0) < 1e-4)
    assert(math.abs(NormalQuantiles.inverseCdf(0.0013498980) + 3.0) < 1e-4)
  }

  test("inverseCdf is antisymmetric around 0.5") {
    for (p <- Seq(0.01, 0.1, 0.25, 0.4, 0.49)) {
      assert(math.abs(NormalQuantiles.inverseCdf(p) + NormalQuantiles.inverseCdf(1 - p)) < 1e-8)
    }
  }

  test("inverseCdf is strictly increasing") {
    val ps = (1 to 999).map(_ / 1000.0)
    val zs = ps.map(NormalQuantiles.inverseCdf)
    zs.sliding(2).foreach(w => assert(w(0) < w(1)))
  }

  test("inverseCdf rejects out-of-range p") {
    intercept[IllegalArgumentException](NormalQuantiles.inverseCdf(0.0))
    intercept[IllegalArgumentException](NormalQuantiles.inverseCdf(1.0))
  }

  test("breakpoints: size, monotonicity, symmetry") {
    for (alpha <- Seq(2, 4, 8, 16, 64, 256)) {
      val bp = NormalQuantiles.breakpoints(alpha)
      assert(bp.length == alpha - 1)
      bp.sliding(2).filter(_.length == 2).foreach(w => assert(w(0) < w(1)))
      // symmetry: bp(i) = -bp(alpha-2-i)
      bp.indices.foreach(i => assert(math.abs(bp(i) + bp(alpha - 2 - i)) < 1e-8))
    }
  }

  test("breakpoints for alpha=4 match the classic SAX table") {
    val bp = NormalQuantiles.breakpoints(4)
    assert(math.abs(bp(0) + 0.6745) < 1e-3)
    assert(math.abs(bp(1)) < 1e-9)
    assert(math.abs(bp(2) - 0.6745) < 1e-3)
  }

  test("dyadic nesting: alpha breakpoints are a subset of 2*alpha breakpoints") {
    for (alpha <- Seq(4, 8, 128)) {
      val coarse = NormalQuantiles.breakpoints(alpha)
      val fine = NormalQuantiles.breakpoints(2 * alpha)
      coarse.indices.foreach { i =>
        assert(math.abs(coarse(i) - fine(2 * i + 1)) < 1e-9)
      }
    }
  }
}
