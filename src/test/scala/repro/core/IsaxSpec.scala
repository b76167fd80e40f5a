package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestData

class IsaxSpec extends AnyFunSuite {

  test("space construction: dimensions, weights = segment lengths") {
    val s = Isax.space(64, 16, 256)
    assert(s.l == 16 && s.alpha == 256 && s.maxBits == 8)
    assert(s.weights.forall(_ == 4.0))
    val s2 = Isax.space(100, 16, 256)
    assert(s2.weights.sum == 100.0)
  }

  test("word of a z-normalized constant-segments series hits the middle symbols") {
    val s = Isax.space(64, 8, 256)
    val z = Series.znorm(TestData.randomSeries(TestData.rng(50), 64))
    val w = s.word(z)
    w.foreach(sym => assert(sym >= 0 && sym < 256))
  }

  test("iSAX MINDIST lower-bounds the true ED — divisible length") {
    val r = TestData.rng(51)
    val s = Isax.space(64, 8, 64)
    for (_ <- 1 to 300) {
      val q = Series.znorm(TestData.mixedSeries(r, 64))
      val c = Series.znorm(TestData.mixedSeries(r, 64))
      val lb = s.wordLbSq(s.project(q), s.word(c), Double.PositiveInfinity)
      assert(lb <= Series.edSq(q, c) + 1e-6)
    }
  }

  test("iSAX MINDIST lower-bounds the true ED — non-divisible length (n=100, l=16)") {
    val r = TestData.rng(52)
    val s = Isax.space(100, 16, 256)
    for (_ <- 1 to 300) {
      val q = Series.znorm(TestData.mixedSeries(r, 100))
      val c = Series.znorm(TestData.mixedSeries(r, 100))
      val lb = s.wordLbSq(s.project(q), s.word(c), Double.PositiveInfinity)
      assert(lb <= Series.edSq(q, c) + 1e-6)
    }
  }

  test("iSAX node-level LBD lower-bounds the word-level LBD at every cardinality") {
    val r = TestData.rng(53)
    val s = Isax.space(64, 8, 256)
    for (_ <- 1 to 50) {
      val q = Series.znorm(TestData.mixedSeries(r, 64))
      val c = Series.znorm(TestData.mixedSeries(r, 64))
      val qp = s.project(q)
      val w = s.word(c)
      val wordLb = s.wordLbSq(qp, w, Double.PositiveInfinity)
      for (bits <- 0 to s.maxBits) {
        val prefix = w.map(_ >>> (s.maxBits - bits))
        assert(s.nodeLbSq(qp, prefix, Array.fill(s.l)(bits)) <= wordLb + 1e-9)
      }
    }
  }

  test("larger alphabets give tighter (or equal) mean iSAX bounds") {
    val r = TestData.rng(54)
    val pairs = Array.fill(100)((Series.znorm(TestData.mixedSeries(r, 64)),
                                 Series.znorm(TestData.mixedSeries(r, 64))))
    val mean = Seq(4, 16, 256).map { a =>
      val s = Isax.space(64, 8, a)
      pairs.map { case (q, c) =>
        math.sqrt(s.wordLbSq(s.project(q), s.word(c), Double.PositiveInfinity))
      }.sum / pairs.length
    }
    assert(mean(0) <= mean(1) + 1e-9 && mean(1) <= mean(2) + 1e-9)
  }

  test("identical series have zero iSAX mindist") {
    val r = TestData.rng(55)
    val s = Isax.space(64, 8, 256)
    val x = Series.znorm(TestData.mixedSeries(r, 64))
    assert(s.wordLbSq(s.project(x), s.word(x), Double.PositiveInfinity) == 0.0)
  }
}
