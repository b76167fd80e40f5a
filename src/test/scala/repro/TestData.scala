package repro

import java.util.Random

import repro.core.Series

/** Shared helpers for the test suites: deterministic random series and a
  * brute-force z-ED k-NN reference implementation.
  */
object TestData {

  def rng(seed: Long): Random = new Random(seed)

  def randomSeries(r: Random, n: Int): Array[Float] =
    Array.fill(n)(r.nextGaussian().toFloat)

  /** A "hard" mix: random walks, sinusoids, bursts — exercises varied spectra. */
  def mixedSeries(r: Random, n: Int): Array[Float] = {
    r.nextInt(3) match {
      case 0 => // random walk
        var acc = 0.0
        Array.fill(n) { acc += r.nextGaussian(); acc.toFloat }
      case 1 => // noisy sinusoid
        val f = 1 + r.nextInt(n / 4)
        val p = r.nextDouble() * 2 * math.Pi
        Array.tabulate(n)(i => (math.sin(2 * math.Pi * f * i / n + p) + 0.3 * r.nextGaussian()).toFloat)
      case _ => // iid noise
        Array.fill(n)(r.nextGaussian().toFloat)
    }
  }

  def dataset(seed: Long, count: Int, n: Int, mixed: Boolean = true): Array[(Long, Array[Float])] = {
    val r = rng(seed)
    Array.tabulate(count)(i => (i.toLong, if (mixed) mixedSeries(r, n) else randomSeries(r, n)))
  }

  /** Brute-force z-normalized k-NN, deterministic tie-break on (dist, id). */
  def bruteKnn(data: Seq[(Long, Array[Float])], query: Array[Float], k: Int): Array[(Long, Double)] = {
    val qz = Series.znorm(query)
    data
      .map { case (id, v) => (id, math.sqrt(Series.edSq(qz, Series.znorm(v)))) }
      .sortBy { case (id, d) => (d, id) }
      .take(k)
      .toArray
  }

  /** Assert two k-NN result lists agree on distances (ids may differ on exact
    * ties, which random float data essentially never produces).
    */
  def assertSameKnn(got: Array[(Long, Double)], want: Array[(Long, Double)], tol: Double = 1e-6): Unit = {
    assert(got.length == want.length, s"k mismatch: got ${got.length} want ${want.length}")
    got.zip(want).zipWithIndex.foreach { case (((gid, gd), (wid, wd)), i) =>
      assert(math.abs(gd - wd) <= tol * math.max(1.0, wd),
        s"rank $i: got ($gid, $gd) want ($wid, $wd)")
    }
  }
}
