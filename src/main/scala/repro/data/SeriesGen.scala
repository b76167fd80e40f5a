package repro.data

import java.util.Random

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.core.SeriesRecord

/** Deterministic generators for the data-series families the paper's 17
  * datasets belong to (see DESIGN.md §5 for the substitution rationale).
  * Every series is a pure function of (profile, seed, id) — partitioning and
  * re-runs never change the data.
  */
object SeriesGen {

  /** A spectral/shape profile. `len` is the series length n. */
  sealed trait Profile extends Serializable { def len: Int }

  /** Integrated Gaussian steps: energy concentrated in low frequencies
    * (Astro-like long-term variability, SALD-like smooth signals).
    */
  final case class RandomWalk(len: Int) extends Profile

  /** Sum of `nComp` sinusoids with frequencies (cycles per window) drawn
    * uniformly from [fLo, fHi], random phase/amplitude, plus Gaussian noise.
    * High fLo/fHi produces the high-frequency regime where SAX flat-lines.
    */
  final case class SineMix(len: Int, fLo: Double, fHi: Double,
                           nComp: Int = 3, noise: Double = 0.1) extends Profile

  /** Seismic-record analog: background noise, then a damped oscillation with
    * dominant frequency in [fLo, fHi] starting at a random onset — the P-wave
    * window the paper's seismic queries are cut around.
    */
  final case class Burst(len: Int, fLo: Double, fHi: Double,
                         noise: Double = 0.3, amp: Double = 3.0) extends Profile

  /** i.i.d. standard normal values: the vector-data regime (BigANN, Deep1b,
    * SIFT1b) with variance spread across the whole spectrum.
    */
  final case class IidGaussian(len: Int) extends Profile

  /** Periodic spike train with baseline wander — an ECG-like shape for the
    * UCR-style ablation suite.
    */
  final case class EcgLike(len: Int, period: Int = 32, noise: Double = 0.1) extends Profile

  /** Band-limited square wave (strong odd harmonics), non-Gaussian values. */
  final case class SquareWave(len: Int, fLo: Double, fHi: Double,
                              noise: Double = 0.1) extends Profile

  /** Latent-template mixture: `clusters` template series drawn from `base`,
    * each member = its template plus `jitter` * template-std Gaussian noise.
    * This reproduces the neighborhood structure of real archives (repeated
    * seismic events, ANN benchmark vectors), where queries have close nearest
    * neighbors — the regime in which lower-bounding pruning pays off. Queries
    * drawn from the same (profile, seed) share the template pool.
    */
  final case class Clustered(base: Profile, clusters: Int, jitter: Double) extends Profile {
    require(clusters >= 1, "clusters must be >= 1")
    def len: Int = base.len
  }

  /** SplitMix64 — decorrelates the per-series RNG seed from (seed, id). */
  private def mix(seed: Long, id: Long): Long = {
    var z = seed + id * 0x9E3779B97F4A7C15L + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  /** Generate one series for (profile, seed, id). */
  def series(profile: Profile, seed: Long, id: Long): Array[Float] = {
    profile match {
      case Clustered(base, clusters, jitter) =>
        // template stream is keyed by (seed, id mod clusters) on a distinct
        // seed lane so it never collides with the member-noise stream
        val template = series(base, seed ^ 0x7E3A9C15D2B4F681L, ((id % clusters) + clusters) % clusters)
        var sum = 0.0; var sumSq = 0.0
        template.foreach { v => sum += v; sumSq += v.toDouble * v }
        val mean = sum / template.length
        val std = math.sqrt(math.max(1e-12, sumSq / template.length - mean * mean))
        val rng = new Random(mix(seed, id))
        return template.map(v => (v + jitter * std * rng.nextGaussian()).toFloat)
      case _ => ()
    }
    val rng = new Random(mix(seed, id))
    val n = profile.len
    val out = new Array[Float](n)
    profile match {
      case RandomWalk(_) =>
        var acc = 0.0
        var i = 0
        while (i < n) { acc += rng.nextGaussian(); out(i) = acc.toFloat; i += 1 }

      case SineMix(_, fLo, fHi, nComp, noise) =>
        val freqs = Array.fill(nComp)(fLo + rng.nextDouble() * (fHi - fLo))
        val phases = Array.fill(nComp)(rng.nextDouble() * 2 * math.Pi)
        val amps = Array.fill(nComp)(0.5 + rng.nextDouble())
        var i = 0
        while (i < n) {
          var v = 0.0
          var c = 0
          while (c < nComp) { v += amps(c) * math.sin(2 * math.Pi * freqs(c) * i / n + phases(c)); c += 1 }
          out(i) = (v + noise * rng.nextGaussian()).toFloat
          i += 1
        }

      case Burst(_, fLo, fHi, noise, amp) =>
        val f = fLo + rng.nextDouble() * (fHi - fLo)
        val phase = rng.nextDouble() * 2 * math.Pi
        val onset = (0.2 + 0.4 * rng.nextDouble()) * n
        val tau = n / 6.0
        var i = 0
        while (i < n) {
          var v = noise * rng.nextGaussian()
          if (i >= onset) {
            val dt = i - onset
            v += amp * math.exp(-dt / tau) * math.sin(2 * math.Pi * f * dt / n + phase)
          }
          out(i) = v.toFloat
          i += 1
        }

      case IidGaussian(_) =>
        var i = 0
        while (i < n) { out(i) = rng.nextGaussian().toFloat; i += 1 }

      case EcgLike(_, period, noise) =>
        val offset = rng.nextInt(period)
        val width = math.max(1.0, period / 10.0)
        val wanderF = 0.5 + rng.nextDouble()
        val wanderP = rng.nextDouble() * 2 * math.Pi
        var i = 0
        while (i < n) {
          val nearest = math.round((i - offset).toDouble / period) * period + offset
          val d = (i - nearest) / width
          val spike = 3.0 * math.exp(-d * d)
          val wander = 0.4 * math.sin(2 * math.Pi * wanderF * i / n + wanderP)
          out(i) = (spike + wander + noise * rng.nextGaussian()).toFloat
          i += 1
        }

      case SquareWave(_, fLo, fHi, noise) =>
        val f = fLo + rng.nextDouble() * (fHi - fLo)
        val phase = rng.nextDouble() * 2 * math.Pi
        var i = 0
        while (i < n) {
          val s = math.sin(2 * math.Pi * f * i / n + phase)
          out(i) = ((if (s >= 0) 1.0 else -1.0) + noise * rng.nextGaussian()).toFloat
          i += 1
        }

      case _: Clustered => throw new IllegalStateException("handled above")
    }
    out
  }

  /** Distributed dataset of `count` series for a profile. */
  def dataset(spark: SparkSession, profile: Profile, count: Long, seed: Long): Dataset[SeriesRecord] = {
    import spark.implicits._
    spark.range(count).map(id => SeriesRecord(id, series(profile, seed, id)))
  }

  /** Driver-local query set: `nq` series from the same profile on a disjoint
    * id stream (the paper keeps query sets separate from the indexed data).
    * Same seed as the dataset so `Clustered` queries share the template pool —
    * as real queries share the archive's event/vector distribution.
    */
  def queries(profile: Profile, nq: Int, seed: Long): Array[Array[Float]] =
    Array.tabulate(nq)(i => series(profile, seed, 1_000_000_000L + i))
}
