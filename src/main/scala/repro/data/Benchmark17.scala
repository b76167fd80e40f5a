package repro.data

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.core.SeriesRecord
import repro.data.SeriesGen._

/** The paper's 17-dataset benchmark (Table I), scaled to laptop size with
  * synthetic analogs that preserve each dataset's series length and spectral
  * profile (DESIGN.md §5). `paperCount` records Table I's series counts so the
  * Table 1 harness can print both.
  */
object Benchmark17 {

  final case class DatasetSpec(name: String, paperCount: Long, len: Int,
                               count: Long, profile: Profile, seed: Long) {
    def scaled(scale: Double): DatasetSpec =
      copy(count = math.max(64L, (count * scale).toLong))
  }

  /** Catalog at benchmark scale (counts are the `scale = 1.0` defaults used by
    * `bench/`; tests shrink via `scaled`). Profiles follow the domains of
    * Table I: seismic records = `Burst` with per-dataset dominant frequency
    * band, astronomy/neuroimaging = low-frequency, vector datasets = i.i.d.
    * High-frequency analogs (LenDB, SCEDC, TXED, OBST2024) are the regime
    * where the paper reports SOFA's largest wins.
    */
  /** Latent-template clustering: real archives contain families of similar
    * series (repeated seismic events per station, near-duplicate vectors), so
    * queries have close nearest neighbors — the regime where lower-bounding
    * pruning pays off. ~24 members per template for structured signals; looser
    * clusters for the vector datasets.
    */
  private def clus(p: Profile, count: Long, jitter: Double, members: Int = 24): Profile =
    Clustered(p, math.max(8, (count / members).toInt), jitter)

  def catalog: Seq[DatasetSpec] = Seq(
    DatasetSpec("Astro",        100_000_000L, 256, 96000, clus(RandomWalk(256), 96000, 0.3),                      101),
    DatasetSpec("BigANN",       100_000_000L, 100, 96000, clus(IidGaussian(100), 96000, 0.5, members = 12),       102),
    DatasetSpec("Deep1b",       100_000_000L,  96, 96000, clus(IidGaussian(96), 96000, 0.5, members = 12),        103),
    DatasetSpec("ETHZ",           4_999_932L, 256, 24000, clus(Burst(256, 4, 12, noise = 0.4), 24000, 0.3),       104),
    DatasetSpec("Iquique",          578_853L, 256, 12000, clus(Burst(256, 2, 6, noise = 0.3), 12000, 0.3),        105),
    DatasetSpec("ISC_EHB",      100_000_000L, 256, 96000, clus(Burst(256, 6, 16, noise = 0.5), 96000, 0.3),       106),
    DatasetSpec("LenDB",         37_345_260L, 256, 48000, clus(SineMix(256, 18, 30, 4, noise = 0.5), 48000, 0.3), 107),
    DatasetSpec("Meier2019JGR",   6_361_998L, 256, 24000, clus(Burst(256, 2, 5, noise = 0.3), 24000, 0.3),        108),
    DatasetSpec("NEIC",          93_473_541L, 256, 96000, clus(Burst(256, 3, 8, noise = 0.4), 96000, 0.3),        109),
    DatasetSpec("OBS",           15_508_794L, 256, 48000, clus(Burst(256, 10, 25, noise = 0.7), 48000, 0.3),      110),
    DatasetSpec("OBST2024",       4_160_286L, 256, 24000, clus(Burst(256, 15, 30, noise = 0.8), 24000, 0.3),      111),
    DatasetSpec("PNW",           31_982_766L, 256, 48000, clus(Burst(256, 4, 10, noise = 0.4), 48000, 0.3),       112),
    DatasetSpec("SALD",         100_000_000L, 128, 96000, clus(SineMix(128, 1, 3, 3, noise = 0.15), 96000, 0.3),  113),
    DatasetSpec("SCEDC",        100_000_000L, 256, 96000, clus(SineMix(256, 14, 26, 4, noise = 0.5), 96000, 0.3), 114),
    DatasetSpec("SIFT1b",       100_000_000L, 128, 96000, clus(IidGaussian(128), 96000, 0.5, members = 12),       115),
    DatasetSpec("STEAD",         87_323_433L, 256, 96000, clus(Burst(256, 8, 20, noise = 0.6), 96000, 0.3),       116),
    DatasetSpec("TXED",          35_851_641L, 256, 48000, clus(Burst(256, 14, 28, noise = 0.6), 48000, 0.3),      117),
  )

  /** UCR-archive-like ablation suite (Table V): small, diverse datasets
    * spanning smooth / periodic / noisy / bursty / non-Gaussian families.
    */
  def ucrLike: Seq[DatasetSpec] = {
    def spec(name: String, len: Int, p: Profile, seed: Long) =
      DatasetSpec(name, 0L, len, 300, p, seed)
    Seq(
      spec("u-walk128",    128, RandomWalk(128),                      201),
      spec("u-walk256",    256, RandomWalk(256),                      202),
      spec("u-sine-lo",    128, SineMix(128, 1, 4, 2, noise = 0.05),  203),
      spec("u-sine-mid",   128, SineMix(128, 8, 16, 3, noise = 0.2),  204),
      spec("u-sine-hi",    128, SineMix(128, 18, 30, 3, noise = 0.3), 205),
      spec("u-sine-noisy", 256, SineMix(256, 5, 20, 4, noise = 1.0),  206),
      spec("u-burst-lo",   256, Burst(256, 2, 6, noise = 0.3),        207),
      spec("u-burst-hi",   256, Burst(256, 20, 40, noise = 0.6),      208),
      spec("u-iid-96",      96, IidGaussian(96),                      209),
      spec("u-iid-256",    256, IidGaussian(256),                     210),
      spec("u-ecg-fast",   128, EcgLike(128, period = 16),            211),
      spec("u-ecg-slow",   256, EcgLike(256, period = 64),            212),
      spec("u-square-lo",  128, SquareWave(128, 2, 5, noise = 0.1),   213),
      spec("u-square-hi",  128, SquareWave(128, 10, 20, noise = 0.2), 214),
      spec("u-walk64",      64, RandomWalk(64),                       215),
      spec("u-sine-64",     64, SineMix(64, 10, 25, 3, noise = 0.3),  216),
    )
  }

  /** Materialize a spec as (index set, driver-local query array). */
  def load(spark: SparkSession, spec: DatasetSpec, nQueries: Int)
      : (Dataset[SeriesRecord], Array[Array[Float]]) = {
    val ds = SeriesGen.dataset(spark, spec.profile, spec.count, spec.seed)
    val qs = SeriesGen.queries(spec.profile, nQueries, spec.seed)
    (ds, qs)
  }
}
