package repro.spark

import repro.core.Sfa

/** A built, queryable similarity-search engine over one dataset.
  *
  * `search` answers one query with intra-query parallelism (one Spark job per
  * query — the paper's sequential-query protocol for MESSI/SOFA).
  * `searchAllTimed` is the benchmark entry point: a single Spark job in which
  * every partition processes the whole query list sequentially, so the
  * per-query wall time is the maximum per-partition compute time — this keeps
  * local-mode scheduler overhead (~tens of ms per job) out of the per-query
  * numbers while preserving the "all workers cooperate on one query at a time"
  * semantics of the paper's engines (see DESIGN.md §5).
  */
trait Built {
  def name: String
  def numPartitions: Int

  def search(query: Array[Float], k: Int): Array[(Long, Double)]

  /** Batched search, default sequential; FAISS overrides with one job. */
  def searchBatch(queries: Seq[Array[Float]], k: Int): Array[Array[(Long, Double)]] =
    queries.map(search(_, k)).toArray

  /** (results per query, per-query wall milliseconds). */
  def searchAllTimed(queries: Seq[Array[Float]], k: Int): (Array[Array[(Long, Double)]], Array[Double])

  def close(): Unit
}

object Built {
  /** Merge per-partition top-k lists into the global top-k, deterministically
    * (distance, then id).
    */
  def mergeTopK(parts: Seq[Array[(Long, Double)]], k: Int): Array[(Long, Double)] =
    parts.flatten.sortBy { case (id, d) => (d, id) }.take(k).toArray
}

/** Shared configuration for the MESSI/SOFA tree engines (paper section V
  * setup; leaf sizes scaled to our dataset sizes).
  */
final case class IndexConfig(
    l: Int = 16,
    alpha: Int = 256,
    leafCapacity: Int = 1000,
    maxCoeff: Int = 32,
    sampleRate: Double = 0.01,
    binning: Sfa.Binning = Sfa.EquiWidth,
    selection: Sfa.Selection = Sfa.ByVariance,
    partitions: Int = 8,
    seed: Long = 42,
)
