package repro.baseline

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.Dataset
import org.apache.spark.storage.StorageLevel
import repro.core.{Series, SeriesRecord}
import repro.spark.Built

/** FAISS IndexFlatL2 analog (paper's exact vector-search competitor): exact
  * brute-force L2 with the ||q||^2 + ||x||^2 - 2 q.x decomposition over a
  * per-partition row-major float matrix, no pruning and no early abandoning.
  * As in the paper's protocol, FAISS processes queries in mini-batches; the
  * whole batch runs in a single Spark job, parallel over partitions.
  */
final class FaissFlat private (
    val store: RDD[FaissFlat.Slab],
    val numPartitions: Int,
) extends Built {

  override def name: String = "FAISS"

  override def search(query: Array[Float], k: Int): Array[(Long, Double)] =
    searchBatch(Seq(query), k)(0)

  override def searchBatch(queries: Seq[Array[Float]], k: Int): Array[Array[(Long, Double)]] = {
    val (results, _) = searchAllTimed(queries, k)
    results
  }

  override def searchAllTimed(queries: Seq[Array[Float]], k: Int)
      : (Array[Array[(Long, Double)]], Array[Double]) = {
    val prepared = queries.map(Series.znorm).toArray
    val nq = prepared.length
    val perPart = store.map { slab =>
      val t0 = System.nanoTime()
      val res = prepared.map(qz => FaissFlat.searchSlab(slab, qz, k))
      val totalMs = (System.nanoTime() - t0) / 1e6
      (res, totalMs)
    }.collect()
    val results = (0 until nq).map(qi => Built.mergeTopK(perPart.toIndexedSeq.map(_._1(qi)), k)).toArray
    // batched processing: per-query cost is the batch cost amortized over nq
    val perQueryMs = perPart.map(_._2).max / math.max(1, nq)
    (results, Array.fill(nq)(perQueryMs))
  }

  override def close(): Unit = { store.unpersist(blocking = false); () }
}

object FaissFlat {

  /** One partition's flat store: ids, a rows x dim row-major matrix of
    * z-normalized values, and precomputed squared row norms.
    */
  final case class Slab(ids: Array[Long], dim: Int, flat: Array[Float],
                        normsSq: Array[Double]) extends Serializable {
    def rows: Int = ids.length
  }

  private[baseline] def searchSlab(slab: Slab, qz: Array[Float], k: Int): Array[(Long, Double)] = {
    val dim = slab.dim
    var qNormSq = 0.0
    var j = 0
    while (j < dim) { val v = qz(j).toDouble; qNormSq += v * v; j += 1 }
    val heap = new java.util.PriorityQueue[(Double, Long)](math.max(1, k),
      (a: (Double, Long), b: (Double, Long)) => java.lang.Double.compare(b._1, a._1))
    var r = 0
    while (r < slab.rows) {
      val base = r * dim
      var dot = 0.0
      j = 0
      while (j < dim) { dot += qz(j).toDouble * slab.flat(base + j); j += 1 }
      val dSq = math.max(0.0, qNormSq + slab.normsSq(r) - 2.0 * dot)
      if (heap.size < k) heap.add((dSq, slab.ids(r)))
      else if (dSq < heap.peek()._1) { heap.poll(); heap.add((dSq, slab.ids(r))) }
      r += 1
    }
    val out = new Array[(Long, Double)](heap.size)
    var i = heap.size - 1
    while (i >= 0) { val (d, id) = heap.poll(); out(i) = (id, math.sqrt(d)); i -= 1 }
    out
  }

  /** Materialize per-partition flat matrices of the z-normalized dataset. */
  def build(ds: Dataset[SeriesRecord], partitions: Int): FaissFlat = {
    val store = ds.rdd
      .map(r => (r.id, Series.znorm(r.values)))
      .repartition(partitions)
      .mapPartitions { it =>
        val buf = it.toArray
        if (buf.isEmpty) Iterator.empty
        else {
          val dim = buf.head._2.length
          val flat = new Array[Float](buf.length * dim)
          val norms = new Array[Double](buf.length)
          var r = 0
          while (r < buf.length) {
            val z = buf(r)._2
            System.arraycopy(z, 0, flat, r * dim, dim)
            var acc = 0.0
            var j = 0
            while (j < dim) { val v = z(j).toDouble; acc += v * v; j += 1 }
            norms(r) = acc
            r += 1
          }
          Iterator.single(Slab(buf.map(_._1), dim, flat, norms))
        }
      }
      .persist(StorageLevel.MEMORY_ONLY)
    store.count()
    new FaissFlat(store, partitions)
  }
}
