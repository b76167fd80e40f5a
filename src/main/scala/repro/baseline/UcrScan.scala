package repro.baseline

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.Dataset
import org.apache.spark.storage.StorageLevel
import repro.core.{Series, SeriesRecord}
import repro.spark.Built

/** UCR Suite-P analog (paper's parallel sequential-scan competitor): each
  * partition owns a slice of the in-memory z-normalized series array and scans
  * it with an early-abandoning Euclidean distance against a per-slice
  * best-so-far; partitions synchronize only at the end (driver merge). No
  * index, no lower bounds — the paper's "optimized serial scan" baseline.
  */
final class UcrScan private (
    val store: RDD[(Array[Long], Array[Array[Float]])],
    val numPartitions: Int,
) extends Built {

  override def name: String = "UCR-P"

  override def search(query: Array[Float], k: Int): Array[(Long, Double)] = {
    val qz = Series.znorm(query)
    val parts = store.map { case (ids, zs) => UcrScan.scanPartition(ids, zs, qz, k) }.collect()
    Built.mergeTopK(parts.toSeq, k)
  }

  override def searchAllTimed(queries: Seq[Array[Float]], k: Int)
      : (Array[Array[(Long, Double)]], Array[Double]) = {
    val prepared = queries.map(Series.znorm).toArray
    val perPart = store.map { case (ids, zs) =>
      prepared.map { qz =>
        val t0 = System.nanoTime()
        val r = UcrScan.scanPartition(ids, zs, qz, k)
        (r, (System.nanoTime() - t0) / 1e6)
      }
    }.collect()
    val results = queries.indices.map(qi => Built.mergeTopK(perPart.toIndexedSeq.map(_(qi)._1), k)).toArray
    val times = queries.indices.map(qi => perPart.map(_(qi)._2).max).toArray
    (results, times)
  }

  override def close(): Unit = { store.unpersist(blocking = false); () }
}

object UcrScan {

  /** Early-abandoning scan of one in-memory slice (static so task closures
    * never capture the engine instance).
    */
  private[baseline] def scanPartition(ids: Array[Long], zs: Array[Array[Float]],
                                      qz: Array[Float], k: Int): Array[(Long, Double)] = {
    val heap = new java.util.PriorityQueue[(Double, Long)](math.max(1, k),
      (a: (Double, Long), b: (Double, Long)) => java.lang.Double.compare(b._1, a._1))
    var bsfSq = Double.PositiveInfinity
    var i = 0
    while (i < zs.length) {
      val dSq = Series.edSqEarlyAbandon(qz, zs(i), bsfSq)
      if (dSq < bsfSq) {
        if (heap.size < k) heap.add((dSq, ids(i)))
        else if (dSq < heap.peek()._1) { heap.poll(); heap.add((dSq, ids(i))) }
        if (heap.size == k) bsfSq = heap.peek()._1
      }
      i += 1
    }
    val out = new Array[(Long, Double)](heap.size)
    var j = heap.size - 1
    while (j >= 0) { val (d, id) = heap.poll(); out(j) = (id, math.sqrt(d)); j -= 1 }
    out
  }

  /** Materialize z-normalized per-partition slices of the dataset. */
  def build(ds: Dataset[SeriesRecord], partitions: Int): UcrScan = {
    val store = ds.rdd
      .map(r => (r.id, Series.znorm(r.values)))
      .repartition(partitions)
      .mapPartitions { it =>
        val buf = it.toArray
        Iterator.single((buf.map(_._1), buf.map(_._2)))
      }
      .persist(StorageLevel.MEMORY_ONLY)
    store.count()
    new UcrScan(store, partitions)
  }
}
