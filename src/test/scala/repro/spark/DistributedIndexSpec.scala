package repro.spark

import repro.{SparkSpec, TestData}
import repro.core.{Isax, SeriesRecord}

class DistributedIndexSpec extends SparkSpec {

  private def toDs(data: Array[(Long, Array[Float])]) = {
    import spark.implicits._
    spark.createDataset(data.map { case (id, v) => SeriesRecord(id, v) }.toIndexedSeq)
  }

  test("distributed 1-NN equals brute force across several partition counts") {
    val n = 64
    val data = TestData.dataset(200, 600, n)
    val ds = toDs(data)
    for (p <- Seq(1, 3, 8)) {
      val idx = DistributedIndex.build("MESSI", ds, Isax.space(n, 8, 256), 32, p)
      try {
        val r = TestData.rng(201)
        for (_ <- 1 to 5) {
          val q = TestData.mixedSeries(r, n)
          TestData.assertSameKnn(idx.search(q, 1), TestData.bruteKnn(data.toIndexedSeq, q, 1))
        }
      } finally idx.close()
    }
  }

  test("distributed k-NN merges per-partition results exactly") {
    val n = 64
    val data = TestData.dataset(202, 500, n)
    val ds = toDs(data)
    val idx = DistributedIndex.build("MESSI", ds, Isax.space(n, 8, 256), 32, 4)
    try {
      val r = TestData.rng(203)
      for (k <- Seq(3, 10, 25); _ <- 1 to 3) {
        val q = TestData.mixedSeries(r, n)
        TestData.assertSameKnn(idx.search(q, k), TestData.bruteKnn(data.toIndexedSeq, q, k))
      }
    } finally idx.close()
  }

  test("searchAllTimed returns the same results as per-query search") {
    val n = 64
    val data = TestData.dataset(204, 400, n)
    val ds = toDs(data)
    val idx = DistributedIndex.build("MESSI", ds, Isax.space(n, 8, 256), 32, 3)
    try {
      val r = TestData.rng(205)
      val queries = Array.fill(5)(TestData.mixedSeries(r, n))
      val (results, times) = idx.searchAllTimed(queries.toIndexedSeq, 2)
      assert(times.length == 5 && times.forall(_ >= 0))
      queries.zip(results).foreach { case (q, got) =>
        TestData.assertSameKnn(got, idx.search(q, 2))
      }
    } finally idx.close()
  }

  test("every partition contributes: ids from all partitions are reachable") {
    val n = 64
    val data = TestData.dataset(206, 300, n)
    val ds = toDs(data)
    val idx = DistributedIndex.build("MESSI", ds, Isax.space(n, 8, 256), 32, 5)
    try {
      // query with k = all: must return every id exactly once
      val q = TestData.mixedSeries(TestData.rng(207), n)
      val all = idx.search(q, data.length)
      assert(all.length == data.length)
      assert(all.map(_._1).toSet == data.map(_._1).toSet)
    } finally idx.close()
  }

  test("structureStats aggregates over partitions") {
    val n = 64
    val ds = toDs(TestData.dataset(208, 400, n))
    val idx = DistributedIndex.build("MESSI", ds, Isax.space(n, 8, 256), 16, 4)
    try {
      val (leaves, depth, fill) = idx.structureStats
      assert(leaves > 0 && depth >= 1 && fill > 0)
      assert(math.abs(fill * leaves - 400) < 1e-6)
    } finally idx.close()
  }
}
