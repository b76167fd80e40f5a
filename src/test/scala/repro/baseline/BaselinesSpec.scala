package repro.baseline

import repro.{SparkSpec, TestData}
import repro.core.SeriesRecord

class BaselinesSpec extends SparkSpec {

  private def toDs(data: Array[(Long, Array[Float])]) = {
    import spark.implicits._
    spark.createDataset(data.map { case (id, v) => SeriesRecord(id, v) }.toIndexedSeq)
  }

  test("UcrScan 1-NN equals brute force across partition counts") {
    val n = 64
    val data = TestData.dataset(240, 500, n)
    val ds = toDs(data)
    for (p <- Seq(1, 4)) {
      val e = UcrScan.build(ds, p)
      try {
        val r = TestData.rng(241)
        for (_ <- 1 to 5) {
          val q = TestData.mixedSeries(r, n)
          TestData.assertSameKnn(e.search(q, 1), TestData.bruteKnn(data.toIndexedSeq, q, 1))
        }
      } finally e.close()
    }
  }

  test("UcrScan k-NN equals brute force") {
    val n = 64
    val data = TestData.dataset(242, 400, n)
    val e = UcrScan.build(toDs(data), 4)
    try {
      val r = TestData.rng(243)
      for (k <- Seq(3, 10, 50)) {
        val q = TestData.mixedSeries(r, n)
        TestData.assertSameKnn(e.search(q, k), TestData.bruteKnn(data.toIndexedSeq, q, k))
      }
    } finally e.close()
  }

  test("UcrScan searchAllTimed matches per-query results") {
    val n = 64
    val data = TestData.dataset(244, 300, n)
    val e = UcrScan.build(toDs(data), 3)
    try {
      val r = TestData.rng(245)
      val queries = Array.fill(4)(TestData.mixedSeries(r, n))
      val (results, times) = e.searchAllTimed(queries.toIndexedSeq, 2)
      assert(times.forall(_ >= 0))
      queries.zip(results).foreach { case (q, got) =>
        TestData.assertSameKnn(got, TestData.bruteKnn(data.toIndexedSeq, q, 2))
      }
    } finally e.close()
  }

  test("FaissFlat 1-NN equals brute force") {
    val n = 64
    val data = TestData.dataset(246, 500, n)
    val e = FaissFlat.build(toDs(data), 4)
    try {
      val r = TestData.rng(247)
      for (_ <- 1 to 5) {
        val q = TestData.mixedSeries(r, n)
        TestData.assertSameKnn(e.search(q, 1), TestData.bruteKnn(data.toIndexedSeq, q, 1))
      }
    } finally e.close()
  }

  test("FaissFlat batched search equals per-query brute force, several k") {
    val n = 64
    val data = TestData.dataset(248, 400, n)
    val e = FaissFlat.build(toDs(data), 3)
    try {
      val r = TestData.rng(249)
      val queries = Array.fill(6)(TestData.mixedSeries(r, n))
      for (k <- Seq(1, 5, 20)) {
        val results = e.searchBatch(queries.toIndexedSeq, k)
        queries.zip(results).foreach { case (q, got) =>
          TestData.assertSameKnn(got, TestData.bruteKnn(data.toIndexedSeq, q, k))
        }
      }
    } finally e.close()
  }

  test("FaissFlat norm decomposition is numerically robust for identical series") {
    val n = 64
    val base = TestData.mixedSeries(TestData.rng(250), n)
    val data = Array.tabulate(5)(i => (i.toLong, base.clone()))
    val e = FaissFlat.build(toDs(data), 2)
    try {
      val res = e.search(base, 5)
      res.foreach { case (_, d) => assert(d < 1e-2, s"self-distance $d") }
    } finally e.close()
  }

  test("baselines agree with each other on a shared dataset") {
    val n = 96 // non-power-of-two, non-divisible by 16
    val data = TestData.dataset(251, 300, n)
    val ds = toDs(data)
    val ucr = UcrScan.build(ds, 3)
    val faiss = FaissFlat.build(ds, 3)
    try {
      val r = TestData.rng(252)
      for (_ <- 1 to 5) {
        val q = TestData.mixedSeries(r, n)
        TestData.assertSameKnn(ucr.search(q, 3), faiss.search(q, 3), tol = 1e-4)
      }
    } finally { ucr.close(); faiss.close() }
  }
}
