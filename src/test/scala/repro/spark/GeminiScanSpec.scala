package repro.spark

import repro.{SparkSpec, TestData}
import repro.core.{Isax, SeriesRecord, Sfa, Series}

class GeminiScanSpec extends SparkSpec {

  private def toDs(data: Array[(Long, Array[Float])]) = {
    import spark.implicits._
    spark.createDataset(data.map { case (id, v) => SeriesRecord(id, v) }.toIndexedSeq)
  }

  test("UDF GEMINI scan is exact vs brute force — iSAX words") {
    val n = 64
    val data = TestData.dataset(230, 400, n)
    val scan = GeminiScan.build(toDs(data), Isax.space(n, 8, 256), partitions = 4)
    try {
      val r = TestData.rng(231)
      for (_ <- 1 to 5) {
        val q = TestData.mixedSeries(r, n)
        TestData.assertSameKnn(scan.search(q, 1), TestData.bruteKnn(data.toIndexedSeq, q, 1))
      }
    } finally scan.close()
  }

  test("UDF GEMINI scan is exact vs brute force — SFA words, k-NN") {
    val n = 64
    val data = TestData.dataset(232, 400, n)
    val r = TestData.rng(233)
    val train = Array.fill(100)(Series.znorm(TestData.mixedSeries(r, n)))
    val space = Sfa.fit(train, n, l = 8, alpha = 256).space
    val scan = GeminiScan.build(toDs(data), space, partitions = 4)
    try {
      for (k <- Seq(1, 5); _ <- 1 to 3) {
        val q = TestData.mixedSeries(r, n)
        TestData.assertSameKnn(scan.search(q, k), TestData.bruteKnn(data.toIndexedSeq, q, k))
      }
    } finally scan.close()
  }

  test("small approxCandidates still yields exact results") {
    val n = 64
    val data = TestData.dataset(234, 300, n)
    val scan = GeminiScan.build(toDs(data), Isax.space(n, 8, 256), partitions = 2,
                                approxCandidates = 2)
    try {
      val r = TestData.rng(235)
      for (_ <- 1 to 5) {
        val q = TestData.mixedSeries(r, n)
        TestData.assertSameKnn(scan.search(q, 2), TestData.bruteKnn(data.toIndexedSeq, q, 2))
      }
    } finally scan.close()
  }
}
