package repro.spark

import repro.{SparkSpec, TestData}
import repro.core.SeriesRecord
import repro.data.{Benchmark17, SeriesGen}

class EnginesParitySpec extends SparkSpec {

  test("all four engines return identical NN distances on diverse benchmark analogs") {
    val specs = Benchmark17.catalog.filter(s => Set("LenDB", "Astro", "SIFT1b").contains(s.name))
      .map(_.scaled(0.02))
    val cfg = IndexConfig(leafCapacity = 64, partitions = 3, sampleRate = 0.25)
    specs.foreach { spec =>
      val (ds, queries) = Benchmark17.load(spark, spec, nQueries = 4)
      val engines = Seq(
        EngineFactory.sofa(ds, spec.len, cfg),
        EngineFactory.messi(ds, spec.len, cfg),
        EngineFactory.ucr(ds, 3),
        EngineFactory.faiss(ds, 3),
      )
      try {
        queries.foreach { q =>
          val results = engines.map(_.search(q, 3))
          results.tail.foreach { r =>
            TestData.assertSameKnn(r, results.head, tol = 1e-4)
          }
        }
      } finally engines.foreach(_.close())
    }
  }

  test("SOFA prunes: exactness holds even with a query far from the data") {
    import spark.implicits._
    val n = 64
    val data = TestData.dataset(260, 300, n)
    val ds = spark.createDataset(data.map { case (id, v) => SeriesRecord(id, v) }.toIndexedSeq)
    val sofa = EngineFactory.sofa(ds, n, IndexConfig(leafCapacity = 32, partitions = 2, sampleRate = 0.5))
    try {
      // a pathological spike query
      val q = Array.tabulate(n)(i => if (i == 0) 100.0f else 0.0f)
      val got = sofa.search(q, 1)
      TestData.assertSameKnn(got, TestData.bruteKnn(data.toIndexedSeq, q, 1))
    } finally sofa.close()
  }

  test("engines handle the vector-data profile (short series, n=96)") {
    val spec = Benchmark17.catalog.find(_.name == "Deep1b").get.scaled(0.01)
    val (ds, queries) = Benchmark17.load(spark, spec, nQueries = 3)
    val cfg = IndexConfig(leafCapacity = 32, partitions = 2, sampleRate = 0.5)
    val sofa = EngineFactory.sofa(ds, spec.len, cfg)
    val faiss = EngineFactory.faiss(ds, 2)
    try {
      queries.foreach { q =>
        TestData.assertSameKnn(sofa.search(q, 5), faiss.search(q, 5), tol = 1e-4)
      }
    } finally { sofa.close(); faiss.close() }
  }

  test("SeriesGen queries are disjoint from the indexed id stream") {
    val spec = Benchmark17.catalog.head.scaled(0.005)
    val qs = SeriesGen.queries(spec.profile, 5, spec.seed)
    val qs2 = SeriesGen.queries(spec.profile, 5, spec.seed)
    // deterministic
    qs.zip(qs2).foreach { case (a, b) => assert(a.sameElements(b)) }
    // and not equal to any of the first indexed series
    val first = SeriesGen.series(spec.profile, spec.seed, 0L)
    qs.foreach(q => assert(!q.sameElements(first)))
  }
}
