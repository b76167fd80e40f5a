package repro.spark

import repro.{SparkSpec, TestData}
import repro.core.{Series, SeriesRecord, Sfa}

class McbSparkSpec extends SparkSpec {

  private def makeDs(seed: Long, count: Int, n: Int) = {
    import spark.implicits._
    val data = TestData.dataset(seed, count, n)
    (data, spark.createDataset(data.map { case (id, v) => SeriesRecord(id, v) }.toIndexedSeq))
  }

  test("distributed stats match the local fit on the full dataset") {
    val n = 64
    val (data, ds) = makeDs(220, 300, n)
    val distStats = McbSpark.fitStats(ds, n, maxCoeff = 16, sampleRate = 1.0, seed = 1)
    val localStats = Sfa.fitStats(data.map(d => Series.znorm(d._2)), n, maxCoeff = 16)
    assert(distStats.cols.map(_.vi).sameElements(localStats.cols.map(_.vi)))
    distStats.cols.zip(localStats.cols).foreach { case (d, l) =>
      assert(math.abs(d.variance - l.variance) < 1e-6 * math.max(1.0, l.variance), s"vi=${d.vi}")
      assert(math.abs(d.min - l.min) < 1e-9)
      assert(math.abs(d.max - l.max) < 1e-9)
      // approximate quantiles: within the value range and monotone
      d.quantiles.sliding(2).foreach(w => assert(w(0) <= w(1)))
      assert(d.quantiles.head >= d.min - 1e-9 && d.quantiles.last <= d.max + 1e-9)
    }
  }

  test("distributed fit selects the same value indices as the local fit") {
    val n = 64
    val (data, ds) = makeDs(221, 300, n)
    val dist = McbSpark.fit(ds, n, l = 8, alpha = 16, sampleRate = 1.0)
    val local = Sfa.fit(data.map(d => Series.znorm(d._2)), n, l = 8, alpha = 16)
    assert(dist.bestIdx.sorted.sameElements(local.bestIdx.sorted))
  }

  test("sampling fallback: tiny datasets with tiny rates still fit") {
    val n = 32
    val (_, ds) = makeDs(222, 20, n)
    val model = McbSpark.fit(ds, n, l = 4, alpha = 8, sampleRate = 0.001)
    assert(model.bestIdx.length == 4)
    model.breakpoints.foreach(bp => assert(bp.length == 7))
  }

  test("fitted model produces valid lower bounds on out-of-sample pairs") {
    val n = 64
    val (_, ds) = makeDs(223, 200, n)
    val space = McbSpark.fit(ds, n, l = 8, alpha = 32, sampleRate = 0.5).space
    val r = TestData.rng(224)
    for (_ <- 1 to 100) {
      val q = Series.znorm(TestData.mixedSeries(r, n))
      val c = Series.znorm(TestData.mixedSeries(r, n))
      val lb = space.wordLbSq(space.project(q), space.word(c), Double.PositiveInfinity)
      assert(lb <= Series.edSq(q, c) + 1e-6)
    }
  }

  test("equi-depth via percentile_approx yields usable bins") {
    val n = 64
    val (_, ds) = makeDs(225, 400, n)
    val model = McbSpark.fit(ds, n, l = 4, alpha = 8, sampleRate = 1.0, binning = Sfa.EquiDepth)
    model.breakpoints.foreach { bp =>
      bp.sliding(2).foreach(w => assert(w(0) <= w(1)))
    }
  }

  test("variance aggregate cross-checked against the DuckDB oracle") {
    import spark.implicits._
    // Cross-check Catalyst's var_pop (used by McbSpark) against DuckDB on a
    // small numeric table.
    val vals = TestData.rng(226).doubles(200).toArray.toIndexedSeq
    val df = vals.zipWithIndex.map { case (v, i) => (i % 4, v) }.toDF("g", "v")
    val agg = df.groupBy("g").agg(
      org.apache.spark.sql.functions.round(org.apache.spark.sql.functions.var_pop($"v"), 6).as("vp"))
    repro.Oracle.assertEquivalent(
      agg,
      "SELECT CAST(g AS INT) AS g, ROUND(VAR_POP(CAST(v AS DOUBLE)), 6) AS vp FROM t GROUP BY g",
      "t" -> df)
  }
}
