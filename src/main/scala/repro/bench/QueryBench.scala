package repro.bench

import org.apache.spark.sql.SparkSession
import repro.data.Benchmark17
import repro.data.Benchmark17.DatasetSpec
import repro.spark.{Built, EngineFactory, IndexConfig}

/** Query-time benchmarks behind Tables II, III and IV. Per dataset the four
  * engines are built over the same `Dataset[SeriesRecord]`; per-query times
  * come from `Built.searchAllTimed` (see Engines.scala for the timing model).
  * Every run cross-checks that all engines return the same nearest-neighbor
  * distances — the benches double as end-to-end exactness tests.
  */
object QueryBench {

  final case class Run(engine: String, dataset: String, partitions: Int, k: Int,
                       timesMs: Array[Double], nnDists: Array[Double])

  /** Mean/median over the pooled per-query times of a set of runs. */
  def mean(runs: Seq[Run]): Double = {
    val t = runs.flatMap(_.timesMs)
    if (t.isEmpty) 0.0 else t.sum / t.size
  }
  def median(runs: Seq[Run]): Double = {
    val t = runs.flatMap(_.timesMs).sorted
    if (t.isEmpty) 0.0 else t(t.size / 2)
  }

  /** All four engines on one dataset at one parallelism level. */
  def runDataset(spark: SparkSession, spec: DatasetSpec, partitions: Int,
                 nQueries: Int, k: Int, cfg0: IndexConfig,
                 engines: Seq[String] = Seq("UCR-P", "FAISS", "MESSI", "SOFA")): Seq[Run] = {
    val cfg = cfg0.copy(partitions = partitions, seed = spec.seed)
    val (ds, queries) = Benchmark17.load(spark, spec, nQueries)
    val built = engines.map {
      case "SOFA"  => EngineFactory.sofa(ds, spec.len, cfg)
      case "MESSI" => EngineFactory.messi(ds, spec.len, cfg)
      case "UCR-P" => EngineFactory.ucr(ds, partitions)
      case "FAISS" => EngineFactory.faiss(ds, partitions)
      case other   => throw new IllegalArgumentException(s"unknown engine $other")
    }
    try {
      val runs = built.map { b =>
        b.searchAllTimed(queries.take(2).toIndexedSeq, k) // JIT/cache warmup, untimed
        val (results, times) = b.searchAllTimed(queries.toIndexedSeq, k)
        val nn = results.map(r => if (r.isEmpty) Double.NaN else r.head._2)
        Run(b.name, spec.name, partitions, k, times, nn)
      }
      // exactness cross-check: every engine must agree on the k-th NN distances
      val ref = runs.head
      runs.tail.foreach { r =>
        ref.nnDists.zip(r.nnDists).zipWithIndex.foreach { case ((a, b), qi) =>
          require(math.abs(a - b) <= 1e-4 * math.max(1.0, math.abs(a)),
            s"engine disagreement on ${spec.name} q$qi: ${ref.engine}=$a vs ${r.engine}=$b")
        }
      }
      runs
    } finally built.foreach(_.close())
  }

  /** Table II: per-engine mean/median 1-NN times pooled over the suite, for
    * each parallelism level.
    */
  def table2(spark: SparkSession, specs: Seq[DatasetSpec], partitionsList: Seq[Int],
             nQueries: Int, cfg: IndexConfig): Map[(String, Int), Seq[Run]] = {
    val all = for {
      p <- partitionsList
      spec <- specs
      run <- runDataset(spark, spec, p, nQueries, k = 1, cfg)
    } yield run
    all.groupBy(r => (r.engine, r.partitions))
  }

  def formatTable2(grouped: Map[(String, Int), Seq[Run]], partitionsList: Seq[Int]): String = {
    val sb = new StringBuilder
    sb.append("Table II analog: 1-NN query times in ms (mixed workload)\n")
    sb.append(f"${"Method"}%-8s${"Partitions"}%-12s${"median"}%10s${"mean"}%10s\n")
    for (m <- Seq("UCR-P", "FAISS", "MESSI", "SOFA"); p <- partitionsList) {
      grouped.get((m, p)).foreach { runs =>
        sb.append(f"$m%-8s$p%-12d${median(runs)}%10.2f${mean(runs)}%10.2f\n")
      }
    }
    sb.toString
  }

  /** Table III: median k-NN times at the maximum parallelism level. Engines
    * are built once per dataset and queried for every k (the paper omits UCR
    * beyond 1-NN).
    */
  def table3(spark: SparkSession, specs: Seq[DatasetSpec], partitions: Int,
             nQueries: Int, ks: Seq[Int], cfg0: IndexConfig): Map[(String, Int), Seq[Run]] = {
    val all = specs.flatMap { spec =>
      val cfg = cfg0.copy(partitions = partitions, seed = spec.seed)
      val (ds, queries) = Benchmark17.load(spark, spec, nQueries)
      val built = Seq(
        EngineFactory.ucr(ds, partitions),
        EngineFactory.faiss(ds, partitions),
        EngineFactory.messi(ds, spec.len, cfg),
        EngineFactory.sofa(ds, spec.len, cfg),
      )
      try {
        built.foreach(_.searchAllTimed(queries.take(2).toIndexedSeq, 1)) // warmup
        for {
          k <- ks
          b <- built if k == 1 || b.name != "UCR-P"
        } yield {
          val (results, times) = b.searchAllTimed(queries.toIndexedSeq, k)
          Run(b.name, spec.name, partitions, k, times,
              results.map(r => if (r.isEmpty) Double.NaN else r.last._2))
        }
      } finally built.foreach(_.close())
    }
    all.groupBy(r => (r.engine, r.k))
  }

  def formatTable3(grouped: Map[(String, Int), Seq[Run]], ks: Seq[Int]): String = {
    val sb = new StringBuilder
    sb.append("Table III analog: median k-NN query times in ms\n")
    sb.append(f"${"Method"}%-8s" + ks.map(k => f"$k%2d-NN" + "   ").mkString).append('\n')
    for (m <- Seq("UCR-P", "FAISS", "MESSI", "SOFA")) {
      sb.append(f"$m%-8s")
      ks.foreach { k =>
        grouped.get((m, k)) match {
          case Some(runs) => sb.append(f"${median(runs)}%8.2f")
          case None       => sb.append(f"${"-"}%8s")
        }
      }
      sb.append('\n')
    }
    sb.toString
  }

  /** Table IV: SOFA at different MCB sampling rates. */
  def table4(spark: SparkSession, specs: Seq[DatasetSpec], partitions: Int,
             nQueries: Int, rates: Seq[Double], cfg: IndexConfig): Map[Double, Seq[Run]] = {
    val all = for {
      r <- rates
      spec <- specs
      run <- runDataset(spark, spec, partitions, nQueries, k = 1,
                        cfg.copy(sampleRate = r), engines = Seq("SOFA"))
    } yield (r, run)
    all.groupBy(_._1).map { case (r, xs) => r -> xs.map(_._2) }
  }

  def formatTable4(grouped: Map[Double, Seq[Run]], rates: Seq[Double]): String = {
    val sb = new StringBuilder
    sb.append("Table IV analog: SOFA 1-NN times vs MCB sampling rate\n")
    sb.append(f"${"Sampling"}%-10s${"mean ms"}%10s${"median ms"}%12s\n")
    rates.foreach { r =>
      grouped.get(r).foreach { runs =>
        sb.append(f"${r * 100}%7.1f%%  ${mean(runs)}%10.2f${median(runs)}%12.2f\n")
      }
    }
    sb.toString
  }

  /** Table I: the benchmark catalog, paper counts vs reproduction counts. */
  def formatTable1(specs: Seq[DatasetSpec]): String = {
    val sb = new StringBuilder
    sb.append("Table I analog: benchmark datasets\n")
    sb.append(f"${"Dataset"}%-14s${"paper #series"}%15s${"repro #series"}%15s${"length"}%8s\n")
    specs.foreach { s =>
      sb.append(f"${s.name}%-14s${s.paperCount}%15d${s.count}%15d${s.len}%8d\n")
    }
    sb.append(f"${"TOTAL"}%-14s${specs.map(_.paperCount).sum}%15d${specs.map(_.count).sum}%15d\n")
    sb.toString
  }
}
