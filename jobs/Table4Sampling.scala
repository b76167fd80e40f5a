package repro.jobs

import repro.bench.QueryBench
import repro.data.Benchmark17
import repro.spark.IndexConfig

/** Table IV analog: SOFA 1-NN query times as the MCB sampling rate varies
  * over {0.1, 0.5, 1, 5, 10, 15, 20} %. Usage: Table4Sampling [scale].
  */
object Table4Sampling {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table4-sampling")
    try {
      val specs = Benchmark17.catalog.map(_.scaled(JobUtil.scale(args)))
      val rates = Seq(0.001, 0.005, 0.01, 0.05, 0.10, 0.15, 0.20)
      val grouped = QueryBench.table4(spark, specs, partitions = 16, nQueries = 20, rates, IndexConfig())
      println(QueryBench.formatTable4(grouped, rates))
    } finally spark.stop()
  }
}
