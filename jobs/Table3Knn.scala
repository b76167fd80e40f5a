package repro.jobs

import repro.bench.QueryBench
import repro.data.Benchmark17
import repro.spark.IndexConfig

/** Table III analog: median k-NN query times (k in {1,3,5,10,20,50}) at the
  * maximum parallelism level. Usage: Table3Knn [scale].
  */
object Table3Knn {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table3-knn")
    try {
      val specs = Benchmark17.catalog.map(_.scaled(JobUtil.scale(args)))
      val ks = Seq(1, 3, 5, 10, 20, 50)
      val grouped = QueryBench.table3(spark, specs, partitions = 16, nQueries = 20, ks, IndexConfig())
      println(QueryBench.formatTable3(grouped, ks))
    } finally spark.stop()
  }
}
