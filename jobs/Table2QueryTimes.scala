package repro.jobs

import repro.bench.QueryBench
import repro.data.Benchmark17
import repro.spark.IndexConfig

/** Table II analog: mean/median 1-NN query times for UCR-P / FAISS / MESSI /
  * SOFA over the 17-dataset suite, at parallelism {4, 8, 16} partitions
  * (the paper's 9/18/36-core axis). Usage: Table2QueryTimes [scale].
  */
object Table2QueryTimes {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table2-query-times")
    try {
      val specs = Benchmark17.catalog.map(_.scaled(JobUtil.scale(args)))
      val grouped = QueryBench.table2(spark, specs, Seq(4, 8, 16), nQueries = 20, IndexConfig())
      println(QueryBench.formatTable2(grouped, Seq(4, 8, 16)))
    } finally spark.stop()
  }
}
