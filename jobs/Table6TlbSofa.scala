package repro.jobs

import repro.bench.TlbBench
import repro.data.Benchmark17

/** Table VI analog: mean TLB on the 17 SOFA benchmark datasets for SFA
  * equi-depth / equi-width (+VAR) and iSAX, alphabet sizes 4..256, l = 16.
  * Usage: Table6TlbSofa [scale].
  */
object Table6TlbSofa {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table6-tlb-sofa")
    try {
      val specs = Benchmark17.catalog.map(_.scaled(JobUtil.scale(args) * 0.25))
      val tlb = TlbBench.forSuite(spark, specs, nQueries = 20, sampleRate = 0.25)
      println(TlbBench.formatTable("Table VI analog: mean TLB on the 17 SOFA datasets", tlb))
    } finally spark.stop()
  }
}
