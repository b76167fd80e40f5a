package repro.jobs

import repro.bench.TlbBench
import repro.data.Benchmark17

/** Table V analog: mean tightness of lower bound (TLB) on the UCR-archive-like
  * suite for SFA equi-depth / equi-width (+VAR) and iSAX, alphabet sizes
  * 4..256, l = 16. Usage: Table5TlbUcr.
  */
object Table5TlbUcr {
  def main(args: Array[String]): Unit = {
    val spark = JobUtil.session("table5-tlb-ucr")
    try {
      val tlb = TlbBench.forSuite(spark, Benchmark17.ucrLike, nQueries = 20)
      println(TlbBench.formatTable("Table V analog: mean TLB on UCR-like datasets", tlb))
    } finally spark.stop()
  }
}
