package repro.jobs

import repro.bench.QueryBench
import repro.data.Benchmark17

/** Prints the Table I analog: the 17-dataset benchmark catalog (paper counts
  * next to the reproduction's scaled counts). Usage: Table1Catalog [scale].
  */
object Table1Catalog {
  def main(args: Array[String]): Unit = {
    val s = JobUtil.scale(args)
    println(QueryBench.formatTable1(Benchmark17.catalog.map(_.scaled(s))))
  }
}
