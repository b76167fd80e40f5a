package repro.bench

import repro.SparkSpec
import repro.data.Benchmark17

class TlbBenchSpec extends SparkSpec {

  test("TLB values are within (0, 1] and alphabet-monotone per method") {
    val spec = Benchmark17.ucrLike.find(_.name == "u-sine-hi").get
    val tlb = TlbBench.forDataset(spark, spec.copy(count = 150), nQueries = 8)
    tlb.values.foreach(v => assert(v >= 0.0 && v <= 1.0 + 1e-9, s"TLB $v out of range"))
    TlbBench.Methods.foreach { m =>
      val byAlpha = TlbBench.Alphabets.map(a => tlb((m, a)))
      byAlpha.sliding(2).foreach(w => assert(w(0) <= w(1) + 0.02, s"$m not ~monotone: $byAlpha"))
    }
  }

  test("SFA equi-width +VAR beats iSAX on a high-frequency dataset (the paper's claim)") {
    val spec = Benchmark17.catalog.find(_.name == "LenDB").get.scaled(0.01)
    val tlb = TlbBench.forDataset(spark, spec, nQueries = 8, sampleRate = 1.0)
    val sfa = tlb(("SFA EW +VAR", 256))
    val isax = tlb(("iSAX", 256))
    assert(sfa > isax, s"SFA EW $sfa should beat iSAX $isax on LenDB analog")
  }

  test("forSuite averages across datasets and formats a table") {
    val specs = Benchmark17.ucrLike.take(2).map(_.copy(count = 100))
    val tlb = TlbBench.forSuite(spark, specs, nQueries = 4)
    assert(tlb.size == TlbBench.Methods.size * TlbBench.Alphabets.size)
    val table = TlbBench.formatTable("test", tlb)
    assert(table.contains("iSAX") && table.contains("SFA EW +VAR") && table.contains("256"))
  }
}
