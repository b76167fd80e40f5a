package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec

class Benchmark17Spec extends AnyFunSuite {

  test("catalog has the paper's 17 datasets with Table I lengths") {
    val cat = Benchmark17.catalog
    assert(cat.size == 17)
    assert(cat.map(_.name).distinct.size == 17)
    val byName = cat.map(s => s.name -> s).toMap
    assert(byName("Astro").len == 256 && byName("Astro").paperCount == 100_000_000L)
    assert(byName("BigANN").len == 100)
    assert(byName("Deep1b").len == 96)
    assert(byName("SALD").len == 128 && byName("SIFT1b").len == 128)
    assert(byName("Iquique").paperCount == 578_853L)
    // Table I total: 1,017,586,504 series
    assert(cat.map(_.paperCount).sum == 1_017_586_504L)
  }

  test("scaled() shrinks counts but never below the floor") {
    val s = Benchmark17.catalog.head.scaled(1e-9)
    assert(s.count == 64)
    val s2 = Benchmark17.catalog.head.scaled(0.5)
    assert(s2.count == Benchmark17.catalog.head.count / 2)
  }

  test("ucrLike suite is diverse in lengths and profiles") {
    val u = Benchmark17.ucrLike
    assert(u.size >= 12)
    assert(u.map(_.len).distinct.size >= 3)
    assert(u.map(_.profile.getClass.getSimpleName).distinct.size >= 5)
  }

  test("load materializes the index set and the query set") {
    val spark = repro.SparkSpec.shared
    val spec = Benchmark17.catalog.find(_.name == "Iquique").get.scaled(0.02)
    val (ds, qs) = Benchmark17.load(spark, spec, nQueries = 3)
    assert(ds.count() == spec.count)
    assert(qs.length == 3)
    qs.foreach(q => assert(q.length == spec.len))
  }

  test("every catalog profile generates at tiny scale") {
    val spark = repro.SparkSpec.shared
    Benchmark17.catalog.foreach { spec0 =>
      val spec = spec0.scaled(1e-9) // 64 series
      val (ds, qs) = Benchmark17.load(spark, spec, nQueries = 1)
      assert(ds.count() == 64, spec.name)
      assert(qs.head.length == spec.len, spec.name)
    }
  }
}
