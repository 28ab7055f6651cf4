package repro.queries

import repro.SparkSpec
import repro.SynthData

class SynthDataSpec extends SparkSpec {

  test("tpc-h-lite row counts scale with sf") {
    assert(SynthData.lineitem(spark, 0.001).count() == 6000L)
    assert(SynthData.orders(spark, 0.001).count() == 1500L)
    assert(SynthData.customer(spark, 0.001).count() == 150L)
    assert(SynthData.part(spark, 0.001).count() == 200L)
  }

  test("extension tables scale like TPC-H") {
    assert(SynthData.supplier(spark, 0.01).count() == 100L)
    assert(SynthData.partsupp(spark, 0.001).count() == 800L)
    assert(SynthData.nation(spark).count() == 25L)
    assert(SynthData.region(spark).count() == 5L)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, 0.001).collect().map(_.toString).sorted
    val b = SynthData.orders(spark, 0.001).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("nation/region join keys line up") {
    val n = SynthData.nation(spark)
    val r = SynthData.region(spark)
    assert(n.join(r, n("n_regionkey") === r("r_regionkey")).count() == 25L)
  }

  test("customer nation keys fall in the nation range") {
    import org.apache.spark.sql.functions._
    val row = SynthData.customer(spark, 0.001)
      .agg(min("c_nationkey"), max("c_nationkey")).head
    assert(row.getInt(0) >= 0 && row.getInt(1) <= 24)
  }
}
