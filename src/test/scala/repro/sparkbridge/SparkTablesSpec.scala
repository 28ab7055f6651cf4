package repro.sparkbridge

import repro.SparkSpec
import repro.SynthData
import repro.engine.Schema

class SparkTablesSpec extends SparkSpec {

  test("fromDf partitions rows into the requested split layout") {
    val df = SynthData.orders(spark, 0.001) // 1500 rows
    val t = SparkTables.fromDf(df, "orders", (0 until 10).toVector, splitsPerNode = 1)
    assert(t.rowCount == 1500L)
    assert(t.splits.size == 10)
    assert(t.nodeIds == (0 until 10).toVector)
    assert(t.schema.names == df.columns.toVector)
  }

  test("fromDf supports multi-split-per-node layouts (lineitem: 7/node)") {
    val df = SynthData.lineitem(spark, 0.001)
    val t = SparkTables.fromDf(df, "lineitem", (0 until 10).toVector, splitsPerNode = 7)
    assert(t.rowCount == 6000L)
    assert(t.splits.size == 70)
    assert(t.splits.groupBy(_.nodeId).forall(_._2.size == 7))
  }

  test("restricting nodes places every split there (§6.4.2 setup)") {
    val df = SynthData.orders(spark, 0.001)
    val t = SparkTables.fromDf(df, "orders", Vector(0, 1), splitsPerNode = 1)
    assert(t.nodeIds == Vector(0, 1))
  }

  test("value conversion: dates become ISO strings, integrals Long, decimals Double") {
    val df = SynthData.lineitem(spark, 0.001).limit(100)
    val t = SparkTables.fromDf(df, "li", Vector(0), 1)
    val r = t.allRows.head
    val s = t.schema
    assert(r(s.idx("l_orderkey")).isInstanceOf[Long])
    assert(r(s.idx("l_linenumber")).isInstanceOf[Long]) // Int → Long
    assert(r(s.idx("l_extendedprice")).isInstanceOf[Double])
    val d = r(s.idx("l_shipdate"))
    assert(d.isInstanceOf[String] && d.asInstanceOf[String].matches("""\d{4}-\d{2}-\d{2}"""))
  }

  test("toDf round-trips engine rows with inferred types") {
    val rows = Seq[Array[Any]](
      Array[Any](1L, 2.5, "x"),
      Array[Any](2L, 3.5, null),
    )
    val df = SparkTables.toDf(spark, Schema.of("a", "b", "c"), rows)
    assert(df.count() == 2)
    assert(df.schema("a").dataType.typeName == "long")
    assert(df.schema("b").dataType.typeName == "double")
    assert(df.schema("c").dataType.typeName == "string")
  }

  test("table bytes estimates are positive and ordered by row count") {
    val orders = SparkTables.fromDf(SynthData.orders(spark, 0.001), "o", Vector(0), 1)
    val cust = SparkTables.fromDf(SynthData.customer(spark, 0.001), "c", Vector(0), 1)
    assert(orders.bytes > cust.bytes)
  }
}
