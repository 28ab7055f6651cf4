package repro.engine

import org.scalatest.funsuite.AnyFunSuite

class AlgebraSpec extends AnyFunSuite {
  private def row(vs: Any*): Data.Row = vs.toArray

  test("count aggregates and merges") {
    val c = CountAgg("cnt")
    val a = c.update(c.update(c.init(), row(1L)), row(2L))
    val b = c.update(c.init(), row(3L))
    assert(c.result(c.merge(a, b)) == 3L)
  }

  test("sum handles long, double and string inputs") {
    val s = SumAgg("s", 0)
    val acc = Seq[Any](1L, 2.5, "3.5").foldLeft(s.init())((a, v) => s.update(a, row(v)))
    assert(s.result(acc) == 7.0)
  }

  test("min/max over numbers and strings") {
    val mn = MinAgg("mn", 0)
    val mx = MaxAgg("mx", 0)
    val accMn = Seq[Any](5L, 2L, 9L).foldLeft(mn.init())((a, v) => mn.update(a, row(v)))
    val accMx = Seq[Any](5L, 2L, 9L).foldLeft(mx.init())((a, v) => mx.update(a, row(v)))
    assert(Num.toD(mn.result(accMn)) == 2.0)
    assert(Num.toD(mx.result(accMx)) == 9.0)
    val sMn = Seq[Any]("b", "a", "c").foldLeft(mn.init())((a, v) => mn.update(a, row(v)))
    assert(mn.result(sMn) == "a")
  }

  test("min/max merge with null (empty-side) accumulators") {
    val mn = MinAgg("mn", 0)
    assert(mn.merge(null, 5L) == 5L)
    assert(mn.merge(5L, null) == 5L)
    assert(mn.result(mn.merge(null, null)) == null)
  }

  test("avg carries (sum, count) and merges") {
    val a = AvgAgg("a", 0)
    val acc1 = Seq[Any](2.0, 4.0).foldLeft(a.init())((x, v) => a.update(x, row(v)))
    val acc2 = a.update(a.init(), row(9.0))
    assert(a.result(a.merge(acc1, acc2)) == 5.0)
    assert(a.result(a.init()) == null)
  }

  test("agg spec output schema is groups then aggregates") {
    val spec = AggSpec(Vector(1), Vector("g"), Vector(CountAgg("cnt"), SumAgg("s", 0)))
    assert(spec.outSchema.names == Vector("g", "cnt", "s"))
    assert(spec.keyOf(row(10L, "k")) == Vector("k"))
    assert(spec.accOffset == 1)
  }

  test("Num coercions") {
    assert(Num.toD(3L) == 3.0)
    assert(Num.toD("4.5") == 4.5)
    assert(Num.toD(null) == 0.0)
    assert(Num.toD(7) == 7.0)
  }

  test("agg defs resolve against a schema") {
    val s = Schema.of("x", "y")
    assert(AggDef("sum", "y", "s").resolve(s) == SumAgg("s", 1))
    assert(AggDef("count", "", "c").resolve(s) == CountAgg("c"))
    assert(AggDef("avg", "x", "a").resolve(s) == AvgAgg("a", 0))
    intercept[IllegalArgumentException](AggDef("median", "x", "m").resolve(s))
  }
}
