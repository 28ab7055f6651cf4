package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable.ArrayDeque
import repro.engine.Data.Row

class DriversUnitSpec extends AnyFunSuite {

  private def spec = AggSpec(Vector(0), Vector("g"),
    Vector(CountAgg("cnt"), SumAgg("s", 1)))

  test("partial aggregator accumulates per group and flushes accumulator rows") {
    val agg = new PartialAggregator(spec, flushGroups = 1000)
    agg.update(Array[Any]("a", 1.0))
    agg.update(Array[Any]("a", 2.0))
    agg.update(Array[Any]("b", 5.0))
    val out = new ArrayDeque[Row]()
    agg.flush(out)
    val rows = out.toVector.map(_.toVector)
    assert(rows.size == 2)
    val a = rows.find(_.head == "a").get
    assert(a(1) == 2L && a(2) == 3.0) // count acc, sum acc
  }

  test("partial aggregator flush empties state (stateless-izable, §4.1)") {
    val agg = new PartialAggregator(spec, flushGroups = 1000)
    agg.update(Array[Any]("a", 1.0))
    val out = new ArrayDeque[Row]()
    agg.flush(out)
    out.clear()
    agg.flush(out)
    assert(out.isEmpty) // nothing left after a flush
  }

  test("maybeFlush respects the group threshold") {
    val agg = new PartialAggregator(spec, flushGroups = 3)
    val out = new ArrayDeque[Row]()
    agg.update(Array[Any]("a", 1.0)); agg.maybeFlush(out)
    agg.update(Array[Any]("b", 1.0)); agg.maybeFlush(out)
    assert(out.isEmpty) // below threshold
    agg.update(Array[Any]("c", 1.0)); agg.maybeFlush(out)
    assert(out.size == 3) // threshold reached → flushed all groups
  }

  test("routing cost charges shuffle work for hash and broadcast outputs") {
    val c = CostModel.forTests
    assert(Drivers.routingCost(Routing.Hash(0), c) == c.shuffleRow)
    assert(Drivers.routingCost(Routing.Broadcast, c) == c.shuffleRow)
    assert(Drivers.routingCost(Routing.RoundRobin, c) == 0.0)
    assert(Drivers.routingCost(Routing.Single, c) == 0.0)
  }

  test("join hash table stores duplicates and counts rows") {
    val ht = new JoinHashTable
    ht.insert(1L, Array[Any](1L, "x"))
    ht.insert(1L, Array[Any](1L, "y"))
    ht.insert(2L, Array[Any](2L, "z"))
    assert(ht.rowCount == 3 && ht.keyCount == 2)
    assert(ht.get(1L).size == 2)
    assert(ht.get(99L).isEmpty)
  }
}
