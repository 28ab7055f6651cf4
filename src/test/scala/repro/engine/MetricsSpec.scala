package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.engine.Dsl._
import repro.engine.TestRig._

class MetricsSpec extends AnyFunSuite {
  private val c = CostModel.forTests.copy(dataScale = 400.0)
  private val orders = ordersT(100)
  private val items = itemsT(100, 5)

  private def query = agg(joinP(keep(scan(orders), "o_id"),
    keep(scan(items), "i_order"), "o_id", "i_order"), Nil, count("cnt"))

  test("collector samples cumulative rows and busy core-seconds") {
    val res = runPlan(Planner.plan(query), c = c)
    val col = res.collector
    assert(col.samples.size >= 2)
    val last = col.samples.last
    assert(last.busyCoreSeconds > 0)
    assert(last.rowsOut.values.sum > 0)
    // cumulative counters never decrease
    col.samples.toVector.sliding(2).foreach {
      case Vector(a, b) =>
        assert(b.rowsOut.values.sum >= a.rowsOut.values.sum)
        assert(b.busyCoreSeconds >= a.busyCoreSeconds)
      case _ => ()
    }
  }

  test("scan rate and throughput are positive mid-run") {
    val plan = Planner.plan(query)
    val qe = new QueryExec(plan, cluster(c), c, 1, 1)
    val sim = new Simulator(qe)
    val res = sim.run()
    val scanId = plan.scanStages.find(_.table.name == "items").get.id
    assert(res.collector.scanRate(scanId, window = res.duration) > 0)
    assert(res.collector.throughputSeries(scanId).nonEmpty)
  }

  test("snapshot exposes the query-stage-task tree (Fig 18)") {
    val plan = Planner.plan(query)
    val qe = new QueryExec(plan, cluster(c), c, 2, 2)
    val res = new Simulator(qe).run()
    val snap = res.collector.snapshot(qe.now)
    assert(snap.stages.size == plan.stages.size)
    val join = snap.stage(plan.joinStages.head.id)
    assert(join.kind == "joinP")
    assert(join.stageDop == 2)
    assert(join.tasks.nonEmpty)
    assert(join.tasks.forall(_.finished))
    val scans = snap.stages.filter(_.scanProgress.isDefined)
    assert(scans.nonEmpty && scans.forall(_.scanProgress.get == 1.0))
  }

  test("scan progress tracks remaining rows") {
    val plan = Planner.plan(agg(scan(items), Nil, count("cnt")))
    val qe = new QueryExec(plan, cluster(c), c, 1, 1)
    new Simulator(qe).run()
    val s = qe.scanStages.head
    assert(s.scanned == items.rowCount)
    assert(s.remainingRows == 0)
    assert(s.progress == 1.0)
  }

  test("turn-up counters accumulate on fast consumers") {
    // streaming query: the output stage consumes much faster than the scan
    // produces, so its receive buffers drain dry every window → turn-ups;
    // slow the clock so several elastic windows elapse before completion
    val slow = c.copy(dataScale = 4000.0)
    val plan = Planner.plan(keep(scan(items), "i_order"))
    val qe = new QueryExec(plan, cluster(slow), slow, 1, 1)
    new Simulator(qe).run()
    val out = qe.outputStage
    assert(out.allTasks.map(_.turnUps).sum > 0)
  }
}
