package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.engine.Dsl._
import repro.engine.TestRig._

/** The end-page relay game (§4.3, Fig 13): ends propagate bottom-up through
  * buffers, local exchanges and stateful operators, closing drivers, tasks and
  * stages in order.
  */
class EndPageSpec extends AnyFunSuite {
  private val c = CostModel.forTests.copy(dataScale = 400.0)
  private val orders = ordersT(100)
  private val items = itemsT(100, 4)

  private def query = agg(joinP(keep(scan(orders), "o_id"),
    keep(scan(items), "i_order"), "o_id", "i_order"), Nil, count("cnt"))

  test("stages complete strictly bottom-up") {
    val plan = Planner.plan(query)
    val qe = new QueryExec(plan, cluster(c), c, 1, 1)
    new Simulator(qe).run()
    val join = qe.joinStages.head
    val buildScan = qe.stage(join.joinDef.buildStageId)
    val probeScan = qe.stage(join.joinDef.probeStageId)
    val finalAgg = qe.stages.collectFirst { case f: FinalAggStageExec => f }.get
    assert(buildScan.completedAt <= join.completedAt)
    assert(probeScan.completedAt <= join.completedAt)
    assert(join.completedAt <= finalAgg.completedAt)
    assert(finalAgg.completedAt <= qe.outputStage.completedAt)
  }

  test("every buffer is end-marked once the query finishes") {
    val plan = Planner.plan(query)
    val qe = new QueryExec(plan, cluster(c), c, 2, 2)
    new Simulator(qe).run()
    qe.stages.foreach { s =>
      s.allTasks.foreach { t =>
        assert(t.finished, s"${t.label} not finished")
        assert(t.outputBuffer.ended, s"${t.label} buffer not ended")
        t.allConsumerQueues.foreach(q => assert(q.endedAndEmpty))
      }
    }
  }

  test("stateful operators flush all results before finishing (hash ready gates)") {
    val plan = Planner.plan(query)
    val qe = new QueryExec(plan, cluster(c), c, 1, 1)
    val res = new Simulator(qe).run()
    val join = qe.joinStages.head
    join.allTasks.foreach(t => assert(t.hashReady)) // builds completed before close
    assert(res.rows.map(_.head) == Vector(400L)) // all probe output flushed
  }

  test("build side empties correctly when the build table has no rows") {
    val emptyBuild = mkTable("empty", Seq("k"), Seq(0 -> Seq.empty))
    val q = agg(joinP(scan(emptyBuild), keep(scan(items), "i_order"), "k", "i_order"),
      Nil, count("cnt"))
    val res = runPlan(Planner.plan(q), c = c)
    assert(canon(res) == Vector("0"))
  }

  test("probe side empties correctly when the probe table has no rows") {
    val emptyProbe = mkTable("empty", Seq("k"), Seq(0 -> Seq.empty))
    val q = agg(joinP(keep(scan(orders), "o_id"), scan(emptyProbe), "o_id", "k"),
      Nil, count("cnt"))
    val res = runPlan(Planner.plan(q), c = c)
    assert(canon(res) == Vector("0"))
  }
}
