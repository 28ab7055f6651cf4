package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.engine.Dsl._
import repro.engine.TestRig._
import repro.engine._

class AutoTunerSpec extends AnyFunSuite {
  private val c = CostModel.forTests.copy(dataScale = 2000.0)
  private val orders = ordersT(300)
  private val items = itemsT(300, 6) // 1800 probe rows

  private def query = agg(joinP(keep(scan(orders), "o_id"),
    keep(scan(items), "i_order", "i_val"), "o_id", "i_order"),
    Seq("i_order"), count("cnt"))

  private def plan = Planner.plan(query)

  private def scanId(p: QueryPlan) = p.scanStages.find(_.table.name == "items").get.id

  private def runTuned(p: QueryPlan, deadline: Double, stageDop: Int, taskDop: Int):
      (SimResult, AutoTuner) = {
    val tuner = new AutoTuner(Map(scanId(p) -> deadline), period = 1.0)
    val qe = new QueryExec(p, cluster(c), c, stageDop, taskDop)
    (new Simulator(qe, tuner = Some(tuner), maxVirtualSeconds = deadline * 20).run(), tuner)
  }

  private lazy val untunedDuration = runPlan(plan, c = c).duration

  test("auto-tuner speeds the query up to meet a tight deadline") {
    val p = plan
    val deadline = untunedDuration * 0.4
    val (res, tuner) = runTuned(p, deadline, 1, 1)
    assert(res.duration <= deadline * 1.3,
      s"finished ${res.duration} vs deadline $deadline (untuned $untunedDuration)")
    assert(tuner.decisions.exists(_._2.startsWith("APPLIED AC")), tuner.decisions.mkString("; "))
    assert(canon(res) == canon(runPlan(plan, c = c)))
  }

  test("auto-tuner releases resources when well ahead of schedule (RP)") {
    val p = plan
    val deadline = untunedDuration * 6.0
    val (res, tuner) = runTuned(p, deadline, 1, 6)
    assert(tuner.decisions.exists(_._2.contains("RP")),
      s"decisions: ${tuner.decisions.mkString("; ")}")
    assert(res.duration <= deadline)
  }

  test("auto-tuning saves resources versus an always-max configuration") {
    val p = plan
    val deadline = untunedDuration * 0.9
    val (tuned, _) = runTuned(p, deadline, 1, 1)
    val alwaysMax = runPlan(plan, stageDop = 4, taskDop = 4, c = c)
    assert(tuned.duration <= deadline * 1.3)
    assert(tuned.busyCoreSeconds < alwaysMax.busyCoreSeconds * 1.5)
  }

  test("deadline updated mid-flight changes tuner behaviour (§6.5.2 Q3)") {
    val p = plan
    val loose = untunedDuration * 3
    val tuner = new AutoTuner(Map(scanId(p) -> loose), period = 1.0)
    val qe = new QueryExec(p, cluster(c), c, 1, 1)
    // tighten the constraint mid-run via the UI path
    val tightener = new TunerHook {
      private var done = false
      def step(now: Double, q: QueryExec, sched: DynamicScheduler): Unit = {
        tuner.step(now, q, sched)
        if (!done && now > untunedDuration * 0.3) {
          done = true
          tuner.setDeadline(scanId(p), now + untunedDuration * 0.2)
        }
      }
    }
    val res = new Simulator(qe, tuner = Some(tightener), maxVirtualSeconds = loose * 10).run()
    assert(tuner.decisions.exists(_._2.startsWith("APPLIED AC")),
      s"decisions: ${tuner.decisions.mkString("; ")}")
    assert(canon(res) == canon(runPlan(plan, c = c)))
  }
}
