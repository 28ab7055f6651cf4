package repro.engine

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite
import repro.engine.Dsl._
import repro.engine.TestRig._

/** The central IQRE correctness invariant, property-tested: for ANY schedule
  * of DOP tuning actions, query results equal the untuned run's results.
  */
class ElasticPropertySpec extends AnyFunSuite {
  private val c = CostModel.forTests.copy(dataScale = 400.0)
  private val orders = ordersT(200)
  private val items = itemsT(200, 5) // 1000 probe rows

  private def query = agg(joinP(keep(scan(orders), "o_id"),
    keep(scan(items), "i_order", "i_val"), "o_id", "i_order"),
    Seq("i_order"), count("cnt"), sum("i_val", "sv"))

  private lazy val expected = canon(runPlan(Planner.plan(query), c = c))

  private def checkProp(prop: Prop, n: Int): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(n), prop)
    assert(res.passed, s"property failed: ${res.status}")
  }

  private case class RandomAction(at: Double, stageKind: Int, taskLevel: Boolean, to: Int)

  private val genAction: Gen[RandomAction] = for {
    at <- Gen.choose(0.1, 4.0)
    stageKind <- Gen.choose(0, 2) // 0 = join, 1 = items scan, 2 = orders scan
    taskLevel <- Gen.oneOf(true, false)
    to <- Gen.choose(1, 5)
  } yield RandomAction(at, stageKind, taskLevel, to)

  private val genSchedule: Gen[List[RandomAction]] = Gen.listOfN(4, genAction)

  test("results are invariant under random DOP tuning schedules") {
    val plan = Planner.plan(query)
    val join = plan.joinStages.head.id
    val itemsScan = plan.scanStages.find(_.table.name == "items").get.id
    val ordersScan = plan.scanStages.find(_.table.name == "orders").get.id

    val prop = Prop.forAll(genSchedule) { schedule =>
      val script: Seq[TuningAction] = schedule.map { a =>
        val sid = a.stageKind match {
          case 0 => join
          case 1 => itemsScan
          case _ => ordersScan
        }
        if (a.taskLevel || sid != join) SetTaskDop(a.at, sid, a.to)
        else SetStageDop(a.at, sid, a.to)
      }
      val res = runPlan(plan, script = script, c = c)
      canon(res) == expected
    }
    checkProp(prop, 25)
  }

  test("results are invariant under random initial DOP configurations") {
    val plan = Planner.plan(query)
    val prop = Prop.forAll(Gen.choose(1, 4), Gen.choose(1, 4)) { (sd: Int, td: Int) =>
      canon(runPlan(plan, stageDop = sd, taskDop = td, c = c)) == expected
    }
    checkProp(prop, 8)
  }
}
