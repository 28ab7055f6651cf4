package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import repro.engine.Dsl._

class PlannerSpec extends AnyFunSuite {
  private val orders = TestRig.ordersT(20)
  private val items = TestRig.itemsT(20, 3)

  test("scan + global aggregate fragments into scan/finalAgg/output") {
    val plan = Planner.plan(agg(scan(orders), Nil, count("cnt")))
    assert(plan.stages.map(_.id).sorted == Vector(0, 1, 2))
    val s = plan.stage(2).asInstanceOf[ScanStageDef]
    assert(s.partialAgg.isDefined) // two-stage aggregation: partial fused into scan
    assert(s.out.routing == Routing.Single)
    val f = plan.stage(1).asInstanceOf[FinalAggStageDef]
    assert(f.childStageId == 2)
    assert(plan.stage(0).asInstanceOf[OutputStageDef].childStageId == 1)
  }

  test("filter and project fuse into the scan stage") {
    val p = project(
      filter(scan(orders), "o_id<10")(s => { val i = s.idx("o_id"); r => Num.toD(r(i)) < 10 }),
      "o_id" -> (s => col(s, "o_id")))
    val plan = Planner.plan(agg(p, Nil, count("c")))
    val s = plan.scanStages.head
    assert(s.filter.isDefined && s.project.isDefined)
    assert(s.outSchema.names.nonEmpty)
  }

  test("partitioned join: both children hash-route and the build side is cached") {
    val j = joinP(keep(scan(orders), "o_id"), keep(scan(items), "i_order", "i_val"),
      "o_id", "i_order")
    val plan = Planner.plan(agg(j, Nil, count("cnt")))
    val join = plan.joinStages.head
    assert(!join.broadcast)
    val build = plan.stage(join.buildStageId)
    val probe = plan.stage(join.probeStageId)
    assert(build.out.routing == Routing.Hash(0) && build.out.cached)
    assert(probe.out.routing == Routing.Hash(0) && !probe.out.cached)
    assert(join.partialAgg.isDefined) // count fused as partial agg into join stage
  }

  test("broadcast join: build replicates, probe round-robins") {
    val j = joinB(keep(scan(orders), "o_id"), keep(scan(items), "i_order"), "o_id", "i_order")
    val plan = Planner.plan(agg(j, Nil, count("cnt")))
    val join = plan.joinStages.head
    assert(join.broadcast)
    assert(plan.stage(join.buildStageId).out.routing == Routing.Broadcast)
    assert(plan.stage(join.probeStageId).out.routing == Routing.RoundRobin)
  }

  test("two-way join produces the paper's stage topology (Fig 15)") {
    val j = joinP(keep(scan(orders), "o_id"), keep(scan(items), "i_order"), "o_id", "i_order")
    val plan = Planner.plan(agg(j, Nil, count("cnt")))
    // S0 output ← S1 final agg ← S2 join ← {S3 build scan, S4 probe scan}
    assert(plan.childrenOf(0) == Vector(1))
    assert(plan.childrenOf(1) == Vector(2))
    assert(plan.childrenOf(2).toSet == Set(3, 4))
    assert(plan.parentOf(3).contains(2) && plan.parentOf(4).contains(2))
  }

  test("shuffle stage insertion rewires a scan through a pipe stage (§4.6)") {
    val j = joinP(keep(scan(orders), "o_id"), keep(scan(items), "i_order"), "o_id", "i_order")
    val plan = Planner.plan(agg(j, Nil, count("cnt")), shuffleStageFor = Set("items"))
    val shuffle = plan.stages.collectFirst { case s: ShuffleStageDef => s }.get
    val scanItems = plan.scanStages.find(_.table.name == "items").get
    assert(scanItems.out.routing == Routing.RoundRobin)
    assert(shuffle.childStageId == scanItems.id)
    assert(shuffle.out.routing.isInstanceOf[Routing.Hash])
    val join = plan.joinStages.head
    assert(join.probeStageId == shuffle.id)
  }

  test("group-by aggregation keys resolve to child schema indices") {
    val plan = Planner.plan(agg(scan(items), Seq("i_order"), count("cnt"), sum("i_val", "sv")))
    val spec = plan.stages.collectFirst { case f: FinalAggStageDef => f }.get.agg
    assert(spec.groupNames == Vector("i_order"))
    assert(spec.outSchema.names == Vector("i_order", "cnt", "sv"))
  }

  test("describe renders every stage") {
    val plan = Planner.plan(agg(scan(orders), Nil, count("cnt")))
    val d = plan.describe
    assert(d.contains("scan(orders)") && d.contains("finalAgg") && d.contains("output"))
  }

  test("unsupported fragment shapes fail loudly") {
    // aggregation below a join is not a supported fragment shape
    val inner = agg(scan(orders), Seq("o_cust"), count("c"))
    intercept[IllegalArgumentException] {
      Planner.plan(joinP(inner, scan(items), "o_cust", "i_order"))
    }
  }

  test("queries without aggregation route straight to output") {
    val plan = Planner.plan(keep(scan(orders), "o_id"))
    assert(plan.stages.map(_.id).sorted == Vector(0, 1))
    assert(plan.stage(1).out.routing == Routing.Single)
  }
}
