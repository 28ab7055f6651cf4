package repro.queries

import repro.{Oracle, SparkSpec}
import repro.engine._
import repro.sparkbridge.SparkTables

/** Every query in the correctness suite: the ENGINE result (simulated
  * distributed execution, virtual cluster) must match DuckDB executing the
  * equivalent SQL over the same input tables. This is the "it's correct", not
  * just "it ran" check for the whole engine substrate.
  */
class OracleEquivalenceSpec extends SparkSpec {
  private lazy val t = Fixtures.tpch
  private val costs = Fixtures.costs

  private def runEngine(qc: QueryCase, stageDop: Int = 2, taskDop: Int = 2): SimResult = {
    val plan = Planner.plan(qc.plan(t), shuffleStageFor = qc.shuffleStageFor)
    val qe = new QueryExec(plan, Cluster.default(costs), costs, stageDop, taskDop)
    new Simulator(qe).run()
  }

  for (qc <- Queries.suite) {
    test(s"engine matches DuckDB: ${qc.name}") {
      val res = runEngine(qc)
      val engineDf = SparkTables.toDf(spark, res.schema, res.rows)
      Oracle.assertEquivalent(engineDf, qc.duckSql,
        "lineitem" -> t.lineitemDf, "orders" -> t.ordersDf,
        "customer" -> t.customerDf, "part" -> t.partDf)
    }
  }

  test("engine matches DuckDB under runtime DOP tuning (q2j with a switch)") {
    val qc = Queries.suite.find(_.name == "q2j").get
    val plan = Planner.plan(qc.plan(t))
    val join = plan.joinStages.head.id
    // slow the clock so the switch fires mid-probe, after the build side
    // (orders scan) has fully streamed in
    val slow = costs.copy(dataScale = 150.0)
    val qe = new QueryExec(plan, Cluster.default(slow), slow, 2, 1)
    val res = new Simulator(qe, script = Seq(SetStageDop(4.5, join, 4))).run()
    assert(res.switchLog.nonEmpty, "switch must fire mid-run for this test to bite")
    val engineDf = SparkTables.toDf(spark, res.schema, res.rows)
    Oracle.assertEquivalent(engineDf, qc.duckSql,
      "lineitem" -> t.lineitemDf, "orders" -> t.ordersDf)
  }
}
