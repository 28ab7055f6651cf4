package repro.queries

import repro.SparkSpec
import repro.engine._
import repro.sparkbridge.{AqeBaseline, SparkTables}

/** Engine results vs Spark SQL (Catalyst) executing the same queries — an
  * independent second ground truth beside DuckDB (Fig 20's "verify the system
  * implementation is reasonable" role).
  */
class EngineVsSparkSpec extends SparkSpec {
  private lazy val t = Fixtures.tpch
  private val costs = Fixtures.costs

  private def canonDf(df: org.apache.spark.sql.DataFrame): Vector[String] =
    df.collect().toVector.map { r =>
      (0 until r.length).map { i =>
        r.get(i) match {
          case null => "∅"
          case d: java.lang.Double => f"${d.doubleValue}%.4f"
          case bd: java.math.BigDecimal => f"${bd.doubleValue}%.4f"
          case x => x.toString
        }
      }.mkString("|")
    }.sorted

  private def runEngine(qc: QueryCase): SimResult = {
    val plan = Planner.plan(qc.plan(t), shuffleStageFor = qc.shuffleStageFor)
    val qe = new QueryExec(plan, Cluster.default(costs), costs, 2, 2)
    new Simulator(qe).run()
  }

  /** DuckDB SQL in the suite is written against VARCHAR tables; Spark gets the
    * typed temp views, so the same SQL text works with its implicit casts.
    */
  private def sparkSql(sql: String): org.apache.spark.sql.DataFrame = {
    t.dfs.foreach { case (n, df) => SparkTables.datesAsStrings(df).createOrReplaceTempView(n) }
    spark.sql(sql)
  }

  for (name <- Seq("count_lineitem", "q1_lite", "q2j", "qshuffle", "q3_lite")) {
    test(s"engine matches Spark SQL: $name") {
      val qc = Queries.suite.find(_.name == name).get
      val engine = runEngine(qc)
      val engineDf = SparkTables.toDf(spark, engine.schema, engine.rows)
      assert(canonDf(engineDf) == canonDf(sparkSql(qc.duckSql)))
    }
  }

  test("Spark AQE adjusts shuffle partitions only at stage boundaries (§4.2.1)") {
    val sql = Queries.q2jDuckSql
    t.dfs.foreach { case (n, df) => df.createOrReplaceTempView(n) }
    val withAqe = AqeBaseline.run(spark, sql, aqe = true,
      "lineitem" -> t.lineitemDf, "orders" -> t.ordersDf)
    val withoutAqe = AqeBaseline.run(spark, sql, aqe = false,
      "lineitem" -> t.lineitemDf, "orders" -> t.ordersDf)
    // AQE coalesces shuffle partitions BETWEEN stages — visible as
    // AQEShuffleRead nodes in the finalized plan; without AQE none exist.
    assert(AqeBaseline.usedAqeShuffleRead(withAqe))
    assert(!AqeBaseline.usedAqeShuffleRead(withoutAqe))
    // and of course both agree on the result
    assert(canonDf(withAqe) == canonDf(withoutAqe))
  }
}
