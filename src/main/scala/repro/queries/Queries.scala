package repro.queries

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.SynthData
import repro.engine._
import repro.engine.Dsl._
import repro.sparkbridge.SparkTables

/** TPC-H-lite tables materialized both as Spark DataFrames (ground truth) and
  * as EngineTables laid out across the simulated data nodes (paper Table 1).
  */
final case class Tpch(
    lineitem: EngineTable, orders: EngineTable, customer: EngineTable, part: EngineTable,
    lineitemDf: DataFrame, ordersDf: DataFrame, customerDf: DataFrame, partDf: DataFrame,
) {
  def dfs: Seq[(String, DataFrame)] = Seq(
    "lineitem" -> lineitemDf, "orders" -> ordersDf,
    "customer" -> customerDf, "part" -> partDf)
}

/** One correctness-suite entry: engine plan + equivalent SQL for the oracle. */
final case class QueryCase(name: String, plan: Tpch => LNode, duckSql: String,
                           shuffleStageFor: Set[String] = Set.empty)

object Queries {

  /** Load TPC-H-lite at `sf`, partitioned per the paper's Table 1 scheme:
    * lineitem 7 splits/node across all data nodes, the rest 1 split/node.
    * `ordersNodes` restricts where orders lives (the §6.4.2 shuffle-bottleneck
    * setup stores orders on just two nodes).
    */
  def loadTpch(spark: SparkSession, sf: Double, dataNodeIds: Vector[Int],
               ordersNodes: Option[Vector[Int]] = None): Tpch = {
    val li = SynthData.lineitem(spark, sf)
    val or = SynthData.orders(spark, sf)
    val cu = SynthData.customer(spark, sf)
    val pa = SynthData.part(spark, sf)
    Tpch(
      SparkTables.fromDf(li, "lineitem", dataNodeIds, splitsPerNode = 7),
      SparkTables.fromDf(or, "orders", ordersNodes.getOrElse(dataNodeIds), splitsPerNode = 1),
      SparkTables.fromDf(cu, "customer", dataNodeIds, splitsPerNode = 1),
      SparkTables.fromDf(pa, "part", dataNodeIds, splitsPerNode = 1),
      li, or, cu, pa,
    )
  }

  // ----------------------------------------------------------------- Q3-lite
  // TPC-H Q3 without the ORDER BY / LIMIT (Top-N is orthogonal to DOP tuning):
  // customer ⋈ orders ⋈ lineitem with the standard predicates, grouped revenue.

  val q3Cutoff = "1995-03-15"

  def q3Plan(t: Tpch): LNode = {
    val cust = project(
      filter(scan(t.customer), s"c_mktsegment='BUILDING'") { s =>
        val i = s.idx("c_mktsegment"); r => r(i) == "BUILDING"
      },
      "c_custkey" -> (s => col(s, "c_custkey")),
    )
    val ord = project(
      filter(scan(t.orders), s"o_orderdate<'$q3Cutoff'") { s =>
        val i = s.idx("o_orderdate"); r => r(i).asInstanceOf[String] < q3Cutoff
      },
      "o_orderkey" -> (s => col(s, "o_orderkey")),
      "o_custkey" -> (s => col(s, "o_custkey")),
      "o_orderdate" -> (s => col(s, "o_orderdate")),
    )
    val custOrders = project(
      joinP(cust, ord, "c_custkey", "o_custkey"),
      "o_orderkey" -> (s => col(s, "o_orderkey")),
      "o_orderdate" -> (s => col(s, "o_orderdate")),
    )
    val li = project(
      filter(scan(t.lineitem), s"l_shipdate>'$q3Cutoff'") { s =>
        val i = s.idx("l_shipdate"); r => r(i).asInstanceOf[String] > q3Cutoff
      },
      "l_orderkey" -> (s => col(s, "l_orderkey")),
      "rev" -> { s =>
        val e = s.idx("l_extendedprice"); val d = s.idx("l_discount")
        r => Num.toD(r(e)) * (1.0 - Num.toD(r(d)))
      },
    )
    val joined = project(
      joinP(custOrders, li, "o_orderkey", "l_orderkey"),
      "l_orderkey" -> (s => col(s, "l_orderkey")),
      "o_orderdate" -> (s => col(s, "o_orderdate")),
      "rev" -> (s => col(s, "rev")),
    )
    agg(joined, Seq("l_orderkey", "o_orderdate"), sum("rev", "revenue"))
  }

  val q3DuckSql: String =
    s"""SELECT l_orderkey, o_orderdate,
       |       SUM(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE))) AS revenue
       |FROM customer, orders, lineitem
       |WHERE c_mktsegment = 'BUILDING'
       |  AND c_custkey = o_custkey AND l_orderkey = o_orderkey
       |  AND o_orderdate < '$q3Cutoff' AND l_shipdate > '$q3Cutoff'
       |GROUP BY l_orderkey, o_orderdate""".stripMargin

  // -------------------------------------------------------------------- Q2J
  // The paper's two-way join (§4.5): SELECT count(l_orderkey) FROM lineitem
  // INNER JOIN orders ON l_orderkey = o_orderkey. Orders is the build side.

  def q2jPlan(t: Tpch): LNode = {
    val ord = keep(scan(t.orders), "o_orderkey")
    val li = keep(scan(t.lineitem), "l_orderkey")
    agg(joinP(ord, li, "o_orderkey", "l_orderkey"), Nil, count("cnt"))
  }

  val q2jDuckSql: String =
    "SELECT count(l_orderkey) AS cnt FROM lineitem, orders WHERE l_orderkey = o_orderkey"

  // ------------------------------------------------------------ QShuffle (§6.4.2)
  // select count(o_orderkey) from orders join customer on o_custkey = c_custkey
  // where c_nationkey = 9; optionally with an elastic shuffle stage under orders.

  def qShufflePlan(t: Tpch): LNode = {
    val cust = project(
      filter(scan(t.customer), "c_nationkey=9") { s =>
        val i = s.idx("c_nationkey"); r => Num.toD(r(i)) == 9.0
      },
      "c_custkey" -> (s => col(s, "c_custkey")),
    )
    val ord = keep(scan(t.orders), "o_orderkey", "o_custkey")
    agg(joinP(cust, ord, "c_custkey", "o_custkey"), Nil, count("cnt"))
  }

  val qShuffleDuckSql: String =
    "SELECT count(o_orderkey) AS cnt FROM orders, customer " +
      "WHERE o_custkey = c_custkey AND CAST(c_nationkey AS INT) = 9"

  // --------------------------------------------------- correctness suite

  /** Queries used by the engine-vs-DuckDB equivalence tests. Aggregates are
    * chosen so floating-point summation order cannot flip the comparison:
    * counts/min/max are exact, averages have tiny relative error, and raw
    * SUMs only appear over small groups (Q3).
    */
  val suite: Vector[QueryCase] = Vector(
    QueryCase("count_lineitem",
      t => agg(keep(scan(t.lineitem), "l_orderkey"), Nil, count("cnt")),
      "SELECT count(*) AS cnt FROM lineitem"),
    QueryCase("filtered_count",
      t => agg(
        filter(scan(t.lineitem), "l_shipdate>'1995-06-01'") { s =>
          val i = s.idx("l_shipdate"); r => r(i).asInstanceOf[String] > "1995-06-01"
        }, Nil, count("cnt")),
      "SELECT count(*) AS cnt FROM lineitem WHERE l_shipdate > '1995-06-01'"),
    QueryCase("global_minmax_avg",
      t => agg(scan(t.lineitem), Nil,
        min("l_extendedprice", "mn"), max("l_extendedprice", "mx"),
        avg("l_quantity", "aq"), count("cnt")),
      "SELECT min(CAST(l_extendedprice AS DOUBLE)) AS mn, " +
        "max(CAST(l_extendedprice AS DOUBLE)) AS mx, " +
        "avg(CAST(l_quantity AS DOUBLE)) AS aq, count(*) AS cnt FROM lineitem"),
    QueryCase("q1_lite",
      t => agg(scan(t.lineitem), Seq("l_returnflag", "l_linestatus"),
        count("cnt"), avg("l_extendedprice", "avg_price"), max("l_discount", "max_disc")),
      "SELECT l_returnflag, l_linestatus, count(*) AS cnt, " +
        "avg(CAST(l_extendedprice AS DOUBLE)) AS avg_price, " +
        "max(CAST(l_discount AS DOUBLE)) AS max_disc " +
        "FROM lineitem GROUP BY l_returnflag, l_linestatus"),
    QueryCase("groupby_orderstatus",
      t => agg(scan(t.orders), Seq("o_orderstatus"), count("cnt"), avg("o_totalprice", "ap")),
      "SELECT o_orderstatus, count(*) AS cnt, avg(CAST(o_totalprice AS DOUBLE)) AS ap " +
        "FROM orders GROUP BY o_orderstatus"),
    QueryCase("q2j", q2jPlan, q2jDuckSql),
    QueryCase("orders_customer",
      t => agg(joinP(keep(scan(t.customer), "c_custkey"),
        keep(scan(t.orders), "o_orderkey", "o_custkey"),
        "c_custkey", "o_custkey"), Nil, count("cnt")),
      "SELECT count(*) AS cnt FROM orders, customer WHERE o_custkey = c_custkey"),
    QueryCase("qshuffle", qShufflePlan, qShuffleDuckSql),
    QueryCase("qshuffle_with_stage", qShufflePlan, qShuffleDuckSql, Set("orders")),
    QueryCase("broadcast_join",
      t => agg(joinB(
        project(filter(scan(t.customer), "c_nationkey=3") { s =>
          val i = s.idx("c_nationkey"); r => Num.toD(r(i)) == 3.0
        }, "c_custkey" -> (s => col(s, "c_custkey"))),
        keep(scan(t.orders), "o_orderkey", "o_custkey"),
        "c_custkey", "o_custkey"), Nil, count("cnt")),
      "SELECT count(*) AS cnt FROM orders, customer " +
        "WHERE o_custkey = c_custkey AND CAST(c_nationkey AS INT) = 3"),
    QueryCase("join_groupby_date",
      t => agg(joinP(keep(scan(t.orders), "o_orderkey", "o_orderdate"),
        keep(scan(t.lineitem), "l_orderkey"),
        "o_orderkey", "l_orderkey"), Seq("o_orderdate"), count("cnt")),
      "SELECT o_orderdate, count(*) AS cnt FROM orders, lineitem " +
        "WHERE o_orderkey = l_orderkey GROUP BY o_orderdate"),
    QueryCase("part_lineitem",
      t => agg(joinP(keep(scan(t.part), "p_partkey"),
        keep(scan(t.lineitem), "l_partkey", "l_quantity"),
        "p_partkey", "l_partkey"), Nil, count("cnt"), avg("l_quantity", "aq")),
      "SELECT count(*) AS cnt, avg(CAST(l_quantity AS DOUBLE)) AS aq " +
        "FROM part, lineitem WHERE p_partkey = l_partkey"),
    QueryCase("empty_result",
      t => agg(filter(scan(t.lineitem), "l_quantity<0") { s =>
        val i = s.idx("l_quantity"); r => Num.toD(r(i)) < 0.0
      }, Nil, count("cnt")),
      "SELECT count(*) AS cnt FROM lineitem WHERE CAST(l_quantity AS DOUBLE) < 0"),
    QueryCase("q3_lite", q3Plan, q3DuckSql),
  )
}
