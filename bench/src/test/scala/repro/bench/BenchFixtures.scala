package repro.bench

import repro.SparkSpec
import repro.engine.CostModel
import repro.experiments.Experiments
import repro.queries.{Queries, Tpch}

/** Shared state for the benchmark suites: SF=0.1 TPC-H-lite (overridable via
  * REPRO_SF), the calibrated cost model (dataScale=1000 ⇒ the data stands in
  * for the paper's SF100), and memoized baselines reused across benches.
  */
object BenchFixtures {
  val sf: Double = sys.env.getOrElse("REPRO_SF", "0.1").toDouble
  val costs: CostModel = CostModel()

  lazy val tpch: Tpch = Queries.loadTpch(SparkSpec.shared, sf, Experiments.DataNodes)

  /** §6.4.2 layout: orders on two data nodes only. */
  lazy val shuffleTpch: Tpch = Experiments.shuffleTables(SparkSpec.shared, sf)

  /** Presto-like Q3 baseline: stage/task DOP 1, no runtime tuning. */
  lazy val q3Static11 = Experiments.q3Static(tpch, costs, 1, 1)

  /** Presto-like Q2J baseline at the paper's initial DOP 2. */
  lazy val q2jStatic2 = Experiments.q2jStatic(tpch, costs, 2)

  /** Order-insensitive result equality with relative tolerance on doubles:
    * runtime tuning reorders partial-aggregate merges, which legitimately
    * perturbs floating-point sums in the last bits.
    */
  def resultsMatch(a: Vector[repro.engine.Data.Row], b: Vector[repro.engine.Data.Row]): Boolean = {
    if (a.size != b.size) return false
    def key(r: repro.engine.Data.Row): String =
      r.collect { case v if !v.isInstanceOf[Double] => String.valueOf(v) }.mkString("|")
    val sa = a.sortBy(key)
    val sb = b.sortBy(key)
    sa.zip(sb).forall { case (x, y) =>
      x.length == y.length && x.indices.forall { i =>
        (x(i), y(i)) match {
          case (d1: Double, d2: Double) =>
            math.abs(d1 - d2) <= 1e-6 * math.max(1.0, math.max(math.abs(d1), math.abs(d2)))
          case (v1, v2) => v1 == v2
        }
      }
    }
  }

  def banner(title: String): Unit = {
    println("=" * 72)
    println(s"== $title")
    println("=" * 72)
  }
}
