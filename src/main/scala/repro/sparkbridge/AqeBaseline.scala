package repro.sparkbridge

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Spark SQL baseline runner (§4.2.1 contrast): Adaptive Query Execution can
  * re-decide shuffle partition counts only **between** stages — once a stage is
  * processing data its DOP is fixed. Running the evaluation queries through
  * Spark with AQE on/off both (a) provides an independent ground truth for the
  * engine's results and (b) documents the gap IQRE fills.
  */
object AqeBaseline {

  /** Execute `sql` over temp views of `tables`, with AQE toggled. */
  def run(spark: SparkSession, sql: String, aqe: Boolean,
          tables: (String, DataFrame)*): DataFrame = {
    tables.foreach { case (n, df) => df.createOrReplaceTempView(n) }
    val prev = spark.conf.get("spark.sql.adaptive.enabled", "true")
    spark.conf.set("spark.sql.adaptive.enabled", aqe.toString)
    try {
      val df = spark.sql(sql)
      df.collect() // force execution so the adaptive plan is finalized
      df
    } finally spark.conf.set("spark.sql.adaptive.enabled", prev)
  }

  /** Final executed plan text (after adaptive re-planning, if any). */
  def executedPlan(df: DataFrame): String =
    df.queryExecution.executedPlan.toString()

  /** Whether the finalized plan contains AQE shuffle reads — evidence that
    * partition-count (DOP) decisions happened at stage boundaries only.
    */
  def usedAqeShuffleRead(df: DataFrame): Boolean =
    executedPlan(df).contains("AQEShuffleRead")
}
