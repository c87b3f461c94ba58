package repro.jobs

import org.apache.spark.sql.SparkSession

/** Shared SparkSession builder for the spark-submit entrypoints. Local by
  * default (the paper's server is a single shared-memory box); honours
  * ``SPARK_MASTER`` so the same jars run on a cluster unchanged.
  */
object JobSession {
  def build(appName: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(appName)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", value = false)
      .getOrCreate()

  /** Per-run time budget (ms) for each algorithm variant, overridable via
    * ``REPRO_BUDGET_MS`` — the analogue of the paper's 4-day INF cutoff.
    */
  def budgetMs: Long = sys.env.getOrElse("REPRO_BUDGET_MS", "300000").toLong
}
