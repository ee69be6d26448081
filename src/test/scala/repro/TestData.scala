package repro

import repro.harness.Workbench

/** Shared unit-test fixture scale: small enough that the whole suite stays
  * fast, large enough that skew/correlation are visible. Workbench caches by
  * (sf, seed), so all suites in the run share one generated database.
  */
object TestData {
  val SF   = 0.02
  val Seed = 42L

  def wb(spark: org.apache.spark.sql.SparkSession): Workbench = Workbench(spark, SF, Seed)
}
