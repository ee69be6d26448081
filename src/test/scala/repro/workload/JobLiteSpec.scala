package repro.workload

import repro.{SparkSpec, TestData}
import repro.core.opt.JoinGraph
import repro.imdb.Schema

/** Workload-level checks: the 113 queries are well-formed, match the paper's
  * Table III distribution exactly, and are valid SQL for Spark.
  */
class JobLiteSpec extends SparkSpec {

  private lazy val wb = TestData.wb(spark)

  test("exactly 113 queries") { assert(JobLite.all.size == 113) }

  test("query names are unique") {
    assert(JobLite.all.map(_.name).distinct.size == 113)
  }

  test("size histogram equals the paper's Table III exactly") {
    assert(JobLite.sizeHistogram == JobLite.paperTableIII)
  }

  test("33 families, like JOB") {
    assert(JobLite.all.map(_.name.dropRight(1)).distinct.size == 33)
  }

  test("byName retrieves and throws for unknown") {
    assert(JobLite.byName("q06a").size == 5)
    intercept[NoSuchElementException](JobLite.byName("zzz"))
  }

  for (q <- JobLite.all) {
    test(s"${q.name}: structurally valid and connected") {
      // aliases unique, tables exist, filter columns exist
      assert(q.relations.map(_.alias).distinct.size == q.size)
      assert(q.relations.forall(r => Schema.columns.contains(r.table)))
      for ((i, ps) <- q.filters; p <- ps)
        assert(Schema.columns(q.relations(i).table).contains(p.column))
      // every class member is a declared join-domain column, all in one domain
      for (c <- q.classes) {
        val doms = c.members.map { case (i, col) => Schema.domain((q.relations(i).table, col)) }
        assert(doms.distinct.size == 1, s"mixed domains in class: $c")
      }
      // join graph is connected (no cartesian products)
      val g = JoinGraph.fromSpec(q)
      assert(g.connected(g.fullMask), "disconnected join graph")
      // at least one selective filter somewhere
      assert(q.filters.nonEmpty)
    }
  }

  for (q <- JobLite.all) {
    test(s"${q.name}: SQL analyzes on Spark") {
      wb // ensure views exist via workbench db
      for ((name, df) <- wb.db) df.createOrReplaceTempView(name)
      // analysis (no execution) catches unknown columns/tables/syntax
      spark.sql(q.countSql()).queryExecution.assertAnalyzed()
    }
  }

  test("spot-check: q06a result count matches DuckDB oracle") {
    for ((name, df) <- wb.db) df.createOrReplaceTempView(name)
    val q  = JobLite.byName("q06a")
    val df = spark.sql(q.countSql())
    val tables = q.relations.map(_.table).distinct.map(t => t -> wb.db(t))
    repro.Oracle.assertEquivalent(df, q.countSql(castBigint = true), tables: _*)
  }

  test("spot-check: q02a result count matches DuckDB oracle") {
    for ((name, df) <- wb.db) df.createOrReplaceTempView(name)
    val q  = JobLite.byName("q02a")
    val df = spark.sql(q.countSql())
    val tables = q.relations.map(_.table).distinct.map(t => t -> wb.db(t))
    repro.Oracle.assertEquivalent(df, q.countSql(castBigint = true), tables: _*)
  }

  test("most queries return non-empty results at test scale") {
    for ((name, df) <- wb.db) df.createOrReplaceTempView(name)
    val sample = Vector("q01a", "q03a", "q05a", "q06a", "q08a", "q09a")
    val nonEmpty = sample.count { n =>
      spark.sql(JobLite.byName(n).countSql()).collect()(0).getLong(0) > 0
    }
    assert(nonEmpty >= 4, s"only $nonEmpty of ${sample.size} non-empty")
  }

  test("build rejects duplicate aliases") {
    intercept[IllegalArgumentException](
      JobLite.build("bad", Seq("t", "t"), Map.empty))
  }

  test("build rejects filters on unknown aliases") {
    intercept[IllegalArgumentException](
      JobLite.build("bad", Seq("t", "ci", "n"), Map("zz" -> Vector(EqPred("id", 1)))))
  }

  test("build drops singleton classes (partner alias absent)") {
    val q = JobLite.build("solo", Seq("t", "ci", "n"), Map.empty)
    // ci binds role_id->rl and person_role_id->ch, but rt/chn absent
    assert(!q.classes.exists(_.members.exists(_._2 == "role_id")))
    assert(q.classes.size == 2) // m{t,ci}, p{ci,n}
  }
}
