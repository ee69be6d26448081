package repro.harness

import scala.collection.mutable

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core.data.LocalDB
import repro.core.opt.{CostModel, JoinGraph}
import repro.core.stats.{Analyzer, Catalog}
import repro.core.truth.TrueCardinality
import repro.imdb.ImdbLite
import repro.workload.QuerySpec

/** Shared experiment context: one generated database + collected snapshot +
  * ANALYZE catalog per (sf, seed), cached for the lifetime of the JVM so unit
  * tests and benches do not regenerate data per suite.
  */
final case class Workbench(
    spark: SparkSession,
    cfg: ImdbLite.Config,
    db: Map[String, DataFrame],
    local: LocalDB,
    catalog: Catalog,
    cost: CostModel,
) {
  def graph(q: QuerySpec): JoinGraph = JoinGraph.fromSpec(q)

  /** Fresh oracle for one query (per-query caches; let it go after use). */
  def truth(q: QuerySpec): TrueCardinality = new TrueCardinality(graph(q), local)
}

object Workbench {
  private val cache = mutable.Map.empty[(Double, Long), Workbench]

  /** Tame AQE so physical join choices stay with our planner. */
  def configure(spark: SparkSession): Unit = {
    spark.conf.set("spark.sql.autoBroadcastJoinThreshold", "-1")
    spark.conf.set("spark.sql.adaptive.autoBroadcastJoinThreshold", "-1")
  }

  def apply(spark: SparkSession, sf: Double, seed: Long = 42L): Workbench = synchronized {
    cache.getOrElseUpdate((sf, seed), {
      configure(spark)
      val cfg   = ImdbLite.Config(sf, seed)
      val db    = ImdbLite.database(spark, cfg)
      val local = LocalDB.collect(db)
      val cat   = Analyzer.analyze(local)
      Workbench(spark, cfg, db, local, cat, CostModel())
    })
  }
}
