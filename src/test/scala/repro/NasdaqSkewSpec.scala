package repro

import repro.core.data.{LocalDB, LocalTable}
import repro.core.opt.{GraphClass, GraphRel, JoinGraph}
import repro.core.stats.{Analyzer, Catalog}
import repro.core.ce.{QError, StatsEstimator}
import repro.core.truth.TrueCardinality
import repro.workload.EqPred

import org.scalatest.funsuite.AnyFunSuite

/** The paper's Tables IV/V demonstration (§IV-C): a `company ⋈ trades`
  * database where trading volume is heavily skewed. A predicate on
  * `company.symbol` fools the uniformity assumption (huge underestimate of
  * the join), while the equivalent predicate on the join column itself is
  * estimated accurately via frequent-value statistics — exactly the paper's
  * observation.
  */
class NasdaqSkewSpec extends AnyFunSuite {

  private val nCompanies = 200
  // symbol i is just i; company 1 ("APPL") does ~45% of all volume
  private val trades: Array[Long] = {
    val rnd = new scala.util.Random(7)
    Array.fill(20000) {
      val u = rnd.nextDouble()
      if (u < 0.45) 1L
      else if (u < 0.65) 2L
      else 3L + rnd.nextInt(nCompanies - 2)
    }
  }

  private val db = LocalDB(Map(
    "company" -> LocalTable("company", Vector("id", "symbol"),
      Map("id" -> (1L to nCompanies).toArray, "symbol" -> (1L to nCompanies).toArray)),
    "trades" -> LocalTable("trades", Vector("company_id", "shares"),
      Map("company_id" -> trades, "shares" -> trades.map(_ * 10))),
  ))
  private val catalog: Catalog = Analyzer.analyze(db)

  private def graph(pred: EqPred, on: String) = JoinGraph(
    "nasdaq",
    Vector(
      GraphRel("c", "company", if (on == "company") Vector(pred) else Vector.empty, 1L),
      GraphRel("t", "trades", if (on == "trades") Vector(pred) else Vector.empty, 2L),
    ),
    Vector(GraphClass(0, Vector((0, "id"), (1, "company_id")))),
  )

  test("predicate on symbol: join cardinality underestimated by 10x+") {
    val g   = graph(EqPred("symbol", 1), "company")
    val est = new StatsEstimator(catalog).cardinality(g, 3L)
    val tru = new TrueCardinality(g, db).card(3L).toDouble
    assert(tru > 5000, s"APPL volume should dominate: $tru")
    assert(QError(tru, est) > 10, s"est=$est true=$tru")
    assert(est < tru, "must be an underestimate")
  }

  test("predicate on the join column itself: estimated accurately via MCVs") {
    val g   = graph(EqPred("company_id", 1), "trades")
    val est = new StatsEstimator(catalog).cardinality(g, 3L)
    val tru = new TrueCardinality(g, db).card(3L).toDouble
    assert(QError(tru, est) < 1.5, s"est=$est true=$tru")
  }

  test("unfiltered join estimated accurately (fk-style)") {
    val g   = graph(EqPred("symbol", -1), "none")
    val est = new StatsEstimator(catalog).cardinality(g, 3L)
    val tru = new TrueCardinality(g, db).card(3L).toDouble
    assert(QError(tru, est) < 1.5, s"est=$est true=$tru")
  }

  test("base-table estimate for the symbol predicate itself is exact-ish") {
    val g   = graph(EqPred("symbol", 1), "company")
    val est = new StatsEstimator(catalog).cardinality(g, 1L)
    assert(math.abs(est - 1.0) < 1.0, s"est=$est")
  }
}
