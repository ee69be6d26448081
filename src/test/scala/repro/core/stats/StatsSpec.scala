package repro.core.stats

import org.scalacheck.Gen
import org.scalacheck.Prop.forAll
import org.scalatest.funsuite.AnyFunSuite

import repro.core.data.LocalTable
import repro.workload.{EqPred, InPred, RangePred}

/** ANALYZE + selectivity formula tests against exact answers on small arrays. */
class StatsSpec extends AnyFunSuite {

  private def stats(values: Array[Long], mcvK: Int = 32, buckets: Int = 20): ColumnStats =
    Analyzer.analyzeColumn(values, mcvK, buckets)

  test("empty column") {
    val s = stats(Array.empty)
    assert(s.rowCount == 0 && s.ndv == 0)
    assert(s.eqSelectivity(1) == 0.0)
    assert(s.rangeSelectivity(0, 10) == 0.0)
  }

  test("ndv, min, max on a known array") {
    val s = stats(Array(5, 1, 3, 3, 9, 1))
    assert(s.ndv == 4 && s.min == 1 && s.max == 9 && s.rowCount == 6)
  }

  test("MCVs are exact for values in the list") {
    val vals = Array.fill(70)(1L) ++ Array.fill(20)(2L) ++ Array.fill(10)(3L)
    val s = stats(vals)
    assert(s.eqSelectivity(1) == 0.7)
    assert(s.eqSelectivity(2) == 0.2)
    assert(s.eqSelectivity(3) == 0.1)
  }

  test("MCV list ordered by descending frequency") {
    val vals = Array.fill(5)(9L) ++ Array.fill(50)(2L) ++ Array.fill(10)(7L)
    val s = stats(vals, mcvK = 2)
    assert(s.mcvs.map(_._1) == Vector(2L, 7L))
  }

  test("equality outside [min,max] estimates zero") {
    val s = stats(Array(1, 2, 3))
    assert(s.eqSelectivity(10) == 0.0 && s.eqSelectivity(-5) == 0.0)
  }

  test("non-MCV equality uses uniform remainder") {
    // 100 distinct values, mcvK=10 -> value 99 estimated as rest/restNdv
    val vals = (1L to 100L).toArray ++ Array.fill(50)(1L)
    val s = stats(vals, mcvK = 10)
    val est = s.eqSelectivity(99)
    val exact = 1.0 / 150
    assert(est > 0 && math.abs(est - exact) / exact < 1.0, s"est=$est exact=$exact")
  }

  test("range selectivity ~ exact on uniform data") {
    val vals = (0L until 1000L).toArray
    val s = stats(vals)
    val est = s.rangeSelectivity(100, 299)
    assert(math.abs(est - 0.2) < 0.06, s"est=$est")
  }

  test("full range has selectivity ~1") {
    val vals = (0L until 500L).toArray
    assert(stats(vals).rangeSelectivity(0, 499) > 0.9)
  }

  test("empty range and inverted range give 0") {
    val s = stats((0L until 100L).toArray)
    assert(s.rangeSelectivity(50, 40) == 0.0)
  }

  test("selectivity dispatches over Pred types") {
    val s = stats((1L to 100L).toArray)
    assert(s.selectivity(EqPred("c", 5)) > 0)
    assert(s.selectivity(InPred("c", Seq(1, 2))) >= s.selectivity(EqPred("c", 1)))
    assert(s.selectivity(RangePred("c", 1, 100)) > 0.9)
  }

  test("IN selectivity capped at 1") {
    val s = stats(Array.fill(10)(1L))
    assert(s.selectivity(InPred("c", Seq(1, 1, 1))) <= 1.0)
  }

  test("selectivities always within [0,1] (scalacheck)") {
    val gen = Gen.listOfN(200, Gen.chooseNum(-50L, 50L)).map(_.toArray)
    val prop = forAll(gen, Gen.chooseNum(-60L, 60L), Gen.chooseNum(-60L, 60L)) { (vs, a, b) =>
      val s  = stats(vs)
      val es = s.eqSelectivity(a)
      val rs = s.rangeSelectivity(math.min(a, b), math.max(a, b))
      es >= 0.0 && es <= 1.0 && rs >= 0.0 && rs <= 1.0
    }
    val res = org.scalacheck.Test.check(org.scalacheck.Test.Parameters.default, prop)
    assert(res.passed, res.status.toString)
  }

  test("analyzeTable covers all columns") {
    val t = LocalTable("t", Vector("a", "b"), Map("a" -> Array(1L, 2L), "b" -> Array(3L, 4L)))
    val ts = Analyzer.analyzeTable(t)
    assert(ts.rowCount == 2 && ts.columns.keySet == Set("a", "b"))
  }

  test("Catalog lookup and temp injection") {
    val ts = TableStats(5, Map.empty)
    val c  = Catalog(Map("x" -> ts))
    assert(c("x").rowCount == 5)
    intercept[NoSuchElementException](c("y"))
    assert(c.withTable("y", ts)("y").rowCount == 5)
  }

  test("histogram bounds are sorted") {
    val vals = Array(9L, 1L, 5L, 5L, 2L, 8L, 0L, 3L)
    val s = stats(vals, buckets = 4)
    assert(s.histBounds == s.histBounds.sorted)
    assert(s.histBounds.head == 0L && s.histBounds.last == 9L)
  }
}
