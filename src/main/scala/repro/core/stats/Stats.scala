package repro.core.stats

import repro.core.data.{LocalDB, LocalTable}
import repro.workload.{EqPred, InPred, Pred, RangePred}

/** Per-column ANALYZE output: the classic statistics a Selinger-style
  * optimizer keeps — number of distinct values, min/max, a most-common-values
  * list with frequencies, and an equi-depth histogram (bucket boundaries are
  * quantiles, each bucket holding ~1/B of the rows).
  */
final case class ColumnStats(
    rowCount: Long,
    ndv: Long,
    min: Long,
    max: Long,
    mcvs: Vector[(Long, Long)], // (value, count), descending by count
    histBounds: Vector[Long],   // B+1 ascending bucket boundaries
) {
  private val mcvMap: Map[Long, Long] = mcvs.toMap
  private val mcvRows: Long           = mcvs.map(_._2).sum

  /** Selectivity of `column = v` (MCV hit: exact; otherwise uniform share of
    * the non-MCV remainder — PostgreSQL's eqsel logic).
    */
  def eqSelectivity(v: Long): Double = {
    if (rowCount == 0) return 0.0
    mcvMap.get(v) match {
      case Some(c) => c.toDouble / rowCount
      case None =>
        if (v < min || v > max) 0.0
        else {
          val restRows = math.max(0L, rowCount - mcvRows)
          val restNdv  = math.max(1L, ndv - mcvs.size)
          (restRows.toDouble / restNdv) / rowCount
        }
    }
  }

  /** Selectivity of `column BETWEEN lo AND hi` via equi-depth histogram
    * interpolation (uniform within a bucket).
    */
  def rangeSelectivity(lo: Long, hi: Long): Double = {
    if (rowCount == 0 || histBounds.size < 2 || hi < lo) return 0.0
    val nb   = histBounds.size - 1
    var frac = 0.0
    var b    = 0
    while (b < nb) {
      val bLo = histBounds(b).toDouble
      val bHi = histBounds(b + 1).toDouble
      // treat the bucket as the half-open value interval [bLo, bHi] with
      // width max(1, bHi-bLo) to handle duplicate boundaries.
      val w  = math.max(1.0, bHi - bLo)
      val ov = math.min(hi.toDouble + 1, bHi + 1) - math.max(lo.toDouble, bLo)
      if (ov > 0) frac += math.min(1.0, ov / (w + 1)) / nb
      b += 1
    }
    math.min(1.0, math.max(0.0, frac))
  }

  def selectivity(p: Pred): Double = p match {
    case EqPred(_, v)       => eqSelectivity(v)
    case InPred(_, vs)      => math.min(1.0, vs.distinct.map(eqSelectivity).sum)
    case RangePred(_, l, h) => rangeSelectivity(l, h)
  }
}

/** Statistics of one table. */
final case class TableStats(rowCount: Long, columns: Map[String, ColumnStats]) {
  def column(c: String): ColumnStats =
    columns.getOrElse(c, throw new NoSuchElementException(s"no stats for column $c"))
}

/** The statistics catalog handed to the cardinality estimator. Re-optimization
  * injects exact statistics for materialized temporaries via [[withTable]].
  */
final case class Catalog(tables: Map[String, TableStats]) {
  def apply(t: String): TableStats =
    tables.getOrElse(t, throw new NoSuchElementException(s"no stats for table $t"))
  def withTable(name: String, stats: TableStats): Catalog =
    Catalog(tables + (name -> stats))
}

/** ANALYZE: builds the catalog by a full scan of the (driver-side) database.
  *
  * `mcvK` bounds the most-common-values list and `histBuckets` the equi-depth
  * histogram resolution — the knobs PostgreSQL exposes via
  * `default_statistics_target` (the paper maxes it out; we keep a list deep
  * enough that *base-table* estimates are accurate, matching the paper's
  * observation that base tables are estimated well and joins are not).
  */
object Analyzer {

  def analyzeColumn(values: Array[Long], mcvK: Int, histBuckets: Int): ColumnStats = {
    val n = values.length
    if (n == 0) return ColumnStats(0, 0, 0, 0, Vector.empty, Vector.empty)
    val freq = new java.util.HashMap[Long, Long]()
    var i = 0
    var mn = Long.MaxValue
    var mx = Long.MinValue
    while (i < n) {
      val v = values(i)
      freq.merge(v, 1L, _ + _)
      if (v < mn) mn = v
      if (v > mx) mx = v
      i += 1
    }
    import scala.jdk.CollectionConverters._
    val ndv  = freq.size.toLong
    val mcvs = freq.asScala.toVector
      .sortBy { case (v, c) => (-c, v) }
      .take(mcvK)
      .map { case (v, c) => (v.longValue, c.longValue) }
    val sorted = values.sorted
    val nb     = math.max(1, math.min(histBuckets, n))
    val bounds = (0 to nb).map { b =>
      sorted(math.min(n - 1, (b.toLong * n / nb).toInt))
    }.toVector
    ColumnStats(n, ndv, mn, mx, mcvs, bounds)
  }

  def analyzeTable(t: LocalTable, mcvK: Int = 32, histBuckets: Int = 20): TableStats =
    TableStats(t.rowCount, t.colNames.map(c => c -> analyzeColumn(t.col(c), mcvK, histBuckets)).toMap)

  def analyze(db: LocalDB, mcvK: Int = 32, histBuckets: Int = 20): Catalog =
    Catalog(db.tables.map { case (n, t) => n -> analyzeTable(t, mcvK, histBuckets) })
}
