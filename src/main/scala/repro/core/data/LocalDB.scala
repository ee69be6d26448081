package repro.core.data

import org.apache.spark.sql.DataFrame

/** A driver-side, columnar snapshot of one table (all columns are BIGINT). */
final case class LocalTable(name: String, colNames: Vector[String], cols: Map[String, Array[Long]]) {
  val rowCount: Int = if (colNames.isEmpty) 0 else cols(colNames.head).length
  def col(c: String): Array[Long] =
    cols.getOrElse(c, throw new NoSuchElementException(s"$name.$c"))
}

/** Driver-side snapshot of the whole database.
  *
  * Collected once per run; it backs two subsystems that in the paper's setup
  * were served by PostgreSQL itself: ANALYZE-style statistics collection
  * ([[repro.core.stats.Analyzer]]) and the EXPLAIN ANALYZE true-cardinality
  * oracle ([[repro.core.truth.TrueCardinality]]). IMDB-lite is small enough
  * (≲1M rows total) that an exact driver-side copy is the simplest honest
  * substrate for both.
  */
final case class LocalDB(tables: Map[String, LocalTable]) {
  def apply(name: String): LocalTable =
    tables.getOrElse(name, throw new NoSuchElementException(s"table $name"))
}

object LocalDB {

  /** Collect each DataFrame once into columnar Long arrays. */
  def collect(db: Map[String, DataFrame]): LocalDB = {
    val tabs = db.map { case (name, df) =>
      val names = df.columns.toVector
      val rows  = df.collect()
      val arrays = names.indices.map { i =>
        val a = new Array[Long](rows.length)
        var r = 0
        while (r < rows.length) { a(r) = rows(r).getLong(i); r += 1 }
        a
      }
      name -> LocalTable(name, names, names.zip(arrays).toMap)
    }
    LocalDB(tabs)
  }
}
