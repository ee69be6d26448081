package repro.imdb

/** Static metadata for the IMDB-lite schema.
  *
  * The schema mirrors the shape of the IMDB snapshot used by the Join Order
  * Benchmark: a movie "hub" (`title`), large fact/link tables keyed on
  * `movie_id` / `person_id`, and small dimension tables. Every column is a
  * 64-bit integer (ids and low-cardinality "group" codes standing in for the
  * string attributes JOB filters on), which keeps the DuckDB oracle, the
  * statistics collector, and the in-memory true-cardinality oracle simple.
  *
  * Join compatibility is expressed through *key domains*: two columns are
  * joinable iff they map to the same domain (e.g. `title.id` and
  * `cast_info.movie_id` are both in the `movie` domain). JOB-lite queries
  * build their equi-join equivalence classes out of these domains.
  */
object Schema {

  /** Ordered column lists, one entry per table. */
  val columns: Map[String, Vector[String]] = Map(
    // scaled entity tables
    "title"          -> Vector("id", "kind_id", "production_year", "series_group"),
    "name"           -> Vector("id", "gender", "name_group", "surname_group"),
    "char_name"      -> Vector("id", "chname_group"),
    "keyword"        -> Vector("id", "keyword_group"),
    "company_name"   -> Vector("id", "country_group", "cname_group"),
    // scaled fact / link tables
    "cast_info"      -> Vector("person_id", "movie_id", "person_role_id", "role_id"),
    "movie_keyword"  -> Vector("movie_id", "keyword_id"),
    "movie_companies"-> Vector("movie_id", "company_id", "company_type_id"),
    "movie_info"     -> Vector("movie_id", "info_type_id", "info_group"),
    "movie_info_idx" -> Vector("movie_id", "info_type_id", "rating_bucket"),
    "person_info"    -> Vector("person_id", "info_type_id", "pinfo_group"),
    "aka_name"       -> Vector("person_id", "aname_group"),
    "complete_cast"  -> Vector("movie_id", "subject_id", "status_id"),
    "movie_link"     -> Vector("movie_id", "linked_movie_id", "link_type_id"),
    // fixed dimension tables
    "info_type"      -> Vector("id", "domain"),
    "role_type"      -> Vector("id", "category"),
    "kind_type"      -> Vector("id", "is_series"),
    "company_type"   -> Vector("id", "ct_group"),
    "comp_cast_type" -> Vector("id", "cct_group"),
    "link_type"      -> Vector("id", "link_group"),
  )

  /** All table names, deterministic order. */
  val tables: Vector[String] = columns.keys.toVector.sorted

  /** Join-key domain of each joinable column; non-key columns are absent. */
  val domain: Map[(String, String), String] = Map(
    ("title", "id")                      -> "movie",
    ("cast_info", "movie_id")            -> "movie",
    ("movie_keyword", "movie_id")        -> "movie",
    ("movie_companies", "movie_id")      -> "movie",
    ("movie_info", "movie_id")           -> "movie",
    ("movie_info_idx", "movie_id")       -> "movie",
    ("complete_cast", "movie_id")        -> "movie",
    ("movie_link", "movie_id")           -> "movie",
    ("movie_link", "linked_movie_id")    -> "movie",
    ("name", "id")                       -> "person",
    ("cast_info", "person_id")           -> "person",
    ("person_info", "person_id")         -> "person",
    ("aka_name", "person_id")            -> "person",
    ("keyword", "id")                    -> "keyword",
    ("movie_keyword", "keyword_id")      -> "keyword",
    ("company_name", "id")               -> "company",
    ("movie_companies", "company_id")    -> "company",
    ("char_name", "id")                  -> "char",
    ("cast_info", "person_role_id")      -> "char",
    ("role_type", "id")                  -> "role",
    ("cast_info", "role_id")             -> "role",
    ("kind_type", "id")                  -> "kind",
    ("title", "kind_id")                 -> "kind",
    ("company_type", "id")               -> "ctype",
    ("movie_companies", "company_type_id") -> "ctype",
    ("info_type", "id")                  -> "itype",
    ("movie_info", "info_type_id")       -> "itype",
    ("movie_info_idx", "info_type_id")   -> "itype",
    ("person_info", "info_type_id")      -> "itype",
    ("comp_cast_type", "id")             -> "cctype",
    ("complete_cast", "subject_id")      -> "cctype",
    ("complete_cast", "status_id")       -> "cctype",
    ("link_type", "id")                  -> "ltype",
    ("movie_link", "link_type_id")       -> "ltype",
  )

  /** Rows per table at scale factor 1.0 (fixed dimensions ignore sf). */
  val scaledRows: Map[String, Long] = Map(
    "title"           -> 20000L,
    "name"            -> 30000L,
    "char_name"       -> 20000L,
    "keyword"         -> 2000L,
    "company_name"    -> 4000L,
    "cast_info"       -> 120000L,
    "movie_keyword"   -> 60000L,
    "movie_companies" -> 40000L,
    "movie_info"      -> 100000L,
    "movie_info_idx"  -> 15000L,
    "person_info"     -> 40000L,
    "aka_name"        -> 10000L,
    "complete_cast"   -> 8000L,
    "movie_link"      -> 4000L,
  )

  /** Rows of the dimension tables, independent of scale factor. */
  val fixedRows: Map[String, Long] = Map(
    "info_type"      -> 40L,
    "role_type"      -> 12L,
    "kind_type"      -> 7L,
    "company_type"   -> 4L,
    "comp_cast_type" -> 4L,
    "link_type"      -> 18L,
  )

  /** Row count of `table` at scale factor `sf`. */
  def rowCount(table: String, sf: Double): Long =
    fixedRows.getOrElse(table, math.max(8L, (scaledRows(table) * sf).toLong))
}
