package repro.core

/** Fully-qualified identifier of a column in a (multi-database) corpus.
  *
  * `database` models the CDW database/schema a table lives in — WarpGate's
  * value proposition is surfacing join paths *across* databases, and the
  * Spider evaluation scopes search *within* each database, so the database
  * name must travel with the column identity.
  */
final case class ColumnId(database: String, table: String, column: String) {
  /** Stable flat key used in DataFrames and driver-side maps. */
  def key: String = s"$database.$table.$column"
  override def toString: String = key
}

object ColumnId {
  /** Inverse of [[ColumnId.key]]; keys are built from names without dots. */
  def fromKey(key: String): ColumnId = {
    val parts = key.split('.')
    require(parts.length == 3, s"malformed column key: $key")
    ColumnId(parts(0), parts(1), parts(2))
  }
}

/** One ranked answer of a discovery query. */
final case class SearchResult(query: ColumnId, candidate: ColumnId, score: Double)
