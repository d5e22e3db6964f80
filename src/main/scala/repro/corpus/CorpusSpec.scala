package repro.corpus

import repro.core.ColumnId

/** Surface formatting applied after pool-value generation. Formats other than
  * `AsIs` break *syntactic* joinability (raw string equality) while leaving
  * the token stream — and hence the embedding — intact: exactly the
  * "semantically joinable" columns WarpGate exists to find (§1).
  */
sealed trait ValueFormat extends Serializable {
  def apply(s: String): String
}
object ValueFormat {
  case object AsIs    extends ValueFormat { def apply(s: String): String = s }
  case object Upper   extends ValueFormat { def apply(s: String): String = s.toUpperCase }
  case object Lower   extends ValueFormat { def apply(s: String): String = s.toLowerCase }
  case object NoPunct extends ValueFormat {
    def apply(s: String): String = s.replaceAll("[^A-Za-z0-9 ]", "").trim
  }
}

/** One column of a generated table: draws values from `domain`'s pool over
  * the index interval [lo, hi). The generator guarantees the first (hi-lo)
  * rows cover the interval exactly once, so the column's distinct set *is*
  * the interval and containment between two columns of the same domain is
  * exact interval arithmetic.
  */
final case class ColumnSpec(
    name: String,
    domain: Domain,
    lo: Long,
    hi: Long,
    format: ValueFormat = ValueFormat.AsIs,
    clusterId: Option[String] = None,
) {
  require(hi > lo, s"empty pool interval for $name")
  def distinct: Long = hi - lo
}

/** One generated table. `nRows` must be >= every column's interval size so
  * the coverage guarantee above holds.
  */
final case class TableSpec(database: String, table: String, nRows: Long, columns: Vector[ColumnSpec]) {
  // case-insensitive: Spark resolves column names case-insensitively
  require(columns.map(_.name.toLowerCase).distinct.size == columns.size,
    s"duplicate column names in $database.$table")
  columns.foreach(c => require(c.distinct <= nRows,
    s"column ${c.name} interval ${c.distinct} exceeds rows $nRows in $database.$table"))
}

/** Full corpus specification, from which both the DataFrames and the exact
  * ground truth are derived.
  */
final case class CorpusSpec(
    name: String,
    tables: Vector[TableSpec],
    /** query columns of the evaluation, all with >= 1 ground-truth answer */
    queries: Vector[ColumnId],
    /** Spider-style per-database scoping (§4.3.2) */
    sameDatabaseOnly: Boolean = false,
) {
  def columnSpecs: Seq[(ColumnId, ColumnSpec)] =
    tables.flatMap(t => t.columns.map(c => ColumnId(t.database, t.table, c.name) -> c))
}

/** The Table 1 row the paper reports for a corpus (for paper-vs-measured
  * diffs in EXPERIMENTS.md). `queries`/`avgAnswers` are None for Sigma
  * ("TBD"/"N/A" in the paper).
  */
final case class PaperStats(
    tables: Int,
    columns: Int,
    avgRows: Double,
    queries: Option[Int],
    avgAnswers: Option[Double],
)
