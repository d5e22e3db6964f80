package repro.core

import org.apache.spark.sql.DataFrame

/** One table of a corpus, qualified by the database it belongs to.
  *
  * The DataFrame is the table's full content; callers decide whether to scan
  * it fully or sample it (WarpGate's §3.1.3 sampling happens downstream).
  */
final case class CorpusTable(database: String, table: String, df: DataFrame) {
  def columnIds: Seq[ColumnId] = df.columns.toSeq.map(c => ColumnId(database, table, c))
}

/** A corpus of tables — the search universe `S` of the problem statement.
  *
  * Mirrors what WarpGate sees in a cloud data warehouse: multiple databases,
  * each with tables; join discovery must work across database boundaries.
  */
final case class Corpus(name: String, tables: Seq[CorpusTable]) {

  def columnIds: Seq[ColumnId] = tables.flatMap(_.columnIds)

  def table(database: String, table: String): CorpusTable =
    tables.find(t => t.database == database && t.table == table)
      .getOrElse(throw new NoSuchElementException(s"$database.$table not in corpus $name"))

  /** Long-format view of the whole corpus: (database, table, column, value).
    * `sampleRows` bounds the rows taken per table (None = full scan), which is
    * exactly the knob §3.1.3 studies.
    */
  def meltAll(sampleRows: Option[Int] = None): DataFrame = {
    val melted = tables.map { t =>
      val src = sampleRows.fold(t.df)(n => t.df.limit(n))
      ColumnValues.melt(t.database, t.table, src)
    }
    melted.reduce(_ union _)
  }

  /** Total row count per table, computed once (used for stats reports). */
  def rowCounts(): Seq[(String, String, Long)] =
    tables.map(t => (t.database, t.table, t.df.count()))
}
