package repro

import org.apache.spark.sql.SparkSession
import repro.core.{ColumnId, Corpus}
import repro.corpus._

/** Shared tiny corpora for unit/integration tests. Built once per JVM (the
  * suites share one SparkSession) and cached.
  */
object TestCorpora {

  /** A 4-table, 2-database corpus with one Company cluster (3 members at
    * nested/shifted intervals => all pairs High), one Code cluster (2
    * members), and assorted fillers. Small enough for the DuckDB oracle.
    */
  def tinySpec: CorpusSpec = {
    val co  = Domain("tiny-co", DomainKind.Company, 101L)
    val ck  = Domain("tiny-code", DomainKind.Code("AB"), 102L)
    val ms  = Domain("tiny-measure", DomainKind.Measure, 103L)
    val dt  = Domain("tiny-date", DomainKind.Date, 104L)
    val ft  = Domain("tiny-text", DomainKind.FreeText, 105L)
    val ct  = Domain("tiny-city", DomainKind.City, 106L)

    val t1 = TableSpec("dbA", "accounts", 400L, Vector(
      ColumnSpec("company", co, 0L, 400L, ValueFormat.AsIs, Some("co")),
      ColumnSpec("amount", ms, 0L, 400L),
      ColumnSpec("created_at", dt, 0L, 365L),
    ))
    val t2 = TableSpec("dbA", "leads", 350L, Vector(
      ColumnSpec("firm", co, 0L, 340L, ValueFormat.AsIs, Some("co")),
      ColumnSpec("ref_code", ck, 0L, 350L, ValueFormat.AsIs, Some("ck")),
      ColumnSpec("notes", ft, 0L, 350L),
    ))
    val t3 = TableSpec("dbB", "orgs", 500L, Vector(
      ColumnSpec("organization", co, 60L, 400L, ValueFormat.AsIs, Some("co")),
      ColumnSpec("city", ct, 0L, 200L),
      ColumnSpec("value", ms, 0L, 500L),
    ))
    val t4 = TableSpec("dbB", "refs", 300L, Vector(
      ColumnSpec("code", ck, 0L, 280L, ValueFormat.AsIs, Some("ck")),
      ColumnSpec("day", dt, 0L, 300L),
    ))

    val queries = Vector(
      ColumnId("dbA", "accounts", "company"),
      ColumnId("dbA", "leads", "firm"),
      ColumnId("dbB", "orgs", "organization"),
      ColumnId("dbA", "leads", "ref_code"),
      ColumnId("dbB", "refs", "code"),
    )
    CorpusSpec("tiny", Vector(t1, t2, t3, t4), queries)
  }

  @volatile private var tinyCache: Option[(Corpus, CorpusSpec)] = None

  def tiny(spark: SparkSession): (Corpus, CorpusSpec) = synchronized {
    tinyCache.getOrElse {
      val spec   = tinySpec
      val corpus = CorpusGen.build(spark, spec)
      val cached = corpus.copy(tables = corpus.tables.map(t => t.copy(df = t.df.cache())))
      cached.tables.foreach(_.df.count()) // materialize once
      val r = (cached, spec)
      tinyCache = Some(r)
      r
    }
  }

  /** Tiny evaluation wrapper around [[tiny]]. */
  def tinyEval(spark: SparkSession): EvalCorpus = {
    val (corpus, spec) = tiny(spark)
    EvalCorpus(corpus, spec, GroundTruth.answers(spec),
      PaperStats(4, 11, 387.5, Some(5), None), 1.0)
  }
}
