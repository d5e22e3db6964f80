package repro.corpus

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestCorpora}

class CorpusGenSpec extends SparkSpec {

  private lazy val (corpus, spec) = TestCorpora.tiny(spark)

  test("generated tables have the specified shape") {
    spec.tables.foreach { ts =>
      val df = corpus.table(ts.database, ts.table).df
      assert(df.count() == ts.nRows, ts.table)
      assert(df.columns.toSeq == ts.columns.map(_.name), ts.table)
    }
  }

  test("generation is deterministic") {
    val again = CorpusGen.build(spark, spec)
    val a = corpus.table("dbA", "accounts").df.orderBy("company").collect().map(_.toSeq)
    val b = again.table("dbA", "accounts").df.orderBy("company").collect().map(_.toSeq)
    assert(a.toSeq == b.toSeq)
  }

  test("distinct set equals the pool interval exactly (coverage guarantee)") {
    // Exact for injective kinds (the ones ground truth is computed over);
    // non-injective pools (Measure/FreeText) may collide rarely.
    spec.tables.foreach { ts =>
      val df = corpus.table(ts.database, ts.table).df
      ts.columns.foreach { cs =>
        val distinct = df.select(cs.name).distinct().count()
        if (cs.domain.kind.injective)
          assert(distinct == cs.distinct, s"${ts.table}.${cs.name}")
        else
          assert(distinct <= cs.distinct && distinct >= (cs.distinct * 0.95).toLong,
            s"${ts.table}.${cs.name}: $distinct vs ${cs.distinct}")
      }
    }
  }

  test("distinct counts match DuckDB (oracle)") {
    val df  = corpus.table("dbA", "accounts").df
    val cnt = df.agg(countDistinct(col("company")).as("n"))
    Oracle.assertEquivalent(cnt,
      "SELECT count(DISTINCT company) AS n FROM accounts", "accounts" -> df)
  }

  test("shared-domain columns share exactly the overlap values") {
    // company = [0,400), organization = [60,400): identical value sets on the
    // overlap, none outside.
    val a = corpus.table("dbA", "accounts").df.select(col("company").as("v")).distinct()
    val b = corpus.table("dbB", "orgs").df.select(col("organization").as("v")).distinct()
    assert(a.intersect(b).count() == 340)
    assert(b.exceptAll(a).count() == 0)
  }

  test("exact containment in Spark matches DuckDB (oracle)") {
    val accounts = corpus.table("dbA", "accounts").df
    val orgs     = corpus.table("dbB", "orgs").df
    val inter = accounts.select(col("company").as("v")).distinct()
      .join(orgs.select(col("organization").as("v")).distinct(), "v")
      .agg(count(lit(1)).as("overlap"))
    Oracle.assertEquivalent(inter,
      """SELECT count(*) AS overlap FROM
        |  (SELECT DISTINCT company AS v FROM accounts) a
        |  JOIN (SELECT DISTINCT organization AS v FROM orgs) b USING (v)""".stripMargin,
      "accounts" -> accounts, "orgs" -> orgs)
  }

  test("value formats are applied") {
    val spec2 = CorpusSpec("fmt", Vector(TableSpec("d", "t", 50L, Vector(
      ColumnSpec("up", Domain("f-co", DomainKind.Company, 9L), 0L, 50L, ValueFormat.Upper),
      ColumnSpec("low", Domain("f-co", DomainKind.Company, 9L), 0L, 50L, ValueFormat.Lower),
      ColumnSpec("raw", Domain("f-co", DomainKind.Company, 9L), 0L, 50L),
    ))), Vector.empty)
    val df = CorpusGen.build(spark, spec2).table("d", "t").df
    val rows = df.collect()
    rows.foreach { r =>
      val up  = r.getString(0); val low = r.getString(1)
      assert(up == up.toUpperCase)
      assert(low == low.toLowerCase)
    }
    // same row draws can differ per column (independent salts), but the
    // distinct sets must be case-variants of the same pool
    val raws = rows.map(_.getString(2)).toSet
    val ups  = rows.map(_.getString(0)).toSet
    assert(raws.map(_.toUpperCase) == ups)
  }

  test("TableSpec rejects duplicate column names") {
    val d = Domain("x", DomainKind.Measure, 1L)
    intercept[IllegalArgumentException](TableSpec("d", "t", 10L,
      Vector(ColumnSpec("a", d, 0, 10), ColumnSpec("a", d, 0, 10))))
  }

  test("TableSpec rejects intervals larger than the row count") {
    val d = Domain("x", DomainKind.Measure, 1L)
    intercept[IllegalArgumentException](TableSpec("d", "t", 10L,
      Vector(ColumnSpec("a", d, 0, 20))))
  }

  test("ColumnSpec rejects empty intervals") {
    val d = Domain("x", DomainKind.Measure, 1L)
    intercept[IllegalArgumentException](ColumnSpec("a", d, 5, 5))
  }
}
