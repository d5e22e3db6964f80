package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class ColumnValuesSpec extends SparkSpec {
  import org.apache.spark.sql.DataFrame

  private lazy val sample: DataFrame = {
    import spark.implicits._
    Seq(
      (1L, "Apple Inc", 10.5),
      (2L, "Bacon Corp", -3.25),
      (3L, null, 0.0),
    ).toDF("id", "name", "score")
  }

  test("melt produces one row per cell") {
    val melted = ColumnValues.melt("db", "t", sample)
    assert(melted.count() == 9)
  }

  test("melt schema is (database, table, column, value)") {
    val melted = ColumnValues.melt("db", "t", sample)
    assert(melted.columns.toSeq == Seq("database", "table", "column", "value"))
  }

  test("melt casts every cell to string") {
    val melted = ColumnValues.melt("db", "t", sample)
    val vals = melted.filter(col("column") === "score").select("value")
      .collect().map(_.getString(0)).toSet
    assert(vals == Set("10.5", "-3.25", "0.0"))
  }

  test("melt preserves nulls") {
    val melted = ColumnValues.melt("db", "t", sample)
    assert(melted.filter(col("column") === "name" && col("value").isNull).count() == 1)
  }

  test("melt matches a DuckDB UNION-ALL unpivot (oracle)") {
    val melted = ColumnValues.melt("db", "t", sample)
      .select(col("column").as("col_name"), col("value").as("cell"))
    val sql =
      """SELECT 'id' AS col_name, CAST(id AS VARCHAR) AS cell FROM t
        |UNION ALL SELECT 'name', CAST(name AS VARCHAR) FROM t
        |UNION ALL SELECT 'score', CAST(score AS VARCHAR) FROM t""".stripMargin
    Oracle.assertEquivalent(melted, sql, "t" -> sample)
  }

  test("meltColumn extracts exactly one column") {
    val one = ColumnValues.meltColumn(ColumnId("db", "t", "name"), sample)
    assert(one.count() == 3)
    assert(one.select("column").distinct().collect().map(_.getString(0)).toSeq == Seq("name"))
  }

  test("meltColumn respects sampling") {
    val one = ColumnValues.meltColumn(ColumnId("db", "t", "name"), sample, Some(2))
    assert(one.count() == 2)
  }

  test("meltColumn matches DuckDB projection (oracle)") {
    val one = ColumnValues.meltColumn(ColumnId("db", "t", "name"), sample)
      .select(col("value").as("name"))
    Oracle.assertEquivalent(one, "SELECT name FROM t", "t" -> sample)
  }

  test("melt handles column names with spaces") {
    val df = sample.withColumnRenamed("name", "Company Name")
    val melted = ColumnValues.melt("db", "t", df)
    assert(melted.filter(col("column") === "Company Name").count() == 3)
  }

  test("corpus meltAll unions all tables") {
    val (corpus, spec) = repro.TestCorpora.tiny(spark)
    val total = spec.tables.map(t => t.nRows * t.columns.size).sum
    assert(corpus.meltAll(None).count() == total)
  }

  test("corpus meltAll with sampling bounds per-table rows") {
    val (corpus, spec) = repro.TestCorpora.tiny(spark)
    val total = spec.tables.map(t => math.min(10L, t.nRows) * t.columns.size).sum
    assert(corpus.meltAll(Some(10)).count() == total)
  }

  test("corpus rowCounts matches spec (oracle)") {
    val (corpus, spec) = repro.TestCorpora.tiny(spark)
    val counts = corpus.rowCounts()
    spec.tables.foreach { ts =>
      val (_, _, n) = counts.find(c => c._1 == ts.database && c._2 == ts.table).get
      assert(n == ts.nRows, s"${ts.table}")
    }
    // oracle: DuckDB count over one generated table
    import spark.implicits._
    val t  = corpus.table("dbA", "accounts").df
    val cnt = t.agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(cnt, "SELECT count(*) AS n FROM accounts", "accounts" -> t)
  }

  test("corpus table lookup fails on unknown table") {
    val (corpus, _) = repro.TestCorpora.tiny(spark)
    intercept[NoSuchElementException](corpus.table("nope", "missing"))
  }
}
