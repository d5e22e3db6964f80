package repro.corpus

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{Corpus, CorpusTable}

/** Materializes a [[CorpusSpec]] as Spark DataFrames.
  *
  * Each table is a `spark.range(nRows)` with one generated string column per
  * [[ColumnSpec]]. Pool index per row:
  *
  *   row < (hi-lo)  ->  lo + row          (guarantees full interval coverage,
  *                                         so distinct set == interval)
  *   row >= (hi-lo) ->  lo + xxhash64(row, salt) mod (hi-lo)   (duplicates)
  *
  * Everything is deterministic in the spec, so re-generation (e.g., inside
  * the DuckDB oracle tests) sees identical data.
  */
object CorpusGen {

  def buildTable(spark: SparkSession, ts: TableSpec): DataFrame = {
    val base = spark.range(ts.nRows)
    val cols: Seq[Column] = ts.columns.map { cs =>
      val range = cs.hi - cs.lo
      val salt  = Rng.mix(ts.database, ts.table, cs.name)
      val poolIdx = when(col("id") < lit(range), col("id") + lit(cs.lo))
        .otherwise(pmod(xxhash64(col("id"), lit(salt)), lit(range)) + lit(cs.lo))
      val domain = cs.domain
      val format = cs.format
      val valueUdf = udf { (i: Long) => format(domain.value(i)) }
      valueUdf(poolIdx).as(cs.name)
    }
    base.select(cols.toIndexedSeq: _*)
  }

  def build(spark: SparkSession, spec: CorpusSpec): Corpus =
    Corpus(spec.name, spec.tables.map(ts => CorpusTable(ts.database, ts.table, buildTable(spark, ts))))
}
