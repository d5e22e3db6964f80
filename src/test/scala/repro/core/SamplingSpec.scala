package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec

class SamplingSpec extends SparkSpec {

  private lazy val df = spark.range(1000).toDF("id")

  test("firstN caps the row count") {
    assert(Sampling.firstN(df, 10).count() == 10)
  }

  test("firstN with n larger than the table returns everything") {
    assert(Sampling.firstN(df, 5000).count() == 1000)
  }

  test("uniformN returns exactly n rows when the table is larger") {
    assert(Sampling.uniformN(df, 50, 1000).count() == 50)
  }

  test("uniformN returns the full table when it is smaller than n") {
    assert(Sampling.uniformN(df, 5000, 1000).count() == 1000)
  }

  test("uniformN is deterministic in its seed") {
    val a = Sampling.uniformN(df, 20, 1000, seed = 3).collect().map(_.getLong(0)).toSeq
    val b = Sampling.uniformN(df, 20, 1000, seed = 3).collect().map(_.getLong(0)).toSeq
    assert(a == b)
  }

  test("uniformN spreads across the range, not just the head") {
    val picked = Sampling.uniformN(df, 100, 1000).collect().map(_.getLong(0))
    assert(picked.max > 500, s"max=${picked.max}")
  }

  test("perColumn caps every column group") {
    val (corpus, _) = repro.TestCorpora.tiny(spark)
    val melted  = corpus.meltAll(None)
    val sampled = Sampling.perColumn(melted, 25)
    val sizes = sampled.groupBy("database", "table", "column").count()
      .collect().map(_.getLong(3))
    assert(sizes.forall(_ <= 25))
    assert(sizes.forall(_ == 25)) // all tiny tables have >= 25 rows
  }

  test("perColumn keeps the melted schema") {
    val (corpus, _) = repro.TestCorpora.tiny(spark)
    val sampled = Sampling.perColumn(corpus.meltAll(None), 5)
    assert(sampled.columns.toSeq == Seq("database", "table", "column", "value"))
  }

  test("perColumn is deterministic in its seed") {
    val (corpus, _) = repro.TestCorpora.tiny(spark)
    def run(): Long = Sampling.perColumn(corpus.meltAll(None), 10, seed = 5)
      .agg(sum(length(col("value")))).collect()(0).getLong(0)
    assert(run() == run())
  }
}
