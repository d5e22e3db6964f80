package repro.eval

import repro.SparkSpec
import repro.core._
import repro.corpus.Testbeds

/** The §4.3.3 ad-hoc walkthrough, asserted: querying ACCOUNT.Name must
  * surface LEAD.Company (same database) and the uppercase cross-database
  * STOCKS.INDUSTRIES."Company Name", which raw-value matching cannot find.
  */
class SigmaCorpusSpec extends SparkSpec {

  private lazy val sigma = Testbeds.sigma(spark, 1.0 / 2048)
  private lazy val index =
    WarpGate.buildIndex(spark, sigma.corpus, WarpGateConfig(sampleSize = Some(200)))

  private val qName = ColumnId("SALESFORCE", "ACCOUNT", "Name")

  test("top-3 for ACCOUNT.Name surfaces LEAD.Company") {
    val (res, _) = index.querySampled(qName, 3)
    assert(res.map(_.candidate.key).contains("SALESFORCE.LEAD.Company"),
      res.map(_.candidate.key))
  }

  test("top-3 for ACCOUNT.Name surfaces the uppercase INDUSTRIES column (semantic-only)") {
    val (res, _) = index.querySampled(qName, 3)
    assert(res.map(_.candidate.key).contains("STOCKS.INDUSTRIES.Company Name"),
      res.map(_.candidate.key))
  }

  test("the semantic match has zero raw-value overlap (syntactics would miss it)") {
    import org.apache.spark.sql.functions._
    val acct = sigma.corpus.table("SALESFORCE", "ACCOUNT").df
    val ind  = sigma.corpus.table("STOCKS", "INDUSTRIES").df
    val overlap = acct.select(col("Name").as("v")).distinct()
      .join(ind.select(col("Company Name").as("v")).distinct(), "v")
      .count()
    assert(overlap == 0L)
  }

  test("recommendations come with descending similarity scores") {
    val (res, _) = index.querySampled(qName, 3)
    val scores = res.map(_.score)
    assert(scores == scores.sorted.reverse)
    assert(scores.forall(_ >= 0.7))
  }

  test("ticker chaining: INDUSTRIES.Ticker finds PRICES.Ticker") {
    val (res, _) = index.querySampled(ColumnId("STOCKS", "INDUSTRIES", "Ticker"), 3)
    assert(res.map(_.candidate.key).contains("STOCKS.PRICES.Ticker"),
      res.map(_.candidate.key))
  }

  test("sampled ad-hoc queries answer at interactive speed") {
    val (_, t) = index.querySampled(qName, 3)
    assert(t.totalMs < 500.0, s"${t.totalMs} ms")
  }
}
