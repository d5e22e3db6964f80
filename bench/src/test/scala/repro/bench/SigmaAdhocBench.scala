package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{ColumnId, WarpGate, WarpGateConfig}

/** §4.3.3 — ad-hoc discovery on the Sigma Sample corpus at bench scale:
  * the ACCOUNT.Name walkthrough with its cross-database, format-variant
  * INDUSTRIES recommendation and the Ticker join-key chaining.
  */
class SigmaAdhocBench extends AnyFunSuite {

  private lazy val index = {
    val ec = BenchContext.corpus("Sigma")
    WarpGate.buildIndex(BenchContext.spark, ec.corpus, WarpGateConfig(sampleSize = Some(1000)))
  }

  test("§4.3.3: top-3 recommendations for ACCOUNT.Name") {
    val (res, t) = index.querySampled(ColumnId("SALESFORCE", "ACCOUNT", "Name"), 3)
    res.foreach(r => BenchContext.report(
      f"sigma-adhoc ACCOUNT.Name -> ${r.candidate.key}%-45s score=${r.score}%.3f"))
    BenchContext.report(f"sigma-adhoc query time ${t.totalMs}%.1f ms")
    val keys = res.map(_.candidate.key)
    assert(keys.contains("SALESFORCE.LEAD.Company"), keys)
    assert(keys.contains("STOCKS.INDUSTRIES.Company Name"), keys)
    assert(t.totalMs < 1000.0)
  }

  test("§4.3.3: Ticker chains INDUSTRIES to PRICES") {
    val (res, _) = index.querySampled(ColumnId("STOCKS", "INDUSTRIES", "Ticker"), 3)
    res.foreach(r => BenchContext.report(
      f"sigma-adhoc INDUSTRIES.Ticker -> ${r.candidate.key}%-45s score=${r.score}%.3f"))
    assert(res.map(_.candidate.key).contains("STOCKS.PRICES.Ticker"))
  }
}
