package repro.jobs

import repro.core.{ColumnId, WarpGate, WarpGateConfig}
import repro.eval.Reports

/** The §4.3.3 walkthrough: ad-hoc discovery on the Sigma Sample corpus.
  * Queries SALESFORCE.ACCOUNT.Name (k=3) and prints the recommendations —
  * expected to surface LEAD.Company (same database) and the uppercase
  * STOCKS.INDUSTRIES."Company Name" (cross-database, semantic-only match),
  * from whose table Ticker then chains into STOCKS.PRICES.
  *
  * Usage: spark-submit --class repro.jobs.SigmaAdhocJob ...
  */
object SigmaAdhocJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("warpgate-sigma-adhoc")
    val ec    = Reports.benchCorpus(spark, "Sigma")
    val index = WarpGate.buildIndex(spark, ec.corpus, WarpGateConfig(sampleSize = Some(1000)))

    println("== Ad-hoc discovery (Sigma): top-3 for SALESFORCE.ACCOUNT.Name ==")
    val (res, t) = index.querySampled(ColumnId("SALESFORCE", "ACCOUNT", "Name"), 3)
    res.foreach(r => println(f"  ${r.candidate.key}%-45s score=${r.score}%.3f"))
    println(f"  (query answered in ${t.totalMs}%.1f ms)")

    println("== Follow-up: top-3 for STOCKS.INDUSTRIES.Ticker (join-key chaining) ==")
    val (res2, _) = index.querySampled(ColumnId("STOCKS", "INDUSTRIES", "Ticker"), 3)
    res2.foreach(r => println(f"  ${r.candidate.key}%-45s score=${r.score}%.3f"))
    JobSession.stop(spark)
  }
}
