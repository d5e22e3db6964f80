package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{BertLikeModel, WebTableEmbeddingModel}
import repro.eval.Reports

/** §4.4 — sample efficiency.
  *
  * Paper: at sample sizes 10/100/1000 the embedding approach stays within
  * ±1-2% of full-value effectiveness at every k, while end-to-end response
  * time drops to interactive speed (<35 ms/query on S, <65 ms/query on M).
  * BERT embeddings are equally robust to sampling but ~10x more expensive at
  * inference.
  *
  * We sweep {10, 100, 1000, full} on testbedS with the web-table model and
  * {1000} with the BERT-like model, asserting: effectiveness within a few
  * points of full for n >= 100; sampled queries orders of magnitude faster
  * than full scans; BERT-like on par in effectiveness but slower.
  */
class SampleEfficiencyBench extends AnyFunSuite {

  private val ks = Seq(1, 5, 10)

  private lazy val sweep = {
    val ec = BenchContext.corpus("S")
    val rows = Reports.sampleEfficiency(BenchContext.spark, ec, new WebTableEmbeddingModel(),
      Seq(Some(10), Some(100), Some(1000), None), ks, nTimingQueries = 10)
    rows.foreach(r => BenchContext.report(r.render))
    rows
  }

  private lazy val bertRows = {
    val ec = BenchContext.corpus("S")
    val rows = Reports.sampleEfficiency(BenchContext.spark, ec, new BertLikeModel(),
      Seq(Some(1000)), ks, nTimingQueries = 10)
    rows.foreach(r => BenchContext.report(r.render))
    rows
  }

  private def at(size: String) = sweep.find(_.sampleSize == size).get

  test("§4.4: effectiveness at n=1000 within a few points of full values") {
    val full = at("full"); val s1000 = at("1000")
    ks.foreach { k =>
      val f = full.pr.find(_.k == k).get
      val s = s1000.pr.find(_.k == k).get
      assert(math.abs(f.recall - s.recall) < 0.05, s"k=$k recall ${f.recall} vs ${s.recall}")
      assert(math.abs(f.precision - s.precision) < 0.05, s"k=$k precision")
    }
  }

  test("§4.4: effectiveness at n=100 within a few points of full values") {
    val full = at("full"); val s100 = at("100")
    ks.foreach { k =>
      val f = full.pr.find(_.k == k).get
      val s = s100.pr.find(_.k == k).get
      assert(math.abs(f.recall - s.recall) < 0.08, s"k=$k recall ${f.recall} vs ${s.recall}")
    }
  }

  test("§4.4: even n=10 retains most of the effectiveness") {
    val full = at("full"); val s10 = at("10")
    val f = full.pr.find(_.k == 10).get
    val s = s10.pr.find(_.k == 10).get
    assert(s.recall > f.recall - 0.2, s"recall ${s.recall} vs ${f.recall}")
  }

  test("§4.4: sampled queries answer at interactive speed, full scans do not") {
    val full = at("full").timing.avgTotalSec
    val s100 = at("100").timing.avgTotalSec
    assert(s100 < full / 10, s"sampled=$s100 full=$full")
    assert(s100 < 0.1, s"sampled=$s100 (s/query)") // interactive: well under 100ms
  }

  test("§4.4: BERT-like model is on par in effectiveness") {
    val wte  = at("1000").pr.find(_.k == 10).get
    val bert = bertRows.head.pr.find(_.k == 10).get
    assert(math.abs(wte.recall - bert.recall) < 0.15,
      s"wte=${wte.recall} bert=${bert.recall}")
  }

  test("§4.4: BERT-like inference is slower at equal sample size") {
    val wte  = at("1000").timing.avgLoadEmbedSec
    val bert = bertRows.head.timing.avgLoadEmbedSec
    assert(bert > wte, s"bert=$bert wte=$wte")
  }
}
