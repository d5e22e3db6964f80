package repro.jobs

import repro.core.{BertLikeModel, WebTableEmbeddingModel}
import repro.eval.Reports

/** Prints the §4.4 sample-efficiency sweep: WarpGate effectiveness and query
  * time at sample sizes 10/100/1000 vs full values, on testbedS and
  * testbedM, for both the web-table model and the BERT-like model.
  *
  * Usage: spark-submit --class repro.jobs.SampleEfficiencyJob ... [corpus...]
  */
object SampleEfficiencyJob {
  def main(args: Array[String]): Unit = {
    val spark   = JobSession.create("warpgate-sample-efficiency")
    val corpora = if (args.nonEmpty) args.toSeq else Seq("S", "M")
    val sizes   = Seq(Some(10), Some(100), Some(1000), None)
    val ks      = Seq(1, 5, 10)
    println("== Section 4.4: sample efficiency ==")
    corpora.foreach { name =>
      val ec = Reports.benchCorpus(spark, name)
      Reports.sampleEfficiency(spark, ec, new WebTableEmbeddingModel(), sizes, ks, 20)
        .foreach(r => println(r.render))
      Reports.sampleEfficiency(spark, ec, new BertLikeModel(), Seq(Some(1000), None), ks, 20)
        .foreach(r => println(r.render))
    }
    JobSession.stop(spark)
  }
}
