package repro.jobs

import repro.eval.Reports

/** Prints Figure-4-shaped top-k precision/recall tables for the three
  * systems on NextiaJD testbedS, testbedM, and Spider.
  *
  * Usage: spark-submit --class repro.jobs.PrecisionRecallJob ... [corpus...]
  */
object PrecisionRecallJob {
  def main(args: Array[String]): Unit = {
    val spark   = JobSession.create("warpgate-pr")
    val corpora = if (args.nonEmpty) args.toSeq else Seq("S", "M", "Spider")
    val ks      = Seq(1, 3, 5, 10)
    println("== Figure 4 (as tables): top-k precision and recall ==")
    corpora.foreach { name =>
      val ec = Reports.benchCorpus(spark, name)
      Reports.effectivenessAll(spark, ec, ks).foreach(r => println(r.render))
    }
    JobSession.stop(spark)
  }
}
