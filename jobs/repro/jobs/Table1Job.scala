package repro.jobs

import repro.eval.Reports

/** Prints Table 1 (dataset statistics), paper vs measured, for all six
  * corpora at the bench row scales.
  *
  * Usage: spark-submit --class repro.jobs.Table1Job ... [corpus...]
  * With no args, all corpora are reported.
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val spark   = JobSession.create("warpgate-table1")
    val corpora = if (args.nonEmpty) args.toSeq else Seq("XS", "S", "M", "L", "Spider", "Sigma")
    println("== Table 1: basic statistics of evaluation datasets ==")
    corpora.foreach { name =>
      val ec = Reports.benchCorpus(spark, name)
      println(Reports.table1Row(ec.paper, Reports.measure(ec)))
    }
    JobSession.stop(spark)
  }
}
