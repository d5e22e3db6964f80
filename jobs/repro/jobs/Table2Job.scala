package repro.jobs

import repro.eval.Reports

/** Prints Table 2: end-to-end query response time (s/query, k=10) for
  * Aurum / D3L / WarpGate on NextiaJD testbedS and testbedM, with WarpGate's
  * index-lookup share in parentheses.
  *
  * Usage: spark-submit --class repro.jobs.Table2Job ... [nTimingQueries]
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("warpgate-table2")
    val nQ    = args.headOption.map(_.toInt).getOrElse(20)
    println(s"== Table 2: end-to-end query response time (s/query, k=10, $nQ queries) ==")
    Seq("S", "M").foreach { name =>
      val ec = Reports.benchCorpus(spark, name)
      println(Reports.table2(spark, ec, nQ).render)
    }
    JobSession.stop(spark)
  }
}
