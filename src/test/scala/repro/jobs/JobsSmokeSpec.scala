package repro.jobs

import repro.SparkSpec

/** Smoke tests for the spark-submit entrypoints: each main must run end to
  * end on a small corpus inside the shared test session (repro.keepSession
  * prevents the jobs from stopping it).
  */
class JobsSmokeSpec extends SparkSpec {

  override def beforeAll(): Unit = {
    super.beforeAll()
    sys.props("repro.keepSession") = "1"
    spark // force shared session creation before any job's getOrCreate
  }

  test("Table1Job runs on XS") {
    Table1Job.main(Array("XS"))
    assert(spark.sparkContext.isStopped == false)
  }

  test("Table1Job runs on Spider") {
    Table1Job.main(Array("Spider"))
  }

  test("Table1Job rejects unknown corpora") {
    intercept[IllegalArgumentException](Table1Job.main(Array("nope")))
  }

  test("JobSession.create reuses the active session under getOrCreate") {
    val s = JobSession.create("smoke")
    assert(s eq spark)
  }

  test("JobSession.stop honors repro.keepSession") {
    JobSession.stop(spark)
    assert(!spark.sparkContext.isStopped)
  }
}
