package repro.bench

import org.apache.spark.sql.SparkSession
import repro.SparkSpec
import repro.baselines.{Aurum, D3L}
import repro.core._
import repro.corpus.EvalCorpus
import repro.eval.{EvalRunner, Reports}
import scala.collection.mutable

/** Shared, lazily-built corpora and indexes for the bench suites. All bench
  * suites run sequentially in one JVM (Test/parallelExecution := false), so a
  * system built for Table 2 is reused by the Figure 4 bench instead of being
  * profiled twice. Build times are recorded for the report.
  */
object BenchContext {
  lazy val spark: SparkSession = SparkSpec.shared

  private val corpora   = mutable.Map[String, EvalCorpus]()
  private val wgIdx     = mutable.Map[String, (WarpGateIndex, Double)]()
  private val aurumIdx  = mutable.Map[String, (Aurum.Index, Double)]()
  private val d3lIdx    = mutable.Map[String, (D3L.Index, Double)]()

  /** Corpora are generated once and persisted: the generator UDFs stand in
    * for the warehouse's storage layer, so systems must profile materialized
    * data, not pay value-generation on every scan. Generation/caching time is
    * excluded from the reported build and query times (the warehouse already
    * holds its data).
    */
  def corpus(name: String): EvalCorpus = synchronized {
    corpora.getOrElseUpdate(name, {
      val ec = Reports.benchCorpus(spark, name)
      val cached = ec.copy(corpus = ec.corpus.copy(tables = ec.corpus.tables.map(t =>
        t.copy(df = t.df.persist(org.apache.spark.storage.StorageLevel.MEMORY_AND_DISK)))))
      cached.corpus.tables.foreach(_.df.count())
      cached
    })
  }

  /** Uncached variant for stats-only uses (Table 1): `count()` prunes the
    * generated value columns entirely, so materialization would be waste —
    * especially for testbedL, which is never profiled, only counted.
    */
  def corpusUncached(name: String): EvalCorpus = synchronized {
    corpora.getOrElse(name, Reports.benchCorpus(spark, name))
  }

  def warpGate(name: String): (WarpGateIndex, Double) = synchronized {
    wgIdx.getOrElseUpdate(name,
      EvalRunner.buildWarpGate(spark, corpus(name), WarpGateConfig()))
  }

  def aurum(name: String): (Aurum.Index, Double) = synchronized {
    aurumIdx.getOrElseUpdate(name, EvalRunner.buildAurum(spark, corpus(name)))
  }

  def d3l(name: String): (D3L.Index, Double) = synchronized {
    d3lIdx.getOrElseUpdate(name, EvalRunner.buildD3L(spark, corpus(name)))
  }

  /** Marker printed around every reported line so bench_output.txt is easy
    * to grep when transcribing numbers into EXPERIMENTS.md.
    */
  def report(line: String): Unit = println(s"[REPRO] $line")
}
