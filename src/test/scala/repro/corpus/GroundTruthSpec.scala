package repro.corpus

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, TestCorpora}
import repro.core.ColumnId

class GroundTruthSpec extends SparkSpec {

  private lazy val (corpus, spec) = TestCorpora.tiny(spark)

  private def cs(db: String, t: String, c: String): ColumnSpec =
    spec.tables.find(ts => ts.database == db && ts.table == t).get
      .columns.find(_.name == c).get

  test("containment of nested intervals is 1") {
    val a = cs("dbA", "accounts", "company") // [0, 400)
    val b = cs("dbA", "leads", "firm")       // [0, 340)
    assert(GroundTruth.containment(a, b) == 1.0)
  }

  test("containment of shifted intervals divides by the smaller side") {
    val a = cs("dbA", "leads", "firm")       // [0, 340)
    val b = cs("dbB", "orgs", "organization") // [60, 400)
    // overlap [60, 340) = 280; min(340, 340) = 340
    assert(math.abs(GroundTruth.containment(a, b) - 280.0 / 340) < 1e-12)
  }

  test("containment of disjoint intervals is 0") {
    val d = Domain("x", DomainKind.Company, 1L)
    val a = ColumnSpec("a", d, 0, 100)
    val b = ColumnSpec("b", d, 100, 200)
    assert(GroundTruth.containment(a, b) == 0.0)
  }

  test("quality thresholds follow the NextiaJD bands") {
    assert(GroundTruth.quality(1.0) == "High")
    assert(GroundTruth.quality(0.75) == "High")
    assert(GroundTruth.quality(0.6) == "Good")
    assert(GroundTruth.quality(0.5) == "Good")
    assert(GroundTruth.quality(0.3) == "Medium")
    assert(GroundTruth.quality(0.1) == "Low")
  }

  test("analytic containment matches the generated data (oracle)") {
    // Spark computes |distinct(A) ∩ distinct(B)| / min(|A|,|B|) over actual
    // values; must equal the interval arithmetic. DuckDB checks the overlap.
    val leads = corpus.table("dbA", "leads").df
    val orgs  = corpus.table("dbB", "orgs").df
    val overlap = leads.select(col("firm").as("v")).distinct()
      .join(orgs.select(col("organization").as("v")).distinct(), "v")
      .agg(count(lit(1)).as("overlap"))
    Oracle.assertEquivalent(overlap,
      """SELECT count(*) AS overlap FROM
        |  (SELECT DISTINCT firm AS v FROM leads) a
        |  JOIN (SELECT DISTINCT organization AS v FROM orgs) b USING (v)""".stripMargin,
      "leads" -> leads, "orgs" -> orgs)
    val measured = overlap.collect()(0).getLong(0).toDouble / 340
    assert(math.abs(measured -
      GroundTruth.containment(cs("dbA", "leads", "firm"), cs("dbB", "orgs", "organization"))) < 1e-12)
  }

  test("labeledPairs covers all cross-table same-cluster pairs") {
    val pairs = GroundTruth.labeledPairs(spec)
    // company cluster has 3 members => 3 pairs; code cluster 2 => 1 pair
    assert(pairs.size == 4)
    assert(pairs.forall(p => p.quality == "High"))
  }

  test("labeledPairs excludes same-table pairs") {
    val d = Domain("x", DomainKind.Company, 1L)
    val spec2 = CorpusSpec("s", Vector(TableSpec("d", "t", 100L, Vector(
      ColumnSpec("a", d, 0, 100, ValueFormat.AsIs, Some("c1")),
      ColumnSpec("b", d, 0, 100, ValueFormat.AsIs, Some("c1")),
    ))), Vector.empty)
    assert(GroundTruth.labeledPairs(spec2).isEmpty)
  }

  test("labeledPairs excludes format-mismatched pairs (not syntactically joinable)") {
    val d = Domain("x", DomainKind.Company, 1L)
    val spec2 = CorpusSpec("s", Vector(
      TableSpec("d", "t1", 100L, Vector(ColumnSpec("a", d, 0, 100, ValueFormat.AsIs, Some("c1")))),
      TableSpec("d", "t2", 100L, Vector(ColumnSpec("b", d, 0, 100, ValueFormat.Upper, Some("c1")))),
    ), Vector.empty)
    assert(GroundTruth.labeledPairs(spec2).isEmpty)
  }

  test("answers are symmetric") {
    val ans = GroundTruth.answers(spec)
    ans.foreach { case (q, s) =>
      s.foreach(c => assert(ans(c).contains(q), s"$q <-> $c"))
    }
  }

  test("every tiny query has at least one answer") {
    val ans = GroundTruth.answers(spec)
    spec.queries.foreach(q => assert(ans.getOrElse(q, Set.empty).nonEmpty, q.key))
  }

  test("answers include only Good and High pairs") {
    val d = Domain("x", DomainKind.Company, 1L)
    val spec2 = CorpusSpec("s", Vector(
      TableSpec("d", "t1", 100L, Vector(ColumnSpec("a", d, 0, 100, ValueFormat.AsIs, Some("c1")))),
      TableSpec("d", "t2", 100L, Vector(ColumnSpec("b", d, 70, 100, ValueFormat.AsIs, Some("c1")))),
      TableSpec("d", "t3", 100L, Vector(ColumnSpec("c", d, 40, 100, ValueFormat.AsIs, Some("c1")))),
    ), Vector.empty)
    val ans = GroundTruth.answers(spec2)
    val a = ColumnId("d", "t1", "a"); val b = ColumnId("d", "t2", "b"); val c = ColumnId("d", "t3", "c")
    // a-b containment = 30/30 = 1.0 High; a-c = 60/60 High; b-c = 30/30 High
    assert(ans(a) == Set(b, c))

    val spec3 = CorpusSpec("s", Vector(
      TableSpec("d", "t1", 100L, Vector(ColumnSpec("a", d, 0, 60, ValueFormat.AsIs, Some("c1")))),
      TableSpec("d", "t2", 100L, Vector(ColumnSpec("b", d, 40, 100, ValueFormat.AsIs, Some("c1")))),
    ), Vector.empty)
    // overlap [40,60) = 20 / min(60,60) = 1/3 -> Medium, not an answer
    assert(GroundTruth.answers(spec3).isEmpty)
  }

  test("sameDatabaseOnly scoping drops cross-database answers") {
    val scoped = spec.copy(sameDatabaseOnly = true)
    val ans = GroundTruth.answers(scoped)
    ans.foreach { case (q, s) => s.foreach(c => assert(c.database == q.database)) }
  }
}
