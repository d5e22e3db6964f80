package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.{EvalRunner, Reports}

/** Table 2 — end-to-end query response time (s/query, k=10) on testbedS and
  * testbedM, full-value mode, with WarpGate's index-lookup time split out.
  *
  * Paper (EC2 p3.8xlarge, full rows):
  *     testbedS: Aurum 0.18 | D3L  4.77 | WarpGate  3.12 (lookup 1.04)
  *     testbedM: Aurum 0.03 | D3L 57.69 | WarpGate 38.73 (lookup 8.39)
  *
  * Claims to preserve at our scale (local Spark, rows/16):
  *   (a) Aurum is fastest by orders of magnitude (graph-only lookup);
  *   (b) D3L is slowest (multi-evidence re-profiling);
  *   (c) WarpGate's lookup is a minority of its end-to-end time (<25% on S,
  *       <13% on M) — improving only the index is not enough;
  *   (d) response time grows with table rows (S -> M).
  */
class Table2Bench extends AnyFunSuite {

  private val NQueries = 12
  private lazy val rows = Seq("S", "M").map { name =>
    val ec      = BenchContext.corpus(name)
    val queries = EvalRunner.timingQueries(ec, NQueries)

    val (wg, wgBuild) = BenchContext.warpGate(name)
    val wgT           = EvalRunner.warpGateTimings(ec, wg, queries, 10)

    val (au, auBuild) = BenchContext.aurum(name)
    val auT           = EvalRunner.aurumTimings(ec, au, queries, 10)

    val (d3, d3Build) = BenchContext.d3l(name)
    val d3T           = EvalRunner.d3lTimings(BenchContext.spark, ec, d3, queries, 10)

    val row = Reports.Table2Row(ec.corpus.name, auT, d3T, wgT)
    BenchContext.report(row.render +
      f" | build: aurum $auBuild%.1fs d3l $d3Build%.1fs warpgate $wgBuild%.1fs")
    name -> row
  }.toMap

  test("Table 2: Aurum is fastest on both testbeds (graph-only lookup)") {
    Seq("S", "M").foreach { n =>
      val r = rows(n)
      assert(r.aurum.avgTotalSec < r.warpGate.avgTotalSec / 5,
        s"$n: aurum=${r.aurum.avgTotalSec} wg=${r.warpGate.avgTotalSec}")
      assert(r.aurum.avgTotalSec < r.d3l.avgTotalSec / 5)
    }
  }

  test("Table 2: D3L is slowest on both testbeds (ensemble re-profiling)") {
    Seq("S", "M").foreach { n =>
      val r = rows(n)
      assert(r.d3l.avgTotalSec > r.warpGate.avgTotalSec,
        s"$n: d3l=${r.d3l.avgTotalSec} wg=${r.warpGate.avgTotalSec}")
    }
  }

  test("Table 2: WarpGate index lookup is a minority of end-to-end time") {
    Seq("S", "M").foreach { n =>
      val r = rows(n)
      assert(r.warpGate.avgLookupSec < 0.25 * r.warpGate.avgTotalSec,
        s"$n: lookup=${r.warpGate.avgLookupSec} total=${r.warpGate.avgTotalSec}")
    }
  }

  test("Table 2: response time grows from S to M with table size") {
    assert(rows("M").warpGate.avgTotalSec > rows("S").warpGate.avgTotalSec,
      s"S=${rows("S").warpGate.avgTotalSec} M=${rows("M").warpGate.avgTotalSec}")
    assert(rows("M").d3l.avgTotalSec > rows("S").d3l.avgTotalSec)
  }
}
