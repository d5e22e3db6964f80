package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.eval.Reports

/** Table 1 — basic statistics of evaluation datasets, paper vs measured.
  *
  * Tables, columns, and query counts must match the paper exactly; average
  * rows match after the documented row scale (XS and Spider at 1:1, S/M/L at
  * 1/16, Sigma at 1/64); average answers match the paper's value closely.
  */
class Table1Bench extends AnyFunSuite {

  private val expected = Map(
    "XS"     -> (28, 257, Some(35), Some(2.8)),
    "S"      -> (46, 2553, Some(177), Some(3.6)),
    "M"      -> (46, 1067, Some(188), Some(4.4)),
    "L"      -> (19, 541, Some(92), Some(3.6)),
    "Spider" -> (70, 429, Some(60), Some(1.1)),
    "Sigma"  -> (98, 1343, None, None),
  )

  expected.toSeq.sortBy(_._1).foreach { case (name, (tbls, cols, queries, avgAns)) =>
    test(s"Table 1 row: $name") {
      val ec = BenchContext.corpusUncached(name)
      val m  = Reports.measure(ec)
      BenchContext.report(Reports.table1Row(ec.paper, m))

      assert(m.tables == tbls)
      assert(m.columns == cols)
      assert(m.queries == queries)
      // average rows: measured vs paper-at-scale within rounding slack
      val target = ec.paper.avgRows * ec.rowScale
      assert(math.abs(m.avgRows - target) / target < 0.05,
        s"avgRows ${m.avgRows} vs target $target")
      avgAns.foreach { a =>
        val measured = m.avgAnswers.get
        assert(math.abs(measured - a) < 0.6, s"avgAnswers $measured vs paper $a")
      }
    }
  }

  test("Table 1: S to M row ratio preserved (15.1x)") {
    val s = Reports.measure(BenchContext.corpusUncached("S"))
    val m = Reports.measure(BenchContext.corpusUncached("M"))
    val ratio = m.avgRows / s.avgRows
    assert(ratio > 10 && ratio < 20, s"ratio=$ratio")
  }
}
