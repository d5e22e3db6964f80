package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.core.ColumnId

class MetricsSpec extends AnyFunSuite {

  private def c(n: String) = ColumnId("db", "t" + n, n)

  test("precision@k counts hits over k") {
    val ranked  = Seq(c("a"), c("b"), c("c"))
    val answers = Set(c("a"), c("c"))
    assert(Metrics.precisionAtK(ranked, answers, 1) == 1.0)
    assert(Metrics.precisionAtK(ranked, answers, 2) == 0.5)
    assert(Metrics.precisionAtK(ranked, answers, 3) == 2.0 / 3)
  }

  test("precision@k divides by k even when fewer results returned") {
    assert(Metrics.precisionAtK(Seq(c("a")), Set(c("a")), 5) == 0.2)
  }

  test("recall@k counts hits over answer count") {
    val ranked  = Seq(c("a"), c("b"), c("c"))
    val answers = Set(c("a"), c("c"), c("z"))
    assert(Metrics.recallAtK(ranked, answers, 1) == 1.0 / 3)
    assert(Metrics.recallAtK(ranked, answers, 3) == 2.0 / 3)
  }

  test("recall@k with empty answers is zero") {
    assert(Metrics.recallAtK(Seq(c("a")), Set.empty, 3) == 0.0)
  }

  test("precision@k rejects non-positive k") {
    intercept[IllegalArgumentException](Metrics.precisionAtK(Nil, Set.empty, 0))
  }

  test("perfect ranking yields precision and recall 1 at k = |answers|") {
    val answers = Set(c("a"), c("b"))
    val ranked  = Seq(c("a"), c("b"))
    assert(Metrics.precisionAtK(ranked, answers, 2) == 1.0)
    assert(Metrics.recallAtK(ranked, answers, 2) == 1.0)
  }

  test("evaluate averages over queries") {
    val q1 = c("q1"); val q2 = c("q2")
    val results = Map(q1 -> Seq(c("a"), c("x")), q2 -> Seq(c("y"), c("b")))
    val answers = Map(q1 -> Set(c("a")), q2 -> Set(c("b")))
    val pr      = Metrics.evaluate(results, answers, Seq(q1, q2), Seq(1, 2))
    assert(pr(0).k == 1)
    assert(pr(0).precision == 0.5) // q1 hit at 1, q2 miss at 1
    assert(pr(0).recall == 0.5)
    assert(pr(1).precision == 0.5) // each query: 1 hit / k=2
    assert(pr(1).recall == 1.0)
  }

  test("evaluate skips queries with no answers") {
    val q1 = c("q1"); val q2 = c("q2")
    val results = Map(q1 -> Seq(c("a")), q2 -> Seq(c("b")))
    val answers = Map(q1 -> Set(c("a")), q2 -> Set.empty[ColumnId])
    val pr      = Metrics.evaluate(results, answers, Seq(q1, q2), Seq(1))
    assert(pr.head.precision == 1.0)
  }

  test("evaluate handles queries missing from results") {
    val q1 = c("q1")
    val pr = Metrics.evaluate(Map.empty, Map(q1 -> Set(c("a"))), Seq(q1), Seq(1))
    assert(pr.head.precision == 0.0 && pr.head.recall == 0.0)
  }

  test("evaluate requires at least one eligible query") {
    intercept[IllegalArgumentException](
      Metrics.evaluate(Map.empty, Map.empty, Seq(c("q")), Seq(1)))
  }

  test("recall is monotonically non-decreasing in k") {
    val ranked  = Seq(c("a"), c("b"), c("c"), c("d"))
    val answers = Set(c("b"), c("d"))
    val recalls = (1 to 4).map(Metrics.recallAtK(ranked, answers, _))
    assert(recalls == recalls.sorted)
  }
}
