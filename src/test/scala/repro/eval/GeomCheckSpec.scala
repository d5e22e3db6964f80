package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.corpus._

/** Embedding-geometry regression guard — the properties the whole evaluation
  * rests on (§3.1.1, §4.4):
  *
  *  - *sampling robustness*: even a 10-value sample of a column embeds above
  *    the 0.7 index threshold against a disjoint sample of the same domain
  *    (value overlap is not required, domain coherence is enough);
  *  - *separation*: columns of different domains — including different
  *    domains of the same kind — stay safely below the threshold.
  */
class GeomCheckSpec extends AnyFunSuite {

  private val wte = new WebTableEmbeddingModel()

  private val kinds: Seq[(String, Int => DomainKind)] = Seq(
    "Company" -> (_ => DomainKind.Company),
    "Person"  -> (_ => DomainKind.Person),
    "City"    -> (_ => DomainKind.City),
    "Product" -> (_ => DomainKind.Product),
    "Email"   -> (_ => DomainKind.Email),
    "Code"    -> (i => DomainKind.Code(s"C$i")))

  private def cosAt(d1: Domain, d2: Domain, n: Int): (Double, Double) = {
    val a = ColumnEmbedder.embedValuesLocal((0L until n.toLong).map(d1.value), wte)
    val b = ColumnEmbedder.embedValuesLocal((5000L until 5000L + n).map(d1.value), wte)
    val x = ColumnEmbedder.embedValuesLocal((0L until n.toLong).map(d2.value), wte)
    (VectorOps.cosine(a, b), VectorOps.cosine(a, x))
  }

  kinds.foreach { case (name, mk) =>
    val d1 = Domain(s"g-$name-1", mk(1), 1000L + name.hashCode)
    val d2 = Domain(s"g-$name-2", mk(2), 2000L + name.hashCode)

    test(s"$name: disjoint 10-value samples of one domain embed above threshold") {
      val (within, _) = cosAt(d1, d2, 10)
      assert(within > 0.7, s"within=$within")
    }

    test(s"$name: disjoint 100-value samples embed very close") {
      val (within, _) = cosAt(d1, d2, 100)
      assert(within > 0.9, s"within=$within")
    }

    test(s"$name: same-kind different-domain columns stay below threshold") {
      Seq(10, 100, 1000).foreach { n =>
        val (within, cross) = cosAt(d1, d2, n)
        assert(cross < 0.65, s"n=$n cross=$cross")
        assert(within > cross + 0.2, s"n=$n within=$within cross=$cross")
      }
    }
  }

  test("cross-kind domains are near-orthogonal") {
    val co = Domain("g-co", DomainKind.Company, 1L)
    val dt = Domain("g-dt", DomainKind.Date, 2L)
    val ms = Domain("g-ms", DomainKind.Measure, 3L)
    val a = ColumnEmbedder.embedValuesLocal((0L until 200L).map(co.value), wte)
    val b = ColumnEmbedder.embedValuesLocal((0L until 200L).map(dt.value), wte)
    val c = ColumnEmbedder.embedValuesLocal((0L until 200L).map(ms.value), wte)
    assert(VectorOps.cosine(a, b) < 0.3)
    assert(VectorOps.cosine(a, c) < 0.3)
  }

  test("overlap ranks above disjoint within one domain (full-scan ranking)") {
    val d = Domain("g-rank", DomainKind.Company, 9L)
    val full     = ColumnEmbedder.embedValuesLocal((0L until 1000L).map(d.value), wte)
    val overlap  = ColumnEmbedder.embedValuesLocal((200L until 1200L).map(d.value), wte)
    val disjoint = ColumnEmbedder.embedValuesLocal((5000L until 6000L).map(d.value), wte)
    assert(VectorOps.cosine(full, overlap) > VectorOps.cosine(full, disjoint))
  }
}
