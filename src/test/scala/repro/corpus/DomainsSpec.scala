package repro.corpus

import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers
import repro.core.{ColumnEmbedder, VectorOps, WebTableEmbeddingModel}

class DomainsSpec extends AnyFunSuite with PropHelpers {

  private def dom(kind: DomainKind, seed: Long = 1L) = Domain(s"d-$kind-$seed", kind, seed)

  test("Rng.mix is deterministic") {
    assert(Rng.mix("a", 1, 2L) == Rng.mix("a", 1, 2L))
  }

  test("Rng.mix differs on argument order") {
    assert(Rng.mix("a", "b") != Rng.mix("b", "a"))
  }

  test("Rng.int stays in bounds") {
    withRandom() { rnd =>
      (0 until 200).foreach { _ =>
        val h = rnd.nextLong()
        val b = 1 + rnd.nextInt(100)
        val v = Rng.int(h, b)
        assert(v >= 0 && v < b)
      }
    }
  }

  test("Rng.double stays in [0, 1)") {
    withRandom() { rnd =>
      (0 until 200).foreach { _ =>
        val d = Rng.double(rnd.nextLong())
        assert(d >= 0.0 && d < 1.0)
      }
    }
  }

  test("master syllables are distinct") {
    val all = (0 until Domains.MasterCount).map(Domains.masterSyllable)
    assert(all.distinct.size == all.size)
  }

  test("values are deterministic") {
    val d = dom(DomainKind.Company)
    (0L until 50L).foreach(i => assert(d.value(i) == d.value(i)))
  }

  test("injective kinds produce distinct values over a large range") {
    val kinds: Seq[DomainKind] = Seq(DomainKind.Company, DomainKind.Person, DomainKind.City,
      DomainKind.Product, DomainKind.Email, DomainKind.IntId, DomainKind.Code("ZZ"), DomainKind.Date)
    kinds.foreach { k =>
      val d    = dom(k)
      val vals = (0L until 5000L).map(d.value)
      assert(vals.distinct.size == vals.size, s"collisions in $k")
      assert(k.injective)
    }
  }

  test("non-injective kinds are flagged") {
    assert(!DomainKind.Measure.injective)
    assert(!DomainKind.FreeText.injective)
  }

  test("same domain, same interval, same values across instances") {
    val a = Domain("shared", DomainKind.Company, 42L)
    val b = Domain("shared", DomainKind.Company, 42L)
    (0L until 100L).foreach(i => assert(a.value(i) == b.value(i)))
  }

  test("company values carry a corporate suffix") {
    val d = dom(DomainKind.Company)
    (0L until 50L).foreach { i =>
      assert(Domains.CompanySuffixes.exists(s => d.value(i).endsWith(s)), d.value(i))
    }
  }

  test("code values carry their prefix") {
    val d = dom(DomainKind.Code("TCK"))
    (0L until 20L).foreach(i => assert(d.value(i).startsWith("TCK-")))
  }

  test("int-id values are sequential integers") {
    val d = dom(DomainKind.IntId)
    assert(d.value(0) == "1" && d.value(41) == "42")
  }

  test("date values are ISO dates") {
    val d = dom(DomainKind.Date)
    assert(d.value(0) == "2015-01-01")
    assert(d.value(31) == "2015-02-01")
  }

  test("measure values parse as doubles") {
    val d = dom(DomainKind.Measure)
    (0L until 50L).foreach(i => assert(d.value(i).toDouble >= 0.0))
  }

  test("free text values are multi-word") {
    val d = dom(DomainKind.FreeText)
    (0L until 20L).foreach(i => assert(d.value(i).split(" ").length >= 4))
  }

  test("word encoder is injective") {
    val d    = dom(DomainKind.Company)
    val vals = (0L until 3000L).map(d.word)
    assert(vals.distinct.size == vals.size)
  }

  test("no generated value contains a dot that would break column keys") {
    // ColumnId keys join on '.'; generated table/database names must not
    // contain it (values may — only identifiers are constrained).
    val d = dom(DomainKind.Company)
    (0L until 100L).foreach(i => assert(!d.word(i).contains(".")))
  }

  test("same-kind domains with different seeds embed apart, same seed together") {
    val wte = new WebTableEmbeddingModel()
    val a1  = Domain("a", DomainKind.Company, 1L)
    val a2  = Domain("a", DomainKind.Company, 1L)
    val b   = Domain("b", DomainKind.Company, 2L)
    val va1 = ColumnEmbedder.embedValuesLocal((0L until 300L).map(a1.value), wte)
    val va2 = ColumnEmbedder.embedValuesLocal((300L until 600L).map(a2.value), wte)
    val vb  = ColumnEmbedder.embedValuesLocal((0L until 300L).map(b.value), wte)
    val within  = VectorOps.cosine(va1, va2)
    val between = VectorOps.cosine(va1, vb)
    assert(within > between, s"within=$within between=$between")
  }

  test("overlapping intervals of one domain embed above the 0.7 threshold") {
    val wte = new WebTableEmbeddingModel()
    val d   = Domain("ov", DomainKind.Company, 3L)
    val a   = ColumnEmbedder.embedValuesLocal((0L until 1000L).map(d.value), wte)
    val b   = ColumnEmbedder.embedValuesLocal((150L until 850L).map(d.value), wte)
    assert(VectorOps.cosine(a, b) > 0.7, VectorOps.cosine(a, b))
  }

  test("different-kind domains embed below the 0.7 threshold") {
    val wte = new WebTableEmbeddingModel()
    val a = ColumnEmbedder.embedValuesLocal(
      (0L until 500L).map(dom(DomainKind.Company, 1).value), wte)
    val b = ColumnEmbedder.embedValuesLocal(
      (0L until 500L).map(dom(DomainKind.Date, 2).value), wte)
    assert(VectorOps.cosine(a, b) < 0.7)
  }

  test("name pools exist for every kind") {
    val kinds: Seq[DomainKind] = Seq(DomainKind.Company, DomainKind.Person, DomainKind.City,
      DomainKind.Product, DomainKind.Email, DomainKind.IntId, DomainKind.Code("A"),
      DomainKind.Date, DomainKind.Measure, DomainKind.FreeText)
    kinds.foreach(k => assert(Domains.namePool(k).nonEmpty))
  }
}
