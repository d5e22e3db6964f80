package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.PropHelpers

class EmbeddingsSpec extends AnyFunSuite with PropHelpers {

  private val wte = new WebTableEmbeddingModel()

  test("embedValue is deterministic") {
    forAllStrings(50) { s =>
      assert(wte.embedValue(s).toSeq == wte.embedValue(s).toSeq)
    }
  }

  test("embedValue is deterministic across model instances") {
    val other = new WebTableEmbeddingModel()
    forAllStrings(20) { s =>
      assert(wte.embedValue(s).toSeq == other.embedValue(s).toSeq)
    }
  }

  test("dimension matches the declared dim") {
    assert(wte.embedValue("hello").length == wte.dim)
    assert(wte.dim == 150)
  }

  test("embedding is never the zero vector, even for empty input") {
    forAllStrings(50) { s =>
      assert(VectorOps.norm(wte.embedValue(s)) > 0.0)
    }
  }

  test("null embeds like the empty sentinel") {
    assert(wte.embedValue(null).toSeq == wte.embedValue("").toSeq)
  }

  test("identical values embed identically") {
    assertApprox(VectorOps.cosine(wte.embedValue("Apple Inc"), wte.embedValue("Apple Inc")),
      1.0, 1e-9)
  }

  test("formatting variants embed identically (semantic joinability)") {
    val base = wte.embedValue("Apple Inc.")
    Seq("APPLE INC", "apple-inc", "Apple_Inc").foreach { v =>
      assertApprox(VectorOps.cosine(base, wte.embedValue(v)), 1.0, 1e-9, v)
    }
  }

  test("values sharing tokens are closer than unrelated values") {
    val a  = wte.embedValue("Apple Inc")
    val b  = wte.embedValue("Apple Corp")
    val c  = wte.embedValue("9473.25")
    assert(VectorOps.cosine(a, b) > VectorOps.cosine(a, c) + 0.2)
  }

  test("values sharing subword structure are closer than unrelated values") {
    val a = wte.embedValue("Baconville")
    val b = wte.embedValue("Baconburg")
    val c = wte.embedValue("Zuzutron")
    assert(VectorOps.cosine(a, b) > VectorOps.cosine(a, c) + 0.1)
  }

  test("different seeds give different embedding spaces") {
    val other = new WebTableEmbeddingModel(seed = 99)
    val a = wte.embedValue("Apple Inc")
    val b = other.embedValue("Apple Inc")
    assert(math.abs(VectorOps.cosine(a, b)) < 0.5)
  }

  test("mean embedding of overlapping value sets has high cosine") {
    // Two columns drawing overlapping intervals of the same pool must land
    // near each other — the geometric property WarpGate relies on.
    val pool = (0 until 400).map(i => s"Entity$i Corp")
    val colA = ColumnEmbedder.embedValuesLocal(pool.take(300), wte)
    val colB = ColumnEmbedder.embedValuesLocal(pool.drop(100), wte)
    assert(VectorOps.cosine(colA, colB) > 0.8)
  }

  test("mean embeddings of different domains have low cosine") {
    val companies = (0 until 300).map(i => s"Vexacorp$i Holdings")
    val dates     = (0 until 300).map(i => java.time.LocalDate.of(2015, 1, 1).plusDays(i).toString)
    val a = ColumnEmbedder.embedValuesLocal(companies, wte)
    val b = ColumnEmbedder.embedValuesLocal(dates, wte)
    assert(VectorOps.cosine(a, b) < 0.4)
  }

  test("bert-like model has larger dimension") {
    val bert = new BertLikeModel()
    assert(bert.dim > wte.dim)
    assert(bert.embedValue("x").length == bert.dim)
  }

  test("bert-like model output is unit-normalized") {
    val bert = new BertLikeModel()
    forAllStrings(20) { s =>
      assertApprox(VectorOps.norm(bert.embedValue(s)), 1.0, 1e-6, s)
    }
  }

  test("bert-like model preserves similarity structure") {
    val bert = new BertLikeModel()
    val a = bert.embedValue("Apple Inc")
    val b = bert.embedValue("Apple Corp")
    val c = bert.embedValue("2015-06-01")
    assert(VectorOps.cosine(a, b) > VectorOps.cosine(a, c))
  }

  test("bert-like inference is measurably more expensive") {
    val bert = new BertLikeModel()
    val values = (0 until 300).map(i => s"Unique Value Number $i Without Cache Hits")
    def time(m: EmbeddingModel): Long = {
      val t0 = System.nanoTime()
      values.foreach(m.embedValue)
      System.nanoTime() - t0
    }
    // warmup both
    time(wte); time(bert)
    val tw = time(new WebTableEmbeddingModel(seed = 5))
    val tb = time(new BertLikeModel(seed = 6))
    assert(tb > tw, s"bert $tb should exceed wte $tw")
  }

  test("model registry resolves known names") {
    assert(EmbeddingModel.byName("wte").name == "web-table-embeddings")
    assert(EmbeddingModel.byName("bert").name == "bert-like")
  }

  test("model registry rejects unknown names") {
    intercept[IllegalArgumentException](EmbeddingModel.byName("gpt"))
  }

  test("embedValuesLocal of empty input is the zero vector") {
    assert(VectorOps.norm(ColumnEmbedder.embedValuesLocal(Nil, wte)) == 0.0)
  }

  test("embedValuesLocal equals single value embedding for one value") {
    val v = "Apple Inc"
    assert(ColumnEmbedder.embedValuesLocal(Seq(v), wte).toSeq == wte.embedValue(v).toSeq)
  }
}
