package repro.corpus

import scala.util.hashing.MurmurHash3

/** Deterministic hash-chain RNG used by all generators — corpora must be
  * bit-identical across runs and across driver/executor boundaries so that
  * the analytic ground truth (DESIGN.md §2) matches the generated data.
  */
object Rng {
  def mix(parts: Any*): Long = {
    var h = 0x9e3779b97f4a7c15L
    parts.foreach { p =>
      val m = p match {
        case s: String => MurmurHash3.stringHash(s, 0x1b873593).toLong
        case l: Long   => l
        case i: Int    => i.toLong
        case other     => MurmurHash3.stringHash(other.toString, 0x1b873593).toLong
      }
      h ^= m + 0x9e3779b97f4a7c15L + (h << 6) + (h >>> 2)
      h = splitmix(h)
    }
    h
  }

  def splitmix(x: Long): Long = {
    var z = x + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Non-negative bounded draw. */
  def int(h: Long, bound: Int): Int = {
    require(bound > 0)
    (((h % bound) + bound) % bound).toInt
  }

  /** Uniform double in [0, 1). */
  def double(h: Long): Double = ((h >>> 11).toDouble) / 9007199254740992.0
}

/** The semantic kind of a value pool. Kinds marked "injective" produce
  * distinct strings for distinct pool indices, which the containment-based
  * ground truth relies on; non-injective kinds are used only for filler
  * columns that never participate in ground truth.
  */
sealed trait DomainKind extends Serializable { def injective: Boolean = true }
object DomainKind {
  case object Company  extends DomainKind
  case object Person   extends DomainKind
  case object City     extends DomainKind
  case object Product  extends DomainKind
  case object Email    extends DomainKind
  case object IntId    extends DomainKind
  final case class Code(prefix: String) extends DomainKind
  case object Date     extends DomainKind
  case object Measure  extends DomainKind { override def injective: Boolean = false }
  case object FreeText extends DomainKind { override def injective: Boolean = false }
}

/** A value pool: a deterministic injection (for injective kinds) from pool
  * index to string value. Two columns drawing overlapping index intervals of
  * the *same* domain share exactly the overlap's values — interval arithmetic
  * therefore gives exact containment, with zero measurement error.
  *
  * Each domain derives its own syllable inventory from `seed`, so values of
  * different domains have different character-n-gram distributions and embed
  * near-orthogonally, while values within one domain share sub-word structure.
  */
final case class Domain(id: String, kind: DomainKind, seed: Long) extends Serializable {
  import Domains._

  /** 30-syllable inventory of this domain: a seeded subset of the master,
    * sampled *without* replacement — a duplicate syllable would map two
    * base-30 digits to the same string and break the encoder's injectivity
    * (and with it the exactness of the containment ground truth).
    */
  @transient private lazy val inventory: Array[String] = {
    val picked = scala.collection.mutable.LinkedHashSet[Int]()
    var j = 0
    while (picked.size < InventorySize) {
      picked += Rng.int(Rng.mix(seed, "inv", j), MasterCount)
      j += 1
    }
    picked.toArray.map(masterSyllable)
  }

  /** Fixed-width base-`InventorySize` syllable encoding of an affine-scrambled
    * index — injective for idx < InventorySize^Digits (~249k; pool intervals
    * are capped below that by the testbed builders).
    *
    * Two properties matter beyond injectivity: (i) *stationarity* — word
    * shape must not depend on where in the pool an index lies, or two
    * interval subsets of one pool would be distributionally distinguishable
    * and sampling (§4.4) would break; the affine scramble and the fixed
    * width provide this. (ii) *domain coherence* — all words of a domain
    * share its small syllable inventory, so even disjoint samples of one
    * domain embed nearby.
    */
  private def encode(idx: Long): String = {
    val m  = Domains.EncodeSpace
    val j0 = ((idx * 1000003L + (seed & 0x7fffffff)) % m + m) % m
    val sb = new java.lang.StringBuilder(16)
    var v  = j0
    var d  = 0
    while (d < Domains.EncodeDigits) {
      val syl = inventory((v % InventorySize).toInt)
      if (d == 0) {
        sb.append(Character.toUpperCase(syl.charAt(0))).append(syl, 1, syl.length)
      } else sb.append(syl)
      v /= InventorySize
      d += 1
    }
    sb.toString
  }

  private def pick(arr: Array[String], h: Long): String = arr(Rng.int(h, arr.length))

  /** Public syllable-word encoder (injective in idx) — used by testbed
    * builders to mint readable entity/table names in this domain's flavor.
    */
  def word(idx: Long): String = encode(idx)

  /** A seeded `k`-subset of a shared token pool. Constant tokens shared by
    * *all* domains of a kind (corporate suffixes, email TLDs, ...) would pull
    * every same-kind column pair above the similarity threshold; restricting
    * each domain to its own small subset keeps within-domain columns tight
    * while pushing cross-domain same-kind pairs well below it.
    */
  private def subset(arr: Array[String], k: Int, salt: String): Array[String] = {
    val picked = scala.collection.mutable.LinkedHashSet[Int]()
    var j = 0
    while (picked.size < math.min(k, arr.length)) {
      picked += Rng.int(Rng.mix(seed, salt, j), arr.length)
      j += 1
    }
    picked.toArray.map(arr)
  }

  @transient private lazy val companySuffixes = subset(Domains.CompanySuffixes, 3, "csub")
  @transient private lazy val citySuffixes    = subset(Domains.CitySuffixes, 2, "ctsub")
  @transient private lazy val productAdjs     = subset(Domains.ProductAdjectives, 3, "pasub")
  @transient private lazy val emailTld        = subset(Domains.EmailTlds, 1, "tldsub")(0)
  /** Per-domain numeric offset for Code pools: varies digit length and digit
    * distribution so two code domains share neither prefix nor number shape.
    */
  @transient private lazy val codeOffset: Long =
    10000L * (1 + Rng.int(Rng.mix(seed, "coff"), 900))

  /** The idx-th value of this pool. */
  def value(idx: Long): String = kind match {
    case DomainKind.Company =>
      // two inventory words + suffix: the shared corporate suffix is a third
      // of the tokens (like real company names), not half — less cross-domain
      // pull from suffix-subset overlap
      s"${encode(idx)} ${inventory(Rng.int(Rng.mix(seed, "w2", idx), Domains.InventorySize)).capitalize}${
        inventory(Rng.int(Rng.mix(seed, "w3", idx), Domains.InventorySize))} ${
        pick(companySuffixes, Rng.mix(seed, "csfx", idx))}"
    case DomainKind.Person =>
      s"${encode(idx * 2 + 1)} ${encode(idx * 2)}"
    case DomainKind.City =>
      s"${encode(idx)}${pick(citySuffixes, Rng.mix(seed, "city", idx))}"
    case DomainKind.Product =>
      s"${pick(productAdjs, Rng.mix(seed, "adj", idx))} ${encode(idx)}"
    case DomainKind.Email =>
      s"${encode(idx).toLowerCase}@${encode(Rng.int(Rng.mix(seed, "edom", idx), 25)).toLowerCase}.$emailTld"
    case DomainKind.IntId =>
      (idx + 1).toString
    case DomainKind.Code(prefix) =>
      f"$prefix-${idx + codeOffset}%d"
    case DomainKind.Date =>
      java.time.LocalDate.of(2015, 1, 1).plusDays(idx).toString
    case DomainKind.Measure =>
      f"${Rng.double(Rng.mix(seed, "m", idx)) * 100000}%.2f"
    case DomainKind.FreeText =>
      val n = 4 + Rng.int(Rng.mix(seed, "ftn", idx), 5)
      (0 until n).map(w => encode(Rng.int(Rng.mix(seed, "ftw", idx, w), 5000)).toLowerCase)
        .mkString(" ")
  }
}

object Domains {
  /** Syllables per domain. Small on purpose: a 10-row sample of a column
    * must still pin down its domain (§4.4's sampling robustness), which
    * requires values of one domain to share substantial sub-word mass — like
    * a trained model mapping all company names into a tight region. With 12
    * syllables and multi-syllable words, two random words of one domain share
    * ~1 syllable in expectation; words of different domains share almost
    * none.
    */
  val InventorySize = 12

  /** Syllables per word (fixed width — see Domain.encode). */
  val EncodeDigits = 5

  /** Injectivity bound of the encoder: InventorySize^EncodeDigits = 248832.
    * Pool intervals must stay below this (see [[MaxPoolInterval]]).
    */
  val EncodeSpace: Long = math.pow(InventorySize.toDouble, EncodeDigits.toDouble).toLong

  /** Cap applied by the testbed builders to every pool interval so the
    * encoder stays injective; table row counts may exceed it (rows then
    * repeat pool values, as real columns repeat categorical values).
    */
  val MaxPoolInterval: Long = 200000L

  private val Onsets =
    Array("b", "br", "c", "ch", "cl", "d", "dr", "f", "fr", "g", "gr", "h", "j",
      "k", "l", "m", "n", "p", "pl", "pr", "r", "s", "st", "t", "tr", "v", "w", "z")
  private val Nuclei = Array("a", "e", "i", "o", "u", "ai", "ea", "io", "ou")
  private val Codas  = Array("", "n", "r", "s", "l", "x", "m", "t", "nd", "rk")

  val MasterCount: Int = Onsets.length * Nuclei.length * Codas.length

  /** The i-th syllable of the master inventory all domains draw from. */
  def masterSyllable(i: Int): String = {
    val o = Onsets(i % Onsets.length)
    val n = Nuclei((i / Onsets.length) % Nuclei.length)
    val c = Codas((i / (Onsets.length * Nuclei.length)) % Codas.length)
    o + n + c
  }

  // Shared-token pools are wide and each domain picks a small seeded subset,
  // keeping cross-domain subset overlap (and with it cross-domain cosine)
  // low while within-domain token distributions stay tight.
  val CompanySuffixes = Array("Inc", "Corp", "LLC", "Group", "Labs", "Holdings",
    "Partners", "Co", "Ltd", "PLC", "Ventures", "Industries", "Global",
    "Systems", "Solutions", "Enterprises")
  val CitySuffixes = Array("ville", "burg", "ton", "field", " City", "ford",
    "haven", "port", "dale", "mont")
  val ProductAdjectives = Array("Ultra", "Eco", "Max", "Prime", "Smart", "Pro",
    "Lite", "Plus", "Turbo", "Nano", "Hyper", "Flex", "Neo", "Apex", "Core", "Vivid")
  val EmailTlds = Array("com", "net", "org", "io", "dev", "biz")

  /** Column-name pools per kind — cluster members get semantically related
    * but non-identical names, which is what D3L's name evidence sees in real
    * corpora.
    */
  def namePool(kind: DomainKind): Array[String] = kind match {
    case DomainKind.Company  => Array("company", "company_name", "firm", "organization", "account_name", "vendor")
    case DomainKind.Person   => Array("name", "full_name", "contact", "person", "customer_name", "owner")
    case DomainKind.City     => Array("city", "location", "municipality", "town", "place")
    case DomainKind.Product  => Array("product", "product_name", "item", "sku_name", "article")
    case DomainKind.Email    => Array("email", "email_address", "contact_email", "mail")
    case DomainKind.IntId    => Array("id", "record_id", "ref_id", "key")
    case DomainKind.Code(_)  => Array("code", "ref_code", "identifier", "serial")
    case DomainKind.Date     => Array("date", "created_at", "event_date", "day")
    case DomainKind.Measure  => Array("amount", "value", "total", "score", "price", "quantity")
    case DomainKind.FreeText => Array("notes", "description", "comment", "details", "summary")
  }
}
