package repro.corpus

import org.apache.spark.sql.SparkSession
import repro.core.{ColumnId, Corpus}
import scala.collection.mutable

/** A corpus plus everything the evaluation needs: exact ground truth, query
  * set, the paper's Table 1 row, and the row scale at which it was generated.
  */
final case class EvalCorpus(
    corpus: Corpus,
    spec: CorpusSpec,
    answers: Map[ColumnId, Set[ColumnId]],
    paper: PaperStats,
    rowScale: Double,
) {
  def queries: Seq[ColumnId] = spec.queries
  def sameDatabaseOnly: Boolean = spec.sameDatabaseOnly
}

/** Synthetic stand-ins for the paper's three repositories (DESIGN.md §2):
  * NextiaJD testbeds XS/S/M/L, Spider, and the Sigma Sample Database. Table
  * counts, column counts, and query counts match Table 1 exactly; rows are
  * scaled by `rowScale` (documented per bench in EXPERIMENTS.md).
  */
object Testbeds {

  final case class NextiaParams(
      name: String,
      nTables: Int,
      nColumns: Int,
      paperAvgRows: Double,
      nQueries: Int,
      clusterSizes: Seq[Int],
      nDatabases: Int,
      paper: PaperStats,
  )

  /** Cluster-size mixes chosen so sum(s*(s-1))/sum(s) — the expected answers
    * per query when every cluster pair is High — lands on the paper's
    * "Avg. # Answers" column (2.8 / 3.6 / 4.4 / 3.6).
    */
  val XS: NextiaParams = NextiaParams("testbedXS", 28, 257, 1938, 35,
    Seq(5, 5, 4, 4, 4, 4, 3, 3, 3, 3, 2, 2), 3,
    PaperStats(28, 257, 1938, Some(35), Some(2.8)))

  val S: NextiaParams = NextiaParams("testbedS", 46, 2553, 209646, 177,
    Seq.fill(36)(5) ++ Seq.fill(10)(4) ++ Seq.fill(10)(3), 5,
    PaperStats(46, 2553, 209646, Some(177), Some(3.6)))

  val M: NextiaParams = NextiaParams("testbedM", 46, 1067, 3175904, 188,
    Seq.fill(14)(6) ++ Seq.fill(25)(5), 5,
    PaperStats(46, 1067, 3175904, Some(188), Some(4.4)))

  val L: NextiaParams = NextiaParams("testbedL", 19, 541, 12288165, 92,
    Seq.fill(15)(5) ++ Seq.fill(4)(4) ++ Seq.fill(4)(3), 4,
    PaperStats(19, 541, 12288165, Some(92), Some(3.6)))

  def nextiaParams(which: String): NextiaParams = which.toUpperCase match {
    case "XS" => XS
    case "S"  => S
    case "M"  => M
    case "L"  => L
    case o    => throw new IllegalArgumentException(s"unknown NextiaJD testbed: $o")
  }

  /** Interval patterns (fractions of the cluster's base pool) cycled over
    * cluster members. Every pairwise containment-of-smaller is >= 0.75, so
    * all cluster pairs are labeled High — keeping the Avg-#-Answers algebra
    * exact — while Jaccard between members ranges from ~0.5 to 1.0, which is
    * the asymmetry that hurts Jaccard-based baselines (DESIGN.md §2).
    */
  private val IntervalPatterns: Seq[(Double, Double)] =
    Seq((0.0, 1.0), (0.0, 0.85), (0.15, 1.0), (0.3, 0.8), (0.05, 0.95), (0.1, 0.9))

  /** Cluster-domain kinds, cycled per cluster index. Kinds whose value pools
    * would be *identical* across domains (IntId's "1","2",...; Date's
    * absolute dates; Code with a fixed prefix) are excluded or parametrized —
    * otherwise unrelated clusters would be genuinely joinable without being
    * labeled, corrupting the ground truth.
    */
  private def clusterKind(ci: Int): DomainKind = (ci % 6) match {
    case 0 => DomainKind.Company
    case 1 => DomainKind.Person
    case 2 => DomainKind.City
    case 3 => DomainKind.Product
    case 4 => DomainKind.Email
    case _ => DomainKind.Code(s"C$ci")
  }

  /** Filler-column kinds. No IntId (all IntId pools are the same values, so
    * fillers would silently join real clusters); Code fillers get a
    * hash-unique prefix for the same reason.
    */
  private def fillerKind(tag: String, t: Any, i: Int): DomainKind = {
    val h = Rng.mix(tag, "fkind", t.toString, i)
    Rng.int(h, 10) match {
      case 0 | 1 | 2 => DomainKind.Measure
      case 3 | 4     => DomainKind.FreeText
      case 5         => DomainKind.Date
      case 6         => DomainKind.City
      case 7         => DomainKind.Person
      case 8         => DomainKind.Code("F" + java.lang.Long.toUnsignedString(h, 36).take(6))
      case _         => DomainKind.Measure
    }
  }

  /** Per-table row counts with a deterministic skew, mean-adjusted to hit
    * `avgRows` exactly (up to integer rounding absorbed by the first table).
    */
  private def rowCounts(seedTag: String, nTables: Int, avgRows: Long, minRows: Long): Array[Long] = {
    val raw = Array.tabulate(nTables)(t => 0.3 + 2.4 * Rng.double(Rng.mix(seedTag, "rows", t)))
    val sum = raw.sum
    val rows = raw.map(f => math.max(minRows, math.round(avgRows * nTables * f / sum)))
    val drift = avgRows * nTables - rows.sum
    rows(0) = math.max(minRows, rows(0) + drift)
    rows
  }

  /** Case-insensitive uniqueness: Spark resolves column names
    * case-insensitively, so "Date" and "date" cannot coexist in a table.
    * The set stores lowercase names; the returned name keeps its case.
    */
  private def dedupe(names: mutable.Set[String], base: String): String = {
    var name = base
    var i = 2
    while (names.contains(name.toLowerCase)) { name = s"${base}_$i"; i += 1 }
    names += name.toLowerCase
    name
  }

  /** Build one NextiaJD-style testbed. */
  def nextiaJd(spark: SparkSession, which: String, rowScale: Double = 1.0): EvalCorpus = {
    val p = nextiaParams(which)
    build(spark, p, rowScale)
  }

  private def build(spark: SparkSession, p: NextiaParams, rowScale: Double): EvalCorpus = {
    val tag     = s"${p.name}-v1"
    val avgRows = math.max(40L, math.round(p.paperAvgRows * rowScale))
    val rows    = rowCounts(tag, p.nTables, avgRows, minRows = 30L)

    // Table and database names.
    val nameDom = Domain(s"$tag-names", DomainKind.IntId, Rng.mix(tag, "nm"))
    val dbOf    = Array.tabulate(p.nTables)(t => s"db${t % p.nDatabases}")
    val tblOf   = Array.tabulate(p.nTables)(t => s"t${t}_${nameDom.word(1000 + t * 7).toLowerCase}")

    // Exact per-table column budgets summing to p.nColumns.
    val base = p.nColumns / p.nTables
    val rem  = p.nColumns % p.nTables
    val slots = Array.tabulate(p.nTables)(t => base + (if (t < rem) 1 else 0))

    val colsOf   = Array.fill(p.nTables)(Vector.newBuilder[ColumnSpec])
    val namesOf  = Array.fill(p.nTables)(mutable.Set[String]())
    val used     = Array.fill(p.nTables)(0)

    // ---- clusters ---------------------------------------------------------
    // Members of one cluster go to distinct tables, spread across databases:
    // candidate tables are ordered database-round-robin, then rotated per
    // cluster so clusters don't pile onto the same tables.
    val rrTables: Vector[Int] =
      (0 until p.nTables).sortBy(t => (t % p.nDatabases, t)).toVector
    var clusterColumns = Vector.newBuilder[ColumnId]

    p.clusterSizes.zipWithIndex.foreach { case (size, ci) =>
      val rot = Rng.int(Rng.mix(tag, "rot", ci), p.nTables)
      val members = (0 until p.nTables).iterator
        .map(i => rrTables((i + rot) % p.nTables))
        .filter(t => used(t) < slots(t))
        .take(size)
        .toVector
      require(members.size == size, s"not enough free slots for cluster $ci in ${p.name}")

      val kind   = clusterKind(ci)
      val domain = Domain(s"$tag-cluster$ci", kind, Rng.mix(tag, "dom", ci))
      val bsize  = math.max(20L, math.min(Domains.MaxPoolInterval, members.map(rows).min))

      members.zipWithIndex.foreach { case (t, j) =>
        val (a, b) = IntervalPatterns(j % IntervalPatterns.size)
        val lo = math.round(bsize * a)
        val hi = math.max(lo + 1, math.round(bsize * b))
        val pool = Domains.namePool(kind)
        val cname = dedupe(namesOf(t), pool(Rng.int(Rng.mix(tag, "cn", ci, j), pool.length)))
        colsOf(t) += ColumnSpec(cname, domain, lo, hi, ValueFormat.AsIs, Some(s"c$ci"))
        used(t) += 1
        clusterColumns += ColumnId(dbOf(t), tblOf(t), cname)
      }
    }

    // ---- fillers ----------------------------------------------------------
    for (t <- 0 until p.nTables) {
      var i = 0
      while (used(t) < slots(t)) {
        val kind   = fillerKind(tag, t, i)
        val domain = Domain(s"$tag-fill-$t-$i", kind, Rng.mix(tag, "fd", t, i))
        val cap = kind match {
          case DomainKind.Date => math.min(rows(t), 3000L)
          case _               => math.min(rows(t), Domains.MaxPoolInterval)
        }
        val pool  = Domains.namePool(kind)
        val cname = dedupe(namesOf(t), pool(Rng.int(Rng.mix(tag, "fn", t, i), pool.length)))
        colsOf(t) += ColumnSpec(cname, domain, 0L, math.max(1L, cap))
        used(t) += 1
        i += 1
      }
    }

    val tableSpecs = (0 until p.nTables).map { t =>
      TableSpec(dbOf(t), tblOf(t), rows(t), colsOf(t).result())
    }.toVector

    // ---- queries ----------------------------------------------------------
    val allClusterCols = clusterColumns.result()
    require(allClusterCols.size >= p.nQueries,
      s"${p.name}: ${allClusterCols.size} cluster columns < ${p.nQueries} queries")
    val queries = allClusterCols
      .sortBy(c => Rng.mix(tag, "q", c.key))
      .take(p.nQueries)

    val spec = CorpusSpec(p.name, tableSpecs, queries)
    EvalCorpus(CorpusGen.build(spark, spec), spec, GroundTruth.answers(spec), p.paper, rowScale)
  }

  // ==========================================================================
  // Spider (§4.3.2): PK/FK detection within each independent database.
  // ==========================================================================

  /** 20 databases / 70 tables / 429 columns / 60 queries, PK-FK ground truth
    * only (FK-FK siblings are *not* answers, mirroring join paths parsed from
    * schema files). Search is scoped per database like the paper's
    * evaluation. Twelve parents have two FKs, so picking 54 one-answer and 6
    * two-answer queries reproduces the 1.1 average answers.
    */
  def spider(spark: SparkSession, rowScale: Double = 1.0): EvalCorpus = {
    val tag     = "spider-v1"
    val paper   = PaperStats(70, 429, 7632, Some(60), Some(1.1))
    val dbSizes = Seq(5, 5) ++ Seq.fill(6)(4) ++ Seq.fill(12)(3)
    require(dbSizes.sum == 70)
    val nTables = 70
    val avgRows = math.max(40L, math.round(paper.avgRows * rowScale))
    val rows    = rowCounts(tag, nTables, avgRows, minRows = 30L)

    val base  = paper.columns / nTables // 6
    val rem   = paper.columns % nTables // 9
    val slots = Array.tabulate(nTables)(t => base + (if (t < rem) 1 else 0))

    val nameDom = Domain(s"$tag-names", DomainKind.IntId, Rng.mix(tag, "nm"))

    val colsOf  = Array.fill(nTables)(Vector.newBuilder[ColumnSpec])
    val namesOf = Array.fill(nTables)(mutable.Set[String]())
    val used    = Array.fill(nTables)(0)
    val dbOf    = new Array[String](nTables)
    val tblOf   = new Array[String](nTables)

    // answers built manually: PK <-> FK only.
    val answers = mutable.Map[ColumnId, Set[ColumnId]]().withDefaultValue(Set.empty)
    def link(a: ColumnId, b: ColumnId): Unit = { answers(a) += b; answers(b) += a }

    var t0 = 0
    dbSizes.zipWithIndex.foreach { case (size, d) =>
      val db = s"spider_db$d"
      val tables = (t0 until t0 + size).toVector
      tables.zipWithIndex.foreach { case (t, i) =>
        dbOf(t) = db
        tblOf(t) = s"t${i}_${nameDom.word(5000 + t * 3).toLowerCase}"
      }
      val nParents = math.max(1, size / 2)
      val parents  = tables.take(nParents)
      val children = tables.drop(nParents)

      children.zipWithIndex.foreach { case (ct, ci) =>
        val pt  = parents(ci % nParents)
        // bounded index: word() of a raw 64-bit hash would decompose into a
        // dozen syllables and produce unusable entity names
        val ent = nameDom.word(1 + Rng.int(Rng.mix(tag, "ent", d, ci % nParents), 20000)).toLowerCase
        val kindHash = Rng.mix(tag, "kk", d, ci % nParents)
        val kind: DomainKind =
          // entity-flavored but collision-free prefix: two entities sharing
          // their first letters must not share a value pool
          if (Rng.double(kindHash) < 0.6)
            DomainKind.Code(s"${ent.take(3).toUpperCase}$d${ci % nParents}")
          else DomainKind.IntId
        val domain  = Domain(s"$tag-$db-$ent", kind, Rng.mix(tag, "kd", d, ci % nParents))
        val cluster = Some(s"$db-$ent")

        // PK: full sequential coverage of the parent's rows (unique per row).
        // A parent serves exactly one entity, so a name already present in
        // namesOf(pt) at this stage means a sibling FK added this same PK.
        val pkName =
          if (Rng.double(Rng.mix(tag, "pkn", d, ci % nParents)) < 0.3) "id" else s"${ent}_id"
        val pkId = ColumnId(dbOf(pt), tblOf(pt), pkName)
        if (!namesOf(pt).contains(pkName.toLowerCase)) {
          namesOf(pt) += pkName.toLowerCase
          colsOf(pt) += ColumnSpec(pkName, domain, 0L,
            math.min(rows(pt), Domains.MaxPoolInterval), ValueFormat.AsIs, cluster)
          used(pt) += 1
        }

        // FK: sub-interval of the PK range — containment 1.0 (High), while
        // Jaccard = m/n dips below Aurum's default threshold for many pairs.
        val frac = 0.5 + 0.45 * Rng.double(Rng.mix(tag, "fkf", d, t0, ci))
        val m    = math.max(1L, Seq(rows(ct), math.round(rows(pt) * frac),
          Domains.MaxPoolInterval).min)
        val fkName = dedupe(namesOf(ct), s"${ent}_id")
        colsOf(ct) += ColumnSpec(fkName, domain, 0L, m, ValueFormat.AsIs, cluster)
        used(ct) += 1
        link(pkId, ColumnId(dbOf(ct), tblOf(ct), fkName))
      }
      t0 += size
    }

    // Fillers to the exact column budget.
    for (t <- 0 until nTables) {
      var i = 0
      while (used(t) < slots(t)) {
        val kind   = fillerKind(tag, t, i)
        val domain = Domain(s"$tag-fill-$t-$i", kind, Rng.mix(tag, "fd", t, i))
        val cap = kind match {
          case DomainKind.Date => math.min(rows(t), 3000L)
          case _               => math.min(rows(t), Domains.MaxPoolInterval)
        }
        val pool  = Domains.namePool(kind)
        val cname = dedupe(namesOf(t), pool(Rng.int(Rng.mix(tag, "fn", t, i), pool.length)))
        colsOf(t) += ColumnSpec(cname, domain, 0L, math.max(1L, cap))
        used(t) += 1
        i += 1
      }
    }

    val tableSpecs = (0 until nTables).map { t =>
      TableSpec(dbOf(t), tblOf(t), rows(t), colsOf(t).result())
    }.toVector

    // Queries: 54 one-answer + 6 two-answer columns -> 66/60 = 1.1 avg.
    val ans  = answers.toMap
    val one  = ans.filter(_._2.size == 1).keys.toSeq.sortBy(c => Rng.mix(tag, "q1", c.key))
    val two  = ans.filter(_._2.size == 2).keys.toSeq.sortBy(c => Rng.mix(tag, "q2", c.key))
    require(one.size >= 54 && two.size >= 6,
      s"spider: need 54 one-answer (${one.size}) and 6 two-answer (${two.size}) queries")
    val queries = (one.take(54) ++ two.take(6)).toVector

    val spec = CorpusSpec("spider", tableSpecs, queries, sameDatabaseOnly = true)
    EvalCorpus(CorpusGen.build(spark, spec), spec, ans, paper, rowScale)
  }

  // ==========================================================================
  // Sigma Sample Database (§4.3.3): no ground truth; includes the §4.3.3
  // walkthrough tables (ACCOUNT / LEAD / INDUSTRIES / PRICES).
  // ==========================================================================

  def sigma(spark: SparkSession, rowScale: Double = 1.0 / 64): EvalCorpus = {
    val tag   = "sigma-v1"
    val paper = PaperStats(98, 1343, 2243932, None, None)
    val avgRows = math.max(60L, math.round(paper.avgRows * rowScale))

    val companies = Domain(s"$tag-companies", DomainKind.Company, Rng.mix(tag, "co"))
    val tickers   = Domain(s"$tag-tickers", DomainKind.Code("TCK"), Rng.mix(tag, "tk"))
    val sectors   = Domain(s"$tag-sectors", DomainKind.City, Rng.mix(tag, "sec"))

    val acctRows = avgRows
    val poolCo   = math.max(50L, acctRows)

    def filler(tname: String, i: Int, nRows: Long, names: mutable.Set[String]): ColumnSpec = {
      val kind   = fillerKind(tag, tname, i)
      val domain = Domain(s"$tag-fill-$tname-$i", kind, Rng.mix(tag, "fd", tname, i))
      val cap = kind match {
        case DomainKind.Date => math.min(nRows, 3000L)
        case _               => math.min(nRows, Domains.MaxPoolInterval)
      }
      val pool = Domains.namePool(kind)
      ColumnSpec(dedupe(names, pool(Rng.int(Rng.mix(tag, "fn", tname, i), pool.length))),
        domain, 0L, math.max(1L, cap))
    }

    def withFillers(db: String, tname: String, nRows: Long, nCols: Int,
                    fixed: Vector[ColumnSpec]): TableSpec = {
      val names = mutable.Set[String](fixed.map(_.name.toLowerCase): _*)
      val extra = (fixed.size until nCols).map(i => filler(tname, i, nRows, names))
      TableSpec(db, tname, nRows, fixed ++ extra)
    }

    // ---- §4.3.3 walkthrough tables ----------------------------------------
    val account = withFillers("SALESFORCE", "ACCOUNT", acctRows, 12, Vector(
      ColumnSpec("Name", companies, 0L, poolCo, ValueFormat.AsIs, Some("co")),
      ColumnSpec("Billing City", Domain(s"$tag-bcity", DomainKind.City, Rng.mix(tag, "bc")),
        0L, math.max(1L, acctRows / 4)),
    ))
    val leadRows = math.max(60L, avgRows / 2)
    val lead = withFillers("SALESFORCE", "LEAD", leadRows, 11, Vector(
      ColumnSpec("Company", companies, 0L, math.max(2L, math.min(leadRows, (poolCo * 0.8).toLong)),
        ValueFormat.AsIs, Some("co")),
      ColumnSpec("Contact", Domain(s"$tag-contact", DomainKind.Person, Rng.mix(tag, "ct")),
        0L, leadRows),
      ColumnSpec("Email", Domain(s"$tag-email", DomainKind.Email, Rng.mix(tag, "em")),
        0L, leadRows),
    ))
    val indRows = math.max(60L, avgRows / 3)
    val coLo    = (poolCo * 0.1).toLong
    val coHi    = math.max(coLo + 1, math.min(coLo + indRows, (poolCo * 0.95).toLong))
    val industries = withFillers("STOCKS", "INDUSTRIES", indRows, 7, Vector(
      // Upper-cased variant: joinable with ACCOUNT.Name only *semantically* —
      // raw-value containment is zero, token-level embedding similarity high.
      ColumnSpec("Company Name", companies, coLo, coHi, ValueFormat.Upper, Some("co")),
      ColumnSpec("Industry Group", sectors, 0L, math.min(indRows, 24L)),
      ColumnSpec("Ticker", tickers, 0L, indRows, ValueFormat.AsIs, Some("tck")),
    ))
    val priceRows = avgRows * 4
    val prices = withFillers("STOCKS", "PRICES", priceRows, 7, Vector(
      ColumnSpec("Ticker", tickers, 0L, math.max(2L, (indRows * 0.9).toLong),
        ValueFormat.AsIs, Some("tck")),
      ColumnSpec("Date", Domain(s"$tag-pdate", DomainKind.Date, Rng.mix(tag, "pd")),
        0L, math.min(priceRows, 3000L)),
      ColumnSpec("Close", Domain(s"$tag-close", DomainKind.Measure, Rng.mix(tag, "cl")),
        0L, math.min(priceRows, Domains.MaxPoolInterval)),
    ))

    val showcase = Vector(account, lead, industries, prices)

    // ---- remaining 94 tables ----------------------------------------------
    val dbsLeft  = Vector("SALESFORCE" -> 10, "STOCKS" -> 13, "RETAIL" -> 25,
      "DEMOGRAPHICS" -> 20, "USAGE" -> 26)
    require(dbsLeft.map(_._2).sum + showcase.size == 98)
    val colsLeft  = paper.columns - showcase.map(_.columns.size).sum
    val nLeft     = dbsLeft.map(_._2).sum
    val baseC     = colsLeft / nLeft
    val remC      = colsLeft % nLeft
    val rowsLeft  = {
      // showcase tables already account for some rows; aim the remaining mean
      // so the corpus-wide average stays near avgRows.
      val total  = avgRows * 98L - showcase.map(_.nRows).sum
      rowCounts(tag, nLeft, math.max(60L, total / nLeft), minRows = 50L)
    }
    val nameDom = Domain(s"$tag-names", DomainKind.IntId, Rng.mix(tag, "nm"))

    var idx = 0
    val rest = dbsLeft.flatMap { case (db, n) =>
      (0 until n).map { i =>
        val t     = idx; idx += 1
        val tname = s"${nameDom.word(9000 + t * 5).toUpperCase}"
        val nCols = baseC + (if (t < remC) 1 else 0)
        val nRows = rowsLeft(t)
        // A third of the generic tables join one of 12 shared domain pools,
        // giving the ad-hoc browsing experience of §4.3.3 more texture.
        val fixed =
          if (t % 3 == 0) {
            val g    = t % 12
            val kind = clusterKind(g)
            val dom  = Domain(s"$tag-pool$g", kind, Rng.mix(tag, "pool", g))
            val pool = Domains.namePool(kind)
            val nm   = pool(Rng.int(Rng.mix(tag, "pn", t), pool.length))
            Vector(ColumnSpec(nm, dom, 0L, math.max(2L, math.min(nRows, 2000L)),
              ValueFormat.AsIs, Some(s"pool$g")))
          } else Vector.empty[ColumnSpec]
        withFillers(db, tname, nRows, nCols, fixed)
      }
    }

    val spec = CorpusSpec("sigma", showcase ++ rest, Vector.empty)
    EvalCorpus(CorpusGen.build(spark, spec), spec, GroundTruth.answers(spec), paper, rowScale)
  }
}
