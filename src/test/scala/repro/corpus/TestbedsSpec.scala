package repro.corpus

import repro.SparkSpec

class TestbedsSpec extends SparkSpec {

  // Small row scales: structure (tables/columns/queries/answers) is
  // scale-invariant; only rows shrink.
  private lazy val xs     = Testbeds.nextiaJd(spark, "XS", 0.05)
  private lazy val spider = Testbeds.spider(spark, 0.02)

  test("XS matches Table 1 table count") {
    assert(xs.spec.tables.size == 28)
  }

  test("XS matches Table 1 column count") {
    assert(xs.spec.tables.map(_.columns.size).sum == 257)
  }

  test("XS matches Table 1 query count") {
    assert(xs.queries.size == 35)
  }

  test("XS average answers is close to the paper's 2.8") {
    val avg = xs.queries.map(q => xs.answers(q).size).sum.toDouble / xs.queries.size
    assert(avg > 2.2 && avg < 3.4, s"avg=$avg")
  }

  test("XS every query has at least one answer") {
    xs.queries.foreach(q => assert(xs.answers.getOrElse(q, Set.empty).nonEmpty, q.key))
  }

  test("XS answers never point at the query's own table") {
    xs.answers.foreach { case (q, s) =>
      s.foreach(c => assert(!(c.database == q.database && c.table == q.table)))
    }
  }

  test("XS cluster members live in distinct tables and span databases") {
    val byCluster = xs.spec.columnSpecs.filter(_._2.clusterId.isDefined)
      .groupBy(_._2.clusterId.get)
    byCluster.values.foreach { members =>
      val tables = members.map(m => (m._1.database, m._1.table))
      assert(tables.distinct.size == tables.size)
    }
    assert(byCluster.values.exists(ms => ms.map(_._1.database).distinct.size > 1),
      "no cross-database cluster")
  }

  test("XS table names are unique and dot-free") {
    val names = xs.spec.tables.map(t => (t.database, t.table))
    assert(names.distinct.size == names.size)
    xs.spec.tables.foreach { t =>
      assert(!t.database.contains(".") && !t.table.contains("."))
      t.columns.foreach(c => assert(!c.name.contains(".")))
    }
  }

  test("all NextiaJD params match Table 1 exactly") {
    val expect = Map(
      "XS" -> (28, 257, 1938.0, 35, 2.8),
      "S"  -> (46, 2553, 209646.0, 177, 3.6),
      "M"  -> (46, 1067, 3175904.0, 188, 4.4),
      "L"  -> (19, 541, 12288165.0, 92, 3.6),
    )
    expect.foreach { case (k, (t, c, r, q, a)) =>
      val p = Testbeds.nextiaParams(k)
      assert(p.nTables == t && p.nColumns == c && p.paperAvgRows == r && p.nQueries == q)
      assert(p.paper.avgAnswers.contains(a))
    }
  }

  test("cluster-size mixes produce the paper's average answers") {
    // sum s*(s-1) / sum s per testbed must approximate Table 1's numbers.
    def mixAvg(sizes: Seq[Int]): Double =
      sizes.map(s => s * (s - 1)).sum.toDouble / sizes.map(_.toLong).sum

    assert(math.abs(mixAvg(Testbeds.XS.clusterSizes) - 2.8) < 0.1)
    assert(math.abs(mixAvg(Testbeds.S.clusterSizes) - 3.6) < 0.1)
    assert(math.abs(mixAvg(Testbeds.M.clusterSizes) - 4.4) < 0.1)
    assert(math.abs(mixAvg(Testbeds.L.clusterSizes) - 3.6) < 0.1)
  }

  test("unknown testbed is rejected") {
    intercept[IllegalArgumentException](Testbeds.nextiaParams("XXL"))
  }

  test("testbed generation is deterministic") {
    val again = Testbeds.nextiaJd(spark, "XS", 0.05)
    assert(again.spec == xs.spec)
    assert(again.answers == xs.answers)
  }

  // ---- Spider -------------------------------------------------------------

  test("Spider matches Table 1 counts") {
    assert(spider.spec.tables.size == 70)
    assert(spider.spec.tables.map(_.columns.size).sum == 429)
    assert(spider.queries.size == 60)
  }

  test("Spider average answers is 1.1") {
    val avg = spider.queries.map(q => spider.answers(q).size).sum.toDouble / spider.queries.size
    assert(math.abs(avg - 1.1) < 1e-9, s"avg=$avg")
  }

  test("Spider is scoped per database") {
    assert(spider.sameDatabaseOnly)
    spider.answers.foreach { case (q, s) =>
      s.foreach(c => assert(c.database == q.database))
    }
  }

  test("Spider answers link PK and FK of the same cluster, never FK-FK pairs of one parent") {
    val specs = spider.spec.columnSpecs.toMap
    spider.answers.foreach { case (q, s) =>
      s.foreach { c =>
        assert(specs(q).clusterId == specs(c).clusterId)
        // one side must be the full-coverage PK (interval == parent rows)
        val qs = specs(q); val cs = specs(c)
        val qFull = qs.lo == 0 && spider.spec.tables
          .find(t => t.database == q.database && t.table == q.table).get.nRows == qs.hi
        val cFull = cs.lo == 0 && spider.spec.tables
          .find(t => t.database == c.database && t.table == c.table).get.nRows == cs.hi
        assert(qFull || cFull, s"FK-FK pair leaked: $q <-> $c")
      }
    }
  }

  test("Spider FKs are fully contained in their PKs") {
    val specs = spider.spec.columnSpecs.toMap
    spider.answers.foreach { case (q, s) =>
      s.foreach(c => assert(GroundTruth.containment(specs(q), specs(c)) >= 1.0 - 1e-12))
    }
  }

  test("Spider PK/FK pairs share syntactically similar names") {
    // the D3L name-evidence hook: at least 80% of answer pairs share a name
    // qgram overlap above 0.3
    val pairs = spider.answers.toSeq.flatMap { case (q, s) => s.map(q -> _) }
    val similar = pairs.count { case (a, b) =>
      val qa = repro.core.Tokenizer.qgrams(a.column)
      val qb = repro.core.Tokenizer.qgrams(b.column)
      qa.intersect(qb).size.toDouble / qa.union(qb).size > 0.3
    }
    assert(similar.toDouble / pairs.size > 0.6, s"$similar/${pairs.size}")
  }

  test("Spider generation is deterministic") {
    val again = Testbeds.spider(spark, 0.02)
    assert(again.spec == spider.spec)
  }

  // ---- Sigma --------------------------------------------------------------

  test("Sigma matches Table 1 counts") {
    val sig = Testbeds.sigma(spark, 1.0 / 1024)
    assert(sig.spec.tables.size == 98)
    assert(sig.spec.tables.map(_.columns.size).sum == 1343)
    assert(sig.queries.isEmpty) // "TBD" in the paper
  }

  test("Sigma contains the §4.3.3 walkthrough tables") {
    val sig   = Testbeds.sigma(spark, 1.0 / 1024)
    val names = sig.spec.tables.map(t => s"${t.database}.${t.table}").toSet
    assert(names.contains("SALESFORCE.ACCOUNT"))
    assert(names.contains("SALESFORCE.LEAD"))
    assert(names.contains("STOCKS.INDUSTRIES"))
    assert(names.contains("STOCKS.PRICES"))
  }

  test("Sigma INDUSTRIES company column is an uppercase format variant") {
    val sig = Testbeds.sigma(spark, 1.0 / 1024)
    val ind = sig.spec.tables.find(_.table == "INDUSTRIES").get
    val cc  = ind.columns.find(_.name == "Company Name").get
    assert(cc.format == ValueFormat.Upper)
    val acct = sig.spec.tables.find(_.table == "ACCOUNT").get
    assert(acct.columns.find(_.name == "Name").get.domain.id == cc.domain.id)
  }

  test("Sigma ticker columns chain INDUSTRIES to PRICES") {
    val sig = Testbeds.sigma(spark, 1.0 / 1024)
    val ind = sig.spec.tables.find(_.table == "INDUSTRIES").get
    val pr  = sig.spec.tables.find(_.table == "PRICES").get
    assert(ind.columns.exists(c => c.name == "Ticker" && c.clusterId.contains("tck")))
    assert(pr.columns.exists(c => c.name == "Ticker" && c.clusterId.contains("tck")))
  }
}
