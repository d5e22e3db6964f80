package repro.corpus

import repro.core.ColumnId

/** A labeled joinable pair with its exact containment (of the smaller
  * column's distinct set in the larger's) and the NextiaJD-style quality.
  */
final case class LabeledPair(a: ColumnId, b: ColumnId, containment: Double, quality: String)

/** Ground truth derived analytically from a [[CorpusSpec]].
  *
  * NextiaJD (Flores et al. 2021) labels attribute pairs by containment with
  * empirically chosen thresholds; the paper evaluates against pairs labeled
  * Good and High. We mirror that: for two columns of the same cluster (same
  * domain, same surface format, different tables), containment is interval
  * overlap divided by the smaller interval, and
  *
  *   High: containment >= 0.75    Good: 0.5 <= containment < 0.75
  *
  * Pairs below Good, format-mismatched pairs (raw values differ), and
  * cross-database pairs under per-database scoping are not answers.
  */
object GroundTruth {

  val HighThreshold = 0.75
  val GoodThreshold = 0.5

  def containment(a: ColumnSpec, b: ColumnSpec): Double = {
    val overlap = math.max(0L, math.min(a.hi, b.hi) - math.max(a.lo, b.lo))
    overlap.toDouble / math.min(a.distinct, b.distinct).toDouble
  }

  def quality(c: Double): String =
    if (c >= HighThreshold) "High"
    else if (c >= GoodThreshold) "Good"
    else if (c >= 0.25) "Medium"
    else "Low"

  /** All same-cluster, cross-table pairs with their label (both orders kept
    * once; (a, b) with a.key < b.key).
    */
  def labeledPairs(spec: CorpusSpec): Seq[LabeledPair] = {
    val clustered = spec.columnSpecs.filter(_._2.clusterId.isDefined)
    val byCluster = clustered.groupBy(_._2.clusterId.get)
    byCluster.toSeq.sortBy(_._1).flatMap { case (_, members) =>
      for {
        i <- members.indices
        j <- (i + 1) until members.size
        (idA, csA) = members(i)
        (idB, csB) = members(j)
        if !(idA.database == idB.database && idA.table == idB.table)
        if csA.format == csB.format
        if csA.domain.id == csB.domain.id
      } yield {
        val c = containment(csA, csB)
        LabeledPair(idA, idB, c, quality(c))
      }
    }
  }

  /** Query -> set of answers (Good + High pairs, symmetric, scoped). */
  def answers(spec: CorpusSpec): Map[ColumnId, Set[ColumnId]] = {
    val good = labeledPairs(spec).filter(p => p.quality == "High" || p.quality == "Good")
      .filter(p => !spec.sameDatabaseOnly || p.a.database == p.b.database)
    val m = scala.collection.mutable.Map[ColumnId, Set[ColumnId]]().withDefaultValue(Set.empty)
    good.foreach { p =>
      m(p.a) = m(p.a) + p.b
      m(p.b) = m(p.b) + p.a
    }
    m.toMap
  }
}
