package repro.eval

import repro.core.ColumnId

/** Top-k precision/recall as §4.2 defines them: at each k, precision and
  * recall are computed per query and averaged over all queries.
  *
  *   precision@k = |top-k ∩ answers| / k
  *   recall@k    = |top-k ∩ answers| / |answers|
  */
object Metrics {

  final case class PrAtK(k: Int, precision: Double, recall: Double)

  def precisionAtK(ranked: Seq[ColumnId], answers: Set[ColumnId], k: Int): Double = {
    require(k > 0)
    ranked.take(k).count(answers.contains).toDouble / k
  }

  def recallAtK(ranked: Seq[ColumnId], answers: Set[ColumnId], k: Int): Double = {
    if (answers.isEmpty) 0.0
    else ranked.take(k).count(answers.contains).toDouble / answers.size
  }

  /** Average P/R over queries at each k. Queries with no ground-truth
    * answers are excluded (evaluation sets are constructed so there are
    * none, but the harness stays safe).
    */
  def evaluate(
      results: Map[ColumnId, Seq[ColumnId]],
      answers: Map[ColumnId, Set[ColumnId]],
      queries: Seq[ColumnId],
      ks: Seq[Int],
  ): Seq[PrAtK] = {
    val eligible = queries.filter(q => answers.getOrElse(q, Set.empty).nonEmpty)
    require(eligible.nonEmpty, "no queries with ground-truth answers")
    ks.map { k =>
      var p = 0.0; var r = 0.0
      eligible.foreach { q =>
        val ranked = results.getOrElse(q, Seq.empty)
        val ans    = answers(q)
        p += precisionAtK(ranked, ans, k)
        r += recallAtK(ranked, ans, k)
      }
      PrAtK(k, p / eligible.size, r / eligible.size)
    }
  }
}
