package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Per-table/per-column sampling (§3.1.3).
  *
  * Reading full tables out of a CDW is the dominant cost the paper attacks;
  * WarpGate instead profiles a small per-column sample (10/100/1000 rows).
  * Two strategies are provided:
  *
  *  - [[firstN]]: `LIMIT n` — what a `SELECT ... LIMIT n` pushed down to the
  *    warehouse returns; cheapest, order-dependent.
  *  - [[uniformN]]: Bernoulli pre-sample sized to over-select ~4x, then
  *    `LIMIT n` — order-independent, still a single cheap scan.
  */
object Sampling {

  def firstN(df: DataFrame, n: Int): DataFrame = df.limit(n)

  def uniformN(df: DataFrame, n: Int, totalRows: Long, seed: Long = 11): DataFrame = {
    if (totalRows <= n) df
    else {
      // Bernoulli pre-sample ~4x the target, then a random-order truncation of
      // the (small) pre-sample — a plain `limit` after `sample` would be
      // biased toward the first partitions.
      val fraction = math.min(1.0, (n.toDouble * 4) / totalRows.toDouble)
      df.sample(withReplacement = false, fraction, seed)
        .orderBy(rand(seed + 1))
        .limit(n)
    }
  }

  /** Sample n values per (database, table, column) group of a melted values
    * DataFrame — used when the corpus is already in long format. Window-based:
    * deterministic in `seed`.
    */
  def perColumn(values: DataFrame, n: Int, seed: Long = 13): DataFrame = {
    import org.apache.spark.sql.expressions.Window
    val w = Window.partitionBy("database", "table", "column").orderBy(col("__r"))
    values
      .withColumn("__r", rand(seed))
      .withColumn("__rank", row_number().over(w))
      .filter(col("__rank") <= n)
      .drop("__r", "__rank")
  }
}
