package repro.analysis

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Seed-set distribution diagnostics (paper §5.1).
  *
  * The diversity of the empirical seed-set distribution is its Shannon
  * entropy H = −Σ_S p_S log₂ p_S; from T trials H ≤ log₂ T, and H = 0 means
  * the distribution is degenerate (a unique solution).
  */
object SeedSetStats {

  /** One-row DataFrame (entropy) over a trials DataFrame with a `seed_key`
    * column — pure Spark SQL so it can be Oracle-checked against DuckDB.
    */
  def entropyDf(trials: DataFrame): DataFrame = {
    val t = trials.count().toDouble
    trials.groupBy("seed_key").agg(count("*") as "cnt")
      .agg(coalesce(-sum((col("cnt") / t) * log(2.0, col("cnt") / t)), lit(0.0)) as "entropy")
  }

  /** Shannon entropy in bits of the seed-set distribution. */
  def entropyBits(trials: DataFrame): Double = entropyDf(trials).head().getDouble(0)

  /** Local entropy over raw keys — the same statistic without a Spark
    * round-trip, for drivers that already collected trial rows.
    */
  def entropyOfKeys(keys: Seq[String]): Double = {
    if (keys.isEmpty) return 0.0
    val t = keys.size.toDouble
    keys.groupBy(identity).values
      .map(_.size / t)
      .map(p => -p * math.log(p) / math.log(2.0))
      .sum
  }

  /** Modal seed-set key and its empirical probability. */
  def mode(keys: Seq[String]): (String, Double) = {
    require(keys.nonEmpty)
    val (k, c) = keys.groupBy(identity).view.mapValues(_.size).maxBy(_._2)
    (k, c.toDouble / keys.size)
  }
}
