package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Extreme-value detection over metric series — formalizes the paper's §III-B
  * observation that sliding windows "reveal additional cross-interval
  * information overlooked by the fixed window based measurements": a window
  * is *extreme* for a metric when it deviates from the series mean by more
  * than `z` sample standard deviations.
  */
object Anomaly {

  /** Windows whose `metric` value is more than `z` standard deviations from
    * the series mean. Returns `(window_id, value, zscore)`.
    */
  def extremes(series: DataFrame, metric: String, z: Double = 2.0): DataFrame = {
    require(z > 0, s"bad z threshold $z")
    val stats = series.agg(
      avg(col(metric).cast("double")).as("mu"),
      stddev_samp(col(metric).cast("double")).as("sigma"),
    )
    series
      .select(col("window_id"), col(metric).cast("double").as("value"))
      .crossJoin(stats)
      .where(col("sigma") > 0 && abs(col("value") - col("mu")) > col("sigma") * lit(z))
      .select(
        col("window_id"),
        col("value"),
        ((col("value") - col("mu")) / col("sigma")).as("zscore"),
      )
      .orderBy("window_id")
  }

  /** Number of extreme windows for a metric. */
  def countExtremes(series: DataFrame, metric: String, z: Double = 2.0): Long =
    extremes(series, metric, z).count()
}
