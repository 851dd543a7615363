package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.chain.ChainSpec

/** End-to-end measurement pipeline: attribution table → per-window metric
  * series → summary statistics. This is the dataflow behind every figure in
  * the paper's evaluation.
  */
object Pipeline {

  /** Metric series from a window-counts frame:
    * `(window_id, producers, attributions, gini, entropy, nakamoto)`,
    * ordered by `window_id`.
    */
  def series(counts: DataFrame): DataFrame =
    Metrics.all(counts).orderBy("window_id")

  /** Fixed-window series for one granularity. */
  def fixed(attrib: DataFrame, g: FixedWindows.Granularity): DataFrame =
    series(FixedWindows.counts(attrib, g))

  /** Sliding-window series for window size `n`; the paper's step `M = N/2`
    * is the default.
    */
  def sliding(attrib: DataFrame, spec: ChainSpec, n: Long, m: Long = 0L): DataFrame = {
    val step = if (m > 0) m else math.max(1L, n / 2)
    series(SlidingWindows.counts(attrib, n, step, spec.blockCount))
  }

  /** Summary statistics of a metric series: one row per metric with
    * `(metric, mean, stddev, min, max, windows)`.
    */
  def summary(s: DataFrame): DataFrame =
    Seq("gini", "entropy", "nakamoto")
      .map { mcol =>
        s.agg(
          avg(col(mcol)).as("mean"),
          stddev_samp(col(mcol).cast("double")).as("stddev"),
          min(col(mcol).cast("double")).as("min"),
          max(col(mcol).cast("double")).as("max"),
          count(lit(1)).as("windows"),
        ).select(lit(mcol).as("metric"), col("mean"), col("stddev"), col("min"), col("max"), col("windows"))
      }
      .reduce(_ unionByName _)
}
