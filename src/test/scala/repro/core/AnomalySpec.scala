package repro.core

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.chain._

/** Extreme-value detection, including the paper's §III-A motivating scenario:
  * a dominance burst straddling a fixed-window boundary is visible to sliding
  * windows but invisible to fixed ones.
  */
class AnomalySpec extends SparkSpec {

  private def seriesOf(values: Seq[Double]) = {
    import spark.implicits._
    values.zipWithIndex.map { case (v, i) => (i.toLong, v) }.toDF("window_id", "gini")
  }

  test("no extremes in a constant series") {
    val s = seriesOf(Seq.fill(20)(0.5))
    assert(Anomaly.countExtremes(s, "gini", 2.0) === 0L)
  }

  test("a single spike is flagged with the right z-score sign") {
    val s  = seriesOf(Seq.fill(30)(0.5) :+ 5.0)
    val ex = Anomaly.extremes(s, "gini", 2.0).collect()
    assert(ex.length === 1)
    assert(ex.head.getLong(0) === 30L)
    assert(ex.head.getDouble(2) > 2.0)
  }

  test("a negative dip is flagged with negative z-score") {
    val s  = seriesOf(Seq.fill(30)(0.5) :+ -4.0)
    val ex = Anomaly.extremes(s, "gini", 2.0).collect()
    assert(ex.length === 1 && ex.head.getDouble(2) < -2.0)
  }

  test("threshold z controls sensitivity") {
    val s = seriesOf(Seq(1, 1, 1, 1, 1, 1, 1, 1, 1, 2.2).map(_.toDouble))
    assert(Anomaly.countExtremes(s, "gini", 1.0) >= 1L)
    assert(Anomaly.countExtremes(s, "gini", 5.0) === 0L)
    intercept[IllegalArgumentException](Anomaly.extremes(s, "gini", 0.0))
  }

  test("works on integer metric columns (nakamoto)") {
    import spark.implicits._
    val s = (Seq.fill(20)(4) :+ 40).zipWithIndex
      .map { case (v, i) => (i.toLong, v) }.toDF("window_id", "nakamoto")
    assert(Anomaly.countExtremes(s, "nakamoto", 2.0) === 1L)
  }

  test("paper §III-A scenario: cross-boundary dominance burst is caught only by sliding windows") {
    // Build a 28-day mini-chain, 48 blocks/day, 8 equal miners — except days
    // 13–16 (last 2 days of week 2 + first 2 days of week 3) where one miner
    // produces ~everything.
    import spark.implicits._
    val blocksPerDay = 48
    val rows = for {
      day <- 1 to 28
      b   <- 0 until blocksPerDay
    } yield {
      val idx = (day - 1).toLong * blocksPerDay + b
      val miner =
        if (day >= 13 && day <= 16) "attacker"
        else s"m${idx % 8}"
      (idx, idx, s"w${(day - 1) / 7 + 1}", miner, day)
    }
    val attrib = rows.toDF("block_number", "idx", "weekLabel", "miner", "day")
      .withColumn("week", ((col("day") - 1) / 7).cast("int") + 1)

    // Fixed weekly windows: the burst is split across weeks 2 and 3; each week
    // still has 5 normal days, so the attacker holds 2/7 ≈ 29% — under 51%.
    val weekly = Metrics.nakamoto(
      attrib.groupBy(col("week").cast("long").as("window_id"), col("miner"))
        .agg(count(lit(1)).as("cnt")))
    val weeklyValues = weekly.collect().map(_.getInt(1)).toSeq
    assert(!weeklyValues.contains(1), s"fixed weekly hid the burst: $weeklyValues")

    // Sliding weekly windows (N=336, M=168): one window spans days 8–14 or
    // 11–17 region aligned to the burst → attacker ≥ 51% → Nakamoto = 1.
    val total = 28L * blocksPerDay
    val sliding = Metrics.nakamoto(
      SlidingWindows.counts(attrib, n = 7L * blocksPerDay, m = 7L * blocksPerDay / 2, total))
    val slidingValues = sliding.collect().map(_.getInt(1)).toSeq
    assert(slidingValues.contains(1), s"sliding missed the burst: $slidingValues")
  }

  test("sliding windows flag the burst as a z-extreme that fixed windows miss") {
    import spark.implicits._
    val blocksPerDay = 48
    val rows = for {
      day <- 1 to 28; b <- 0 until blocksPerDay
    } yield {
      val idx = (day - 1).toLong * blocksPerDay + b
      val miner = if (day >= 13 && day <= 16) "attacker" else s"m${idx % 8}"
      (idx, idx, miner, day)
    }
    val attrib = rows.toDF("block_number", "idx", "miner", "day")
      .withColumn("week", ((col("day") - 1) / 7).cast("int") + 1)
    val total = 28L * blocksPerDay

    val fixedSeries = Pipeline.series(
      attrib.groupBy(col("week").cast("long").as("window_id"), col("miner"))
        .agg(count(lit(1)).as("cnt")))
    val slidingSeries = Pipeline.series(
      SlidingWindows.counts(attrib, 7L * blocksPerDay, 7L * blocksPerDay / 2, total))

    val minNakFixed   = fixedSeries.agg(min("nakamoto")).first().getInt(0)
    val minNakSliding = slidingSeries.agg(min("nakamoto")).first().getInt(0)
    assert(minNakSliding < minNakFixed,
      s"sliding should reach a lower Nakamoto ($minNakSliding vs $minNakFixed)")
  }
}
