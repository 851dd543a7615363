package repro.chain

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.UserDefinedFunction
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Deterministic synthetic block → producer attribution generator.
  *
  * Output schema (one row per attribution; anomalous blocks have one row per
  * one-off producer, normal blocks exactly one row):
  *
  *   - `block_number: Long` — absolute block number
  *   - `idx: Long`          — 0-based position within the year (block_number − firstBlock)
  *   - `ts_sec: Long`       — seconds since the year start (uniform spacing)
  *   - `day: Int`           — 1-based day-of-year
  *   - `week: Int`          — 1-based 7-day bucket, week = (day−1)/7 + 1 (week 53 partial)
  *   - `month: Int`         — calendar month of 2019
  *   - `miner: String`      — producer identity
  *
  * Sampling is driven by `xxhash64(block_number, seed)` rather than `rand()`
  * so rows are deterministic in (spec, seed) regardless of partitioning.
  */
object BlockGenerator {

  /** Modulus used to fold the 64-bit hash into a uniform in [0, 1). */
  private val HashMod = 1000000007L

  /** Inverse-CDF categorical sampler over a regime's miners. */
  private[chain] def pickerFor(regime: Regime): UserDefinedFunction = {
    val (cdf, names) = regime.samplingArrays
    udf { (u: Double) =>
      // Upper-bound binary search: smallest i with u < cdf(i).
      var lo = 0
      var hi = cdf.length - 1
      while (lo < hi) {
        val mid = (lo + hi) >>> 1
        if (u < cdf(mid)) hi = mid else lo = mid + 1
      }
      names(lo)
    }
  }

  /** Block-level frame (before producer attribution): one row per block with
    * block_number / idx / ts_sec / day.
    */
  private def blockFrame(spark: SparkSession, spec: ChainSpec): DataFrame = {
    val spb = spec.secondsPerBlock
    spark
      .range(spec.blockCount)
      .toDF("idx")
      .select(
        (col("idx") + lit(spec.firstBlock)).as("block_number"),
        col("idx"),
        floor(col("idx").cast(DoubleType) * lit(spb)).cast(LongType).as("ts_sec"),
      )
      .withColumn("day", (col("ts_sec") / lit(86400L)).cast(IntegerType) + lit(1))
  }

  /** One-off producer rows for the spec's anomaly blocks (the paper's
    * multi-coinbase-address blocks): `nProducers` rows per anomalous block,
    * producers named `anon_<block>_<j>`.
    */
  private def anomalyFrame(spark: SparkSession, spec: ChainSpec): DataFrame = {
    import spark.implicits._
    val rows = spec.anomalies.flatMap { a =>
      val bn  = spec.blockAtDay(a.day, a.frac)
      val idx = bn - spec.firstBlock
      val ts  = spec.tsOf(idx)
      val day = spec.dayOf(idx)
      (1 to a.nProducers).map(j => (bn, idx, ts, day, s"anon_${bn}_$j"))
    }
    rows.toDF("block_number", "idx", "ts_sec", "day", "miner")
  }

  /** Full attribution table for a chain spec. */
  def attributions(spark: SparkSession, spec: ChainSpec, seed: Long = 2019L): DataFrame = {
    val blocks = blockFrame(spark, spec)
    val u = pmod(xxhash64(col("block_number"), lit(seed)), lit(HashMod))
      .cast(DoubleType) / lit(HashMod.toDouble)

    val sampled = spec.regimes
      .map { r =>
        blocks
          .where(col("day").between(r.firstDay, r.lastDay))
          .withColumn("miner", pickerFor(r)(u))
      }
      .reduce(_ unionByName _)

    val anomalousBlockNumbers = spec.anomalies.map(a => spec.blockAtDay(a.day, a.frac)).distinct
    val normal =
      if (anomalousBlockNumbers.isEmpty) sampled
      else sampled.where(!col("block_number").isInCollection(anomalousBlockNumbers))

    val all =
      if (spec.anomalies.isEmpty) normal
      else normal.unionByName(anomalyFrame(spark, spec))

    all
      .withColumn("week", ((col("day") - 1) / lit(7)).cast(IntegerType) + lit(1))
      .withColumn("month", month(date_add(to_date(lit("2019-01-01")), col("day") - 1)))
  }

  /** Calendar month (1–12) of a 1-based day-of-year in a non-leap year —
    * Scala mirror of the DataFrame expression, used by tests.
    */
  def monthOfDay(day: Int): Int = {
    require(day >= 1 && day <= 365, s"bad day $day")
    val cum = Array(31, 59, 90, 120, 151, 181, 212, 243, 273, 304, 334, 365)
    cum.indexWhere(day <= _) + 1
  }
}
