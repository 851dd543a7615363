package repro.bench

import org.apache.spark.sql.functions._
import repro.core.Tables
import repro.util.Render

/** T7 — the paper's headline conclusion (§II-C-3, §V): across all metrics
  * and granularities, Bitcoin is more decentralized while Ethereum is more
  * stable.
  */
class T7ComparisonBench extends BenchSpec {

  private lazy val t7 = Tables.comparison(btcAttrib, ethAttrib).cache()

  test("T7: report table") {
    BenchData.report("T7_comparison", Render.table(t7))
    assert(t7.count() === 9L)
  }

  test("T7: Bitcoin is more decentralized on every metric and granularity") {
    for (r <- t7.collect())
      assert(r.getString(r.fieldIndex("more_decentralized")) === "bitcoin",
        s"${r.getString(0)}/${r.getString(1)}")
  }

  test("T7: Ethereum is more stable on every metric at daily granularity") {
    for (r <- t7.where(col("granularity") === "day").collect())
      assert(r.getString(r.fieldIndex("more_stable")) === "ethereum",
        s"${r.getString(0)}/${r.getString(1)}")
  }

  test("T7: gini means — ETH clearly above BTC (0.84 vs 0.52 daily in the paper)") {
    val r = t7.where(col("granularity") === "day" && col("metric") === "gini").first()
    val (b, e) = (r.getDouble(2), r.getDouble(3))
    assert(e - b > 0.15, s"eth $e vs btc $b")
  }

  test("T7: nakamoto means — BTC ≈ 4-5 vs ETH ≈ 2-3") {
    val r = t7.where(col("granularity") === "day" && col("metric") === "nakamoto").first()
    val (b, e) = (r.getDouble(2), r.getDouble(3))
    assert(b > 4.0 && b < 8.0, s"btc $b")
    assert(e >= 2.0 && e <= 3.0, s"eth $e")
  }
}
