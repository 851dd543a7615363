package repro.bench

import org.apache.spark.sql.functions._
import repro.core.Tables
import repro.util.Render

/** T4 — sliding-window averages (paper §III-B in-text numbers):
  *
  *   BTC entropy 3.810 / 4.002 / 4.091 and Gini 0.523 / 0.667 / 0.760
  *   ETH entropy 3.420 / 3.433 / 3.445 and Gini 0.837 / 0.878 / 0.916
  *   (day / week / month windows, M = N/2)
  *
  * plus the Eq. 5 result counts ("about 700 results using sliding windows
  * instead of 365 using fixed windows" for BTC daily).
  */
class T4SlidingAveragesBench extends BenchSpec {

  private lazy val btcT4 = Tables.slidingSummary(BenchData.btcSpec, btcAttrib).cache()
  private lazy val ethT4 = Tables.slidingSummary(BenchData.ethSpec, ethAttrib).cache()

  private def row(t4: org.apache.spark.sql.DataFrame, window: String) =
    t4.where(col("window") === window).first()

  private def mean(t4: org.apache.spark.sql.DataFrame, window: String, metric: String): Double = {
    val r = row(t4, window); r.getDouble(r.fieldIndex(s"mean_$metric"))
  }

  test("T4: report tables") {
    BenchData.report("T4_sliding_bitcoin", Render.table(btcT4))
    BenchData.report("T4_sliding_ethereum", Render.table(ethT4))
  }

  test("T4: result counts follow Eq. 5 (BTC 752/106/24, ETH 733/103/23)") {
    def windows(t4: org.apache.spark.sql.DataFrame, w: String): Long = {
      val r = row(t4, w); r.getLong(r.fieldIndex("windows"))
    }
    assert(windows(btcT4, "day") === 752L)   // paper: "about 700" vs 365 fixed
    assert(windows(btcT4, "week") === 106L)
    assert(windows(btcT4, "month") === 24L)
    assert(windows(ethT4, "day") === 733L)
    assert(windows(ethT4, "week") === 103L)
    assert(windows(ethT4, "month") === 23L)
  }

  test("T4: BTC sliding entropy means near 3.810/4.002/4.091") {
    assert(math.abs(mean(btcT4, "day", "entropy") - 3.810) < 0.35)
    assert(math.abs(mean(btcT4, "week", "entropy") - 4.002) < 0.35)
    assert(math.abs(mean(btcT4, "month", "entropy") - 4.091) < 0.35)
    // ordering is the sharper claim
    assert(mean(btcT4, "day", "entropy") < mean(btcT4, "week", "entropy"))
    assert(mean(btcT4, "week", "entropy") < mean(btcT4, "month", "entropy"))
  }

  test("T4: BTC sliding Gini means near 0.523/0.667/0.760") {
    assert(math.abs(mean(btcT4, "day", "gini") - 0.523) < 0.08)
    assert(math.abs(mean(btcT4, "week", "gini") - 0.667) < 0.10)
    assert(math.abs(mean(btcT4, "month", "gini") - 0.760) < 0.08)
  }

  test("T4: ETH sliding entropy means near 3.420/3.433/3.445 and nearly flat") {
    for (w <- Seq("day", "week", "month"))
      assert(math.abs(mean(ethT4, w, "entropy") - 3.43) < 0.20, w)
    val spread = Seq("day", "week", "month").map(mean(ethT4, _, "entropy"))
    assert(spread.max - spread.min < 0.10, s"ETH entropy should be flat, got $spread")
  }

  test("T4: ETH sliding Gini means near 0.837/0.878/0.916") {
    assert(math.abs(mean(ethT4, "day", "gini") - 0.837) < 0.05)
    assert(math.abs(mean(ethT4, "week", "gini") - 0.878) < 0.05)
    assert(math.abs(mean(ethT4, "month", "gini") - 0.916) < 0.05)
  }

  test("T4: BTC Nakamoto ~4-5, ETH Nakamoto ~2-3 (Figs. 13-14)") {
    assert(mean(btcT4, "day", "nakamoto") >= 4.0 && mean(btcT4, "day", "nakamoto") < 7.0)
    assert(mean(ethT4, "day", "nakamoto") >= 2.0 && mean(ethT4, "day", "nakamoto") <= 3.0)
  }

  test("T4: ETH less decentralized than BTC under sliding windows too") {
    assert(mean(ethT4, "day", "gini") > mean(btcT4, "day", "gini"))
    assert(mean(ethT4, "day", "entropy") < mean(btcT4, "day", "entropy"))
    assert(mean(ethT4, "day", "nakamoto") < mean(btcT4, "day", "nakamoto"))
  }
}
