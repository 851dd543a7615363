package repro.core

import org.apache.spark.sql.DataFrame
import org.scalacheck.{Gen, Prop}
import repro.{PropertyCheck, SparkSpec}

/** Spark metric aggregations vs the local reference implementation, on
  * hand-built window-count frames.
  */
class MetricsSpec extends SparkSpec with PropertyCheck {

  private def countsDf(windows: Map[Long, Seq[Long]]): DataFrame = {
    import spark.implicits._
    windows.toSeq
      .flatMap { case (w, xs) => xs.zipWithIndex.map { case (x, i) => (w, f"m$i%03d", x) } }
      .toDF("window_id", "miner", "cnt")
  }

  private def collectMetric(df: DataFrame, col: String): Map[Long, Double] =
    df.collect().map(r => r.getLong(r.fieldIndex("window_id")) ->
      (r.get(r.fieldIndex(col)) match {
        case d: Double => d
        case i: Int    => i.toDouble
        case l: Long   => l.toDouble
        case x         => fail(s"unexpected type $x")
      })).toMap

  private val sample = Map(
    1L -> Seq(5L, 5L, 5L, 5L),
    2L -> Seq(1L, 3L),
    3L -> Seq(60L, 20L, 20L),
    4L -> Seq(1L, 1L, 2L, 7L, 19L),
    5L -> Seq(42L),
  )

  test("gini matches local reference on hand-built windows") {
    val got = collectMetric(Metrics.gini(countsDf(sample)), "gini")
    for ((w, xs) <- sample)
      assert(math.abs(got(w) - LocalMetrics.gini(xs)) < 1e-12, s"window $w")
  }

  test("entropy matches local reference on hand-built windows") {
    val got = collectMetric(Metrics.entropy(countsDf(sample)), "entropy")
    for ((w, xs) <- sample)
      assert(math.abs(got(w) - LocalMetrics.entropy(xs)) < 1e-9, s"window $w")
  }

  test("nakamoto matches local reference on hand-built windows") {
    val got = collectMetric(Metrics.nakamoto(countsDf(sample)), "nakamoto")
    for ((w, xs) <- sample)
      assert(got(w).toInt === LocalMetrics.nakamoto(xs), s"window $w")
  }

  test("gini of even split is 0 and of [1,3] is 0.25 (spot values)") {
    val got = collectMetric(Metrics.gini(countsDf(sample)), "gini")
    assert(math.abs(got(1L)) < 1e-12)
    assert(math.abs(got(2L) - 0.25) < 1e-12)
    assert(got(5L) === 0.0)
  }

  test("entropy of a single-producer window is +0.0 (not -0.0)") {
    val got = collectMetric(Metrics.entropy(countsDf(sample)), "entropy")
    assert(got(5L) === 0.0)
    assert(1.0 / got(5L) === Double.PositiveInfinity)
  }

  test("nakamoto spot values: majority=1, even-2=2") {
    val got = collectMetric(Metrics.nakamoto(countsDf(sample)), "nakamoto")
    assert(got(3L) === 1.0)
    assert(got(5L) === 1.0)
  }

  test("nakamoto honors custom threshold column-wide") {
    val got = collectMetric(Metrics.nakamoto(countsDf(sample), thresholdPct = 90), "nakamoto")
    for ((w, xs) <- sample)
      assert(got(w).toInt === LocalMetrics.nakamoto(xs, thresholdPct = 90), s"window $w")
  }

  test("metrics are independent across windows (adding a window changes nothing)") {
    val base  = Map(1L -> Seq(3L, 9L, 1L))
    val extra = base + (2L -> Seq(100L, 1L))
    val g1 = collectMetric(Metrics.gini(countsDf(base)), "gini")(1L)
    val g2 = collectMetric(Metrics.gini(countsDf(extra)), "gini")(1L)
    assert(g1 === g2)
  }

  test("all() returns every metric plus population stats, one row per window") {
    val all = Metrics.all(countsDf(sample))
    assert(all.count() === sample.size)
    assert(all.columns.toSet ===
      Set("window_id", "producers", "attributions", "gini", "entropy", "nakamoto"))
    val r = all.where(all("window_id") === 4L).collect().head
    assert(r.getLong(r.fieldIndex("producers")) === 5L)
    assert(r.getLong(r.fieldIndex("attributions")) === 30L)
  }

  test("property: spark metrics equal local metrics on random windows") {
    val gen = Gen.nonEmptyListOf(Gen.chooseNum(1L, 200L)).map(_.take(20))
    checkProp(Prop.forAll(gen) { xs =>
      val df = countsDf(Map(0L -> xs))
      val g  = collectMetric(Metrics.gini(df), "gini")(0L)
      val e  = collectMetric(Metrics.entropy(df), "entropy")(0L)
      val n  = collectMetric(Metrics.nakamoto(df), "nakamoto")(0L)
      math.abs(g - LocalMetrics.gini(xs)) < 1e-12 &&
        math.abs(e - LocalMetrics.entropy(xs)) < 1e-9 &&
        n.toInt == LocalMetrics.nakamoto(xs)
    }, minSuccessful = 20)
  }
}
