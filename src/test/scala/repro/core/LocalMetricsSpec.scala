package repro.core

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.PropertyCheck

/** Hand-computed and property-based checks of the pure-Scala reference
  * metrics that every Spark result is later compared against.
  */
class LocalMetricsSpec extends AnyFunSuite with PropertyCheck {

  private val eps = 1e-12

  // ------------------------------------------------------------------ Gini

  test("gini of a single producer is 0") {
    assert(LocalMetrics.gini(Seq(7L)) === 0.0)
  }

  test("gini of an even distribution is 0") {
    assert(math.abs(LocalMetrics.gini(Seq(5L, 5L, 5L, 5L))) < eps)
  }

  test("gini of [1,3] is 0.25") {
    // Σ|diffs| over ordered pairs = 2·|3−1| = 4; 2·n·Σx = 2·2·4 = 16 → 0.25
    assert(math.abs(LocalMetrics.gini(Seq(1L, 3L)) - 0.25) < eps)
  }

  test("gini of [1,1,1,1,96] matches direct pairwise formula") {
    val xs = Seq(1L, 1L, 1L, 1L, 96L)
    val direct = (for (a <- xs; b <- xs) yield math.abs(a - b)).sum.toDouble /
      (2.0 * xs.size * xs.sum)
    assert(math.abs(LocalMetrics.gini(xs) - direct) < eps)
  }

  test("gini of [10,20,30,40] is 0.25") {
    // classic textbook example
    assert(math.abs(LocalMetrics.gini(Seq(10L, 20L, 30L, 40L)) - 0.25) < eps)
  }

  test("gini is permutation invariant") {
    val xs = Seq(3L, 1L, 7L, 7L, 2L)
    assert(LocalMetrics.gini(xs) === LocalMetrics.gini(xs.reverse))
    assert(LocalMetrics.gini(xs) === LocalMetrics.gini(xs.sorted))
  }

  test("gini is scale invariant") {
    val xs = Seq(2L, 5L, 9L, 1L)
    assert(math.abs(LocalMetrics.gini(xs) - LocalMetrics.gini(xs.map(_ * 17L))) < eps)
  }

  test("gini rejects empty and non-positive input") {
    intercept[IllegalArgumentException](LocalMetrics.gini(Seq.empty))
    intercept[IllegalArgumentException](LocalMetrics.gini(Seq(1L, 0L)))
  }

  test("gini property: result in [0, (n-1)/n] and equals pairwise formula") {
    val gen = Gen.nonEmptyListOf(Gen.chooseNum(1L, 500L)).map(_.take(30))
    checkProp(Prop.forAll(gen) { xs =>
      val g = LocalMetrics.gini(xs)
      val direct = (for (a <- xs; b <- xs) yield math.abs(a - b)).sum.toDouble /
        (2.0 * xs.size * xs.sum)
      g >= -eps && g <= (xs.size - 1).toDouble / xs.size + eps && math.abs(g - direct) < 1e-9
    })
  }

  test("gini increases when one producer absorbs another's blocks") {
    val even = Seq(10L, 10L, 10L, 10L)
    val skew = Seq(19L, 1L, 10L, 10L)
    assert(LocalMetrics.gini(skew) > LocalMetrics.gini(even))
  }

  test("a flood of 1-block producers lowers gini (the paper's day-14 effect)") {
    val pools       = Seq(24L, 17L, 17L, 15L, 13L, 11L, 10L, 6L, 5L, 4L)
    val typicalDay  = pools ++ Seq.fill(25)(1L)  // a few small miners → unequal
    val floodedDay  = pools ++ Seq.fill(180)(1L) // day-14 flood of one-offs
    // most pairs become (1,1) with zero difference → population gini drops
    assert(LocalMetrics.gini(floodedDay) < LocalMetrics.gini(typicalDay))
    assert(LocalMetrics.gini(floodedDay) < 0.45)
  }

  // --------------------------------------------------------------- Entropy

  test("entropy of a single producer is exactly +0.0") {
    val e = LocalMetrics.entropy(Seq(42L))
    assert(e === 0.0)
    assert(1.0 / e === Double.PositiveInfinity, "must be +0.0, not -0.0")
  }

  test("entropy of an even n-way split is log2(n)") {
    for (n <- Seq(2, 4, 8, 16, 100)) {
      val e = LocalMetrics.entropy(Seq.fill(n)(3L))
      assert(math.abs(e - math.log(n) / math.log(2)) < 1e-9, s"n=$n")
    }
  }

  test("entropy of [1,1,2] is 1.5") {
    assert(math.abs(LocalMetrics.entropy(Seq(1L, 1L, 2L)) - 1.5) < eps)
  }

  test("entropy of [1,3] is 0.811278...") {
    val expected = 0.25 * 2.0 + 0.75 * (math.log(4.0 / 3.0) / math.log(2.0))
    assert(math.abs(LocalMetrics.entropy(Seq(1L, 3L)) - expected) < eps)
  }

  test("entropy is permutation and scale invariant") {
    val xs = Seq(3L, 9L, 1L, 7L)
    assert(math.abs(LocalMetrics.entropy(xs) - LocalMetrics.entropy(xs.reverse)) < eps)
    assert(math.abs(LocalMetrics.entropy(xs) - LocalMetrics.entropy(xs.map(_ * 5L))) < 1e-9)
  }

  test("entropy rejects empty and non-positive input") {
    intercept[IllegalArgumentException](LocalMetrics.entropy(Seq.empty))
    intercept[IllegalArgumentException](LocalMetrics.entropy(Seq(-1L)))
  }

  test("entropy property: 0 <= E <= log2(n), maximal iff even") {
    val gen = Gen.nonEmptyListOf(Gen.chooseNum(1L, 500L)).map(_.take(30))
    checkProp(Prop.forAll(gen) { xs =>
      val e = LocalMetrics.entropy(xs)
      e >= -eps && e <= math.log(xs.size) / math.log(2) + 1e-9
    })
  }

  test("merging two producers decreases entropy") {
    val xs     = Seq(5L, 7L, 11L, 13L)
    val merged = Seq(5L + 7L, 11L, 13L)
    assert(LocalMetrics.entropy(merged) < LocalMetrics.entropy(xs))
  }

  // -------------------------------------------------------------- Nakamoto

  test("nakamoto of a single producer is 1") {
    assert(LocalMetrics.nakamoto(Seq(99L)) === 1)
  }

  test("nakamoto when one producer holds a majority is 1") {
    assert(LocalMetrics.nakamoto(Seq(60L, 20L, 20L)) === 1)
  }

  test("nakamoto of an even 100-way split is 51") {
    assert(LocalMetrics.nakamoto(Seq.fill(100)(10L)) === 51)
  }

  test("nakamoto of an even 2-way split is 2") {
    // 1/2 = 50% < 51% → needs both
    assert(LocalMetrics.nakamoto(Seq(10L, 10L)) === 2)
  }

  test("nakamoto of the BTC main-regime pool mix is 4") {
    // top-4 = 17+13+12+11 = 53 ≥ 51
    val xs = Seq(17L, 13L, 12L, 11L, 9L, 8L, 6L, 5L, 4L, 3L, 12L /* rest split */ )
    assert(LocalMetrics.nakamoto(Seq(17L, 13L, 12L, 11L, 9L, 8L, 6L, 5L, 4L, 3L, 6L, 6L)) === 4)
    assert(xs.sorted.reverse.take(4).sum * 100L >= xs.sum * 51L)
  }

  test("nakamoto threshold boundary: exactly 51% counts") {
    assert(LocalMetrics.nakamoto(Seq(51L, 49L)) === 1)
    assert(LocalMetrics.nakamoto(Seq(50L, 50L)) === 2)
  }

  test("nakamoto honors a custom threshold") {
    assert(LocalMetrics.nakamoto(Seq(40L, 30L, 30L), thresholdPct = 33) === 1)
    assert(LocalMetrics.nakamoto(Seq(40L, 30L, 30L), thresholdPct = 70) === 2)
    assert(LocalMetrics.nakamoto(Seq(40L, 30L, 30L), thresholdPct = 100) === 3)
  }

  test("nakamoto rejects bad input") {
    intercept[IllegalArgumentException](LocalMetrics.nakamoto(Seq.empty))
    intercept[IllegalArgumentException](LocalMetrics.nakamoto(Seq(1L), thresholdPct = 0))
    intercept[IllegalArgumentException](LocalMetrics.nakamoto(Seq(1L), thresholdPct = 101))
  }

  test("nakamoto property: 1 <= N <= n and prefix sums behave") {
    val gen = Gen.nonEmptyListOf(Gen.chooseNum(1L, 500L)).map(_.take(30))
    checkProp(Prop.forAll(gen) { xs =>
      val k    = LocalMetrics.nakamoto(xs)
      val desc = xs.sorted(Ordering[Long].reverse)
      val tot  = xs.sum
      k >= 1 && k <= xs.size &&
        desc.take(k).sum * 100L >= tot * 51L &&
        (k == 1 || desc.take(k - 1).sum * 100L < tot * 51L)
    })
  }

  test("adding dust producers never decreases nakamoto") {
    val xs = Seq(40L, 30L, 20L, 10L)
    val withDust = xs ++ Seq.fill(50)(1L)
    assert(LocalMetrics.nakamoto(withDust) >= LocalMetrics.nakamoto(xs))
  }
}
