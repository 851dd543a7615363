package repro.core

/** Pure-Scala reference implementations of the paper's three decentralization
  * metrics over a window's per-producer block counts. These mirror
  * [[Metrics]] (the Spark implementations) and serve as an independent test
  * oracle alongside DuckDB.
  */
object LocalMetrics {

  private def log2(x: Double): Double = math.log(x) / math.log(2.0)

  /** Gini coefficient (paper Eq. 1):
    * `G = Σᵢⱼ |xᵢ − xⱼ| / (2·n·Σx)`, computed via the rank formula
    * `G = (2·Σᵢ i·x₍ᵢ₎ − (n+1)·Σx) / (n·Σx)` with x sorted ascending.
    * 0 for a perfectly even distribution, → 1 as one producer dominates.
    */
  def gini(counts: Seq[Long]): Double = {
    require(counts.nonEmpty, "gini of empty window")
    require(counts.forall(_ > 0), "block counts must be positive")
    val xs  = counts.sorted
    val n   = xs.size.toLong
    val tot = xs.sum
    val s1  = xs.iterator.zipWithIndex.map { case (x, i) => (i + 1L) * x }.sum
    (2L * s1 - (n + 1L) * tot).toDouble / (n * tot).toDouble
  }

  /** Shannon entropy in bits (paper Eq. 2–3): `E = Σ pᵢ·log₂(1/pᵢ)`.
    * 0 for a single producer, log₂(n) for a perfectly even split.
    */
  def entropy(counts: Seq[Long]): Double = {
    require(counts.nonEmpty, "entropy of empty window")
    require(counts.forall(_ > 0), "block counts must be positive")
    val tot = counts.sum.toDouble
    counts.iterator.map { x => val p = x / tot; p * log2(1.0 / p) }.sum
  }

  /** Nakamoto coefficient (paper Eq. 4): the minimum number of producers
    * whose combined share reaches the threshold (51%). The threshold test is
    * integer-exact: `cum·100 ≥ tot·pct`.
    */
  def nakamoto(counts: Seq[Long], thresholdPct: Int = 51): Int = {
    require(counts.nonEmpty, "nakamoto of empty window")
    require(counts.forall(_ > 0), "block counts must be positive")
    require(thresholdPct >= 1 && thresholdPct <= 100, s"bad threshold $thresholdPct")
    val tot = counts.sum
    val desc = counts.sorted(Ordering[Long].reverse)
    var cum = 0L
    var k   = 0
    while (cum * 100L < tot * thresholdPct) { cum += desc(k); k += 1 }
    k
  }
}
