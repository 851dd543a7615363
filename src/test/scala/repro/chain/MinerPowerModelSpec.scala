package repro.chain

import org.scalatest.funsuite.AnyFunSuite
import repro.core.LocalMetrics

/** The calibrated 2019 populations must encode the paper's structural facts:
  * underlying Nakamoto coefficients, regime ordering, tail shapes.
  */
class MinerPowerModelSpec extends AnyFunSuite {

  private def sharesOf(ms: Vector[Miner]): Vector[Double] = {
    val t = ms.map(_.weight).sum
    ms.map(_.weight / t)
  }

  /** Nakamoto of an exact share vector (k shares summing past 0.51). */
  private def nakamotoOfShares(shares: Vector[Double]): Int = {
    val desc = shares.sorted(Ordering[Double].reverse)
    val cum  = desc.scanLeft(0.0)(_ + _).tail
    cum.indexWhere(_ >= 0.51 - 1e-12) + 1
  }

  private def entropyOfShares(shares: Vector[Double]): Double =
    shares.map(p => p * math.log(1.0 / p) / math.log(2.0)).sum

  test("group builders produce the requested mass and count") {
    val u = MinerPowerModel.uniformGroup("x", 10, 0.5)
    assert(u.size === 10)
    assert(math.abs(u.map(_.weight).sum - 0.5) < 1e-12)
    assert(u.map(_.weight).distinct.size === 1)

    val z = MinerPowerModel.zipfGroup("z", 20, 0.3, alpha = 1.0)
    assert(z.size === 20)
    assert(math.abs(z.map(_.weight).sum - 0.3) < 1e-12)
    // Zipf weights strictly decreasing for alpha > 0
    assert(z.map(_.weight).sliding(2).forall { case Seq(a, b) => a > b })
  }

  test("zipfGroup with alpha=0 is uniform") {
    val z = MinerPowerModel.zipfGroup("z", 5, 1.0, alpha = 0.0)
    assert(z.map(_.weight).distinct.size === 1)
  }

  test("group names are unique and prefixed") {
    val all = MinerPowerModel.btcMain
    assert(all.map(_.name).distinct.size === all.size)
    assert(all.count(_.name.startsWith("btc_solo")) === 20)
    assert(all.count(_.name.startsWith("btc_dust")) === 30)
  }

  test("BTC main-regime underlying Nakamoto coefficient is 4 (top-4 = 0.53)") {
    assert(nakamotoOfShares(sharesOf(MinerPowerModel.btcMain)) === 4)
  }

  test("BTC early-regime underlying Nakamoto coefficient is 5 (fragmented)") {
    assert(nakamotoOfShares(sharesOf(MinerPowerModel.btcEarly)) === 5)
  }

  test("ETH H1 underlying Nakamoto is 2, H2 is 3 (the paper's 2–3 range)") {
    assert(nakamotoOfShares(sharesOf(MinerPowerModel.ethH1)) === 2)
    assert(nakamotoOfShares(sharesOf(MinerPowerModel.ethH2)) === 3)
  }

  test("BTC underlying entropy exceeds ETH underlying entropy (paper conclusion)") {
    val btc = entropyOfShares(sharesOf(MinerPowerModel.btcMain))
    val eth = entropyOfShares(sharesOf(MinerPowerModel.ethH1))
    assert(btc > eth)
  }

  test("BTC early regime is more decentralized than main (higher entropy)") {
    assert(entropyOfShares(sharesOf(MinerPowerModel.btcEarly)) >
      entropyOfShares(sharesOf(MinerPowerModel.btcMain)))
  }

  test("top pools dominate: BTC top pool ~17%, ETH top pool ~28%") {
    val btcTop = sharesOf(MinerPowerModel.btcMain).max
    val ethTop = sharesOf(MinerPowerModel.ethH1).max
    assert(btcTop > 0.15 && btcTop < 0.20)
    assert(ethTop > 0.25 && ethTop < 0.31)
    assert(ethTop > btcTop) // ETH more concentrated at the top
  }

  test("chain specs use the paper's exact dataset parameters") {
    val b = ChainParams.btc2019
    assert(b.firstBlock === 556459L)
    assert(b.blockCount === 54231L)
    assert(b.firstBlock + b.blockCount - 1 === 610689L) // paper's range end 610,690 is the (S+1)th block
    assert((b.slidingDay, b.slidingWeek, b.slidingMonth) === ((144L, 1008L, 4320L)))

    val e = ChainParams.eth2019
    assert(e.firstBlock === 6988615L)
    assert(e.blockCount === 2204650L)
    assert((e.slidingDay, e.slidingWeek, e.slidingMonth) === ((6000L, 42000L, 180000L)))
    assert(e.anomalies.isEmpty, "paper: no abnormal values observed in Ethereum")
  }

  test("BTC block production rate ≈ 10 minutes, ETH ≈ 14 seconds") {
    assert(math.abs(ChainParams.btc2019.secondsPerBlock - 581.5) < 1.0)
    assert(math.abs(ChainParams.eth2019.secondsPerBlock - 14.3) < 0.1)
  }

  test("BTC anomalies include the two day-14 multi-coinbase blocks") {
    val day14 = ChainParams.btc2019.anomalies.filter(_.day == 14)
    assert(day14.map(_.nProducers).sorted === Vector(85, 95))
    // paper: >80 and >90 independent coinbase addresses
    assert(day14.forall(_.nProducers > 80))
    assert(day14.exists(_.nProducers > 90))
  }

  test("all BTC anomalies fall in the first 50 days (paper's observation window)") {
    assert(ChainParams.btc2019.anomalies.forall(_.day <= 50))
  }

  test("a window sampled exactly at the BTC main shares yields the paper's metric ballpark") {
    // Deterministic "expected" daily window: counts proportional to shares of
    // the 10 named pools plus mid tier, tail dropped — entropy near 3, N=4.
    val pools = MinerPowerModel.btcMain.take(10)
    val counts = pools.map(m => math.round(m.weight * 1000).max(1L))
    assert(LocalMetrics.nakamoto(counts) === 4)
    assert(LocalMetrics.entropy(counts) > 3.0 && LocalMetrics.entropy(counts) < 3.5)
  }
}
