package repro.chain

/** Calibrated 2019 mining-power populations for the synthetic chains.
  *
  * Each population is pools + a uniform mid-tier + a Zipf tail + uniform dust.
  * Parameters were fitted numerically (multinomial simulation over
  * daily/weekly/monthly windows) so that windowed Gini / Shannon entropy /
  * Nakamoto coefficient land near the values the paper reports for 2019;
  * see DESIGN.md §6 for the fitted values and the simulated metrics.
  */
object MinerPowerModel {

  /** Named pools from (name, weight) pairs. */
  def pools(ps: (String, Double)*): Vector[Miner] =
    ps.map { case (n, w) => Miner(n, w) }.toVector

  /** `n` equally-weighted miners sharing `totalMass`. */
  def uniformGroup(prefix: String, n: Int, totalMass: Double): Vector[Miner] = {
    require(n > 0 && totalMass > 0)
    Vector.tabulate(n)(i => Miner(f"${prefix}_${i + 1}%03d", totalMass / n))
  }

  /** `n` miners sharing `totalMass` with Zipf(alpha) rank weights 1/k^alpha. */
  def zipfGroup(prefix: String, n: Int, totalMass: Double, alpha: Double): Vector[Miner] = {
    require(n > 0 && totalMass > 0 && alpha >= 0)
    val raw  = Vector.tabulate(n)(k => 1.0 / math.pow(k + 1.0, alpha))
    val norm = raw.sum
    raw.zipWithIndex.map { case (w, i) => Miner(f"${prefix}_${i + 1}%03d", totalMass * w / norm) }
  }

  // ---------------------------------------------------------------- Bitcoin

  /** Days 1–60: the more fragmented early-2019 pool landscape (higher
    * entropy, Nakamoto ≈ 5, larger dust population → monthly Gini ≈ 0.85).
    */
  val btcEarly: Vector[Miner] =
    pools(
      "BTC.com" -> 0.135, "AntPool" -> 0.105, "F2Pool" -> 0.100, "Poolin" -> 0.095,
      "SlushPool" -> 0.080, "ViaBTC" -> 0.075, "BTC.TOP" -> 0.070, "Bitfury" -> 0.055,
      "Huobi.pool" -> 0.045, "OKExPool" -> 0.035, "DPOOL" -> 0.030, "BitClub" -> 0.025,
    ) ++
      uniformGroup("btc_mid", 10, 0.06) ++
      zipfGroup("btc_solo", 30, 0.06, alpha = 0.3) ++
      uniformGroup("btc_dust", 200, 0.015)

  /** Days 61–365: the consolidated landscape (top-4 = 0.53 → Nakamoto 4). */
  val btcMain: Vector[Miner] =
    pools(
      "BTC.com" -> 0.17, "AntPool" -> 0.13, "F2Pool" -> 0.12, "Poolin" -> 0.11,
      "SlushPool" -> 0.09, "ViaBTC" -> 0.08, "BTC.TOP" -> 0.06, "Bitfury" -> 0.05,
      "Huobi.pool" -> 0.04, "OKExPool" -> 0.03,
    ) ++
      uniformGroup("btc_mid", 8, 0.055) ++
      zipfGroup("btc_solo", 20, 0.06, alpha = 0.3) ++
      uniformGroup("btc_dust", 30, 0.005)

  // --------------------------------------------------------------- Ethereum

  private def ethCommon: Vector[Miner] =
    uniformGroup("eth_mid", 14, 0.13) ++
      zipfGroup("eth_solo", 25, 0.028, alpha = 0.3) ++
      uniformGroup("eth_dust", 60, 0.0008)

  /** First half of 2019: top-2 = 0.525 → Nakamoto coefficient 2. */
  val ethH1: Vector[Miner] =
    pools(
      "Ethermine" -> 0.280, "SparkPool" -> 0.245, "F2Pool" -> 0.125,
      "Nanopool" -> 0.090, "MiningPoolHub" -> 0.055, "zhizhu.top" -> 0.045,
    ) ++ ethCommon

  /** Second half of 2019: top-2 = 0.485 → Nakamoto coefficient 3. */
  val ethH2: Vector[Miner] =
    pools(
      "Ethermine" -> 0.260, "SparkPool" -> 0.225, "F2Pool" -> 0.140,
      "Nanopool" -> 0.100, "MiningPoolHub" -> 0.065, "zhizhu.top" -> 0.045,
    ) ++ ethCommon
}

/** The two chains the paper measures, at the paper's exact 2019 scale. */
object ChainParams {
  /** Seconds in 2019 (non-leap year). */
  val YearSeconds: Long = 365L * 86400L

  /** Bitcoin 2019: 54,231 blocks from no. 556,459 (§II-A); sliding-window
    * sizes 144/1008/4320 blocks (§III-A). Anomalies: the two day-14
    * multi-coinbase blocks (>80 and >90 producers, §II-C-1d) plus six smaller
    * early-year ones that produce the paper's first-50-day extremes
    * (daily Nakamoto > 35, entropy > 5.5).
    */
  val btc2019: ChainSpec = ChainSpec(
    name = "bitcoin",
    firstBlock = 556459L,
    blockCount = 54231L,
    yearSeconds = YearSeconds,
    regimes = Vector(
      Regime(1, 60, MinerPowerModel.btcEarly),
      Regime(61, 365, MinerPowerModel.btcMain),
    ),
    anomalies = Vector(
      AnomalySpec(day = 5, frac = 0.30, nProducers = 30),
      AnomalySpec(day = 9, frac = 0.60, nProducers = 45),
      AnomalySpec(day = 14, frac = 0.55, nProducers = 85),
      AnomalySpec(day = 14, frac = 0.85, nProducers = 95),
      AnomalySpec(day = 23, frac = 0.40, nProducers = 25),
      AnomalySpec(day = 31, frac = 0.50, nProducers = 55),
      AnomalySpec(day = 38, frac = 0.70, nProducers = 35),
      AnomalySpec(day = 47, frac = 0.20, nProducers = 40),
    ),
    slidingDay = 144L,
    slidingWeek = 1008L,
    slidingMonth = 4320L,
  )

  /** Ethereum 2019: 2,204,650 blocks from no. 6,988,615 (§II-A);
    * sliding-window sizes 6000/42000/180000 blocks (§III-A). The paper
    * observed no anomalous values in Ethereum, so no anomalies are injected.
    */
  val eth2019: ChainSpec = ChainSpec(
    name = "ethereum",
    firstBlock = 6988615L,
    blockCount = 2204650L,
    yearSeconds = YearSeconds,
    regimes = Vector(
      Regime(1, 181, MinerPowerModel.ethH1),
      Regime(182, 365, MinerPowerModel.ethH2),
    ),
    anomalies = Vector.empty,
    slidingDay = 6000L,
    slidingWeek = 42000L,
    slidingMonth = 180000L,
  )
}
