package repro.engine

/** Per-row virtual CPU costs (seconds) and modelling constants for the
  * discrete-time simulator.
  *
  * `dataScale` lets SF=0.1 synthetic data stand in for the paper's SF100: each
  * generated row represents `dataScale` real rows, so virtual times land in the
  * paper's range while the simulator only materializes ~100 MB. All per-row
  * costs and per-row byte counts are multiplied by `dataScale` when charged.
  *
  * Calibration targets (see DESIGN.md §3): with the default 10 data + 10
  * compute nodes of 8 cores, Q2J at stage DOP 2 runs ~1300 virtual seconds
  * (paper: 1331.99 s) and a 2→4 DOP switch spends ~12 s shuffling + ~30 s
  * building (paper Table 2: 12.55 s / 30.12 s).
  */
final case class CostModel(
    dataScale: Double = 1000.0,
    pageRows: Int = 256,
    scanRow: Double = 1.2e-6, // CSV parse + scan (Arrow reader in the paper)
    filterRow: Double = 1.0e-7,
    projectRow: Double = 1.5e-7,
    exchangeRow: Double = 3.0e-7, // receive + local handoff
    shuffleRow: Double = 3.4e-6, // hash partitioning + transfer (shuffle buffer work)
    buildRow: Double = 8.0e-7, // hash table insert
    probeRow: Double = 3.5e-6, // hash table lookup + emit
    partialAggRow: Double = 6.0e-7,
    finalAggRow: Double = 6.0e-7,
    netBytesPerSec: Double = 1.25e9, // 10 Gbps NIC, matching the paper's EC2 nodes
    tickSeconds: Double = 0.2,
    elasticWindow: Double = 0.5, // consumer-side resize period (paper: 500 ms)
    elasticMaxPages: Int = 64,
    partialAggFlushGroups: Int = 4096,
    restRequestSeconds: Double = 0.005, // one RESTful scheduling call (paper: 1–10 ms)
) {

  /** Effective per-row cost: one generated row stands for `dataScale` rows. */
  def eff(perRow: Double): Double = perRow * dataScale

  /** Effective bytes a generated row occupies on the wire. */
  def effBytes(rowBytes: Double): Double = rowBytes * dataScale
}

object CostModel {

  /** Fast-ticking model for unit tests: no data scaling, tiny pages, so tests
    * over a few thousand rows finish in milliseconds of wall time.
    */
  def forTests: CostModel = CostModel(
    dataScale = 1.0,
    pageRows = 32,
    tickSeconds = 0.05,
    elasticMaxPages = 32,
    partialAggFlushGroups = 256,
  )
}
