package repro.core

/** Mechanistic cost model for the simulated timely substrate.
  *
  * Every latency the benchmarks report is produced by charging these costs to
  * simulated workers and letting queueing do the rest; nothing about migration
  * behaviour is hard-coded. Constants are calibrated once (see EXPERIMENTS.md)
  * against the paper's steady-state baselines and then held fixed across all
  * experiments, exactly as the authors' hardware was.
  *
  * @param perRecordNs      S-side state update cost per record (hash-map vs.
  *                         dense-array variants differ here)
  * @param routeNs          F-side routing-table lookup + exchange per record
  * @param binScanBaseNs    per-owned-bin bookkeeping charged on each apply
  *                         cycle of S (notificator scan); the paper's "larger
  *                         routing table" overhead
  * @param cacheBins        bins fitting in cache; beyond this the per-bin scan
  *                         cost grows as sqrt(bins/cacheBins) (cache misses)
  * @param serializeNsPerByte    cost to extract+serialize migrating state
  * @param deserializeNsPerByte  cost to install received state
  * @param netBytesPerNs    NIC serialization bandwidth (per worker)
  * @param netLatencyNs     one-way propagation latency
  * @param epochNs          input batching quantum of the open-loop source
  * @param progressLagNs    delay for progress (frontier) updates to circulate
  * @param hiccupEveryNs    mean interval between scheduling hiccups per worker
  * @param hiccupNs         mean hiccup duration (exponential-ish, seeded)
  */
final case class CostModel(
    perRecordNs: Double = 280.0,
    routeNs: Double = 200.0,
    binScanBaseNs: Double = 350.0,
    cacheBins: Long = 1L << 14,
    // Serialization (0.4 ns/B ≈ 2.5 GB/s) outpaces the 10 Gb/s NIC, so an
    // all-at-once migration accumulates serialized copies at the send queue
    // — the §5.3.5 memory-spike mechanism. Installing into hash maps is the
    // slow side (≈ 0.33 GB/s).
    serializeNsPerByte: Double = 0.4,
    deserializeNsPerByte: Double = 3.0,
    netBytesPerNs: Double = 1.25, // 1.25 B/ns = 10 Gb/s
    netLatencyNs: Long = 100_000L,
    epochNs: Long = 1_000_000L,
    progressLagNs: Long = 200_000L,
    hiccupEveryNs: Long = 400_000_000L,
    hiccupNs: Long = 2_000_000L,
) {

  /** Effective per-bin scan cost including the cache-miss penalty: flat while
    * the routing/bin tables fit in cache, then a sub-linear power law.
    */
  def binScanNs(totalBins: Long): Double =
    binScanBaseNs * (1.0 + math.pow(totalBins.toDouble / cacheBins.toDouble, 0.75))
}

object CostModel {

  /** Hash-map bins ("hash count" in §5.2): slower per-record updates and
    * larger, more frequent hiccups (rehashing, allocation).
    */
  val hashCount: CostModel =
    CostModel(perRecordNs = 700.0, hiccupEveryNs = 150_000_000L, hiccupNs = 6_000_000L)

  /** Dense-array bins ("key count" in §5.2): 16 workers saturate at
    * ≈ 16/(200+280) ns ≈ 33×10⁶ rec/s, the paper's Figure 19 knee.
    */
  val keyCount: CostModel = CostModel(perRecordNs = 280.0)

  /** Native timely operator: plain exchange by key, no routing table, no
    * binning — the baseline rows of Figures 13–15.
    */
  def native(base: CostModel): CostModel =
    base.copy(routeNs = 40.0, binScanBaseNs = 0.0, hiccupNs = base.hiccupNs / 2)
}
