package repro.exp

import repro.core.CostModel
import repro.harness.{CountingWorkload, TextTable}

/** §5.2 "Overhead of the interface": steady-state per-record latency
  * percentiles of the counting workload as the bin count varies, against a
  * native (non-migrateable) implementation — the tables of Figures 13–15(b).
  */
object OverheadExp {

  final case class Row(label: String, p90Ns: Long, p99Ns: Long, p9999Ns: Long, maxNs: Long)

  /** Run one steady-state (no migration) configuration. */
  def one(cost: CostModel, domain: Long, ratePerSec: Long, logBins: Int, native: Boolean, runNs: Long): Row = {
    val cfg = CountingWorkload.Config(
      bins = 1 << logBins,
      domain = domain,
      ratePerSec = ratePerSec,
      cost = cost,
      native = native,
    )
    val res = CountingWorkload.run(cfg, runNs, strategy = None)
    val h   = res.hist
    Row(if (native) "Native" else logBins.toString, h.percentile(0.90), h.percentile(0.99), h.percentile(0.9999), h.max)
  }

  /** The full sweep of Figures 13–15(b): log bin counts 4,6,…,20 + native. */
  def sweep(cost: CostModel, domain: Long, ratePerSec: Long = 4_000_000L, runNs: Long = 30_000_000_000L): Seq[Row] =
    (4 to 20 by 2).map(lb => one(cost, domain, ratePerSec, lb, native = false, runNs)) :+
      one(cost, domain, ratePerSec, 4, native = true, runNs)

  def render(rows: Seq[Row]): String =
    TextTable.render(
      Seq("Experiment", "90%", "99%", "99.99%", "max"),
      rows.map(r => Seq(r.label, TextTable.ms(r.p90Ns), TextTable.ms(r.p99Ns), TextTable.ms(r.p9999Ns), TextTable.ms(r.maxNs))),
    )
}
