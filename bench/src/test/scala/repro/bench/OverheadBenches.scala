package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.CostModel
import repro.exp.OverheadExp

/** Figures 13(b), 14(b), 15(b): steady-state latency percentiles of the
  * counting workload vs. bin count, against the native baseline. Each bench
  * prints the reproduced table (EXPERIMENTS.md records it next to the
  * paper's) and asserts the paper's qualitative shape.
  */
abstract class OverheadBenchBase(
    tableName: String,
    cost: CostModel,
    domain: Long,
) extends AnyFunSuite {

  private lazy val rows = OverheadExp.sweep(cost, domain, runNs = 15_000_000_000L)

  test(s"$tableName: reproduce and print the percentile table") {
    println(s"\n=== $tableName (domain=$domain keys, 4e6 rec/s, 16 workers, 15 s steady state) ===")
    println(OverheadExp.render(rows))
    assert(rows.size == 10)
  }

  test(s"$tableName: bin counts up to 2^12 are near-indistinguishable (paper §5.2)") {
    val small = rows.filter(r => r.label != "Native" && r.label.toInt <= 12)
    val ratio = small.map(_.p90Ns).max.toDouble / small.map(_.p90Ns).min
    assert(ratio < 2.0, s"p90 spread $ratio across 2^4..2^12 bins should be small")
  }

  test(s"$tableName: latency blows up beyond 2^16 bins") {
    val at12 = rows.find(_.label == "12").get.p90Ns
    val at18 = rows.find(_.label == "18").get.p90Ns
    val at20 = rows.find(_.label == "20").get.p90Ns
    assert(at18 > 10 * at12, s"2^18 ($at18) must dwarf 2^12 ($at12)")
    assert(at20 > 3 * at18, s"2^20 ($at20) must exceed 2^18 ($at18)")
  }

  test(s"$tableName: the native baseline has the lowest p90") {
    val native = rows.find(_.label == "Native").get.p90Ns
    assert(rows.filter(_.label != "Native").forall(_.p90Ns >= native))
  }

  test(s"$tableName: percentiles are internally consistent") {
    rows.foreach { r =>
      assert(r.p90Ns <= r.p99Ns && r.p99Ns <= r.p9999Ns && r.p9999Ns <= r.maxNs, r.toString)
    }
  }
}

/** Figure 13(b): hash count, 256×10⁶ keys. */
class OverheadHashBench extends OverheadBenchBase("Fig13b hash-count", CostModel.hashCount, 256L * 1000 * 1000)

/** Figure 14(b): key count, 256×10⁶ keys. */
class OverheadKeyBench extends OverheadBenchBase("Fig14b key-count", CostModel.keyCount, 256L * 1000 * 1000)

/** Figure 15(b): key count, 8192×10⁶ keys (larger working set ⇒ slightly
  * higher per-record cost, §5.2).
  */
class OverheadKeyLargeBench
    extends OverheadBenchBase(
      "Fig15b key-count-large",
      CostModel.keyCount.copy(perRecordNs = 320.0),
      8192L * 1000 * 1000,
    )
