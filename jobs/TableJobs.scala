package repro.jobs

import repro.core.CostModel
import repro.exp._
import repro.harness.TextTable

/** spark-submit / sbt-run entrypoints, one per reproduced table or figure.
  * Each prints the same rows as the corresponding bench suite; EXPERIMENTS.md
  * records them next to the paper's numbers.
  *
  * Example: `sbt "runMain repro.jobs.OverheadKeyJob"`.
  */
object Table1LocJob {
  def main(args: Array[String]): Unit = {
    println("Table 1: NEXMark query implementations, lines of code")
    println(Table1Loc.render(Table1Loc.rows()))
  }
}

/** Figure 13(b): hash-count overhead percentiles vs bin count. */
object OverheadHashJob {
  def main(args: Array[String]): Unit =
    println(OverheadExp.render(OverheadExp.sweep(CostModel.hashCount, 256L * 1000 * 1000)))
}

/** Figure 14(b): key-count overhead percentiles vs bin count. */
object OverheadKeyJob {
  def main(args: Array[String]): Unit =
    println(OverheadExp.render(OverheadExp.sweep(CostModel.keyCount, 256L * 1000 * 1000)))
}

/** Figure 15(b): key-count overhead percentiles, 8192×10⁶ keys. */
object OverheadKeyLargeJob {
  def main(args: Array[String]): Unit =
    println(OverheadExp.render(
      OverheadExp.sweep(CostModel.keyCount.copy(perRecordNs = 320.0), 8192L * 1000 * 1000)))
}

/** Figure 1: the headline all-at-once / fluid / optimized comparison. */
object HeadlineJob {
  def main(args: Array[String]): Unit = println(MigrationExp.render(MigrationExp.headline()))
}

/** Figure 16: migration latency vs duration as bin count varies. */
object MigrationBinsJob {
  def main(args: Array[String]): Unit = println(MigrationExp.render(MigrationExp.varyBins()))
}

/** Figure 17: migration latency vs duration as the key domain varies. */
object MigrationKeysJob {
  def main(args: Array[String]): Unit = println(MigrationExp.render(MigrationExp.varyKeys()))
}

/** Figure 18: keys and bins grow proportionally (fixed keys/bin). */
object MigrationProportionalJob {
  def main(args: Array[String]): Unit = println(MigrationExp.render(MigrationExp.varyProportional()))
}

/** Figure 19: offered load vs maximum latency per strategy. */
object ThroughputJob {
  def main(args: Array[String]): Unit = println(MigrationExp.render(MigrationExp.varyLoad()))
}

/** Figure 20: per-process memory over time per strategy. */
object MemoryJob {
  def main(args: Array[String]): Unit =
    MigrationExp.memory().foreach { case (name, samples) =>
      println(s"--- $name (t [s], state [GiB], in-flight [GiB]) ---")
      samples.foreach { case (t, st, fl) =>
        println(f"${t / 1e9}%8.1f ${TextTable.gib(st)}%8s ${TextTable.gib(fl)}%8s")
      }
    }
}

/** Figures 5–12: NEXMark queries under migration (all-at-once vs batched). */
object NexmarkJob {
  def main(args: Array[String]): Unit = println(NexmarkExp.render(NexmarkExp.sweep()))
}
