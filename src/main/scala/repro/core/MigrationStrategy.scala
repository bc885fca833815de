package repro.core

/** The migration strategies of §3.3, expressed as schedules of configuration
  * updates on the control stream.
  */
sealed trait Strategy {
  def name: String

  /** Partition the full set of moves into ordered batches, each issued at a
    * common logical time after the previous batch's migration completed.
    */
  def batches(moves: Seq[(Int, Int)]): Seq[Seq[(Int, Int)]]

  /** Gap inserted after each batch completes, letting the system drain
    * enqueued records before the next migration (§4.4's optimization).
    */
  def gapNs: Long = 0L
}

/** One common time for every move — the partial pause-and-resume of existing
  * systems (§2.1, §3.3).
  */
case object AllAtOnce extends Strategy {
  val name                                 = "all-at-once"
  def batches(moves: Seq[(Int, Int)])      = Seq(moves)
}

/** One bin at a time, each awaiting the previous migration's completion. */
final case class Fluid(override val gapNs: Long = 0L) extends Strategy {
  val name                            = "fluid"
  def batches(moves: Seq[(Int, Int)]) = moves.map(Seq(_))
}

/** Groups of bins at a common time — the paper's latency/duration trade-off;
  * with a gap this is the "optimized" strategy of Figure 1.
  */
final case class Batched(binsPerBatch: Int, override val gapNs: Long = 0L) extends Strategy {
  require(binsPerBatch > 0)
  val name                            = if (gapNs > 0) "optimized" else "batched"
  def batches(moves: Seq[(Int, Int)]) = moves.grouped(binsPerBatch).toSeq
}

/** Drives a migration over an engine's control input: issues each batch at
  * the current logical time, lets the configuration become final, and awaits
  * the output frontier of S passing the batch time before the next (§3.3).
  */
final class MigrationController[K, V, O](engine: MegaphoneEngine[K, V, O]) {
  import engine.{controlInput, probe, sim}

  /** Issue `moves` per `strategy` starting at `startNs`; `onDone(start, end)`
    * fires when the final batch's migration completed (probe passed it).
    */
  def migrate(startNs: Long, strategy: Strategy, moves: Seq[(Int, Int)])(
      onDone: (Long, Long) => Unit
  ): Unit = {
    val batches = strategy.batches(moves)
    sim.at(startNs) {
      val begin = sim.now
      def issue(i: Int): Unit =
        if (i >= batches.length) onDone(begin, sim.now)
        else {
          // Updates may be future-dated past the control capability (§3.3:
          // migrations can be prepared ahead of time).
          val t = math.max(sim.now, controlInput.capability)
          controlInput.send(t, batches(i))
          controlInput.advanceTo(t + 1) // configuration at t becomes final
          probe.whenPassed(t) {
            if (strategy.gapNs > 0) sim.at(sim.now + strategy.gapNs)(issue(i + 1))
            else issue(i + 1)
          }
        }
      issue(0)
    }
  }
}

/** Canonical move sets used throughout §5: first migrate half of the bins on
  * the first half of the workers to the second half (leaving 25% of all state
  * displaced, an imbalanced assignment), then migrate them back.
  */
object Moves {

  /** Bins initially live at `bin % workers`. */
  def imbalance(bins: Int, workers: Int): Seq[(Int, Int)] = {
    val half = workers / 2
    (0 until bins).collect {
      case b if b % workers < half && (b / workers) % 2 == 0 => (b, b % workers + half)
    }
  }

  def rebalance(bins: Int, workers: Int): Seq[(Int, Int)] =
    imbalance(bins, workers).map { case (b, _) => (b, b % workers) }
}
