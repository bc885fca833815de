package repro.timely

import scala.collection.mutable

/** Deterministic discrete-event simulation clock.
  *
  * All latencies in the reproduction are *simulated* nanoseconds: events are
  * executed in (time, insertion-sequence) order, so runs are reproducible
  * bit-for-bit regardless of host load. This substitutes for the paper's
  * wall-clock measurements on a 16-worker cluster (see DESIGN.md).
  */
final class Sim {
  private final case class Ev(time: Long, seq: Long, action: () => Unit)
  private implicit val ord: Ordering[Ev] =
    Ordering.by[Ev, (Long, Long)](e => (-e.time, -e.seq))

  private val queue  = mutable.PriorityQueue.empty[Ev]
  private var seqCtr = 0L
  private var nowNs  = 0L

  /** Current simulated time in nanoseconds. */
  def now: Long = nowNs

  /** Schedule `action` at simulated time `t` (clamped to `now`). */
  def at(t: Long)(action: => Unit): Unit = {
    seqCtr += 1
    queue.enqueue(Ev(math.max(t, nowNs), seqCtr, () => action))
  }

  /** Run events until the queue is empty or simulated time exceeds `until`. */
  def run(until: Long = Long.MaxValue): Unit = {
    while (queue.nonEmpty && queue.head.time <= until) {
      val e = queue.dequeue()
      nowNs = e.time
      e.action()
    }
    if (until != Long.MaxValue && nowNs < until) nowNs = until
  }

  /** True if no events remain. */
  def idle: Boolean = queue.isEmpty
}

/** A simulated worker: a single CPU with a FIFO run queue.
  *
  * `exec` charges `costNs` of CPU time starting no earlier than both `sim.now`
  * and the completion of previously submitted work; queueing delay under load
  * is what produces the paper's latency spikes.
  */
final class SimWorker(val id: Int, sim: Sim) {
  private var freeAt = 0L

  /** Total busy nanoseconds, for utilization accounting. */
  var busyNs = 0L

  /** Submit a task; `onDone` fires at its completion time. Returns that time. */
  def exec(costNs: Long)(onDone: Long => Unit): Long = {
    val start = math.max(freeAt, sim.now)
    val done  = start + math.max(0L, costNs)
    freeAt = done
    busyNs += done - start
    sim.at(done)(onDone(done))
    done
  }

  /** Inject an exogenous stall (scheduling noise, GC hiccup). */
  def stall(costNs: Long): Unit = exec(costNs)(_ => ())

  /** Earliest time new work could start. */
  def freeTime: Long = math.max(freeAt, sim.now)
}

/** Simulated network: per-source-NIC serialization bandwidth plus a fixed
  * propagation latency. Bytes are counted as "in flight" from the moment the
  * sender enqueues them (serialized copies awaiting the NIC) until delivery —
  * the quantity behind the paper's Figure 20 memory spikes.
  */
final class Net(sim: Sim, bytesPerNs: Double, latencyNs: Long) {
  private val nicFreeAt = mutable.Map.empty[Int, Long]

  /** Serialized-but-undelivered bytes, per sending worker. */
  val inFlightBySrc = mutable.Map.empty[Int, Long].withDefaultValue(0L)

  def inFlightBytes: Long = inFlightBySrc.valuesIterator.sum

  /** Send `bytes` from `src` to `dst`; `deliver` fires at arrival time.
    * Local sends are immediate and never counted as in flight.
    */
  def send(src: Int, dst: Int, bytes: Long)(deliver: Long => Unit): Unit = {
    if (src == dst) {
      sim.at(sim.now)(deliver(sim.now))
    } else {
      val start = math.max(nicFreeAt.getOrElse(src, 0L), sim.now)
      val xmit  = if (bytesPerNs <= 0) 0L else math.ceil(bytes / bytesPerNs).toLong
      val done  = start + xmit
      nicFreeAt(src) = done
      inFlightBySrc(src) += bytes
      sim.at(done + latencyNs) {
        inFlightBySrc(src) -= bytes
        deliver(sim.now)
      }
    }
  }
}
