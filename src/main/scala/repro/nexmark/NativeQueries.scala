package repro.nexmark

import scala.collection.mutable

/** NEXMark queries Q1–Q8 as *native* hand-tuned operators: the implementor
  * manages keyed state, pending (post-dated) work, window bookkeeping and
  * frontier reactions by hand — everything Megaphone's stateful interface
  * (state bins + extended notificator) otherwise provides. This mirrors the
  * paper's "Native" rows of Table 1, which are longer for stateful queries
  * because the per-operator machinery must be re-implemented each time.
  *
  * Each operator is single-threaded here (the exchange/partitioning is the
  * runtime's job in timely; line counts compare operator implementations).
  * `// QN-native-begin/end` markers delimit the lines counted in Table 1.
  *
  * Tests drive these against the Megaphone implementations on identical
  * event streams and assert identical output multisets.
  */
trait NativeOp {
  /** An input event, delivered in nondecreasing time order. */
  def onEvent(t: Long, ev: Event, emit: Product => Unit): Unit
  /** The input frontier advanced to `f`: all events with time < f arrived. */
  def onTime(f: Long, emit: Product => Unit): Unit = {}
}

object NativeQueries {

  // Q1-native-begin
  /** Q1: currency conversion. */
  final class Q1Native extends NativeOp {
    def onEvent(t: Long, ev: Event, emit: Product => Unit): Unit = ev match {
      case b: Bid => emit((b.auction, b.bidder, b.price * 908L / 1000L))
      case _      => ()
    }
  }
  // Q1-native-end

  // Q2-native-begin
  /** Q2: selection. */
  final class Q2Native extends NativeOp {
    def onEvent(t: Long, ev: Event, emit: Product => Unit): Unit = ev match {
      case b: Bid if b.auction % 123 == 0 => emit((b.auction, b.price))
      case _                              => ()
    }
  }
  // Q2-native-end

  // Q3-native-begin
  /** Q3: incremental person⋈auction join with hand-managed two-sided state. */
  final class Q3Native extends NativeOp {
    private val persons  = mutable.HashMap.empty[Long, Person]
    private val auctions = mutable.HashMap.empty[Long, mutable.ArrayBuffer[Auction]]
    def onEvent(t: Long, ev: Event, emit: Product => Unit): Unit = ev match {
      case p: Person if Events.Q3States(p.state) =>
        persons(p.id) = p
        auctions.get(p.id).foreach(_.foreach(a => emit((p.name, p.city, p.state, a.id))))
      case a: Auction if a.category == 10 =>
        auctions.getOrElseUpdate(a.seller, mutable.ArrayBuffer.empty) += a
        persons.get(a.seller).foreach(p => emit((p.name, p.city, p.state, a.id)))
      case _ => ()
    }
  }
  // Q3-native-end

  // Q4-native-begin
  /** Q4: average closing price per category. The operator hand-manages the
    * per-auction state, a priority queue of future close times keyed by
    * auction, the frontier reaction that fires closes in timestamp order,
    * and the downstream per-category aggregate.
    */
  final class Q4Native(emitSeller: Boolean = false) extends NativeOp {
    private val open   = mutable.HashMap.empty[Long, Auction]
    private val best   = mutable.HashMap.empty[Long, Long]
    private var seq    = 0L
    private val closes =
      mutable.PriorityQueue.empty[(Long, Long, Long)](Ordering.by(e => (-e._1, -e._2)))
    private val sums = mutable.HashMap.empty[Long, (Long, Long)]
    def onEvent(t: Long, ev: Event, emit: Product => Unit): Unit = ev match {
      case a: Auction =>
        open(a.id) = a
        seq += 1
        closes.enqueue((a.expires, seq, a.id))
      case b: Bid =>
        val within = open.get(b.auction).forall(a => b.time <= a.expires)
        if (within && b.price > best.getOrElse(b.auction, 0L)) best(b.auction) = b.price
      case _ => ()
    }
    override def onTime(f: Long, emit: Product => Unit): Unit = {
      while (closes.nonEmpty && closes.head._1 < f) {
        val (_, _, id) = closes.dequeue()
        for (a <- open.remove(id); price <- best.remove(id)) {
          if (emitSeller) emit((a.seller, price))
          else {
            val (s, c) = sums.getOrElse(a.category.toLong, (0L, 0L))
            val agg    = (s + price, c + 1)
            sums(a.category.toLong) = agg
            emit((a.category.toLong, agg._1 / agg._2))
          }
        }
      }
    }
  }
  // Q4-native-end

  // Q5-native-begin
  /** Q5: hottest auction over a sliding window — hand-managed per-auction
    * counts, a retraction queue, and max maintenance with re-scan on decrease.
    */
  final class Q5Native(windowNs: Long) extends NativeOp {
    private val counts = mutable.HashMap.empty[Long, Long]
    private var seq    = 0L
    private val retractions =
      mutable.PriorityQueue.empty[(Long, Long, Long)](Ordering.by(e => (-e._1, -e._2)))
    private var maxA = -1L
    private var maxC = 0L
    private def report(a: Long, c: Long, emit: Product => Unit): Unit = {
      if (c > maxC) { maxA = a; maxC = c; emit((a, c)) }
      else if (a == maxA && c < maxC) {
        // Deterministic tie-break: highest count, then lowest auction id.
        val (ma, mc) =
          if (counts.isEmpty) (-1L, 0L) else counts.maxBy { case (k, v) => (v, -k) }
        maxA = ma; maxC = mc; emit((ma, mc))
      }
    }
    def onEvent(t: Long, ev: Event, emit: Product => Unit): Unit = ev match {
      case b: Bid =>
        val c = counts.getOrElse(b.auction, 0L) + 1
        counts(b.auction) = c
        seq += 1
        retractions.enqueue((t + windowNs, seq, b.auction))
        report(b.auction, c, emit)
      case _ => ()
    }
    override def onTime(f: Long, emit: Product => Unit): Unit =
      while (retractions.nonEmpty && retractions.head._1 < f) {
        val (_, _, a) = retractions.dequeue()
        val c      = counts.getOrElse(a, 0L) - 1
        if (c <= 0) counts.remove(a) else counts(a) = c
        report(a, c, emit)
      }
  }
  // Q5-native-end

  // Q6-native-begin
  /** Q6: average of the last ten closing prices per seller; reuses the
    * hand-written close detection of Q4 plus a hand-managed ring per seller.
    */
  final class Q6Native extends NativeOp {
    private val closer = new Q4Native(emitSeller = true)
    private val last10 = mutable.HashMap.empty[Long, mutable.Queue[Long]]
    private def absorb(o: Product, emit: Product => Unit): Unit = {
      val (seller, price) = o.asInstanceOf[(Long, Long)]
      val q               = last10.getOrElseUpdate(seller, mutable.Queue.empty)
      q.enqueue(price)
      if (q.size > 10) q.dequeue()
      emit((seller, q.sum / q.size))
    }
    def onEvent(t: Long, ev: Event, emit: Product => Unit): Unit =
      closer.onEvent(t, ev, o => absorb(o, emit))
    override def onTime(f: Long, emit: Product => Unit): Unit =
      closer.onTime(f, o => absorb(o, emit))
  }
  // Q6-native-end

  // Q7-native-begin
  /** Q7: highest bid per tumbling window, with hand-managed window state and
    * flush on frontier advance.
    */
  final class Q7Native(windowNs: Long) extends NativeOp {
    private val windows = mutable.HashMap.empty[Long, (Long, Long, Long)] // w -> (price, bidder, auction)
    def onEvent(t: Long, ev: Event, emit: Product => Unit): Unit = ev match {
      case b: Bid =>
        val w = t / windowNs
        val cur = windows.getOrElse(w, (0L, -1L, -1L))
        if (b.price > cur._1) windows(w) = (b.price, b.bidder, b.auction)
        else if (!windows.contains(w)) windows(w) = cur
      case _ => ()
    }
    override def onTime(f: Long, emit: Product => Unit): Unit = {
      val done = windows.keys.filter(w => (w + 1) * windowNs < f).toSeq.sorted
      done.foreach { w =>
        val (p, bidder, auction) = windows.remove(w).get
        emit((w, auction, bidder, p))
      }
    }
  }
  // Q7-native-end

  // Q8-native-begin
  /** Q8: tumbling-window join of new persons and new auction sellers, with
    * hand-managed window pruning on both sides.
    */
  final class Q8Native(windowNs: Long) extends NativeOp {
    private val personWindow  = mutable.HashMap.empty[Long, Long]
    private val sellerWindows = mutable.HashMap.empty[Long, mutable.Set[Long]]
    private val emitted       = mutable.HashMap.empty[Long, Long]
    def onEvent(t: Long, ev: Event, emit: Product => Unit): Unit = {
      val w = t / windowNs
      def report(id: Long): Unit =
        if (!emitted.get(id).contains(w)) { emitted(id) = w; emit((id, w)) }
      ev match {
        case p: Person =>
          personWindow(p.id) = w
          if (sellerWindows.get(p.id).exists(_.contains(w))) report(p.id)
        case a: Auction =>
          val ws = sellerWindows.getOrElseUpdate(a.seller, mutable.Set.empty)
          ws.filterInPlace(_ >= w)
          ws += w
          if (personWindow.get(a.seller).contains(w)) report(a.seller)
        case _ => ()
      }
    }
  }
  // Q8-native-end

  /** Single-threaded reference harness: events in time order, frontier
    * advanced at each epoch boundary (mirrors a one-worker timely dataflow).
    */
  def drive(op: NativeOp, events: Seq[Event], epochNs: Long, horizonNs: Long): Seq[Product] = {
    val out = mutable.ArrayBuffer.empty[Product]
    events.sortBy(_.time).groupBy(_.time).toSeq.sortBy(_._1).foreach { case (t, evs) =>
      op.onTime(t, out += _)
      evs.foreach(ev => op.onEvent(t, ev, out += _))
    }
    op.onTime(horizonNs + epochNs, out += _)
    out.toSeq
  }
}
