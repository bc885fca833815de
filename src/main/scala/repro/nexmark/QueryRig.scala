package repro.nexmark

import repro.core._
import repro.harness.{LatencyHistogram, LatencySeries}
import repro.timely.Sim
import MegaphoneQueries._

/** Assembles NEXMark queries into one- or two-stage Megaphone dataflows on
  * the simulated substrate. The *main* (stateful, migrated) operator of each
  * query (§5: "we migrate the state of the main operator of each dataflow")
  * carries the latency instrumentation and the control input.
  */
object QueryRig {

  final case class NexConfig(
      workers: Int = 8,
      bins: Int = 1 << 10,
      ratePerSec: Int = 100_000,
      /** Q5 sliding / Q7 tumbling window (time-dilated, §5.1). */
      windowNs: Long = 2_000_000_000L,
      /** Q8 tumbling window (dilated from twelve hours). */
      q8WindowNs: Long = 8_000_000_000L,
      auctionLifeNs: Long = 10_000_000_000L,
      cost: CostModel = CostModel.keyCount.copy(perRecordNs = 250.0),
      seed: Long = 11L,
  )

  /** A built query dataflow with uniform driving hooks. */
  final case class Built(
      sim: Sim,
      send: (Long, Seq[Event]) => Unit,
      advance: Long => Unit,
      closeData: () => Unit,
      controlAdvance: Long => Unit,
      closeControl: () => Unit,
      migrate: (Long, Strategy, Seq[(Int, Int)], (Long, Long) => Unit) => Unit,
      mainBins: Int,
      drained: () => Boolean,
      outputCount: () => Long,
  )

  /** Per-query input keying for the first stage. */
  private def keyOf(q: Int, cfg: NexConfig): Event => Option[(Long, In)] = {
    case b: Bid if q == 7     => Some((b.time / cfg.windowNs, BidIn(b)))
    case b: Bid if q != 3 && q != 8 => Some((b.auction, BidIn(b)))
    case a: Auction if q == 3 || q == 8 => Some((a.seller, AuctionIn(a)))
    case a: Auction if q == 4 || q == 6 => Some((a.id, AuctionIn(a)))
    case p: Person if q == 3 || q == 8  => Some((p.id, PersonIn(p)))
    case _ => None
  }

  def build(
      q: Int,
      cfg: NexConfig,
      hist: LatencyHistogram,
      series: LatencySeries,
      collect: scala.collection.mutable.Buffer[Out] = null,
  ): Built = {
    val sim = new Sim
    var outCount = 0L
    def countOut(o: Out): Unit = { outCount += 1; if (collect != null) collect += o; () }

    def mkBinOf(bins: Int): Long => Int = k => (((k % bins) + bins) % bins).toInt

    /** Second stage (no migration): control closed immediately unless main. */
    def stage2[V2](logic: BinLogic[Long, V2, Out], main: Boolean): MegaphoneEngine[Long, V2, Out] = {
      val e = new MegaphoneEngine[Long, V2, Out](
        sim, cfg.workers, cfg.bins, cfg.cost, logic, mkBinOf(cfg.bins),
        onOutput = (_, _, o, _) => countOut(o),
        onLatency = if (main) (lo, hi, w) => { hist.addRange(lo, hi, w.toDouble); series.add(sim.now, hi) } else null,
        noiseSeed = cfg.seed + 1,
      )
      e.initBins()
      e
    }

    def stage1(
        logic: BinLogic[Long, In, Out],
        main: Boolean,
        forward: (Long, Out) => Unit,
    ): MegaphoneEngine[Long, In, Out] = {
      val e = new MegaphoneEngine[Long, In, Out](
        sim, cfg.workers, cfg.bins, cfg.cost, logic, mkBinOf(cfg.bins),
        onOutput = (_, t, o, _) => forward(t, o),
        onLatency = if (main) (lo, hi, w) => { hist.addRange(lo, hi, w.toDouble); series.add(sim.now, hi) } else null,
        noiseSeed = cfg.seed,
      )
      e.initBins()
      e
    }

    /** Pipe e1's outputs/progress into e2's data input. */
    def connect[V2](e1: MegaphoneEngine[Long, In, Out], e2: MegaphoneEngine[Long, V2, Out]): Unit =
      e1.probe.onAdvance { _ =>
        // Read the live frontier: a stale advance value could overshoot.
        val f = e1.probe.frontier
        if (f == Long.MaxValue) e2.dataInput.close()
        else { e2.dataInput.advanceTo(f); e2.controlInput.advanceTo(f) }
      }

    val key = keyOf(q, cfg)

    def mkSend(e: MegaphoneEngine[Long, In, Out]): (Long, Seq[Event]) => Unit = (t, evs) => {
      val recs = evs.flatMap(ev => key(ev).map { case (k, v) => Rec(k, v) })
      recs.grouped(math.max(1, recs.size / cfg.workers + 1)).zipWithIndex.foreach { case (g, w) =>
        e.dataInput.send(w % cfg.workers, t, g)
      }
    }

    def mkBuilt[V2](
        e1: MegaphoneEngine[Long, In, Out],
        e2: Option[MegaphoneEngine[Long, V2, Out]],
        mainIsStage2: Boolean,
    ): Built = {
      val main: MegaphoneEngine[_, _, _] = if (mainIsStage2) e2.get else e1
      val ctl  = if (mainIsStage2) new MigrationController(e2.get) else new MigrationController(e1)
      // The non-main stage never migrates: its control stream closes now.
      if (mainIsStage2) e1.controlInput.close() else e2.foreach(_.controlInput.close())
      Built(
        sim,
        send = mkSend(e1),
        advance = t => e1.dataInput.advanceTo(t),
        closeData = () => e1.dataInput.close(),
        controlAdvance = t => (if (mainIsStage2) e2.get.controlInput else e1.controlInput).advanceTo(t),
        closeControl = () => (if (mainIsStage2) e2.get.controlInput else e1.controlInput).close(),
        migrate = (at, s, moves, done) => ctl.migrate(at, s, moves)(done),
        mainBins = cfg.bins,
        drained = () => e1.probe.frontier == Long.MaxValue && e2.forall(_.probe.frontier == Long.MaxValue),
        outputCount = () => outCount,
      )
    }

    q match {
      case 1 => mkBuilt(stage1(new Q1Logic, main = true, (_, o) => countOut(o)), None: Option[MegaphoneEngine[Long, In, Out]], mainIsStage2 = false)
      case 2 => mkBuilt(stage1(new Q2Logic, main = true, (_, o) => countOut(o)), None: Option[MegaphoneEngine[Long, In, Out]], mainIsStage2 = false)
      case 3 => mkBuilt(stage1(new Q3Logic, main = true, (_, o) => countOut(o)), None: Option[MegaphoneEngine[Long, In, Out]], mainIsStage2 = false)
      case 4 =>
        val e2 = stage2(new AvgLogic, main = false)
        val e1 = stage1(new CloseLogic(emitSeller = false), main = true, (t, o) => {
          val (cat, price) = o.asInstanceOf[(Long, Long)]
          e2.dataInput.send((cat % cfg.workers).toInt, t, Seq(Rec(cat, (cat, price))))
        })
        connect(e1, e2)
        mkBuilt(e1, Some(e2), mainIsStage2 = false)
      case 5 =>
        val e2 = stage2(new MaxCountLogic, main = false)
        val e1 = stage1(new HotLogic(cfg.windowNs), main = true, (t, o) => {
          val (a, c) = o.asInstanceOf[(Long, Long)]
          e2.dataInput.send(0, t, Seq(Rec(0L, (a, c))))
        })
        connect(e1, e2)
        mkBuilt(e1, Some(e2), mainIsStage2 = false)
      case 6 =>
        val e2 = stage2(new Last10Logic, main = true)
        val e1 = stage1(new CloseLogic(emitSeller = true), main = false, (t, o) => {
          val (seller, price) = o.asInstanceOf[(Long, Long)]
          e2.dataInput.send((seller % cfg.workers).toInt, t, Seq(Rec(seller, (seller, price))))
        })
        connect(e1, e2)
        mkBuilt(e1, Some(e2), mainIsStage2 = true)
      case 7 => mkBuilt(stage1(new MaxBidLogic(cfg.windowNs), main = true, (_, o) => countOut(o)), None: Option[MegaphoneEngine[Long, In, Out]], mainIsStage2 = false)
      case 8 => mkBuilt(stage1(new NewUsersLogic(cfg.q8WindowNs), main = true, (_, o) => countOut(o)), None: Option[MegaphoneEngine[Long, In, Out]], mainIsStage2 = false)
      case _ => throw new IllegalArgumentException(s"unknown query $q")
    }
  }
}
