package repro.nexmark

import org.scalatest.funsuite.AnyFunSuite

class EventGenSpec extends AnyFunSuite {
  private def gen() = new EventGen(1_000_000L, 100, 10_000_000L, seed = 5L)

  test("generation is deterministic in the seed") {
    val a = gen().all(20)
    val b = gen().all(20)
    assert(a == b)
  }

  test("different seeds differ") {
    val a = new EventGen(1_000_000L, 100, 10_000_000L, seed = 5L).all(10)
    val b = new EventGen(1_000_000L, 100, 10_000_000L, seed = 6L).all(10)
    assert(a != b)
  }

  test("epochs must be requested in order") {
    val g = gen()
    g.epoch(0)
    intercept[IllegalArgumentException](g.epoch(2))
  }

  test("event mix is 1:3:46 persons:auctions:bids per 50 events") {
    val evs = gen().all(50) // 5000 events
    val p   = evs.count(_.isInstanceOf[Person])
    val a   = evs.count(_.isInstanceOf[Auction])
    val b   = evs.count(_.isInstanceOf[Bid])
    assert(p == 100 && a == 300 && b == 4600)
  }

  test("ids are dense and monotone") {
    val evs = gen().all(30)
    val ps  = evs.collect { case p: Person => p.id }
    val as  = evs.collect { case a: Auction => a.id }
    assert(ps == ps.indices.map(_.toLong))
    assert(as == as.indices.map(_.toLong))
  }

  test("bids reference already-opened auctions and existing persons") {
    val evs        = gen().all(30)
    var maxAuction = -1L
    var maxPerson  = -1L
    evs.foreach {
      case a: Auction => maxAuction = a.id; assert(a.seller <= maxPerson)
      case p: Person  => maxPerson = p.id
      case b: Bid =>
        assert(b.auction <= maxAuction && b.auction >= 0)
        assert(b.bidder <= maxPerson)
    }
  }

  test("timestamps equal the epoch start") {
    val g = gen()
    (0 until 5).foreach(e => g.epoch(e).foreach(ev => assert(ev.time == e * 1_000_000L)))
  }

  test("auction lifetimes are jittered within [life/2, life) and positive") {
    val as = gen().all(40).collect { case a: Auction => a }
    as.foreach { a =>
      val life = a.expires - a.time
      assert(life >= 5_000_000L && life < 10_000_000L)
    }
    // Distinct expiry times for same-epoch auctions (close-order determinism).
    as.groupBy(_.time).values.foreach(g => assert(g.map(_.expires).distinct.size == g.size))
  }

  test("auction categories are 1..10") {
    val as = gen().all(20).collect { case a: Auction => a.category }
    assert(as.forall(c => c >= 1 && c <= 10))
    assert(as.toSet.size > 5)
  }

  test("person states cycle through the US state list") {
    val ps = gen().all(50).collect { case p: Person => p.state }
    assert(ps.toSet == Events.UsStates.toSet)
  }
}
