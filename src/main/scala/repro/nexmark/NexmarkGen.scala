package repro.nexmark

import repro.dataflow.SourceEvent
import scala.collection.mutable
import scala.util.Random

/** Configuration of the NexMark-lite stream generator.
  *
  * Events are interleaved persons : auctions : bids at the classic NexMark
  * 1 : 3 : 46 proportions, timestamped at a constant `ratePerSec` over
  * `durationMicros`. `hotRatio` is the paper's hot-items knob: that share
  * of bids (auction & bidder) and auctions (seller) target a tiny hot key
  * set, so the instances owning those keys straggle.
  *
  * @param include which event classes to generate (queries consume subsets:
  *                Q1/Q12 bids, Q3/Q8 persons+auctions)
  */
final case class NexmarkConfig(
    ratePerSec: Double,
    durationMicros: Long,
    hotRatio: Double = 0.0,
    nHot: Int = 2,
    seed: Long = 7L,
    include: Set[String] = Set("person", "auction", "bid"),
    personShare: Int = 1,
    auctionShare: Int = 3,
    bidShare: Int = 46,
)

/** Deterministic NexMark-lite event stream generator (the paper extends
  * the generator of Kalavri et al. [33]; we re-implement the same contract:
  * rate-controlled, proportioned, skewable, seeded).
  */
object NexmarkGen {
  val States: IndexedSeq[String] =
    IndexedSeq("OR", "ID", "CA", "NY", "WA", "TX", "FL", "MA", "GA")
  val Cities: IndexedSeq[String] =
    IndexedSeq("Portland", "Boise", "SF", "NYC", "Seattle", "Austin")
  val NumCategories = 20
  /** Q3's category predicate. */
  val Q3Category = 10
  /** Tumbling window size for Q8/Q12 (event time, micros). */
  val WindowMicros: Long = 10_000_000L

  /** Generate the interleaved, timestamp-ordered event stream. */
  def events(cfg: NexmarkConfig): IndexedSeq[NxEvent] = {
    val rnd = new Random(cfg.seed)
    val total = math.max(1L, (cfg.ratePerSec * cfg.durationMicros / 1e6).toLong)
    val stepMicros = cfg.durationMicros.toDouble / total

    val cycle: IndexedSeq[String] = {
      val pat = mutable.ArrayBuffer.empty[String]
      if (cfg.include("person"))  pat ++= Seq.fill(cfg.personShare)("person")
      if (cfg.include("auction")) pat ++= Seq.fill(cfg.auctionShare)("auction")
      if (cfg.include("bid"))     pat ++= Seq.fill(cfg.bidShare)("bid")
      require(pat.nonEmpty, "at least one event class must be included")
      // Spread classes through the cycle deterministically.
      new Random(cfg.seed ^ 0xbeef).shuffle(pat.toIndexedSeq)
    }

    var nextPerson = 1L
    var nextAuction = 1L
    val personIds = mutable.ArrayBuffer.empty[Long]
    val auctionIds = mutable.ArrayBuffer.empty[Long]

    // When a referenced entity class is not part of the generated stream
    // (e.g. bid-only input for Q1/Q12), draw its ids from a virtual
    // universe that grows at the full 1:3:46 stream's proportions — the
    // references then have the same key distribution as in a full stream.
    val includedShare =
      (if (cfg.include("person")) cfg.personShare else 0) +
        (if (cfg.include("auction")) cfg.auctionShare else 0) +
        (if (cfg.include("bid")) cfg.bidShare else 0)
    var i = 0L
    def virtUniverse(share: Int): Long =
      math.max(cfg.nHot.toLong, 1L + i * share / math.max(1, includedShare))

    def somePerson(): Long =
      if (cfg.hotRatio > 0 && rnd.nextDouble() < cfg.hotRatio)
        1L + rnd.nextInt(cfg.nHot)
      else if (cfg.include("person")) {
        if (personIds.isEmpty) { personIds += nextPerson; nextPerson += 1 }
        personIds(rnd.nextInt(personIds.length))
      } else 1L + rnd.nextLong(virtUniverse(cfg.personShare))

    def someAuction(): Long =
      if (cfg.hotRatio > 0 && rnd.nextDouble() < cfg.hotRatio)
        1L + rnd.nextInt(cfg.nHot)
      else if (cfg.include("auction")) {
        if (auctionIds.isEmpty) { auctionIds += nextAuction; nextAuction += 1 }
        auctionIds(rnd.nextInt(auctionIds.length))
      } else 1L + rnd.nextLong(virtUniverse(cfg.auctionShare))

    val out = IndexedSeq.newBuilder[NxEvent]
    while (i < total) {
      val ts = math.round(i * stepMicros)
      cycle(((i % cycle.length).toInt)) match {
        case "person" =>
          val id = nextPerson; nextPerson += 1; personIds += id
          out += NxPerson(id, s"p$id", Cities(rnd.nextInt(Cities.length)),
            States(rnd.nextInt(States.length)), ts)
        case "auction" =>
          val id = nextAuction; nextAuction += 1; auctionIds += id
          out += NxAuction(id, somePerson(), rnd.nextInt(NumCategories), ts,
            ts + 60_000_000L)
        case "bid" =>
          out += NxBid(someAuction(), somePerson(), 10.0 + rnd.nextInt(1000) / 10.0, ts)
      }
      i += 1
    }
    out.result()
  }

  /** Wrap events for the simulator's replayable input. */
  def sourceEvents(evs: IndexedSeq[NxEvent]): IndexedSeq[SourceEvent] =
    evs.map(e => SourceEvent(e.ts, e, e.sizeBytes))
}
