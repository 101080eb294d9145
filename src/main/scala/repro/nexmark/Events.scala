package repro.nexmark

import repro.dataflow.Sized

/** NexMark event types (simplified to the fields the four queries touch).
  * `sizeBytes` approximates a compact binary wire encoding; it drives serde
  * cost and the Table II overhead ratios.
  */
sealed trait NxEvent extends Sized { def ts: Long }

/** A registered person/user. */
final case class NxPerson(id: Long, name: String, city: String, state: String, ts: Long)
    extends NxEvent {
  def sizeBytes: Int = 8 + name.length + city.length + state.length + 8 + 3
}

/** An auction opened by `seller` in `category`. */
final case class NxAuction(id: Long, seller: Long, category: Int, ts: Long, expires: Long)
    extends NxEvent {
  def sizeBytes: Int = 8 + 8 + 4 + 8 + 8
}

/** A bid on `auction` by `bidder`. */
final case class NxBid(auction: Long, bidder: Long, price: Double, ts: Long) extends NxEvent {
  def sizeBytes: Int = 8 + 8 + 8 + 8
}

/** Q1 output: bid with price converted to EUR. */
final case class Q1Out(auction: Long, bidder: Long, priceEur: Double, ts: Long) extends Sized {
  def sizeBytes: Int = 32
}

/** Q3 output: a person selling in OR/ID/CA in category 10. */
final case class Q3Out(name: String, city: String, state: String, auction: Long) extends Sized {
  def sizeBytes: Int = name.length + city.length + state.length + 8 + 3
}

/** Q8 output: a person who opened an auction within the same window. */
final case class Q8Out(personId: Long, name: String, window: Long) extends Sized {
  def sizeBytes: Int = 8 + name.length + 8 + 1
}

/** Q12 running output: bid count of `bidder` within `window` so far. */
final case class Q12Out(bidder: Long, window: Long, count: Long) extends Sized {
  def sizeBytes: Int = 24
}
