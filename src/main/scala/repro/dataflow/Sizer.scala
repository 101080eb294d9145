package repro.dataflow

/** Values that know their serialized size. Query event types implement
  * this; anything else gets a conservative default.
  */
trait Sized { def sizeBytes: Int }

object Sizer {
  /** Serialized payload size of a record value. */
  def bytes(value: Any): Int = value match {
    case s: Sized  => s.sizeBytes
    case _: Long   => 8
    case _: Int    => 4
    case _: Double => 8
    case s: String => 4 + s.length
    case p: Product => 8 + p.productIterator.map(bytes).sum
    case _         => 32
  }
}
