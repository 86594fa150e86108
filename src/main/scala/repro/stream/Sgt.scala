package repro.stream

/** Edge operation type of a streaming graph tuple (paper Definition 2). */
sealed trait Op
object Op {
  case object Insert extends Op
  case object Delete extends Op
}

/** Streaming graph tuple: `(τ, (u,v), l, op)` (paper Definition 2).
  *
  * `ts` is the event (application) timestamp assigned by the source; streams
  * are assumed to arrive in non-decreasing `ts` order (paper §2).
  */
final case class Sgt(ts: Long, src: Long, dst: Long, label: String, op: Op = Op.Insert)

/** Time-based sliding window configuration (paper Definitions 4–5).
  *
  * @param size  `|W|`, the window length in time units
  * @param slide `β`, the slide interval: expiry runs every `β` time units
  *              (eager evaluation of arrivals, lazy expiration — §2)
  */
final case class WindowSpec(size: Long, slide: Long) {
  require(size > 0, s"window size must be positive: $size")
  require(slide > 0, s"slide interval must be positive: $slide")

  /** Earliest timestamp (exclusive) still inside the window ending at `endTs`:
    * contents are `{ t : endTs − |W| < t.ts ≤ endTs }`.
    */
  def lowerBound(endTs: Long): Long = endTs - size
}
