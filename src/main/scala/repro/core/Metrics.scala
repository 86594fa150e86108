package repro.core

import java.util.Arrays

/** Per-tuple latency recorder with the statistics the paper reports:
  * mean, tail (99th percentile) and throughput (edges/second).
  *
  * Latencies are recorded in nanoseconds. Like the paper (§5.1.1), callers
  * should record only tuples whose label is in the query alphabet.
  */
final class Metrics(initialCapacity: Int = 1 << 16) {
  private var buf  = new Array[Long](initialCapacity)
  private var size = 0
  private var totalNanos = 0L

  def record(nanos: Long): Unit = {
    if (size == buf.length) buf = Arrays.copyOf(buf, buf.length * 2)
    buf(size) = nanos
    size += 1
    totalNanos += nanos
  }

  def count: Int = size

  def meanMicros: Double = if (size == 0) 0.0 else totalNanos / 1e3 / size

  /** q ∈ (0, 1], e.g. 0.99 for the paper's tail latency. */
  def percentileMicros(q: Double): Double = {
    if (size == 0) return 0.0
    val sorted = Arrays.copyOf(buf, size)
    Arrays.sort(sorted)
    val idx = math.min(size - 1, math.max(0, math.ceil(q * size).toInt - 1))
    sorted(idx) / 1e3
  }

  def p99Micros: Double = percentileMicros(0.99)

  /** Tuples per second, from the sum of recorded per-tuple latencies —
    * matches the paper's closed-system setup where throughput is the inverse
    * of mean latency (§5.1.1).
    */
  def throughputPerSec: Double =
    if (totalNanos == 0) 0.0 else size.toDouble / (totalNanos / 1e9)
}
