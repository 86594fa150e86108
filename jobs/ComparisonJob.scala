package repro.jobs

import repro.data.{Queries, StreamGen}
import repro.harness.{BenchConfig, Runner}
import repro.stream.WindowSpec

/** Fig 11 experiment as a spark-submit entrypoint: incremental RAPQ vs the
  * per-arrival re-evaluation baseline (Virtuoso emulation).
  */
object ComparisonJob {
  def main(args: Array[String]): Unit = {
    val edges = math.max(600, (2400 * BenchConfig.scale).toInt)
    val stream = StreamGen.yagoLike(math.max(100, (600 * BenchConfig.scale).toInt), edges)
    val window = WindowSpec(edges / 4, math.max(1, edges / 40))
    val rows = Queries.yago.map { q =>
      val inc  = Runner.runRapq(q.name, "yago", q.dfa, window, stream)
      val base = Runner.runBaseline(q.name, "yago", q.dfa, window, stream)
      Seq(q.name, Runner.fmt(inc.throughputPerSec), Runner.fmt(base.throughputPerSec),
          f"${inc.throughputPerSec / math.max(1e-9, base.throughputPerSec)}%.0fx")
    }
    println(Runner.markdownTable(
      Seq("query", "RAPQ t/s", "baseline t/s", "speed-up"), rows))
  }
}
