package repro.jobs

import repro.data.Queries
import repro.harness.{BenchConfig, Runner}

/** Fig 4/5 experiment as a spark-submit entrypoint.
  *
  * Usage: `ThroughputLatencyJob [dataset ...]` with datasets among
  * `so`, `ldbc`, `yago` (default: all three).
  */
object ThroughputLatencyJob {
  def main(args: Array[String]): Unit = {
    val datasets = if (args.nonEmpty) args.toSeq else Seq("so", "ldbc", "yago")
    val results = datasets.flatMap { ds =>
      val (stream, window) = BenchConfig.dataset(ds)
      Queries.forDataset(ds).map(q => Runner.runRapq(q.name, ds, q.dfa, window, stream))
    }
    println(Runner.markdownTable(
      Seq("dataset", "query", "matched", "throughput (t/s)", "mean (µs)",
          "p99 (µs)", "trees", "nodes", "results"),
      results.map(r => Seq(r.dataset, r.query, r.matched.toString,
        Runner.fmt(r.throughputPerSec), Runner.fmt(r.meanMicros),
        Runner.fmt(r.p99Micros), r.trees.toString, r.nodes.toString,
        r.resultPairs.toString))))
  }
}
