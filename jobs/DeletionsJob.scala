package repro.jobs

import repro.data.{Queries, StreamGen}
import repro.harness.{BenchConfig, Runner}

/** Fig 10 experiment as a spark-submit entrypoint: explicit-deletion impact
  * on the Yago-like graph. Usage: `DeletionsJob [ratio ...]` (e.g. 0.02 0.1).
  */
object DeletionsJob {
  def main(args: Array[String]): Unit = {
    val ratios = if (args.nonEmpty) args.toSeq.map(_.toDouble) else Seq(0.0, 0.02, 0.05, 0.10)
    val (base, window) = BenchConfig.yago()
    val rows = for (q <- Queries.yago; ratio <- ratios) yield {
      val stream = if (ratio == 0.0) base else StreamGen.withDeletions(base, ratio)
      val r = Runner.runRapq(q.name, "yago", q.dfa, window, stream)
      Seq(q.name, f"${ratio * 100}%.0f%%", Runner.fmt(r.meanMicros), Runner.fmt(r.p99Micros))
    }
    println(Runner.markdownTable(Seq("query", "deletions", "mean (µs)", "p99 (µs)"), rows))
  }
}
