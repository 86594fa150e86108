package repro.jobs

import repro.data.Queries
import repro.harness.{BenchConfig, Runner}

/** Table 4 experiment as a spark-submit entrypoint: RSPQ feasibility and
  * overhead relative to RAPQ per dataset.
  */
object SimplePathJob {
  def main(args: Array[String]): Unit = {
    val datasets = if (args.nonEmpty) args.toSeq else Seq("yago", "so", "ldbc")
    val rows = datasets.flatMap { ds =>
      val (stream, window) = BenchConfig.dataset(ds)
      Queries.forDataset(ds).map { q =>
        val ra = Runner.runRapq(q.name, ds, q.dfa, window, stream)
        val rs = Runner.runRspq(q.name, ds, q.dfa, window, stream, stepBudget = 300_000)
        Seq(ds, q.name, if (rs.completed) "yes" else "NO", rs.conflicts.toString,
            Runner.fmt(ra.p99Micros),
            if (rs.completed) f"${rs.p99Micros / math.max(1e-9, ra.p99Micros)}%.1fx" else "—")
      }
    }
    println(Runner.markdownTable(
      Seq("dataset", "query", "successful", "conflicts", "RAPQ p99 (µs)", "overhead"),
      rows))
  }
}
