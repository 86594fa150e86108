package repro.jobs

import repro.data.{Queries, StreamGen}
import repro.harness.{BenchConfig, Runner}
import repro.stream.WindowSpec

/** Fig 6 experiment as a spark-submit entrypoint: |W| and β sensitivity on
  * the Yago-like graph. Usage: `WindowScalabilityJob [nEdges]`.
  */
object WindowScalabilityJob {
  def main(args: Array[String]): Unit = {
    val edges = args.lift(0).map(_.toInt)
      .getOrElse(math.max(2000, (24000 * BenchConfig.scale).toInt))
    val stream = StreamGen.yagoLike(math.max(100, (3000 * BenchConfig.scale).toInt), edges)
    val queries = Queries.yago.filter(q => Set("Q2", "Q7", "Q10").contains(q.name))

    val rows = for {
      q <- queries
      w <- Seq(edges / 8, edges / 4, edges * 3 / 8, edges / 2)
    } yield {
      val r = Runner.runRapq(q.name, s"|W|=$w", q.dfa, WindowSpec(w, math.max(1, w / 10)), stream)
      Seq(q.name, w.toString, Runner.fmt(r.meanMicros), Runner.fmt(r.p99Micros),
          Runner.fmt(r.expiryMillis))
    }
    println(Runner.markdownTable(
      Seq("query", "|W|", "mean (µs)", "p99 (µs)", "expiry total (ms)"), rows))
  }
}
