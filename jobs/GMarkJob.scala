package repro.jobs

import repro.automaton.Dfa
import repro.data.GMark
import repro.harness.{BenchConfig, Runner}

/** Fig 7–9 experiment as a spark-submit entrypoint: the gMark synthetic RPQ
  * workload — DFA sizes, and throughput per query on the gMark graph.
  */
object GMarkJob {
  def main(args: Array[String]): Unit = {
    val workload = GMark.workload()
    val (stream, window) = BenchConfig.gmark()

    println("DFA sizes (|Q_R| -> k):")
    workload.foreach(r => println(s"  ${r.size} -> ${Dfa.fromRegex(r).k}  $r"))

    val rows = workload.zipWithIndex.filter(_._2 % 3 == 0).map(_._1).map { r =>
      val dfa = Dfa.fromRegex(r)
      val res = Runner.runRapq(r.toString.take(40), "gmark", dfa, window, stream)
      Seq(r.toString.take(40), r.size.toString, dfa.k.toString,
          Runner.fmt(res.throughputPerSec), res.nodes.toString)
    }
    println(Runner.markdownTable(
      Seq("query", "|Q_R|", "k", "throughput (t/s)", "Δ nodes"), rows))
  }
}
