package repro.jobs

import java.nio.file.Files

import org.apache.spark.sql.SparkSession

import repro.automaton.Dfa
import repro.data.StreamGen
import repro.spark.StructuredStreamingRpq
import repro.stream.WindowSpec

/** Persistent RPQ evaluation as a Structured Streaming job: generates a
  * synthetic LDBC-like sgt stream, feeds it in micro-batches through the
  * incremental DataFrame maintainer, and prints the append-only result log.
  *
  * Usage: `StreamingRpqJob [pattern] [nEdges] [batchSize]`
  * (default: `likes replyOf*` over 2000 edges in batches of 200).
  */
object StreamingRpqJob {
  def main(args: Array[String]): Unit = {
    val pattern   = args.lift(0).getOrElse("likes replyOf*")
    val nEdges    = args.lift(1).map(_.toInt).getOrElse(2000)
    val batchSize = args.lift(2).map(_.toInt).getOrElse(200)

    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("streaming-rpq")
      .config("spark.sql.shuffle.partitions", "8")
      .getOrCreate()

    val dir = Files.createTempDirectory("rpq-stream")
    val window = WindowSpec(size = nEdges / 4, slide = math.max(1, nEdges / 40))
    val job = new StructuredStreamingRpq(spark, Dfa.fromPattern(pattern), window, dir)
    job.start()

    val stream = StreamGen.ldbcLike(nPersons = 500, nEdges = nEdges)
    stream.grouped(batchSize).zipWithIndex.foreach { case (batch, i) =>
      job.feed(batch, i)
      job.processAllAvailable()
      println(s"batch $i: ${batch.size} sgts -> ${job.output.size} results so far")
    }
    job.stop()
    println(s"final result-log size: ${job.output.size}")
    spark.stop()
  }
}
