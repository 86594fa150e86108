package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.automaton.Dfa
import repro.data.StreamGen
import repro.spark.SparkBatchRpq

/** Batch RPQ evaluation on a Yago-like snapshot, as a Catalyst dataflow.
  *
  * Usage: `SparkBatchRpqJob [pattern] [nEdges]`
  * (default: `participatedIn happenedIn hasCapital*` over 20000 edges).
  */
object SparkBatchRpqJob {
  def main(args: Array[String]): Unit = {
    val pattern = args.lift(0).getOrElse("participatedIn happenedIn hasCapital*")
    val nEdges  = args.lift(1).map(_.toInt).getOrElse(20000)

    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("spark-batch-rpq")
      .config("spark.sql.shuffle.partitions", "16")
      .getOrCreate()
    import spark.implicits._

    val edges = StreamGen.yagoLike(nEntities = 2000, nEdges = nEdges)
      .map(t => (t.src, t.dst, t.label)).toDF("src", "dst", "label")
    val dfa = Dfa.fromPattern(pattern)
    val t0 = System.nanoTime()
    val result = SparkBatchRpq.evaluate(edges, dfa)
    val count = result.count()
    println(f"query `$pattern` -> $count result pairs in ${(System.nanoTime() - t0) / 1e9}%.2fs")
    result.show(20, truncate = false)
    spark.stop()
  }
}
