package repro.spark

import scala.util.Random

import org.apache.spark.sql.DataFrame

import repro.{Oracle, SparkSpec}
import repro.automaton.Dfa
import repro.batch.BatchRpq

/** The Catalyst semi-naive RPQ evaluator, checked row-for-row against the
  * DuckDB `WITH RECURSIVE` oracle and the in-memory batch algorithm.
  */
class SparkBatchRpqSpec extends SparkSpec {

  private def edgesDf(edges: Seq[(Long, Long, String)]): DataFrame = {
    import spark.implicits._
    edges.toDF("src", "dst", "label")
  }

  private def finalsDf(dfa: Dfa): DataFrame = {
    import spark.implicits._
    dfa.finals.toSeq.toDF("state")
  }

  private def checkAgainstDuckDb(edges: Seq[(Long, Long, String)], pattern: String): Unit = {
    val dfa = Dfa.fromPattern(pattern)
    val df = edgesDf(edges)
    val result = SparkBatchRpq.evaluate(df, dfa)
    Oracle.assertEquivalent(
      result,
      SparkBatchRpq.oracleSql(dfa),
      "edges"  -> df,
      "trans"  -> SparkBatchRpq.transitionsDf(spark, dfa),
      "finals" -> finalsDf(dfa),
    )
  }

  private def randomEdges(n: Int, nV: Int, labels: Seq[String], seed: Long) = {
    val rnd = new Random(seed)
    (1 to n).map(_ => (rnd.nextInt(nV).toLong, rnd.nextInt(nV).toLong,
                       labels(rnd.nextInt(labels.length))))
  }

  test("chain graph, concatenation query — DuckDB oracle") {
    checkAgainstDuckDb(Seq((1L, 2L, "a"), (2L, 3L, "b"), (3L, 4L, "c")), "a b c")
  }

  test("cyclic graph, kleene plus — DuckDB oracle") {
    checkAgainstDuckDb(Seq((1L, 2L, "a"), (2L, 3L, "a"), (3L, 1L, "a")), "a+")
  }

  test("the s0-revisit corner matches the oracle's exclusion") {
    checkAgainstDuckDb(Seq((1L, 2L, "a"), (2L, 1L, "a")), "(a a)*")
  }

  for ((p, seed) <- Seq(("a b*", 1), ("(a | b | c)+", 2), ("a b* c", 3),
                        ("(a b)+", 4), ("a? b*", 5))) {
    test(s"random graph vs DuckDB oracle: $p") {
      checkAgainstDuckDb(randomEdges(60, 10, Seq("a", "b", "c"), seed), p)
    }
  }

  for ((p, seed) <- Seq(("a* b*", 11), ("(a | b | c) b*", 12), ("a b c*", 13))) {
    test(s"random graph vs in-memory batch: $p") {
      val edges = randomEdges(80, 12, Seq("a", "b", "c"), seed)
      val dfa = Dfa.fromPattern(p)
      val got = SparkBatchRpq.evaluate(edgesDf(edges), dfa)
        .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
      val expected = BatchRpq.evaluate(edges.map(e => BatchRpq.E(e._1, e._2, e._3)), dfa)
      assert(got == expected)
    }
  }

  test("empty edge set yields empty results") {
    val dfa = Dfa.fromPattern("a b")
    assert(SparkBatchRpq.evaluate(edgesDf(Nil), dfa).isEmpty)
  }

  test("productEdges expands one edge into all matching transitions") {
    val dfa = Dfa.fromPattern("a+") // two states, both with an a-transition
    val pe = SparkBatchRpq.productEdges(edgesDf(Seq((1L, 2L, "a"))), dfa)
    assert(pe.count() == 2)
  }
}
