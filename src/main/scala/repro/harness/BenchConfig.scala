package repro.harness

import repro.data.StreamGen
import repro.stream.{Sgt, WindowSpec}

/** Scaled-down dataset/window configurations for the benchmark suites.
  *
  * The paper's defaults are kept *proportionally*: SO uses |W|/β = 30
  * (1 month / 1 day), LDBC |W|/β = 10 (10 days / 1 day), Yago windows hold a
  * fixed number of edges with β = |W|/10, and every stream advances one time
  * unit per tuple. `BENCH_SCALE` (default 1.0) multiplies stream lengths.
  */
object BenchConfig {

  val scale: Double = sys.env.get("BENCH_SCALE").map(_.toDouble).getOrElse(1.0)

  private def n(base: Int): Int = math.max(100, (base * scale).toInt)

  /** Stackoverflow-like: dense, cyclic, 3 labels. */
  def so(): (Vector[Sgt], WindowSpec) = {
    val edges = n(16000)
    (StreamGen.soLike(nVertices = n(800), nEdges = edges),
     WindowSpec(size = edges / 4, slide = math.max(1, edges / 120)))
  }

  /** LDBC-SNB-like: sparse, heterogeneous. */
  def ldbc(): (Vector[Sgt], WindowSpec) = {
    val edges = n(30000)
    (StreamGen.ldbcLike(nPersons = n(1500), nEdges = edges),
     WindowSpec(size = edges / 10, slide = math.max(1, edges / 100)))
  }

  /** Yago2s-like: rich schema, shallow and mostly acyclic. */
  def yago(): (Vector[Sgt], WindowSpec) = {
    val edges = n(30000)
    (StreamGen.yagoLike(nEntities = n(3000), nEdges = edges),
     WindowSpec(size = edges / 4, slide = math.max(1, edges / 40)))
  }

  def dataset(name: String): (Vector[Sgt], WindowSpec) = name match {
    case "so"   => so()
    case "ldbc" => ldbc()
    case "yago" => yago()
    case other  => throw new IllegalArgumentException(s"unknown dataset: $other")
  }

  /** gMark graph for the synthetic-query workload (Figs 7–9). */
  def gmark(): (Vector[Sgt], WindowSpec) = {
    val stream = repro.data.GMark.graph(nPersons = n(2000), nEdges = n(30000))
    val span = if (stream.isEmpty) 1L else stream.last.ts
    (stream, WindowSpec(size = math.max(1, span / 4), slide = math.max(1, span / 40)))
  }
}
