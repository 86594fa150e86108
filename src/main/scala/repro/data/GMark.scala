package repro.data

import scala.util.Random

import repro.automaton.Regex
import repro.stream.Sgt

/** gMark-style workload generation (paper §5.1.2, [12]): a synthetic graph
  * with an LDBC-SNB-mimicking schema, and random RPQs of a target size.
  *
  * Query recipe, verbatim from the paper: "Each RPQ is formulated by grouping
  * labels into concatenations and alternations of size up to 3 where each
  * group has a 50% probability of having * and +"; the size |Q_R| counts
  * label occurrences plus occurrences of * and +.
  */
object GMark {

  /** The schema's edge labels (the recursive social-network core of LDBC). */
  val labels: Vector[String] = Vector("knows", "replyOf", "likes", "hasCreator")

  /** LDBC-schema-mimicking graph with fixed-rate timestamps, as the paper
    * assigns to the (static) gMark output.
    */
  def graph(nPersons: Int, nEdges: Int, seed: Long = 19): Vector[Sgt] =
    StreamGen.ldbcLike(nPersons, nEdges, seed)
      .filter(t => labels.contains(t.label))

  /** One random RPQ of size ≥ `targetSize` (stops at the first group crossing
    * the target, so sizes land in `[targetSize, targetSize + 3]`).
    */
  def randomQuery(targetSize: Int, rnd: Random): Regex = {
    require(targetSize >= 1)
    var groups = List.empty[Regex]
    var size = 0
    while (size < targetSize) {
      val g = rnd.nextInt(3) + 1
      val syms: Seq[Regex] = Seq.fill(g)(Regex.Sym(labels(rnd.nextInt(labels.length))))
      var group = if (rnd.nextBoolean()) Regex.altAll(syms) else Regex.concatAll(syms)
      size += g
      if (rnd.nextDouble() < 0.5) {
        group = if (rnd.nextBoolean()) Regex.Star(group) else Regex.Plus(group)
        size += 1
      }
      groups ::= group
    }
    Regex.concatAll(groups.reverse)
  }

  /** The paper's synthetic workload: 100 RPQs with sizes spread over 2–20. */
  def workload(n: Int = 100, seed: Long = 23): Vector[Regex] = {
    val rnd = new Random(seed)
    Vector.tabulate(n)(i => randomQuery(2 + (i % 19), rnd))
  }
}
