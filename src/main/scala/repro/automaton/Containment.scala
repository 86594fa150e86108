package repro.automaton

import scala.collection.mutable

/** Suffix-language containment relation (paper Definitions 14–16).
  *
  * For a DFA `A` and states `s`, `t`, the suffix language `[s]` is the set of
  * words taking `A` from `s` to a final state. The RSPQ engine needs the
  * boolean relation `[s] ⊇ [t]` for all state pairs; the paper computes it
  * once at query registration. We decide `L(A_t) ⊆ L(A_s)` by the standard
  * product construction: explore pairs `(q_t, q_s?)` from `(t, s)`, where the
  * `s`-side may fall off into an implicit dead state (None); containment
  * fails iff some reachable pair is (accepting, non-accepting-or-dead).
  */
final class Containment private (val dfa: Dfa, matrix: Array[Array[Boolean]]) {

  /** `[s] ⊇ [t]` — every word accepted from `t` is accepted from `s`. */
  def superset(s: Int, t: Int): Boolean = matrix(s)(t)

  /** Whether the whole automaton has the suffix-language containment property
    * (paper Definition 15): along every path of useful states, successor
    * suffix languages are contained in predecessor ones. In a trimmed DFA
    * every state is on a path from start to a final state, so the check is
    * simply: for every transition s → t, `[s] ⊇ [t]`.
    *
    * Queries whose DFA has this property are conflict-free on every graph
    * (e.g. Table 2's Q1, Q4, Q11).
    */
  lazy val hasContainmentProperty: Boolean =
    (0 until dfa.k).forall(s => dfa.trans(s).values.forall(t => superset(s, t)))
}

object Containment {

  def apply(dfa: Dfa): Containment = {
    val k = dfa.k
    val matrix = Array.tabulate(k, k)((s, t) => subsetOf(dfa, t, s))
    new Containment(dfa, matrix)
  }

  /** L(from `sub`) ⊆ L(from `sup`)? BFS over the pair graph. */
  private def subsetOf(dfa: Dfa, sub: Int, sup: Int): Boolean = {
    val seen  = mutable.Set.empty[(Int, Option[Int])]
    val queue = mutable.Queue.empty[(Int, Option[Int])]
    val start = (sub, Option(sup))
    seen += start; queue.enqueue(start)
    while (queue.nonEmpty) {
      val (a, bOpt) = queue.dequeue()
      val aAccepts = dfa.isFinal(a)
      val bAccepts = bOpt.exists(dfa.isFinal)
      if (aAccepts && !bAccepts) return false
      for ((l, a2) <- dfa.trans(a)) {
        val b2 = bOpt.flatMap(b => dfa.delta(b, l))
        val p  = (a2, b2)
        if (!seen(p)) { seen += p; queue.enqueue(p) }
      }
    }
    true
  }
}
