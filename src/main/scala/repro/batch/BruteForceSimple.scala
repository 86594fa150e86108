package repro.batch

import scala.collection.mutable

import repro.automaton.Dfa
import repro.batch.BatchRpq.E

/** Exhaustive RPQ evaluation under **simple path semantics**: enumerate every
  * vertex-distinct path of length ≥ 1 and test its label against the DFA.
  *
  * Exponential — strictly a correctness oracle for [[repro.core.RspqEngine]]
  * on small graphs (tests keep |V| ≤ ~30).
  */
object BruteForceSimple {

  def evaluate(edges: Iterable[E], dfa: Dfa): Set[(Long, Long)] = {
    val adj = mutable.LongMap.empty[mutable.ArrayBuffer[(Long, String)]]
    edges.foreach(e => adj.getOrElseUpdate(e.src, mutable.ArrayBuffer.empty) += ((e.dst, e.label)))
    val results = mutable.Set.empty[(Long, Long)]

    def dfs(x: Long, v: Long, s: Int, onPath: mutable.Set[Long]): Unit = {
      adj.getOrElse(v, Nil).foreach { case (w, l) =>
        if (!onPath.contains(w)) {
          dfa.delta(s, l).foreach { t =>
            if (dfa.isFinal(t)) results += ((x, w))
            onPath += w
            dfs(x, w, t, onPath)
            onPath -= w
          }
        }
      }
    }

    adj.keys.toSeq.foreach { x =>
      dfs(x, x, dfa.start, mutable.Set(x))
    }
    results.toSet
  }
}
