package repro.core

import scala.collection.mutable

import repro.automaton.{Containment, Dfa}
import repro.stream.{Op, Sgt, SnapshotGraph, WindowSpec}

/** Thrown when a single tuple exceeds the configured extension budget —
  * the practical signal that a query/graph combination is blowing up under
  * simple path semantics (RSPQ is NP-hard with conflicts; paper §4, §5.5).
  */
final class RspqBudgetExceeded(val budget: Long)
    extends RuntimeException(s"RSPQ extension budget exceeded: $budget")

/** Incremental RPQ evaluation under **simple path semantics** (paper §4:
  * Algorithms RSPQ, Extend, Unmark, ExpiryRSPQ).
  *
  * Differences from [[RapqEngine]] (paper §4.1):
  *   - a spanning tree may hold *several* nodes for the same `(v, s)` pair
  *     when conflicts force re-traversal, so the node index maps a pair to a
  *     set of tree nodes;
  *   - a markings set `M_x` per tree prunes re-visits (case 2); a pair is
  *     marked on its first insertion and unmarked when one of its descendants
  *     becomes a conflict predecessor (Definition 18), which re-opens the
  *     previously pruned incoming extensions (Algorithm Unmark);
  *   - an extension is refused when it would revisit a vertex whose
  *     first-occurrence state does not suffix-contain the new state
  *     (Definition 16) — the conflict case.
  *
  * Deviations (documented in DESIGN.md §3): ExpiryRSPQ's re-marking
  * refinement (paper lines 12–15, re-adding parents to `M_x` once all their
  * children are marked again) is skipped — under-marking only costs extra
  * traversal work, never correctness.
  */
final class RspqEngine(
    val dfa: Dfa,
    val window: WindowSpec,
    collectResults: Boolean = true,
    stepBudgetPerTuple: Long = Long.MaxValue,
) {
  import RspqEngine._

  val containment: Containment = Containment(dfa)
  val graph = new SnapshotGraph

  val results = mutable.LinkedHashSet.empty[(Long, Long)]
  var emissionCount: Long = 0L
  var conflictCount: Long = 0L
  var expiryNanos: Long = 0L

  private val trees = mutable.LongMap.empty[Tree]
  private val vertexTrees = mutable.LongMap.empty[mutable.Set[Tree]]
  private var lastExpiryAt: Long = Long.MinValue
  private var steps: Long = 0L

  private def key(v: Long, s: Int): Long = v * dfa.k + s

  def numTrees: Int = trees.size
  def numNodes: Long = trees.valuesIterator.map(_.size.toLong).sum

  def processTuple(t: Sgt): Unit = {
    advanceTime(t.ts)
    steps = 0
    t.op match {
      case Op.Insert => insertEdge(t.ts, t.src, t.dst, t.label)
      case Op.Delete => deleteEdge(t.ts, t.src, t.dst, t.label)
    }
  }

  private def advanceTime(ts: Long): Unit = {
    if (lastExpiryAt == Long.MinValue) lastExpiryAt = ts
    else if (ts - lastExpiryAt >= window.slide) {
      runExpiry(ts)
      lastExpiryAt = ts
    }
  }

  def forceExpiry(ts: Long): Unit = runExpiry(ts)

  // ------------------------------------------------------------------ insert

  private def insertEdge(ts: Long, u: Long, v: Long, label: String): Unit = {
    graph.add(u, v, label, ts)
    val pairs = dfa.byLabel.getOrElse(label, Nil)
    if (pairs.isEmpty) return
    val minTs = window.lowerBound(ts)

    if (pairs.exists(_._1 == dfa.start) && !trees.contains(u)) {
      val tree = new Tree(u)
      val root = new PNode(u, dfa.start, null, Long.MaxValue)
      tree.addNode(key(u, dfa.start), root, this)
      tree.rootNode = root
      tree.markings += key(u, dfa.start)
      trees(u) = tree
    }

    val snapshot = vertexTrees.getOrElse(u, EmptyTrees).toArray
    snapshot.foreach { tree =>
      val frames = mutable.Stack.empty[Frame]
      pairs.foreach { case (s, t) =>
        // a marked pair has one node; an unmarked one may have several
        tree.nodesFor(key(u, s)).foreach { n =>
          if (n.ts > minTs) frames.push(Frame(n, v, t, ts))
        }
      }
      drain(tree, frames, minTs)
    }
  }

  /** Run the Extend/Unmark state machine to quiescence. Every frame re-checks
    * the pruning cases at pop time, so ordering does not affect the result
    * set. Throws [[RspqBudgetExceeded]] past the per-tuple budget.
    */
  private def drain(tree: Tree, frames: mutable.Stack[Frame], minTs: Long): Unit = {
    while (frames.nonEmpty) {
      val Frame(parent, v, t, edgeTs) = frames.pop()
      steps += 1
      if (steps > stepBudgetPerTuple) throw new RspqBudgetExceeded(stepBudgetPerTuple)
      if (parent.ts > minTs && !parent.detached) {
        // prefix-path states at vertex v; head == FIRST(p[v]) (closest to root)
        var statesAtV = List.empty[Int]
        var cur = parent
        while (cur != null) { if (cur.v == v) statesAtV ::= cur.s; cur = cur.parent }

        if (!statesAtV.contains(t) && !tree.markings.contains(key(v, t))) {
          if (statesAtV.nonEmpty && !containment.superset(statesAtV.head, t)) {
            // Case 3 — conflict at v between FIRST(p[v]) and t: do not extend;
            // unmark the prefix path so pruned alternatives are re-explored.
            conflictCount += 1
            unmark(tree, parent, minTs, frames)
          } else {
            // Case 4 — extend the path with (v, t).
            val ts = math.min(edgeTs, parent.ts)
            if (ts > minTs) {
              val wasAbsent = tree.nodesFor(key(v, t)).isEmpty
              val node = new PNode(v, t, parent, ts)
              parent.addChild(node)
              tree.addNode(key(v, t), node, this)
              // A self-pair (x, x) can only witness the empty path under simple
              // path semantics (any length≥1 path x→…→x revisits x), and we do
              // not report ε-results — so self-pairs are never emitted.
              if (dfa.isFinal(t) && v != tree.rootVertex) emit(tree.rootVertex, v)
              if (wasAbsent) tree.markings += key(v, t)
              graph.outEdges(v, minTs).foreach { e =>
                dfa.delta(t, e.label).foreach { r =>
                  frames.push(Frame(node, e.dst, r, e.ts))
                }
              }
            }
          }
        }
      }
    }
  }

  /** Algorithm Unmark: pop marked ancestors starting at the conflict
    * predecessor `from`; for each newly unmarked pair, re-open the window's
    * incoming extensions that case 2 previously pruned.
    */
  private def unmark(tree: Tree, from: PNode, minTs: Long, frames: mutable.Stack[Frame]): Unit = {
    val reopened = mutable.ListBuffer.empty[(Long, Int)]
    var cur = from
    while (cur != null && tree.markings.contains(key(cur.v, cur.s))) {
      tree.markings -= key(cur.v, cur.s)
      reopened += ((cur.v, cur.s))
      cur = cur.parent
    }
    reopened.foreach { case (v, t) =>
      graph.inEdges(v, minTs).foreach { e =>
        dfa.byLabel.getOrElse(e.label, Nil).foreach { case (q, t2) =>
          if (t2 == t) {
            tree.nodesFor(key(e.src, q)).foreach { m =>
              if (m.ts > minTs) frames.push(Frame(m, v, t, e.ts))
            }
          }
        }
      }
    }
  }

  private def emit(x: Long, v: Long): Unit = {
    emissionCount += 1
    if (collectResults) results += ((x, v))
  }

  // ------------------------------------------------------------------ expiry

  /** Algorithm ExpiryRSPQ: prune expired nodes and their markings; attempt to
    * reconnect only the pairs that were *marked* (unmarked pairs were already
    * fully re-opened by Unmark when they lost their marking).
    */
  private def runExpiry(ts: Long): Set[(Long, Long)] = {
    graph.pruneExpired(window.lowerBound(ts))
    expireTrees(trees.values.toArray, ts)
  }

  /** ExpiryRSPQ over the given trees only (deletions pass just the affected
    * trees; window slides pass all of Δ).
    */
  private def expireTrees(allTrees: Array[Tree], ts: Long): Set[(Long, Long)] = {
    val t0 = System.nanoTime()
    val minTs = window.lowerBound(ts)
    val invalidated = mutable.Set.empty[(Long, Long)]

    allTrees.foreach { tree =>
      val expired = tree.allNodes.filter(n => (n ne tree.rootNode) && n.ts <= minTs).toArray
      if (expired.nonEmpty) {
        val markedExpired = mutable.LinkedHashSet.empty[(Long, Int)]
        expired.foreach { n =>
          val k = key(n.v, n.s)
          if (tree.markings.contains(k)) { markedExpired += ((n.v, n.s)); tree.markings -= k }
          tree.removeNode(k, n, this)
          if (n.parent != null) n.parent.removeChild(n)
          n.parent = null
          n.detached = true
        }
        // reconnect marked pairs via valid in-edges
        val frames = mutable.Stack.empty[Frame]
        markedExpired.foreach { case (v, t) =>
          graph.inEdges(v, minTs).foreach { e =>
            dfa.byLabel.getOrElse(e.label, Nil).foreach { case (q, t2) =>
              if (t2 == t) {
                tree.nodesFor(key(e.src, q)).foreach { m =>
                  if (m.ts > minTs) frames.push(Frame(m, v, t, e.ts))
                }
              }
            }
          }
        }
        steps = 0 // expiry gets its own budget window
        drain(tree, frames, minTs)
        markedExpired.foreach { case (v, t) =>
          if (tree.nodesFor(key(v, t)).isEmpty && dfa.isFinal(t) && v != tree.rootVertex)
            invalidated += ((tree.rootVertex, v))
        }
      }
      if (tree.rootNode != null && tree.rootNode.childCount == 0 && tree.size <= 1) {
        tree.removeNode(key(tree.rootVertex, dfa.start), tree.rootNode, this)
        trees.remove(tree.rootVertex)
      }
    }
    expiryNanos += System.nanoTime() - t0
    invalidated.toSet
  }

  // ------------------------------------------------------------------ delete

  /** Explicit deletion, uniformly through the expiry machinery (§3.2 / §4). */
  def deleteEdge(ts: Long, u: Long, v: Long, label: String): Set[(Long, Long)] = {
    val existed = graph.remove(u, v, label)
    if (!existed) return Set.empty
    val pairs = dfa.byLabel.getOrElse(label, Nil)
    if (pairs.isEmpty) return Set.empty

    val affected = mutable.ArrayBuffer.empty[Tree]
    vertexTrees.getOrElse(v, EmptyTrees).toArray.foreach { tree =>
      pairs.foreach { case (s, t) =>
        tree.nodesFor(key(v, t)).toArray.foreach { node =>
          if (node.parent != null && node.parent.v == u && node.parent.s == s) {
            var stack = List(node)
            while (stack.nonEmpty) {
              val n = stack.head; stack = stack.tail
              n.ts = Long.MinValue
              n.foreachChild(c => stack ::= c)
            }
            if (!affected.contains(tree)) affected += tree
          }
        }
      }
    }
    if (affected.nonEmpty) expireTrees(affected.toArray, ts) else Set.empty
  }

  // ------------------------------------------------------------------ views

  /** Explicit-window view: pairs with a currently valid accepting node. */
  def currentResults(ts: Long): Set[(Long, Long)] = {
    val minTs = window.lowerBound(ts)
    val out = mutable.Set.empty[(Long, Long)]
    trees.values.foreach { tree =>
      tree.allNodes.foreach { n =>
        if ((n ne tree.rootNode) && n.v != tree.rootVertex && n.ts > minTs && dfa.isFinal(n.s))
          out += ((tree.rootVertex, n.v))
      }
    }
    out.toSet
  }

  /** Multiset of `(v, s)` occurrences in tree `T_x` — Figure 3 assertions. */
  def treeNodeCounts(x: Long): Map[(Long, Int), Int] =
    trees.get(x) match {
      case None       => Map.empty
      case Some(tree) => tree.allNodes.toSeq.groupBy(n => (n.v, n.s)).map { case (k, v) => k -> v.size }
    }

  /** Marked pairs of tree `T_x`. */
  def markedPairs(x: Long): Set[(Long, Int)] =
    trees.get(x) match {
      case None       => Set.empty
      case Some(tree) =>
        tree.markings.iterator.map(k => (k / dfa.k, (k % dfa.k).toInt)).toSet
    }

  private[core] def indexAdd(tree: Tree, v: Long): Unit =
    vertexTrees.getOrElseUpdate(v, mutable.Set.empty) += tree

  private[core] def indexRemove(tree: Tree, v: Long): Unit =
    vertexTrees.get(v).foreach { set =>
      set -= tree
      if (set.isEmpty) vertexTrees.remove(v)
    }
}

object RspqEngine {
  private val EmptyTrees = mutable.Set.empty[Tree]

  /** An extension attempt: try to add `(v, t)` as a child of `parent` using an
    * edge with timestamp `edgeTs`. All pruning cases re-checked at pop time.
    */
  private[core] final case class Frame(parent: PNode, v: Long, t: Int, edgeTs: Long)

  /** Traversal-tree node; unlike RAPQ, several nodes may share `(v, s)`. */
  private[core] final class PNode(val v: Long, val s: Int, var parent: PNode, var ts: Long) {
    private var children: mutable.HashSet[PNode] = null
    var detached: Boolean = false

    def addChild(c: PNode): Unit = {
      if (children == null) children = mutable.HashSet.empty
      children += c
    }
    def removeChild(c: PNode): Unit = if (children != null) children -= c
    def childCount: Int = if (children == null) 0 else children.size
    def foreachChild(f: PNode => Unit): Unit = if (children != null) children.foreach(f)
  }

  private[core] final class Tree(val rootVertex: Long) {
    private val nodes = mutable.LongMap.empty[mutable.Set[PNode]]
    val markings = mutable.Set.empty[Long]
    private val vertexNodeCount = mutable.LongMap.empty[Int]
    var rootNode: PNode = null
    private var count = 0

    def size: Int = count
    def nodesFor(k: Long): collection.Set[PNode] = nodes.getOrElse(k, EmptyNodes)
    def allNodes: Iterator[PNode] = nodes.valuesIterator.flatten

    def addNode(k: Long, n: PNode, engine: RspqEngine): Unit = {
      nodes.getOrElseUpdate(k, mutable.Set.empty) += n
      count += 1
      val c = vertexNodeCount.getOrElse(n.v, 0)
      vertexNodeCount(n.v) = c + 1
      if (c == 0) engine.indexAdd(this, n.v)
    }

    def removeNode(k: Long, n: PNode, engine: RspqEngine): Unit = {
      nodes.get(k).foreach { set =>
        if (set.remove(n)) {
          count -= 1
          if (set.isEmpty) nodes.remove(k)
          val c = vertexNodeCount.getOrElse(n.v, 1) - 1
          if (c == 0) { vertexNodeCount.remove(n.v); engine.indexRemove(this, n.v) }
          else vertexNodeCount(n.v) = c
        }
      }
    }
  }

  private val EmptyNodes = mutable.Set.empty[PNode]
}
