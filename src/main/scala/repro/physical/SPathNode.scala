package repro.physical

import repro.core.{Dfa, Regex}
import repro.core.Model.{Edge, Sgt}
import scala.collection.mutable

/** PATH (Def. 20) via the paper's S-PATH algorithm (§6.2) — the *direct*
  * approach: Δ-PATH spanning forests whose nodes carry validity
  * intervals, so expirations are located directly from expiry timestamps
  * and never require re-derivation traversals.
  *
  * State:
  *  - a DFA for the PATH regex (Alg. S-PATH line 1);
  *  - a windowed adjacency index of currently-valid input sgts, used by
  *    Expand/Propagate to traverse the snapshot graph;
  *  - Δ-PATH (Def. 22): one spanning tree per discovered root vertex,
  *    with a hash-based inverted index from `(vertex, state)` pairs to
  *    the trees containing them.
  *
  * Each tree node `(v, s)` stores the path segment from the root with the
  * *largest expiry* among all equivalent segments (coalesce with
  * `f_agg = max` over expiry, Def. 21); parent pointers materialize the
  * actual path, making paths first-class citizens of the output.
  */
final class SPathNode(regex: Regex, outLabel: String) extends Node {
  val dfa: Dfa = Dfa.fromRegex(regex)

  private final class TNode(val v: Long, val s: Int) {
    var parent: TNode = _
    var parentEdge: Edge = _
    var ts: Long = 0L
    var exp: Long = 0L
    val children = mutable.HashSet.empty[TNode]
  }

  private final class Tree(val rootV: Long) {
    val root = new TNode(rootV, dfa.start)
    root.ts = 0L; root.exp = Long.MaxValue
    val nodes = mutable.HashMap[(Long, Int), TNode]((rootV, dfa.start) -> root)
  }

  private final class EdgeRec(var ts: Long, var exp: Long)

  // Windowed adjacency: src -> (trg, label) -> validity.
  private val adjacency = mutable.HashMap.empty[Long, mutable.HashMap[(Long, String), EdgeRec]]
  private val trees     = mutable.HashMap.empty[Long, Tree]
  private val inverted  = mutable.HashMap.empty[(Long, Int), mutable.HashSet[Tree]]
  private val coalescer = new Coalescer

  /** Operator metrics: traversal steps performed (Expand+Propagate). */
  var traversalSteps: Long = 0L

  override def receive(d: Delta, slot: Int): Unit = {
    require(d.sign == 1, "S-PATH is the direct-approach operator; use NtPathNode for negative tuples")
    val t = d.sgt
    // 1. Maintain the windowed adjacency (coalescing on max expiry).
    val rec = adjacency.getOrElseUpdate(t.src, mutable.HashMap.empty)
      .getOrElseUpdate((t.trg, t.label), new EdgeRec(t.ts, t.exp))
    if (t.exp > rec.exp) rec.exp = t.exp
    if (t.ts < rec.ts) rec.ts = t.ts

    // 2. Alg. S-PATH main loop: for every DFA transition on this label.
    for ((s, q) <- dfa.transitionsOn(t.label)) {
      if (s == dfa.start && !trees.contains(t.src)) {
        val tree = new Tree(t.src)
        trees(t.src) = tree
        inverted.getOrElseUpdate((t.src, dfa.start), mutable.HashSet.empty) += tree
      }
      for (tree <- inverted.getOrElse((t.src, s), mutable.HashSet.empty).toList) {
        val un = tree.nodes((t.src, s))
        if (un.exp > t.ts) // ExpandableTrees: ignore expired segments
          process(tree, un, t.trg, q, t.ts, t.exp, t.label, now = t.ts)
      }
    }
  }

  /** Expand / Propagate driver (iterative; graphs are cyclic and deep). */
  private def process(tree: Tree, parent0: TNode, v0: Long, s0: Int,
                      eTs0: Long, eExp0: Long, lbl0: String, now: Long): Unit = {
    val stack = mutable.Stack((parent0, v0, s0, eTs0, eExp0, lbl0))
    while (stack.nonEmpty) {
      val (parent, v, s, eTs, eExp, lbl) = stack.pop()
      traversalSteps += 1
      val candTs  = math.max(eTs, parent.ts)
      val candExp = math.min(eExp, parent.exp)
      tree.nodes.get((v, s)) match {
        case None => // Alg. Expand: new leaf under `parent`.
          if (candTs < candExp) {
            val node = new TNode(v, s)
            node.parent = parent; node.parentEdge = Edge(parent.v, v, lbl)
            node.ts = candTs; node.exp = candExp
            parent.children += node
            tree.nodes((v, s)) = node
            inverted.getOrElseUpdate((v, s), mutable.HashSet.empty) += tree
            if (dfa.finals.contains(s)) emitResult(tree, node)
            pushNeighbours(tree, node, stack, now)
          }
        case Some(node) if node.exp < candExp => // Alg. Propagate: better segment.
          val structural = (node.parent ne parent) ||
            node.parentEdge.src != parent.v || node.parentEdge.label != lbl
          if (structural) {
            node.parent.children -= node
            node.parent = parent; node.parentEdge = Edge(parent.v, v, lbl)
            parent.children += node
          }
          node.ts = math.min(node.ts, candTs)
          node.exp = candExp
          // Pure interval refreshes re-report the same path: emit the
          // extension without re-materializing the unchanged payload.
          if (dfa.finals.contains(s)) emitResult(tree, node, withPath = structural)
          pushNeighbours(tree, node, stack, now)
        case _ => () // already covered by a segment with a larger expiry
      }
    }
  }

  /** Enumerate currently-valid out-edges of `node.v` that the DFA can
    * take from state `node.s` (the `G_ts` traversal of Expand line 8).
    */
  private def pushNeighbours(tree: Tree, node: TNode,
                             stack: mutable.Stack[(TNode, Long, Int, Long, Long, String)],
                             now: Long): Unit =
    for {
      ((w, lbl), rec) <- adjacency.getOrElse(node.v, mutable.HashMap.empty)
      if rec.exp > now
      q <- dfa.delta(node.s, lbl)
    } {
      val worth = tree.nodes.get((w, q)) match {
        case None        => true
        case Some(child) => child.exp < math.min(node.exp, rec.exp)
      }
      if (worth) stack.push((node, w, q, rec.ts, rec.exp, lbl))
    }

  private def emitResult(tree: Tree, node: TNode, withPath: Boolean = true): Unit = {
    val path = if (withPath) materialize(node) else Nil
    val out  = Sgt(tree.rootV, node.v, outLabel, node.ts, node.exp, path)
    coalescer.offer(out).foreach(o => emit(Delta(o, 1)))
  }

  /** Materialize the path by following parent pointers (cost O(len)). */
  private def materialize(node: TNode): List[Edge] = {
    var cur = node
    var acc = List.empty[Edge]
    while (cur.parent != null) { acc = cur.parentEdge :: acc; cur = cur.parent }
    acc
  }

  /** Direct window maintenance: drop expired tree nodes (child expiry
    * never exceeds parent expiry, so expired nodes form whole subtrees),
    * expired adjacency entries and stale result keys. No graph traversal
    * is needed — this is the point of the direct approach.
    */
  override def advance(now: Long): Unit = {
    for ((rootV, tree) <- trees.toList) {
      val stack = mutable.Stack.empty[TNode]
      stack.pushAll(tree.root.children)
      while (stack.nonEmpty) {
        val n = stack.pop()
        if (n.exp <= now) dropSubtree(tree, n)
        else stack.pushAll(n.children)
      }
      if (tree.root.children.isEmpty) {
        trees.remove(rootV)
        detachFromInverted(tree, tree.root)
      }
    }
    for ((src, m) <- adjacency.toList) {
      m.filterInPlace((_, rec) => rec.exp > now)
      if (m.isEmpty) adjacency.remove(src)
    }
    coalescer.purge(now)
  }

  private def dropSubtree(tree: Tree, n: TNode): Unit = {
    n.parent.children -= n
    val stack = mutable.Stack(n)
    while (stack.nonEmpty) {
      val m = stack.pop()
      tree.nodes.remove((m.v, m.s))
      detachFromInverted(tree, m)
      stack.pushAll(m.children)
      m.children.clear()
    }
  }

  private def detachFromInverted(tree: Tree, m: TNode): Unit =
    inverted.get((m.v, m.s)).foreach { set =>
      set -= tree
      if (set.isEmpty) inverted.remove((m.v, m.s))
    }

  /** State-size metric: total tree nodes resident in Δ-PATH. */
  def stateSize: Long = trees.valuesIterator.map(_.nodes.size.toLong).sum
}
