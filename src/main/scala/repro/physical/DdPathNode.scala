package repro.physical

import repro.core.{Dfa, Regex}
import repro.core.Model.{Edge, Sgt}
import scala.collection.mutable

/** PATH under the Differential-Dataflow baseline of paper §7.2.2.
  *
  * DD evaluates a PATH as `base.iterate(r => distinct(r.join(edges) ++
  * base))`: every reachability tuple lives at its *minimal iteration
  * round*, and the arrangements that back `iterate`/`distinct` must be
  * re-stabilized whenever a window slide inserts or deletes edges — a
  * tuple whose minimal round changes produces churn in every affected
  * round. This operator reproduces that cost profile faithfully by
  * maintaining, per root vertex, the minimal round (BFS level in the
  * DFA-product graph) of every `(vertex, state)` tuple:
  *
  *  - edge insertion ⇒ level-decrease relaxations (cheap, monotone);
  *  - edge deletion ⇒ suspect tuples must recompute their level from
  *    in-neighbours and increases cascade (the expensive re-stabilization,
  *    including count-to-∞ rounds on cycles until tuples drop out).
  *
  * On tree-shaped inputs levels are unique and stable, so deletions stay
  * cheap — which is exactly why DD wins on LDBC's `replyOf` but loses on
  * the dense cyclic SO graph in the paper's Table 2.
  */
final class DdPathNode(regex: Regex, outLabel: String) extends Node {
  val dfa: Dfa = Dfa.fromRegex(regex)

  private val revTrans: Map[(String, Int), Seq[Int]] =
    dfa.transitions.toSeq.groupBy { case ((_, l), q) => (l, q) }
      .view.mapValues(_.map { case ((s, _), _) => s }).toMap

  private final class Tree(val rootV: Long) {
    // Minimal round of each (v, s); the root tuple is round 0 and pinned.
    val levels = mutable.HashMap[(Long, Int), Int]((rootV, dfa.start) -> 0)
  }

  // Counted edge multiset plus forward/reverse adjacency (distinct edges).
  private val edgeCounts = mutable.HashMap.empty[(Long, Long, String), Int]
  private val fwd = mutable.HashMap.empty[Long, mutable.HashSet[(Long, String)]]
  private val rev = mutable.HashMap.empty[Long, mutable.HashSet[(Long, String)]]

  private val trees    = mutable.HashMap.empty[Long, Tree]
  private val inverted = mutable.HashMap.empty[(Long, Int), mutable.HashSet[Tree]]
  private val counting = new CountingDistinct

  /** Operator metric: arrangement-maintenance steps (level updates and
    * in-neighbour scans) — DD's re-stabilization work.
    */
  var stabilizationSteps: Long = 0L

  override def receive(d: Delta, slot: Int): Unit =
    if (d.sign == 1) insert(d.sgt) else delete(d.sgt)

  private def insert(t: Sgt): Unit = {
    val k = (t.src, t.trg, t.label)
    val c = edgeCounts.getOrElse(k, 0) + 1
    edgeCounts(k) = c
    if (c > 1) return
    fwd.getOrElseUpdate(t.src, mutable.HashSet.empty) += ((t.trg, t.label))
    rev.getOrElseUpdate(t.trg, mutable.HashSet.empty) += ((t.src, t.label))

    for ((s, q) <- dfa.transitionsOn(t.label)) {
      if (s == dfa.start && !trees.contains(t.src)) {
        val tree = new Tree(t.src)
        trees(t.src) = tree
        inverted.getOrElseUpdate((t.src, dfa.start), mutable.HashSet.empty) += tree
      }
      for (tree <- inverted.getOrElse((t.src, s), mutable.HashSet.empty).toList)
        relax(tree, t.trg, q, tree.levels((t.src, s)) + 1)
    }
  }

  /** Monotone level-decrease relaxation wave (DD round forward-pass). */
  private def relax(tree: Tree, v0: Long, s0: Int, cand0: Int): Unit = {
    val queue = mutable.Queue((v0, s0, cand0))
    while (queue.nonEmpty) {
      val (v, s, cand) = queue.dequeue()
      stabilizationSteps += 1
      val cur = tree.levels.get((v, s))
      if (cur.forall(_ > cand)) {
        if (cur.isEmpty) {
          inverted.getOrElseUpdate((v, s), mutable.HashSet.empty) += tree
          if (dfa.finals.contains(s)) emitDelta(tree, v, +1)
        }
        tree.levels((v, s)) = cand
        for ((w, lbl) <- fwd.getOrElse(v, mutable.HashSet.empty); q <- dfa.delta(s, lbl))
          queue.enqueue((w, q, cand + 1))
      }
    }
  }

  private def delete(t: Sgt): Unit = {
    val k = (t.src, t.trg, t.label)
    val c = edgeCounts.getOrElse(k, 0) - 1
    require(c >= 0, s"negative tuple for absent edge $k")
    if (c > 0) { edgeCounts(k) = c; return }
    edgeCounts.remove(k)
    fwd.get(t.src).foreach(_ -= ((t.trg, t.label)))
    rev.get(t.trg).foreach(_ -= ((t.src, t.label)))

    // Every tree holding the source tuple of this edge must re-stabilize
    // the target tuple (and transitively its successors).
    for ((s, q) <- dfa.transitionsOn(t.label);
         tree <- inverted.getOrElse((t.src, s), mutable.HashSet.empty).toList
         if tree.levels.contains((t.trg, q)))
      restabilize(tree, t.trg, q)
  }

  /** Level-increase repair: recompute a suspect's minimal round from its
    * in-neighbours; increases cascade to successors, and tuples whose
    * level exceeds the finite-round bound drop out (count-to-∞ on
    * cycles, then retraction) — DD's expensive backward re-stabilization.
    */
  private def restabilize(tree: Tree, v0: Long, s0: Int): Unit = {
    val queue = mutable.Queue((v0, s0))
    while (queue.nonEmpty) {
      val (v, s) = queue.dequeue()
      if ((v, s) != (tree.rootV, dfa.start)) {
        tree.levels.get((v, s)) match {
          case None => ()
          case Some(cur) =>
            // A level is bounded by the number of live tuples; beyond
            // that the tuple is underivable.
            val bound = tree.levels.size
            var best  = Int.MaxValue
            for ((u, lbl) <- rev.getOrElse(v, mutable.HashSet.empty);
                 sp <- revTrans.getOrElse((lbl, s), Nil)) {
              stabilizationSteps += 1
              tree.levels.get((u, sp)) match {
                case Some(lu) if (u, sp) != ((v, s)) => best = math.min(best, lu + 1)
                case _                               => ()
              }
            }
            if (best == cur) ()
            else if (best > bound) { // underivable: retract and cascade
              tree.levels.remove((v, s))
              inverted.get((v, s)).foreach { set =>
                set -= tree
                if (set.isEmpty) inverted.remove((v, s))
              }
              if (dfa.finals.contains(s)) emitDelta(tree, v, -1)
              enqueueSuccessors(tree, v, s, queue)
            } else if (best != cur) { // round shifted: re-stabilize successors
              tree.levels((v, s)) = best
              enqueueSuccessors(tree, v, s, queue)
            }
        }
      }
    }
  }

  private def enqueueSuccessors(tree: Tree, v: Long, s: Int,
                                queue: mutable.Queue[(Long, Int)]): Unit =
    for ((w, lbl) <- fwd.getOrElse(v, mutable.HashSet.empty); q <- dfa.delta(s, lbl)
         if tree.levels.contains((w, q))) {
      stabilizationSteps += 1
      queue.enqueue((w, q))
    }

  private def emitDelta(tree: Tree, v: Long, sign: Int): Unit = {
    // DD evaluates reachability — result payloads carry the derived edge
    // only (DD's dataflow cannot report paths, paper §7.2.2).
    val out = Sgt(tree.rootV, v, outLabel, 0L, Long.MaxValue,
                  List(Edge(tree.rootV, v, outLabel)))
    counting.offer(Delta(out, sign)).foreach(emit)
  }

  /** State-size metric: total tuples resident across all rounds. */
  def stateSize: Long = trees.valuesIterator.map(_.levels.size.toLong).sum
}
