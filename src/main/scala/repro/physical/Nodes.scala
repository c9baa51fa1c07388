package repro.physical

import repro.core.Model.{Edge, Sgt}
import repro.core.SgaExpr
import scala.collection.mutable

/** Execution mode of the physical dataflow (paper §6, §7.2.2).
  *
  * - [[Mode.Direct]] — the paper's approach: operators rely on validity
  *   intervals to locate expired tuples directly; no deletion processing
  *   for window movements.
  * - [[Mode.NegativeTuple]] — the DD-style baseline: windows are evolving
  *   collections, every expiration is an explicit deletion (a negative
  *   tuple) that flows through the operators and triggers retraction /
  *   re-derivation work.
  */
sealed trait Mode
object Mode {
  case object Direct extends Mode
  case object NegativeTuple extends Mode
  /** Differential-Dataflow-style baseline: like [[NegativeTuple]] for
    * windows/joins, but PATH is a round-stratified incremental fixpoint
    * ([[DdPathNode]]) — tuples live at their minimal iteration round and
    * window churn forces round re-stabilization, the cost profile of
    * DD's `iterate` + `distinct` (paper §7.2.2).
    */
  case object Differential extends Mode

  /** Window handling: does this mode rely on explicit deletions? */
  def usesNegativeTuples(m: Mode): Boolean = m != Direct
}

/** A signed tuple flowing through the dataflow: `sign = +1` insert,
  * `sign = -1` delete (negative tuple).
  */
final case class Delta(sgt: Sgt, sign: Int) {
  require(sign == 1 || sign == -1, "sign must be ±1")
}

/** A dataflow operator node. Children push deltas into their parent's
  * `receive(delta, slot)`; outputs propagate by calling `emit`, which
  * forwards to the parent (or the sink at the root). `advance(now)` is
  * invoked once per window slide before the slide's batch, leaf-to-root:
  * direct-mode operators purge expired state, the negative-tuple WSCAN
  * emits deletions for expired inputs.
  */
abstract class Node {
  var parent: Node = _
  var slotInParent: Int = -1
  var sink: mutable.Buffer[Delta] = _

  protected final def emit(d: Delta): Unit =
    if (parent != null) parent.receive(d, slotInParent) else if (sink != null) sink += d

  def receive(d: Delta, slot: Int): Unit
  def advance(now: Long): Unit = {}
}

/** Coalescer (paper Def. 11 at operator outputs, §5.1): enforces set
  * semantics in direct mode. Keyed by the distinguished attributes, it
  * suppresses results whose validity is covered by what was already
  * emitted and emits interval-extended results otherwise. Sound for
  * in-order streams: a later result for the same key never starts
  * earlier than an already-emitted one with a larger expiry.
  */
final class Coalescer {
  private val state = mutable.HashMap.empty[(Long, Long, String), (Long, Long)]

  /** Offer a result; returns the (possibly merged) sgt to emit, if any. */
  def offer(t: Sgt): Option[Sgt] = state.get(t.key) match {
    case Some((_, exp0)) if t.exp <= exp0 => None
    case Some((ts0, exp0)) if math.max(ts0, t.ts) <= math.min(exp0, t.exp) =>
      val merged = (math.min(ts0, t.ts), t.exp)
      state(t.key) = merged
      Some(t.copy(ts = merged._1))
    case _ =>
      state(t.key) = (t.ts, t.exp)
      Some(t)
  }

  def purge(now: Long): Unit = state.filterInPlace { case (_, (_, exp)) => exp > now }
  def size: Int = state.size
}

/** Counting-based DISTINCT (classical Counting IVM [35]) for the
  * negative-tuple mode: tracks derivation counts per distinguished key,
  * emitting an insert on 0→1 and a retraction on 1→0.
  */
final class CountingDistinct {
  private val counts = mutable.HashMap.empty[(Long, Long, String), Int]

  def offer(d: Delta): Option[Delta] = {
    val k = d.sgt.key
    val c = counts.getOrElse(k, 0) + d.sign
    require(c >= 0, s"negative multiplicity for $k — unbalanced deletes")
    if (c == 0) counts.remove(k) else counts(k) = c
    if (d.sign == 1 && c == 1) Some(d)
    else if (d.sign == -1 && c == 0) Some(d)
    else None
  }

  def size: Int = counts.size
}

/** WSCAN (Def. 16): assigns validity `[ts, ⌊ts/slide⌋·slide + size)`.
  *
  * In direct mode the interval alone encodes expiry. In negative-tuple
  * mode emitted tuples carry `[ts, ∞)` — the window is simulated the DD
  * way, by buffering every input and emitting an explicit deletion when
  * its window interval has passed (SEQ-WINDOW of CQL, paper §7.2.2).
  */
final class WscanNode(val w: SgaExpr.Wscan, mode: Mode) extends Node {
  val label: String = w.label
  private val pending = mutable.TreeMap.empty[Long, mutable.ArrayBuffer[Sgt]] // exp -> tuples

  override def receive(d: Delta, slot: Int): Unit = {
    require(d.sign == 1, "WSCAN receives only source insertions")
    val e   = d.sgt
    val exp = w.expiryOf(e.ts)
    mode match {
      case Mode.Direct =>
        emit(Delta(e.copy(exp = exp, path = List(Edge(e.src, e.trg, e.label))), 1))
      case _ =>
        // Identity in NT mode is values-only: a retraction must be
        // indistinguishable from its insertion, so intervals are vacuous
        // (`[0, ∞)`); the real expiry drives the deletion schedule below.
        val t = e.copy(ts = 0L, exp = Long.MaxValue, path = List(Edge(e.src, e.trg, e.label)))
        pending.getOrElseUpdate(exp, mutable.ArrayBuffer.empty) += t
        emit(Delta(t, 1))
    }
  }

  override def advance(now: Long): Unit = mode match {
    case Mode.Direct => ()
    case _ =>
      val expired = pending.rangeTo(now).toList
      for ((exp, ts) <- expired) { pending.remove(exp); ts.foreach(t => emit(Delta(t, -1))) }
  }
}

/** FILTER (Def. 17): stateless predicate on distinguished attributes;
  * deletions pass through symmetrically.
  */
final class FilterNode(pred: SgaExpr.SgtPredicate) extends Node {
  override def receive(d: Delta, slot: Int): Unit =
    if (pred(d.sgt.src, d.sgt.trg, d.sgt.label)) emit(d)
}

/** UNION (Def. 18) with relabeling; set semantics via coalesce (direct)
  * or counting distinct (negative-tuple).
  */
final class UnionNode(outLabel: String, mode: Mode) extends Node {
  private val coalescer = new Coalescer
  private val counting  = new CountingDistinct

  override def receive(d: Delta, slot: Int): Unit = {
    val t = d.sgt.copy(label = outLabel)
    mode match {
      case Mode.Direct => coalescer.offer(t).foreach(o => emit(Delta(o, 1)))
      case _           => counting.offer(Delta(t, d.sign)).foreach(emit)
    }
  }

  override def advance(now: Long): Unit = if (mode == Mode.Direct) coalescer.purge(now)
}
