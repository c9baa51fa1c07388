package repro.util

import repro.core.{Dfa, SgaExpr}
import repro.core.Model.Sge
import scala.collection.mutable

/** Test-only reference evaluator: computes the snapshot of an SGA
  * expression at time `t` with naive set algorithms (hash joins over
  * materialized snapshots, BFS product reachability). Deliberately
  * independent from both production backends so that agreement between
  * the three (plus DuckDB) is meaningful.
  */
object BruteForce {

  /** Distinguished-attribute snapshot `τ_t(expr(S))` as a pair set. */
  def snapshot(expr: SgaExpr, stream: Seq[Sge], t: Long): Set[(Long, Long)] = expr match {
    case w @ SgaExpr.Wscan(l, _, _) =>
      stream.iterator
        .filter(e => e.label == l && e.ts <= t && t < w.expiryOf(e.ts))
        .map(e => (e.src, e.trg))
        .toSet

    case SgaExpr.Filter(in, pred) =>
      snapshot(in, stream, t).filter { case (s, g) => pred(s, g, in.outLabel) }

    case SgaExpr.Union(ins, _) =>
      ins.map(snapshot(_, stream, t)).reduce(_ union _)

    case SgaExpr.Pattern(ins, eqs, outSrc, outTrg, _) =>
      val rels = ins.map(snapshot(_, stream, t).toSeq)
      // Left-deep nested join over partial bindings (posIdx -> value).
      var partials: Seq[Map[Int, Long]] = Seq(Map.empty)
      for ((rel, i) <- rels.zipWithIndex) {
        val applicable = eqs.filter { case (a, b) =>
          math.max(a.input, b.input) == i && a.input != b.input
        }
        val intra = eqs.filter(e => e._1.input == i && e._2.input == i)
        partials = for {
          p <- partials
          (s, g) <- rel
          if intra.forall(_ => s == g) || intra.isEmpty
          if intra.forall { case (x, y) => value(s, g, x, i) == value(s, g, y, i) }
          if applicable.forall { case (a, b) =>
            val (earlier, here) = if (a.input == i) (b, a) else (a, b)
            p(posIdx(earlier)) == value(s, g, here, i)
          }
        } yield p + (posIdx(SgaExpr.src(i)) -> s) + (posIdx(SgaExpr.trg(i)) -> g)
      }
      partials.map(p => (p(posIdx(outSrc)), p(posIdx(outTrg)))).toSet

    case SgaExpr.Path(ins, regex, _) =>
      val dfa = Dfa.fromRegex(regex)
      val edges: Seq[(Long, Long, String)] = ins.flatMap { in =>
        snapshot(in, stream, t).toSeq.map { case (s, g) => (s, g, in.outLabel) }
      }
      val bySrc = edges.groupBy(_._1)
      val seen  = mutable.HashSet.empty[(Long, Int, Long)]
      val queue = mutable.Queue.empty[(Long, Int, Long)]
      for ((s, g, l) <- edges; q <- dfa.delta(dfa.start, l))
        if (seen.add((s, q, g))) queue.enqueue((s, q, g))
      while (queue.nonEmpty) {
        val (root, st, v) = queue.dequeue()
        for ((_, w, l) <- bySrc.getOrElse(v, Seq.empty); q <- dfa.delta(st, l))
          if (seen.add((root, q, w))) queue.enqueue((root, q, w))
      }
      seen.iterator.collect { case (s, st, g) if dfa.finals.contains(st) => (s, g) }.toSet
  }

  private def posIdx(p: SgaExpr.Pos): Int = 2 * p.input + (if (p.isSrc) 0 else 1)
  private def value(s: Long, g: Long, p: SgaExpr.Pos, i: Int): Long = {
    require(p.input == i); if (p.isSrc) s else g
  }
}
