package repro.physical

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Regex
import repro.core.Regex.{Lbl, Plus}
import repro.core.Model.{Edge, Sgt}
import scala.collection.mutable

class DdPathSpec extends AnyFunSuite {

  private def mkNode(regex: Regex = Plus(Lbl("a")), out: String = "out")
      : (DdPathNode, mutable.Buffer[Delta]) = {
    val n = new DdPathNode(regex, out)
    val sink = mutable.ArrayBuffer.empty[Delta]
    n.sink = sink
    (n, sink)
  }

  private def sgt(s: Long, t: Long, l: String): Sgt =
    Sgt(s, t, l, 0L, Long.MaxValue, List(Edge(s, t, l)))

  private val (x, y, z, u) = (1L, 2L, 3L, 4L)

  test("insertions relax rounds and emit reachable pairs") {
    val (n, sink) = mkNode()
    n.receive(Delta(sgt(x, y, "a"), 1), 0)
    n.receive(Delta(sgt(y, z, "a"), 1), 0)
    assert(sink.map(d => (d.sgt.key, d.sign)).toSet ==
      Set(((x, y, "out"), 1), ((x, z, "out"), 1), ((y, z, "out"), 1)))
  }

  test("a shortcut edge re-stabilizes rounds without result churn") {
    val (n, sink) = mkNode()
    n.receive(Delta(sgt(x, y, "a"), 1), 0)
    n.receive(Delta(sgt(y, z, "a"), 1), 0)
    sink.clear()
    val before = n.stabilizationSteps
    n.receive(Delta(sgt(x, z, "a"), 1), 0) // (x,z) now round 1, was round 2
    assert(sink.isEmpty, "(x,z) was already reachable — no result delta")
    assert(n.stabilizationSteps > before, "round relaxation work was performed")
  }

  test("deletion with no alternative retracts, with alternative keeps") {
    val (n, sink) = mkNode()
    n.receive(Delta(sgt(x, y, "a"), 1), 0)
    n.receive(Delta(sgt(y, z, "a"), 1), 0)
    n.receive(Delta(sgt(x, z, "a"), 1), 0)
    sink.clear()
    n.receive(Delta(sgt(y, z, "a"), -1), 0)
    // (x,z) survives via the direct edge; (y,z) is gone.
    assert(sink.map(d => (d.sgt.key, d.sign)).toSet == Set(((y, z, "out"), -1)))
    assert(n.stabilizationSteps > 0)
  }

  test("cycle deletion counts to the bound and drops unreachable tuples") {
    val (n, sink) = mkNode()
    n.receive(Delta(sgt(x, y, "a"), 1), 0)
    n.receive(Delta(sgt(y, x, "a"), 1), 0)
    sink.clear()
    n.receive(Delta(sgt(x, y, "a"), -1), 0)
    val retracted = sink.filter(_.sign == -1).map(_.sgt.key).toSet
    assert(retracted == Set((x, y, "out"), (x, x, "out"), (y, y, "out")))
  }

  test("deletion cascades round shifts through successors") {
    val (n, sink) = mkNode()
    // Chain x→y→z→u plus shortcut x→z.
    for (e <- Seq(sgt(x, y, "a"), sgt(y, z, "a"), sgt(z, u, "a"), sgt(x, z, "a")))
      n.receive(Delta(e, 1), 0)
    sink.clear()
    n.receive(Delta(sgt(x, z, "a"), -1), 0)
    // All pairs still derivable through the chain — no retraction, but
    // re-stabilization work was done ((x,z) and (x,u) shift rounds).
    assert(sink.isEmpty)
    assert(n.stabilizationSteps > 0)
  }

  test("duplicate edges are counted") {
    val (n, sink) = mkNode()
    n.receive(Delta(sgt(x, y, "a"), 1), 0)
    n.receive(Delta(sgt(x, y, "a"), 1), 0)
    sink.clear()
    n.receive(Delta(sgt(x, y, "a"), -1), 0)
    assert(sink.isEmpty)
    n.receive(Delta(sgt(x, y, "a"), -1), 0)
    assert(sink.map(d => (d.sgt.key, d.sign)).toSet == Set(((x, y, "out"), -1)))
  }

  test("multi-state regex: rounds tracked per (vertex, state)") {
    val (n, sink) = mkNode(Regex.parse("a b+"), "out")
    n.receive(Delta(sgt(x, y, "a"), 1), 0)
    n.receive(Delta(sgt(y, z, "b"), 1), 0)
    n.receive(Delta(sgt(z, y, "b"), 1), 0)
    assert(sink.map(_.sgt.key).toSet == Set((x, z, "out"), (x, y, "out")))
    sink.clear()
    n.receive(Delta(sgt(y, z, "b"), -1), 0)
    // Without y→z nothing is b-reachable from y anymore.
    assert(sink.filter(_.sign == -1).map(_.sgt.key).toSet ==
      Set((x, z, "out"), (x, y, "out")))
  }
}
