package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Model._

class ModelSpec extends AnyFunSuite {

  private def sgt(src: Long, trg: Long, l: String, ts: Long, exp: Long): Sgt =
    Sgt(src, trg, l, ts, exp, List(Edge(src, trg, l)))

  test("interval intersection of overlapping intervals") {
    assert(Interval.intersect(0, 10, 5, 20).contains((5L, 10L)))
  }

  test("interval intersection of disjoint intervals is empty") {
    assert(Interval.intersect(0, 5, 5, 10).isEmpty)
    assert(Interval.intersect(0, 5, 7, 10).isEmpty)
  }

  test("adjacent intervals are mergeable but not intersecting") {
    assert(Interval.mergeable(0, 5, 5, 10))
    assert(Interval.intersect(0, 5, 5, 10).isEmpty)
  }

  test("validAt respects half-open semantics") {
    val t = sgt(1, 2, "a", 10, 20)
    assert(t.validAt(10) && t.validAt(19))
    assert(!t.validAt(9) && !t.validAt(20))
  }

  test("fromSge lifts to a NOW-window tuple with the edge payload") {
    val t = Sgt.fromSge(Sge(1, 2, "a", 42))
    assert(t.ts == 42 && t.exp == 43)
    assert(t.path == List(Edge(1, 2, "a")))
  }

  test("coalesce merges overlapping value-equivalent tuples (paper Ex. 5)") {
    // PATTERN finds (u,RL,v) via two subgraphs: [29,31) and [30,31).
    val merged = coalesce(Seq(sgt(1, 2, "RL", 29, 31), sgt(1, 2, "RL", 30, 31)))
    assert(merged == Seq(sgt(1, 2, "RL", 29, 31)))
  }

  test("coalesce merges adjacent intervals") {
    val merged = coalesce(Seq(sgt(1, 2, "a", 0, 5), sgt(1, 2, "a", 5, 9)))
    assert(merged.map(t => (t.ts, t.exp)) == Seq((0L, 9L)))
  }

  test("coalesce keeps disjoint intervals separate") {
    val merged = coalesce(Seq(sgt(1, 2, "a", 0, 4), sgt(1, 2, "a", 6, 9)))
    assert(merged.map(t => (t.ts, t.exp)).sorted == Seq((0L, 4L), (6L, 9L)))
  }

  test("coalesce never merges across value-equivalence classes") {
    val merged = coalesce(Seq(sgt(1, 2, "a", 0, 5), sgt(1, 3, "a", 2, 7), sgt(1, 2, "b", 3, 8)))
    assert(merged.size == 3)
  }

  test("coalesce keeps the payload of the largest-expiry representative") {
    val t1 = Sgt(1, 2, "a", 0, 5, List(Edge(9, 9, "x")))
    val t2 = Sgt(1, 2, "a", 3, 8, List(Edge(8, 8, "y")))
    val merged = coalesce(Seq(t1, t2))
    assert(merged.head.path == List(Edge(8, 8, "y")))
    assert((merged.head.ts, merged.head.exp) == (0L, 8L))
  }

  test("value-equivalence key ignores the interval and payload") {
    assert(sgt(1, 2, "a", 0, 5).key == sgt(1, 2, "a", 90, 95).key)
  }
}
