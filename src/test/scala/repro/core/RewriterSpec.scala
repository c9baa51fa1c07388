package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Regex.{Lbl, Plus}

class RewriterSpec extends AnyFunSuite {

  private def w(l: String) = SgaExpr.Wscan(l, 30, 1)

  test("alternation rule: P_{a|b}(Sa,Sb) = ∪(Sa,Sb)") {
    val path = SgaExpr.Path(List(w("a"), w("b")), Regex.alt(Lbl("a"), Lbl("b")), "d")
    val out  = Rewriter.alternationToUnion(path)
    assert(out.contains(SgaExpr.Union(List(w("a"), w("b")), "d")))
  }

  test("alternation rule does not fire on non-label alternatives") {
    val path = SgaExpr.Path(List(w("a"), w("b")),
      Regex.alt(Lbl("a"), Regex.concat(Lbl("b"), Lbl("a"))), "d")
    assert(Rewriter.alternationToUnion(path).isEmpty)
  }

  test("concatenation rule: P_{a·b}(Sa,Sb) = ⋈_{trg1=src2}(Sa,Sb)") {
    val path = SgaExpr.Path(List(w("a"), w("b")), Regex.concat(Lbl("a"), Lbl("b")), "d")
    val out  = Rewriter.concatToPattern(path).get.asInstanceOf[SgaExpr.Pattern]
    assert(out.ins == List(w("a"), w("b")))
    assert(out.equalities == List((SgaExpr.trg(0), SgaExpr.src(1))))
    assert(out.outSrc == SgaExpr.src(0) && out.outTrg == SgaExpr.trg(1))
    assert(Rewriter.isLinearChain(out))
  }

  test("concatenation rule generalizes to longer chains") {
    val path = SgaExpr.Path(List(w("a"), w("b"), w("c")),
      Regex.concat(Lbl("a"), Lbl("b"), Lbl("c")), "d")
    val out = Rewriter.concatToPattern(path).get.asInstanceOf[SgaExpr.Pattern]
    assert(out.equalities ==
      List((SgaExpr.trg(0), SgaExpr.src(1)), (SgaExpr.trg(1), SgaExpr.src(2))))
  }

  test("concatenation rule does not fire under a closure") {
    val path = SgaExpr.Path(List(w("a"), w("b")),
      Plus(Regex.concat(Lbl("a"), Lbl("b"))), "d")
    assert(Rewriter.concatToPattern(path).isEmpty)
  }

  test("fold rule turns canonical Q4 into plan P1 (§7.4)") {
    val inner = SgaExpr.Pattern(List(w("a"), w("b"), w("c")),
      List((SgaExpr.trg(0), SgaExpr.src(1)), (SgaExpr.trg(1), SgaExpr.src(2))),
      SgaExpr.src(0), SgaExpr.trg(2), "d")
    val canonical = SgaExpr.Path(List(inner), Plus(Lbl("d")), "Answer")
    val p1 = Rewriter.foldLinearPatternIntoClosure(canonical).get
    assert(p1 == SgaExpr.Path(List(w("a"), w("b"), w("c")),
      Plus(Regex.concat(Lbl("a"), Lbl("b"), Lbl("c"))), "Answer"))
  }

  test("fold rule refuses non-linear patterns") {
    val triangle = SgaExpr.Pattern(List(w("a"), w("b"), w("c")),
      List((SgaExpr.trg(0), SgaExpr.src(1)), (SgaExpr.trg(1), SgaExpr.src(2)),
           (SgaExpr.trg(2), SgaExpr.src(0))),
      SgaExpr.src(0), SgaExpr.trg(2), "d")
    val path = SgaExpr.Path(List(triangle), Plus(Lbl("d")), "Answer")
    assert(Rewriter.foldLinearPatternIntoClosure(path).isEmpty)
  }

  test("isLinearChain rejects reversed projections") {
    val p = SgaExpr.Pattern(List(w("a"), w("b")),
      List((SgaExpr.trg(0), SgaExpr.src(1))), SgaExpr.trg(1), SgaExpr.src(0), "d")
    assert(!Rewriter.isLinearChain(p))
  }

  test("simplifyPaths rewrites nested PATH nodes bottom-up") {
    val inner = SgaExpr.Path(List(w("a"), w("b")), Regex.alt(Lbl("a"), Lbl("b")), "u")
    val outer = SgaExpr.Path(List(inner, w("c")), Regex.concat(Lbl("u"), Lbl("c")), "d")
    val simplified = Rewriter.simplifyPaths(outer)
    val pat = simplified.asInstanceOf[SgaExpr.Pattern]
    assert(pat.ins.head == SgaExpr.Union(List(w("a"), w("b")), "u"))
    assert(pat.ins(1) == w("c"))
  }
}
