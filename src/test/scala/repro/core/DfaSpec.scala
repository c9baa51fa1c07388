package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.util.PropertyChecks
import repro.core.Regex._

class DfaSpec extends AnyFunSuite with PropertyChecks {

  /** Reference matcher via the JDK regex engine (labels are mapped to
    * single characters, which our 1-char test alphabet guarantees).
    */
  private def javaPattern(r: Regex): String = r match {
    case Lbl(l)     => l
    case Concat(rs) => rs.map(p => s"(?:${javaPattern(p)})").mkString
    case Alt(rs)    => rs.map(p => s"(?:${javaPattern(p)})").mkString("|")
    case Star(p)    => s"(?:${javaPattern(p)})*"
    case Plus(p)    => s"(?:${javaPattern(p)})+"
  }

  private def refAccepts(r: Regex, word: Seq[String]): Boolean =
    word.mkString.matches(javaPattern(r))

  private val alphabet = Seq("a", "b", "c")

  private def allWords(maxLen: Int): Seq[Seq[String]] =
    (0 to maxLen).flatMap(n =>
      Seq.fill(n)(alphabet).foldLeft(Seq(Seq.empty[String]))((acc, as) =>
        for (w <- acc; a <- as) yield w :+ a))

  private def exhaustive(r: Regex): Unit =
    for (w <- allWords(5) if w.nonEmpty) // non-empty: paths have ≥1 edge
      assert(Dfa.fromRegex(r).accepts(w) == refAccepts(r, w), s"word=$w regex=${r.render}")

  test("single label DFA") {
    val dfa = Dfa.fromRegex(Lbl("a"))
    assert(dfa.accepts(Seq("a")))
    assert(!dfa.accepts(Seq("b")))
    assert(!dfa.accepts(Seq("a", "a")))
  }

  test("a+ accepts powers of a only") { exhaustive(Plus(Lbl("a"))) }
  test("a* on non-empty words equals a+") { exhaustive(Star(Lbl("a"))) }
  test("a b c concatenation") { exhaustive(Concat(List(Lbl("a"), Lbl("b"), Lbl("c")))) }
  test("alternation a|b") { exhaustive(Alt(List(Lbl("a"), Lbl("b")))) }
  test("Q2 shape: a b*") { exhaustive(Regex.parse("a b*")) }
  test("Q3 shape: a b* c*") { exhaustive(Regex.parse("a b* c*")) }
  test("Q4 shape: (a b c)+") { exhaustive(Regex.parse("(a b c)+")) }
  test("nested: (a | b c)* a") { exhaustive(Regex.parse("(a | b c)* a")) }
  test("double closure: (a+ b)+") { exhaustive(Regex.parse("(a+ b)+")) }

  test("transitionsOn lists exactly the label's transitions") {
    val dfa = Dfa.fromRegex(Regex.parse("a b*"))
    for ((s, t) <- dfa.transitionsOn("a")) assert(dfa.delta(s, "a").contains(t))
    assert(dfa.transitionsOn("c").isEmpty)
  }

  test("start state is 0 and deterministic") {
    val dfa = Dfa.fromRegex(Regex.parse("(a b c)+"))
    assert(dfa.start == 0)
    val keys = dfa.transitions.keys.toSeq
    assert(keys.distinct.size == keys.size)
  }

  test("alphabet restricted to regex labels") {
    assert(Dfa.fromRegex(Regex.parse("a b+")).alphabet == Set("a", "b"))
  }

  private val genRegex: Gen[Regex] = {
    val genLbl = Gen.oneOf(alphabet).map(Lbl.apply)
    def gen(depth: Int): Gen[Regex] =
      if (depth == 0) genLbl
      else Gen.frequency(
        3 -> genLbl,
        2 -> Gen.listOfN(2, gen(depth - 1)).map(Concat.apply),
        2 -> Gen.listOfN(2, gen(depth - 1)).map(Alt.apply),
        1 -> gen(depth - 1).map(Star.apply),
        1 -> gen(depth - 1).map(Plus.apply))
    gen(3)
  }

  test("property: DFA agrees with JDK regex on random regexes and words") {
    val genWord = Gen.choose(1, 6).flatMap(n => Gen.listOfN(n, Gen.oneOf(alphabet)))
    checkProp(Prop.forAll(genRegex, genWord) { (r, w) =>
      Dfa.fromRegex(r).accepts(w) == refAccepts(r, w)
    }, minTests = 200)
  }
}
