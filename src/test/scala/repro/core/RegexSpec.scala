package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop}
import repro.util.PropertyChecks
import repro.core.Regex._

class RegexSpec extends AnyFunSuite with PropertyChecks {

  test("parses a single label") {
    assert(Regex.parse("knows") == Lbl("knows"))
  }

  test("parses concatenation by juxtaposition") {
    assert(Regex.parse("a b c") == Concat(List(Lbl("a"), Lbl("b"), Lbl("c"))))
  }

  test("parses concatenation with dot separators") {
    assert(Regex.parse("a.b.c") == Concat(List(Lbl("a"), Lbl("b"), Lbl("c"))))
  }

  test("parses alternation") {
    assert(Regex.parse("a | b | c") == Alt(List(Lbl("a"), Lbl("b"), Lbl("c"))))
  }

  test("parses star and plus postfix") {
    assert(Regex.parse("a*") == Star(Lbl("a")))
    assert(Regex.parse("a+") == Plus(Lbl("a")))
  }

  test("concatenation binds tighter than alternation") {
    assert(Regex.parse("a b | c") == Alt(List(Concat(List(Lbl("a"), Lbl("b"))), Lbl("c"))))
  }

  test("parentheses group subexpressions") {
    assert(Regex.parse("(a | b)*") == Star(Alt(List(Lbl("a"), Lbl("b")))))
    assert(Regex.parse("a (b c)+") == Concat(List(Lbl("a"), Plus(Concat(List(Lbl("b"), Lbl("c")))))))
  }

  test("Q4 pattern parses") {
    assert(Regex.parse("(a b c)+") == Plus(Concat(List(Lbl("a"), Lbl("b"), Lbl("c")))))
  }

  test("double closure parses") {
    assert(Regex.parse("a*+") == Plus(Star(Lbl("a"))))
  }

  test("labels with underscores and digits") {
    assert(Regex.parse("has_creator1") == Lbl("has_creator1"))
  }

  test("rejects trailing garbage") {
    assertThrows[IllegalArgumentException](Regex.parse("a )"))
  }

  test("rejects empty alternation branch") {
    assertThrows[IllegalArgumentException](Regex.parse("a |"))
  }

  test("rejects unclosed parenthesis") {
    assertThrows[IllegalArgumentException](Regex.parse("(a b"))
  }

  test("labels collects the alphabet") {
    assert(Regex.parse("a (b | c)* d+").labels == Set("a", "b", "c", "d"))
  }

  test("render of examples is parseable and stable") {
    for (s <- Seq("a", "a b", "a | b", "(a | b)*", "a (b c)+", "(a b c)+"))
      assert(Regex.parse(Regex.parse(s).render) == Regex.parse(s))
  }

  private val genRegex: Gen[Regex] = {
    val genLbl = Gen.oneOf("a", "b", "c").map(Lbl.apply)
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

  test("property: render/parse round-trips") {
    checkProp(Prop.forAll(genRegex) { r => Regex.parse(r.render) == r })
  }
}
