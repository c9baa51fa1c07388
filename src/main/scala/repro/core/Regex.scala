package repro.core

/** Regular expressions over edge labels — the path constraint language of
  * the PATH operator (paper Def. 20, RPQ model).
  */
sealed trait Regex {

  /** All labels mentioned by this expression (the PATH input alphabet). */
  def labels: Set[String] = this match {
    case Regex.Lbl(l)      => Set(l)
    case Regex.Concat(rs)  => rs.flatMap(_.labels).toSet
    case Regex.Alt(rs)     => rs.flatMap(_.labels).toSet
    case Regex.Star(r)     => r.labels
    case Regex.Plus(r)     => r.labels
  }

  /** Pretty printer; `Regex.parse(r.render)` round-trips structurally —
    * nested same-operator nodes are parenthesized so they do not flatten
    * on reparse.
    */
  def render: String = this match {
    case Regex.Lbl(l)     => l
    case Regex.Concat(rs) => rs.map(r => if (prec(r) <= 2) s"(${r.render})" else r.render).mkString(" ")
    case Regex.Alt(rs)    => rs.map(r => if (prec(r) <= 1) s"(${r.render})" else r.render).mkString(" | ")
    case Regex.Star(r)    => if (prec(r) < 3) s"(${r.render})*" else s"${r.render}*"
    case Regex.Plus(r)    => if (prec(r) < 3) s"(${r.render})+" else s"${r.render}+"
  }

  private def prec(r: Regex): Int = r match {
    case _: Regex.Alt    => 1
    case _: Regex.Concat => 2
    case _               => 3
  }
}

object Regex {
  /** A single edge label. */
  final case class Lbl(l: String) extends Regex
  /** Concatenation `r1 ∘ r2 ∘ …`. */
  final case class Concat(rs: List[Regex]) extends Regex
  /** Alternation `r1 | r2 | …`. */
  final case class Alt(rs: List[Regex]) extends Regex
  /** Kleene star `r*` — evaluated as one-or-more on streams (see note). */
  final case class Star(r: Regex) extends Regex
  /** Kleene plus `r+`. */
  final case class Plus(r: Regex) extends Regex

  def concat(rs: Regex*): Regex = Concat(rs.toList)
  def alt(rs: Regex*): Regex    = Alt(rs.toList)

  /** Parse expressions like `a (b | c)* d+`; concatenation is written by
    * juxtaposition or `.`/`∘`, alternation by `|`, closure by postfix
    * `*`/`+`, grouping by parentheses. Labels match `[A-Za-z_][A-Za-z0-9_]*`.
    */
  def parse(s: String): Regex = new Parser(s).parseAll()

  private final class Parser(input: String) {
    private var pos = 0

    def parseAll(): Regex = {
      val r = parseAlt()
      skipWs()
      require(pos == input.length, s"trailing input at $pos in '$input'")
      r
    }

    private def skipWs(): Unit =
      while (pos < input.length && (input(pos).isWhitespace || input(pos) == '.' || input(pos) == '∘')) pos += 1

    private def peek: Option[Char] = { skipWs(); if (pos < input.length) Some(input(pos)) else None }

    private def parseAlt(): Regex = {
      val first = parseConcat()
      val alts  = scala.collection.mutable.ListBuffer(first)
      while (peek.contains('|')) { pos += 1; alts += parseConcat() }
      if (alts.size == 1) first else Alt(alts.toList)
    }

    private def parseConcat(): Regex = {
      val parts = scala.collection.mutable.ListBuffer.empty[Regex]
      var go = true
      while (go) peek match {
        case Some(c) if c == '(' || c.isLetter || c == '_' => parts += parsePostfix()
        case _                                             => go = false
      }
      require(parts.nonEmpty, s"empty expression at $pos in '$input'")
      if (parts.size == 1) parts.head else Concat(parts.toList)
    }

    private def parsePostfix(): Regex = {
      var r = parseAtom()
      var go = true
      while (go) peek match {
        case Some('*') => pos += 1; r = Star(r)
        case Some('+') => pos += 1; r = Plus(r)
        case _         => go = false
      }
      r
    }

    private def parseAtom(): Regex = peek match {
      case Some('(') =>
        pos += 1
        val r = parseAlt()
        require(peek.contains(')'), s"expected ')' at $pos in '$input'")
        pos += 1
        r
      case Some(c) if c.isLetter || c == '_' =>
        val start = pos
        while (pos < input.length && (input(pos).isLetterOrDigit || input(pos) == '_')) pos += 1
        Lbl(input.substring(start, pos))
      case other =>
        throw new IllegalArgumentException(s"unexpected '$other' at $pos in '$input'")
    }
  }
}
