package repro.core.lang

import repro.core.Structure

/** Terms of the programming language (Sections 3 and 4.1): the four
  * regex-based terms plus constant-string terms (used only inside MatchPos).
  */
sealed trait Term extends Serializable { def key: String }
case object Td extends Term { val key = "Td" } // [0-9]+
case object Tl extends Term { val key = "Tl" } // [a-z]+
case object Tc extends Term { val key = "TC" } // [A-Z]+
case object Tb extends Term { val key = "Tb" } // \s+
final case class TStr(s: String) extends Term { def key = "T(" + s + ")" }

object Term {
  val regexTerms: List[Term] = List(Td, Tl, Tc, Tb)

  private def regexCat(t: Term): Char = t match {
    case Td => 'd'; case Tl => 'l'; case Tc => 'C'; case Tb => 'b'
    case _  => throw new IllegalArgumentException("not a regex term")
  }

  /** All matches of `t` in `s` as 1-based half-open `[begin, end)` spans.
    * Regex terms match maximal runs; constant terms match every (possibly
    * overlapping) occurrence, left to right.
    */
  def matches(t: Term, s: String): Vector[(Int, Int)] = t match {
    case TStr(sub) =>
      if (sub.isEmpty) Vector.empty
      else {
        val out = Vector.newBuilder[(Int, Int)]
        var i = s.indexOf(sub)
        while (i >= 0) { out += ((i + 1, i + 1 + sub.length)); i = s.indexOf(sub, i + 1) }
        out.result()
      }
    case _ =>
      val cat = regexCat(t)
      val out = Vector.newBuilder[(Int, Int)]
      var i = 0
      while (i < s.length) {
        if (Structure.category(s.charAt(i)) == cat) {
          val start = i
          while (i < s.length && Structure.category(s.charAt(i)) == cat) i += 1
          out += ((start + 1, i + 1))
        } else i += 1
      }
      out.result()
  }
}

/** Position functions (Section 4.1). Both return a 1-based position in the
  * input string `s`, in `[1, |s|+1]`, or None when out of range.
  */
sealed trait Pos extends Serializable { def key: String }

/** `k > 0`: forward position `k`; `k < 0`: backward, `|s| + 1 + k`.
  * We additionally allow the forward position `|s| + 1` (see DESIGN.md §6).
  */
final case class ConstPos(k: Int) extends Pos { def key = s"CP($k)" }

/** Beginning (`dir = 'B'`) or ending (`dir = 'E'`) position of the k-th match
  * of `t` in `s`; `k < 0` counts matches from the back (`m + 1 + k`).
  */
final case class MatchPos(t: Term, k: Int, dir: Char) extends Pos {
  def key = s"MP(${t.key},$k,$dir)"
}

object Pos {
  def eval(p: Pos, s: String): Option[Int] = p match {
    case ConstPos(k) =>
      if (k > 0 && k <= s.length + 1) Some(k)
      else if (k < 0 && s.length + 1 + k >= 1) Some(s.length + 1 + k)
      else None
    case MatchPos(t, k, dir) =>
      val ms = Term.matches(t, s)
      val m  = ms.length
      val idx = if (k > 0) k else m + 1 + k
      if (k == 0 || idx < 1 || idx > m) None
      else Some(if (dir == 'B') ms(idx - 1)._1 else ms(idx - 1)._2)
  }
}

/** String functions used as edge labels in the transformation graph
  * (Definitions 4 and 6). `ConstantStr` and `SubStrF` are deterministic;
  * the affix labels `PrefixF`/`SuffixF` are multi-output (Section 4.4).
  */
sealed trait Label extends Serializable { def key: String }

final case class ConstantStr(x: String) extends Label { def key = s"CS($x)" }

final case class SubStrF(l: Pos, r: Pos) extends Label {
  def key = s"SS(${l.key},${r.key})"
}

/** Output: any non-empty prefix of the k-th match of regex term `t` in `s`. */
final case class PrefixF(t: Term, k: Int) extends Label { def key = s"PRE(${t.key},$k)" }

/** Output: any non-empty suffix of the k-th match of regex term `t` in `s`. */
final case class SuffixF(t: Term, k: Int) extends Label { def key = s"SUF(${t.key},$k)" }

object Label {

  /** The k-th (possibly backward-indexed) match of `t` in `s`, if any. */
  private def kthMatch(t: Term, k: Int, s: String): Option[String] = {
    val ms  = Term.matches(t, s)
    val m   = ms.length
    val idx = if (k > 0) k else m + 1 + k
    if (k == 0 || idx < 1 || idx > m) None
    else Some(s.substring(ms(idx - 1)._1 - 1, ms(idx - 1)._2 - 1))
  }

  /** The single output of a deterministic label, if defined. */
  def evalDeterministic(label: Label, s: String): Option[String] = label match {
    case ConstantStr(x) => Some(x)
    case SubStrF(l, r) =>
      for {
        a <- Pos.eval(l, s)
        b <- Pos.eval(r, s)
        if a < b
      } yield s.substring(a - 1, b - 1)
    case _ => None
  }

  /** Whether `label`, applied to `s`, can output exactly `out`. */
  def canOutput(label: Label, s: String, out: String): Boolean = label match {
    case ConstantStr(x) => x == out
    case f: SubStrF     => evalDeterministic(f, s).contains(out)
    case PrefixF(t, k)  => out.nonEmpty && kthMatch(t, k, s).exists(_.startsWith(out))
    case SuffixF(t, k)  => out.nonEmpty && kthMatch(t, k, s).exists(_.endsWith(out))
  }

  /** All lengths `len` such that `label` on `s` can output `t[at, at+len)`
    * (0-based `at`). Used to check path consistency without building graphs.
    */
  def matchLengthsAt(label: Label, s: String, t: String, at: Int): List[Int] = label match {
    case ConstantStr(x) =>
      if (t.regionMatches(at, x, 0, x.length)) List(x.length) else Nil
    case f: SubStrF =>
      evalDeterministic(f, s) match {
        case Some(o) if t.regionMatches(at, o, 0, o.length) => List(o.length)
        case _ => Nil
      }
    case PrefixF(tm, k) =>
      kthMatch(tm, k, s) match {
        case Some(m) =>
          val max = math.min(m.length, t.length - at)
          (1 to max).filter(len => t.regionMatches(at, m, 0, len)).toList
        case None => Nil
      }
    case SuffixF(tm, k) =>
      kthMatch(tm, k, s) match {
        case Some(m) =>
          val max = math.min(m.length, t.length - at)
          (1 to max).filter(len => t.regionMatches(at, m, m.length - len, len)).toList
        case None => Nil
      }
  }

  /** Static-order rank for label preference (Appendix B): regex-positioned
    * SubStr first, then affix labels, then constant-term-positioned SubStr,
    * then ConstPos-based SubStr, then ConstantStr.
    */
  def staticRank(label: Label): Int = label match {
    case SubStrF(l, r) =>
      def posRank(p: Pos): Int = p match {
        case MatchPos(_: TStr, _, _) => 1
        case MatchPos(_, _, _)       => 0
        case ConstPos(_)             => 2
      }
      math.max(posRank(l), posRank(r)) match {
        case 0 => 0 // both regex MatchPos
        case 1 => 2 // involves a constant-string term
        case _ => 3 // involves ConstPos
      }
    case _: PrefixF | _: SuffixF => 1
    case _: ConstantStr          => 4
  }
}

/** A program = a sequence of labels (Definition 3); consistency checking
  * per Theorem 4.5 without materializing the transformation graph.
  */
object PathCheck {

  def pathKey(path: Seq[Label]): String =
    if (path.isEmpty) "ε" else path.map(_.key).mkString("⊕")

  /** Does the program `path` transform `s` into exactly `t`? */
  def consistent(path: Seq[Label], s: String, t: String): Boolean = {
    var reachable = Set(0)
    for (label <- path) {
      if (reachable.isEmpty) return false
      reachable = reachable.flatMap { at =>
        Label.matchLengthsAt(label, s, t, at).map(at + _)
      }
    }
    reachable.contains(t.length)
  }
}
