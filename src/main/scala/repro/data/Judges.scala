package repro.data

import repro.core.RuleJudge

/** Dictionary-based normalization judge: a matching rule `a ↔ b` is true iff
  * both sides normalize to the same token sequence (or multiset, for author
  * lists where `last, first` inversion is a true variant).
  */
final case class DictJudge(
    abbrevInv: Map[String, String],
    dropTokens: Set[String],
    multiset: Boolean,
    dropSingleLetters: Boolean,
) extends RuleJudge {

  def normalize(s: String): Vector[String] = {
    val toks = s.toLowerCase.split("\\s+").toVector
      .map { raw =>
        val t0 = if (Variants.andForms.contains(raw)) "and" else Variants.stripEdgePunct(raw)
        val t1 = Variants.stripOrdinal(t0)
        abbrevInv.getOrElse(t1, abbrevInv.getOrElse(raw.toLowerCase, t1))
      }
      .filter(_.nonEmpty)
      .filterNot(dropTokens)
      .filterNot(t => dropSingleLetters && t.length == 1 && t.head.isLetter)
    if (multiset) toks.sorted else toks
  }

  override def isTrue(a: String, b: String): Boolean = normalize(a) == normalize(b)
}

/** The three dataset-specific judges standing in for the paper's expert. */
object Judges {

  /** Author lists: inversion and separator changes are true variants, middle
    * initials and "(author)"-style annotations are ignorable.
    */
  val authorList: DictJudge = DictJudge(
    abbrevInv = Map.empty,
    dropTokens = Set("author", "by", "and"),
    multiset = true,
    dropSingleLetters = true,
  )

  /** Journal titles: word abbreviations and &/and are true variants. */
  val journalTitle: DictJudge = DictJudge(
    abbrevInv = Variants.inverse(Variants.journalWords) + ("&" -> "and") + ("&amp;" -> "and"),
    dropTokens = Set.empty,
    multiset = false,
    dropSingleLetters = false,
  )

  /** Addresses: street-type/state/direction abbreviations and ordinal
    * suffixes are true variants.
    */
  val address: DictJudge = DictJudge(
    abbrevInv = Variants.inverse(Variants.streetTypes, Variants.directions, Variants.states),
    dropTokens = Set.empty,
    multiset = false,
    dropSingleLetters = false,
  )
}
