package repro.data

/** Shared variant dictionaries. The generators use the *forward* maps to
  * produce format variants of a canonical value; the rule judges use the
  * *inverse* maps to normalize both sides of a candidate matching rule.
  * Keeping both sides of the experiment on one dictionary is what makes the
  * simulated expert consistent with the synthetic ground truth.
  */
object Variants {

  /** Street-type abbreviations (canonical -> variant forms). */
  val streetTypes: Map[String, Vector[String]] = Map(
    "street"    -> Vector("st", "str", "st."),
    "avenue"    -> Vector("ave", "av", "ave."),
    "road"      -> Vector("rd", "rd."),
    "boulevard" -> Vector("blvd", "blvd."),
    "drive"     -> Vector("dr", "dr."),
    "lane"      -> Vector("ln", "ln."),
    "court"     -> Vector("ct", "ct."),
  )

  /** Cardinal directions. */
  val directions: Map[String, Vector[String]] = Map(
    "east"  -> Vector("e", "e."),
    "west"  -> Vector("w", "w."),
    "north" -> Vector("n", "n."),
    "south" -> Vector("s", "s."),
  )

  /** US states (single-token names only, to keep token alignment simple). */
  val states: Map[String, Vector[String]] = Map(
    "wisconsin"  -> Vector("wi"),
    "california" -> Vector("ca"),
    "texas"      -> Vector("tx"),
    "florida"    -> Vector("fl"),
    "ohio"       -> Vector("oh"),
    "maine"      -> Vector("me"),
    "utah"       -> Vector("ut"),
    "nevada"     -> Vector("nv"),
    "oregon"     -> Vector("or"),
    "kansas"     -> Vector("ks"),
    "georgia"    -> Vector("ga"),
    "arizona"    -> Vector("az"),
  )

  /** Journal-title abbreviations. */
  val journalWords: Map[String, Vector[String]] = Map(
    "journal"       -> Vector("j.", "j"),
    "international" -> Vector("int.", "intl"),
    "transactions"  -> Vector("trans.", "trans"),
    "review"        -> Vector("rev.", "rev"),
    "proceedings"   -> Vector("proc.", "proc"),
    "bulletin"      -> Vector("bull.", "bull"),
    "annals"        -> Vector("ann."),
    "quarterly"     -> Vector("q."),
    "science"       -> Vector("sci.", "sci"),
    "research"      -> Vector("res."),
    "medicine"      -> Vector("med."),
    "engineering"   -> Vector("eng."),
    "technology"    -> Vector("tech.", "technol."),
    "american"      -> Vector("am.", "amer."),
    "european"      -> Vector("eur."),
    "applied"       -> Vector("appl."),
    "clinical"      -> Vector("clin."),
    "chemistry"     -> Vector("chem."),
    "physics"       -> Vector("phys."),
    "biology"       -> Vector("biol."),
    "economics"     -> Vector("econ."),
    "mathematics"   -> Vector("math.", "math"),
    "environmental" -> Vector("environ.", "env."),
    "management"    -> Vector("manag.", "mgmt"),
    "education"     -> Vector("educ."),
    "psychology"    -> Vector("psychol."),
    "surgery"       -> Vector("surg."),
  )

  /** "&" variants (the Section 6 H&M example family). */
  val andForms: Vector[String] = Vector("and", "&", "&amp;")

  /** Inverse lookup: variant token -> canonical token, over a dictionary. */
  def inverse(dicts: Map[String, Vector[String]]*): Map[String, String] = {
    val b = Map.newBuilder[String, String]
    for (d <- dicts; (canon, vars) <- d) {
      b += canon -> canon
      for (v <- vars) b += v -> canon
    }
    b.result()
  }

  private val OrdinalRe = "([0-9]+)(st|nd|rd|th)".r

  /** Strip an ordinal suffix ("9th" -> "9"); identity otherwise. */
  def stripOrdinal(tok: String): String = tok match {
    case OrdinalRe(d, _) => d
    case _               => tok
  }

  /** Ordinal suffix for a number ("9" -> "9th", "23" -> "23rd"). */
  def ordinal(n: Int): String = {
    val suffix =
      if (n % 100 / 10 == 1) "th"
      else n % 10 match {
        case 1 => "st"; case 2 => "nd"; case 3 => "rd"; case _ => "th"
      }
    s"$n$suffix"
  }

  /** Characters stripped from token edges during normalization. */
  val EdgePunct: Set[Char] = Set('.', ',', ';', ':', '(', ')', '/', '\'', '"')

  def stripEdgePunct(tok: String): String = {
    var i = 0
    var j = tok.length
    while (i < j && EdgePunct(tok.charAt(i))) i += 1
    while (j > i && EdgePunct(tok.charAt(j - 1))) j -= 1
    tok.substring(i, j)
  }
}
