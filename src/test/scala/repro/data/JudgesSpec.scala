package repro.data

import org.scalatest.funsuite.AnyFunSuite

class JudgesSpec extends AnyFunSuite {

  test("address judge: abbreviations and ordinals are true rules") {
    val j = Judges.address
    assert(j.isTrue("street", "st"))
    assert(j.isTrue("st.", "street"))
    assert(j.isTrue("9", "9th"))
    assert(j.isTrue("wisconsin", "wi"))
    assert(j.isTrue("e", "east"))
    assert(j.isTrue("9 st", "9th street"))
    assert(j.isTrue("3 e avenue, 33990 ca", "3rd e ave, 33990 california"))
  }

  test("address judge: false rules rejected") {
    val j = Judges.address
    assert(!j.isTrue("3", "5th"))
    assert(!j.isTrue("street", "avenue"))
    assert(!j.isTrue("wisconsin", "ca"))
    assert(!j.isTrue("9 st", "st 9")) // order matters for addresses
  }

  test("journal judge: word abbreviations are true") {
    val j = Judges.journalTitle
    assert(j.isTrue("journal", "j."))
    assert(j.isTrue("journal", "j"))
    assert(j.isTrue("international", "int."))
    assert(j.isTrue("j. of applied science", "journal of applied sci."))
    assert(j.isTrue("science and medicine", "science & medicine"))
  }

  test("journal judge: different words are false") {
    val j = Judges.journalTitle
    assert(!j.isTrue("journal", "bulletin"))
    assert(!j.isTrue("science", "sciencex"))
    assert(!j.isTrue("journal of physics", "journal of chemistry"))
  }

  test("author judge: inversion and initials are true") {
    val j = Judges.authorList
    assert(j.isTrue("sloss, andrew", "andrew sloss"))
    assert(j.isTrue("andrew n sloss", "andrew sloss"))
    assert(j.isTrue("sloss, andrew n.", "andrew sloss"))
    assert(j.isTrue("andrew (author)", "andrew;"))
    assert(j.isTrue("andrew, and", "andrew;")) // Table 9 group 4
    assert(j.isTrue("symes,", "symes;"))        // Table 9 group 1
    assert(j.isTrue("", "n"))                   // middle initial insertion
  }

  test("author judge: different people are false") {
    val j = Judges.authorList
    assert(!j.isTrue("andrew sloss", "chris wright"))
    assert(!j.isTrue("sloss", "symes"))
    assert(!j.isTrue("", "et al"))
    assert(!j.isTrue("andrew sloss", "andrew sloss, et al"))
  }

  test("normalization details") {
    assert(Judges.authorList.normalize("Sloss, Andrew N.") == Vector("andrew", "sloss"))
    assert(Judges.address.normalize("9th St.") == Vector("9", "street"))
    assert(Judges.journalTitle.normalize("J. of Sci.") == Vector("journal", "of", "science"))
  }

  test("variants helpers") {
    assert(Variants.ordinal(1) == "1st")
    assert(Variants.ordinal(2) == "2nd")
    assert(Variants.ordinal(3) == "3rd")
    assert(Variants.ordinal(4) == "4th")
    assert(Variants.ordinal(11) == "11th")
    assert(Variants.ordinal(12) == "12th")
    assert(Variants.ordinal(13) == "13th")
    assert(Variants.ordinal(21) == "21st")
    assert(Variants.ordinal(22) == "22nd")
    assert(Variants.stripOrdinal("9th") == "9")
    assert(Variants.stripOrdinal("22nd") == "22")
    assert(Variants.stripOrdinal("th") == "th")
    assert(Variants.stripOrdinal("9") == "9")
    assert(Variants.stripEdgePunct("(author)") == "author")
    assert(Variants.stripEdgePunct("st.") == "st")
  }

  test("inverse maps every variant to its canonical form") {
    val inv = Variants.inverse(Variants.streetTypes)
    assert(inv("st") == "street")
    assert(inv("street") == "street")
    assert(inv("blvd") == "boulevard")
  }
}
