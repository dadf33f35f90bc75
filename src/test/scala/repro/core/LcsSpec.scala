package repro.core

import org.scalatest.funsuite.AnyFunSuite

class LcsSpec extends AnyFunSuite {

  private def lcsLen[T](a: IndexedSeq[T], b: IndexedSeq[T]): Int = Lcs.align(a, b).length

  test("align identical sequences") {
    val a = Vector("a", "b", "c")
    assert(Lcs.align(a, a) == Vector((0, 0), (1, 1), (2, 2)))
  }

  test("align disjoint sequences") {
    assert(Lcs.align(Vector("a", "b"), Vector("c", "d")) == Vector.empty)
  }

  test("align paper Example 2.1 tokens") {
    // "9 St, 02141 Wisconsin" vs "9th St, 02141 WI"
    val a = Vector("9", "St,", "02141", "Wisconsin")
    val b = Vector("9th", "St,", "02141", "WI")
    assert(Lcs.align(a, b) == Vector((1, 1), (2, 2)))
  }

  test("align empty sequences") {
    assert(Lcs.align(Vector.empty[String], Vector("a")) == Vector.empty)
    assert(Lcs.align(Vector("a"), Vector.empty[String]) == Vector.empty)
  }

  test("alignment indices are strictly increasing in both coordinates") {
    val a = Vector("x", "a", "y", "b", "z", "c")
    val b = Vector("a", "q", "b", "c", "r")
    val m = Lcs.align(a, b)
    assert(m.map(_._1) == m.map(_._1).sorted && m.map(_._1).distinct == m.map(_._1))
    assert(m.map(_._2) == m.map(_._2).sorted && m.map(_._2).distinct == m.map(_._2))
    assert(m.forall { case (i, j) => a(i) == b(j) })
  }

  test("LCS length matches a known case") {
    assert(lcsLen("ABCBDAB".toVector, "BDCABA".toVector) == 4)
  }

  test("gaps of paper Example 2.1 produce the two rule ranges") {
    val a = Vector("9", "St,", "02141", "Wisconsin")
    val b = Vector("9th", "St,", "02141", "WI")
    // gap 1: 9 vs 9th; gap 2: Wisconsin vs WI
    assert(Lcs.gaps(a, b) == Vector(((0, 0), (0, 0)), ((3, 3), (3, 3))))
  }

  test("gaps with an insertion on one side") {
    val a = Vector("andrew", "sloss")
    val b = Vector("andrew", "n", "sloss")
    assert(Lcs.gaps(a, b) == Vector(((1, 0), (1, 1))))
  }

  test("gaps with leading mismatch") {
    val a = Vector("dr.", "smith")
    val b = Vector("smith")
    assert(Lcs.gaps(a, b) == Vector(((0, 0), (0, -1))))
  }

  test("gaps with trailing mismatch") {
    val a = Vector("smith", "jr")
    val b = Vector("smith")
    assert(Lcs.gaps(a, b) == Vector(((1, 1), (1, 0))))
  }

  test("no gaps for identical sequences") {
    assert(Lcs.gaps(Vector("a", "b"), Vector("a", "b")) == Vector.empty)
  }

  test("fully mismatched sequences produce one whole-range gap") {
    assert(Lcs.gaps(Vector("a"), Vector("x", "y")) == Vector(((0, 0), (0, 1))))
  }
}
