package repro.core

/** Token-level longest common subsequence, used to align a pair of attribute
  * values and derive candidate matching rules (Section 2, Step 1).
  */
object Lcs {

  /** Indices `(i, j)` of a longest common subsequence of `a` and `b`,
    * in increasing order. Backtracking is deterministic: on ties it prefers
    * consuming from `a` first, so the alignment is stable across runs.
    */
  def align[T](a: IndexedSeq[T], b: IndexedSeq[T]): Vector[(Int, Int)] = {
    val n = a.length
    val m = b.length
    val dp = Array.ofDim[Int](n + 1, m + 1)
    var i = n - 1
    while (i >= 0) {
      var j = m - 1
      while (j >= 0) {
        dp(i)(j) =
          if (a(i) == b(j)) dp(i + 1)(j + 1) + 1
          else math.max(dp(i + 1)(j), dp(i)(j + 1))
        j -= 1
      }
      i -= 1
    }
    val out = Vector.newBuilder[(Int, Int)]
    var x = 0
    var y = 0
    while (x < n && y < m) {
      if (a(x) == b(y)) { out += ((x, y)); x += 1; y += 1 }
      else if (dp(x + 1)(y) >= dp(x)(y + 1)) x += 1
      else y += 1
    }
    out.result()
  }

  /** The maximal "gaps" between consecutive LCS matches (including before the
    * first and after the last match): pairs of index ranges
    * `((aFrom, aTo), (bFrom, bTo))`, inclusive, possibly empty (`from > to`).
    * Gaps where both sides are empty are dropped.
    */
  def gaps[T](a: IndexedSeq[T], b: IndexedSeq[T]): Vector[((Int, Int), (Int, Int))] = {
    val matches = align(a, b)
    val out = Vector.newBuilder[((Int, Int), (Int, Int))]
    var prevA = -1
    var prevB = -1
    for ((ma, mb) <- matches) {
      if (ma - prevA > 1 || mb - prevB > 1)
        out += (((prevA + 1, ma - 1), (prevB + 1, mb - 1)))
      prevA = ma
      prevB = mb
    }
    if (a.length - prevA > 1 || b.length - prevB > 1)
      out += (((prevA + 1, a.length - 1), (prevB + 1, b.length - 1)))
    out.result()
  }
}
