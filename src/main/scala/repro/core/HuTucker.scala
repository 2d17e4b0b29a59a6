package repro.core

/** Optimal alphabetic (order-preserving) binary prefix codes — the Hu-Tucker
  * algorithm (§4.2 of the paper, [Hu & Tucker 1971], quadratic variant per
  * [Yohe 1972]).
  *
  * Phase 1 repeatedly merges the minimum-weight *tentatively compatible* pair
  * (two list nodes with no **leaf** strictly between them), recording the
  * merge tree. Phase 2 reads off each leaf's depth and rebuilds the canonical
  * alphabetic code level-by-level: the resulting codes are prefix-free and
  * strictly increasing, so concatenations preserve source order (§3.1).
  *
  * Complexity: O(N²) — each of the N−1 merges rescans the active list once.
  */
object HuTucker {

  /** A right-aligned code word: the low `len` bits of `bits`, MSB first. */
  final case class Code(bits: Long, len: Int) {
    def bitString: String =
      if (len == 0) "" else ((len - 1) to 0 by -1).map(i => (bits >>> i) & 1L).mkString
  }

  /** Optimal alphabetic code for `weights` (must be positive). */
  def assign(weights: Array[Double]): Array[Code] = codesFromLengths(codeLengths(weights))

  /** Phase 1: leaf depths of the optimal alphabetic tree, in alphabet order. */
  def codeLengths(weights: Array[Double]): Array[Int] = {
    val n = weights.length
    require(n > 0, "empty weight vector")
    if (n == 1) return Array(1)

    val total = 2 * n - 1
    val w     = new Array[Double](total)
    val lch   = new Array[Int](total)
    val rch   = new Array[Int](total)
    val leaf  = new Array[Boolean](total)
    java.util.Arrays.fill(lch, -1)
    java.util.Arrays.fill(rch, -1)
    var i = 0
    while (i < n) { w(i) = weights(i); leaf(i) = true; i += 1 }

    // Doubly linked list over active node ids; sentinel head at index `total`.
    val HEAD = total
    val next = new Array[Int](total + 1)
    val prev = new Array[Int](total + 1)
    i = 0
    while (i < n) {
      next(i) = if (i == n - 1) HEAD else i + 1
      prev(i) = if (i == 0) HEAD else i - 1
      i += 1
    }
    next(HEAD) = 0; prev(HEAD) = n - 1

    var free   = n // next unused internal node id
    var active = n
    while (active > 1) {
      // Find the global minimum compatible pair. Windows run from one leaf to
      // the next (inclusive); any two nodes inside a window are compatible.
      var bestSum  = Double.MaxValue
      var bestL    = -1
      var bestR    = -1
      var bestLOrd = Int.MaxValue
      var bestROrd = Int.MaxValue
      // Two smallest (weight, ordinal) in the current window.
      var w1 = Double.MaxValue; var o1 = -1; var i1 = -1
      var w2 = Double.MaxValue; var o2 = -1; var i2 = -1

      var cur = next(HEAD)
      var ord = 0
      while (cur != HEAD) {
        val wc = w(cur)
        if (wc < w1) { w2 = w1; o2 = o1; i2 = i1; w1 = wc; o1 = ord; i1 = cur }
        else if (wc < w2) { w2 = wc; o2 = ord; i2 = cur }

        val isBoundary = leaf(cur)
        val isLast     = next(cur) == HEAD
        if (isBoundary || isLast) {
          if (i1 >= 0 && i2 >= 0) {
            val s = w1 + w2
            val (lo, li, ro, ri) = if (o1 < o2) (o1, i1, o2, i2) else (o2, i2, o1, i1)
            val better = s < bestSum ||
              (s == bestSum && (lo < bestLOrd || (lo == bestLOrd && ro < bestROrd)))
            if (better) { bestSum = s; bestL = li; bestR = ri; bestLOrd = lo; bestROrd = ro }
          }
          // New window starts at this leaf (tail windows end at list end).
          if (isBoundary) { w1 = wc; o1 = ord; i1 = cur; w2 = Double.MaxValue; o2 = -1; i2 = -1 }
        }
        cur = next(cur); ord += 1
      }

      // Merge: internal node replaces the left member; right member unlinked.
      val m = free; free += 1
      w(m) = bestSum; lch(m) = bestL; rch(m) = bestR; leaf(m) = false
      val pl = prev(bestL); val nl = next(bestL)
      next(pl) = m; prev(m) = pl
      if (nl == bestR) { val nr = next(bestR); next(m) = nr; prev(nr) = m }
      else {
        next(m) = nl; prev(nl) = m
        val pr = prev(bestR); val nr = next(bestR)
        next(pr) = nr; prev(nr) = pr
      }
      active -= 1
    }

    // Depths via iterative DFS from the final root.
    val root  = free - 1
    val depth = new Array[Int](total)
    val stack = new Array[Int](total)
    var top = 0
    stack(top) = root; top += 1
    while (top > 0) {
      top -= 1
      val v = stack(top)
      if (lch(v) >= 0) {
        depth(lch(v)) = depth(v) + 1; depth(rch(v)) = depth(v) + 1
        stack(top) = lch(v); top += 1
        stack(top) = rch(v); top += 1
      }
    }
    val lens = new Array[Int](n)
    i = 0
    while (i < n) { lens(i) = depth(i); i += 1 }
    lens
  }

  /** Phase 2: canonical alphabetic codes from a valid level sequence. */
  def codesFromLengths(lens: Array[Int]): Array[Code] = {
    val n = lens.length
    val out = new Array[Code](n)
    require(lens(0) <= 62, s"code length ${lens(0)} exceeds 62 bits")
    out(0) = Code(0L, lens(0))
    var c = 0L
    var prevLen = lens(0)
    var i = 1
    while (i < n) {
      val l = lens(i)
      require(l <= 62, s"code length $l exceeds 62 bits")
      c += 1
      if (l >= prevLen) c <<= (l - prevLen) else c >>= (prevLen - l)
      require(l == 0 || c < (1L << l), s"invalid alphabetic level sequence at index $i")
      out(i) = Code(c, l)
      prevLen = l
      i += 1
    }
    validateAdjacent(out)
    out
  }

  /** Cheap O(n) sanity check: adjacent codes strictly increase as bitstrings
    * and neither is a prefix of the other. (Full prefix-freeness is checked
    * exhaustively in tests.)
    */
  private def validateAdjacent(codes: Array[Code]): Unit = {
    var i = 1
    while (i < codes.length) {
      val a = codes(i - 1); val b = codes(i)
      val m = math.min(a.len, b.len)
      val ah = a.bits >>> (a.len - m)
      val bh = b.bits >>> (b.len - m)
      require(ah < bh, s"codes not strictly increasing/prefix-free at $i: ${a.bitString} vs ${b.bitString}")
      i += 1
    }
  }

  /** O(n³)-ish DP for the optimal alphabetic tree cost — test oracle only. */
  def optimalCostDp(weights: Array[Double]): Double = {
    val n = weights.length
    if (n == 1) return weights(0)
    val pre = new Array[Double](n + 1)
    for (i <- 0 until n) pre(i + 1) = pre(i) + weights(i)
    val e = Array.fill(n, n)(0.0)
    for (len <- 2 to n; i <- 0 to n - len) {
      val j = i + len - 1
      var best = Double.MaxValue
      for (k <- i until j) best = math.min(best, e(i)(k) + e(k + 1)(j))
      e(i)(j) = best + (pre(j + 1) - pre(i))
    }
    e(0)(n - 1)
  }
}
