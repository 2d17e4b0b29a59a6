package repro.core

import scala.collection.mutable

/** The interval set of a complete, order-preserving dictionary: `boundaries`
  * are the sorted left interval endpoints b₀ < b₁ < … (b₀ = 0x00; the axis
  * below 0x00 contains only the empty string, which never needs encoding),
  * and `symbols(i)` is the longest common prefix of every string in
  * [bᵢ, bᵢ₊₁) — the bytes consumed when a lookup lands in interval i.
  */
final case class IntervalSet(boundaries: Array[Array[Byte]], symbols: Array[Array[Byte]]) {
  def size: Int = boundaries.length
  /** Bytes consumed per interval — hot-path copy of `symbols(i).length`. */
  val symbolLens: Array[Int] = symbols.map(_.length)
}

/** String-axis interval construction (§3.1).
  *
  * Completeness: boundaries always include all 256 single bytes, so the
  * intervals cover the whole axis and every non-empty suffix finds an
  * interval whose symbol (≥1 byte) is a prefix of it — encoding always makes
  * progress on arbitrary input.
  *
  * Order preservation of padded encodings: if neither of two distinct source
  * strings is a prefix of the other (we guarantee this in tree integration by
  * appending a 0x00 terminator to NUL-free keys), their encodings diverge at
  * a step where they map to different intervals — the two intervals cannot
  * share a common ≥1-byte symbol across a first-differing character — and the
  * assigned codes are prefix-free and monotone, so neither encoded bitstream
  * is a bit-prefix of the other and zero-padding preserves strict order.
  */
object Axis {

  /** Smallest string strictly greater than every string prefixed by `b`:
    * strip trailing 0xff bytes and increment the last byte. `None` when `b`
    * is all-0xff (its prefix interval extends to the end of the axis).
    */
  def inc(b: Array[Byte]): Option[Array[Byte]] = {
    var i = b.length - 1
    while (i >= 0 && b(i) == -1) i -= 1
    if (i < 0) None
    else {
      val out = java.util.Arrays.copyOf(b, i + 1)
      out(i) = (out(i) + 1).toByte
      Some(out)
    }
  }

  /** Longest common prefix of all strings in [lo, hi) — `hi = None` means the
    * interval extends to the end of the axis.
    */
  def intervalPrefix(lo: Array[Byte], hi: Option[Array[Byte]]): Array[Byte] = hi match {
    case None =>
      // Interval top is 0xff^∞: prefix extends over lo's leading 0xff run.
      var k = 0
      while (k < lo.length && lo(k) == -1) k += 1
      java.util.Arrays.copyOf(lo, k)
    case Some(h) =>
      val k = Bytes.lcp(lo, h)
      if (k == lo.length) lo // lo is a prefix of hi: every string in [lo, hi) starts with lo
      else if (h.length == k + 1 && (h(k) & 0xff) == (lo(k) & 0xff) + 1) {
        // hi is the sibling-increment of lo.take(k+1): the interval is the top
        // of the lo.take(k+1) subtree, so the prefix extends over lo's
        // following 0xff run.
        var j = k + 1
        while (j < lo.length && lo(j) == -1) j += 1
        java.util.Arrays.copyOf(lo, j)
      } else java.util.Arrays.copyOf(lo, k)
  }

  /** Build the sorted interval set from scheme-specific extra boundaries. All
    * 256 single bytes are always included, guaranteeing completeness and
    * non-empty symbols (see class comment).
    */
  def buildIntervals(extras: Iterable[Array[Byte]]): IntervalSet = {
    val set = mutable.TreeSet.empty[Array[Byte]](Bytes.ordering)
    var c = 0
    while (c < 256) { set += Array(c.toByte); c += 1 }
    extras.foreach(b => if (b.nonEmpty) set += b)
    val boundaries = set.toArray
    val n = boundaries.length
    val symbols = new Array[Array[Byte]](n)
    var i = 0
    while (i < n) {
      val hi = if (i + 1 < n) Some(boundaries(i + 1)) else None
      val s = intervalPrefix(boundaries(i), hi)
      require(s.nonEmpty,
        s"empty interval symbol at ${Bytes.hex(boundaries(i))} — boundary set not single-byte dense")
      symbols(i) = s
      i += 1
    }
    IntervalSet(boundaries, symbols)
  }
}
