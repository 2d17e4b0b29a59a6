package repro.core

import scala.collection.mutable

/** The six compression schemes of §3.3. `dictSizeLimit` bounds the number of
  * dictionary entries for the variable-interval schemes (the fixed-interval
  * schemes have implied sizes: 256 and 65 792).
  */
sealed trait Scheme extends Serializable {
  def name: String
  /** Upper bound on boundary length — used by batch encoding to find a safe
    * symbol-aligned reuse point (Appendix B); `Int.MaxValue` disables reuse.
    */
  def maxBoundaryLen: Int
}

object Scheme {
  case object SingleChar extends Scheme { val name = "Single-Char"; val maxBoundaryLen = 1 }
  case object DoubleChar extends Scheme { val name = "Double-Char"; val maxBoundaryLen = 2 }
  final case class NGrams(n: Int, dictSizeLimit: Int) extends Scheme {
    require(n >= 2 && n <= 8)
    val name = s"$n-Grams(${dictSizeLimit})"
    val maxBoundaryLen: Int = n
  }
  final case class Alm(dictSizeLimit: Int, maxSymbolLen: Int = 16) extends Scheme {
    val name = s"ALM(${dictSizeLimit})"
    val maxBoundaryLen: Int = Int.MaxValue
  }
  final case class AlmImproved(dictSizeLimit: Int, maxSymbolLen: Int = 32) extends Scheme {
    val name = s"ALM-Improved(${dictSizeLimit})"
    val maxBoundaryLen: Int = Int.MaxValue
  }

  /** Does the scheme assign Hu-Tucker codes (vs. fixed-length)? Table 1. */
  def usesHuTucker(s: Scheme): Boolean = s match {
    case Alm(_, _) => false
    case _         => true
  }
}

/** Symbol Selector module (§4.2): counts pattern statistics over the sampled
  * keys and emits the scheme's extra interval boundaries. Interval division
  * itself is uniform ([[Axis.buildIntervals]]).
  */
object SymbolSelect {

  /** Scheme-specific extra boundaries (beyond the 256 single bytes). */
  def extraBoundaries(scheme: Scheme, samples: Array[Array[Byte]]): Seq[Array[Byte]] =
    scheme match {
      case Scheme.SingleChar => Nil
      case Scheme.DoubleChar =>
        // all 2-byte strings: fixed-length intervals, boundaries are implied
        val out = new Array[Array[Byte]](65536)
        var i = 0
        while (i < 65536) { out(i) = Array(((i >> 8) & 0xff).toByte, (i & 0xff).toByte); i += 1 }
        scala.collection.immutable.ArraySeq.unsafeWrapArray(out)
      case Scheme.NGrams(n, limit) =>
        val grams = topNGrams(samples, n, math.max(1, (limit - 256) / 2))
        grams.flatMap(g => g +: Axis.inc(g).toSeq)
      case Scheme.Alm(limit, maxLen) =>
        val counts = substringCounts(samples, maxLen, suffixOnly = false)
        val sel = almSelect(blend(counts), math.max(1, (limit - 256) / 2))
        sel.flatMap(s => s +: Axis.inc(s).toSeq)
      case Scheme.AlmImproved(limit, maxLen) =>
        // No blending: ALM needs it because its interval divider cannot take
        // nested symbols, but the uniform axis builder handles prefix-nested
        // boundaries natively, so keeping frequent prefix symbols (instead of
        // zeroing them onto a rare long extension) strictly helps CPR — this
        // is part of why ALM-Improved dominates ALM (DESIGN.md §3).
        val counts = substringCounts(samples, maxLen, suffixOnly = true)
        val sel = almSelect(counts.toSeq, math.max(1, (limit - 256) / 2))
        sel.flatMap(s => s +: Axis.inc(s).toSeq)
    }

  /** Frequency of every n-byte window in the samples. */
  def ngramCounts(samples: Array[Array[Byte]], n: Int): mutable.HashMap[String, Long] = {
    val m = mutable.HashMap.empty[String, Long]
    samples.foreach { k =>
      var i = 0
      while (i + n <= k.length) {
        val s = new String(k, i, n, java.nio.charset.StandardCharsets.ISO_8859_1)
        m.update(s, m.getOrElse(s, 0L) + 1L)
        i += 1
      }
    }
    m
  }

  /** The `k` most frequent n-grams (ties by lexicographic order). */
  def topNGrams(samples: Array[Array[Byte]], n: Int, k: Int): Seq[Array[Byte]] =
    ngramCounts(samples, n).toSeq
      .sortBy { case (g, c) => (-c, g) }
      .take(k)
      .map { case (g, _) => Bytes.of(g) }

  /** Truncation lengths for ALM-Improved's suffix statistics: a geometric
    * ladder instead of every length, preserving the paper's build-time
    * reduction while keeping short frequent patterns in the candidate set.
    */
  private val SuffixLens = Array(1, 2, 3, 4, 5, 6, 7, 8, 12, 16, 24, 32)

  /** ALM statistics: counts of all substrings up to `maxLen` (the original
    * scheme) or only of sample-string suffixes truncated at the geometric
    * ladder of lengths (the ALM-Improved simplification that cuts build
    * time, §3.3; ladder deviation documented in DESIGN.md).
    */
  def substringCounts(samples: Array[Array[Byte]], maxLen: Int,
                      suffixOnly: Boolean): mutable.HashMap[String, Long] = {
    val m = mutable.HashMap.empty[String, Long]
    samples.foreach { k =>
      var i = 0
      while (i < k.length) {
        if (suffixOnly) {
          val rem = math.min(maxLen, k.length - i)
          var j = 0
          var countedFull = false
          while (j < SuffixLens.length) {
            val len = SuffixLens(j)
            if (len <= rem) {
              val s = new String(k, i, len, java.nio.charset.StandardCharsets.ISO_8859_1)
              m.update(s, m.getOrElse(s, 0L) + 1L)
              if (len == rem) countedFull = true
            }
            j += 1
          }
          if (!countedFull) {
            val s = new String(k, i, rem, java.nio.charset.StandardCharsets.ISO_8859_1)
            m.update(s, m.getOrElse(s, 0L) + 1L)
          }
        } else {
          var len = 1
          val max = math.min(maxLen, k.length - i)
          while (len <= max) {
            val s = new String(k, i, len, java.nio.charset.StandardCharsets.ISO_8859_1)
            m.update(s, m.getOrElse(s, 0L) + 1L)
            len += 1
          }
        }
        i += 1
      }
    }
    m
  }

  /** ALM *blending* (§4.2): redistribute the count of every symbol that is a
    * proper prefix of other symbols to its longest extension, so the selected
    * symbol set satisfies the prefix property. Longest-extension queries use
    * a sparse-table RMQ over the lexicographically sorted symbol array.
    */
  def blend(counts: mutable.HashMap[String, Long]): Seq[(String, Long)] = {
    val arr = counts.keysIterator.toArray.sorted
    val n = arr.length
    if (n == 0) return Nil
    val cnt = arr.map(counts(_))
    val lens = arr.map(_.length)

    // sparse table over (length, index), max by length then earliest index
    val logN = 32 - Integer.numberOfLeadingZeros(math.max(1, n))
    val table = Array.ofDim[Int](logN + 1, n)
    var i = 0
    while (i < n) { table(0)(i) = i; i += 1 }
    var j = 1
    while ((1 << j) <= n) {
      var k = 0
      while (k + (1 << j) <= n) {
        val a = table(j - 1)(k)
        val b = table(j - 1)(k + (1 << (j - 1)))
        table(j)(k) = if (lens(b) > lens(a)) b else a
        k += 1
      }
      j += 1
    }
    def rmq(lo: Int, hi: Int): Int = { // max-length index in [lo, hi)
      val w = 31 - Integer.numberOfLeadingZeros(hi - lo)
      val a = table(w)(lo)
      val b = table(w)(hi - (1 << w))
      if (lens(b) > lens(a)) b else a
    }

    // process in increasing symbol length so mass cascades to the longest
    val order = arr.indices.toArray.sortBy(lens(_))
    order.foreach { idx =>
      val s = arr(idx)
      val hi = Axis.inc(Bytes.of(s)) match {
        case Some(up) =>
          val u = Bytes.str(up)
          lowerBound(arr, u)
        case None => n
      }
      if (idx + 1 < hi) { // extensions exist
        val tgt = rmq(idx + 1, hi)
        cnt(tgt) += cnt(idx)
        cnt(idx) = 0
      }
    }
    arr.iterator.zip(cnt.iterator).filter(_._2 > 0).toSeq
  }

  private def lowerBound(arr: Array[String], key: String): Int = {
    var lo = 0; var hi = arr.length
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (arr(mid) < key) lo = mid + 1 else hi = mid
    }
    lo
  }

  /** ALM selection: keep the `k` symbols with the largest len(s)·freq(s)
    * product (the paper binary-searches the threshold W to the same effect).
    */
  def almSelect(blended: Seq[(String, Long)], k: Int): Seq[Array[Byte]] =
    blended
      .sortBy { case (s, c) => (-(s.length.toLong * c), s) }
      .take(k)
      .map { case (s, _) => Bytes.of(s) }

  /** Test-encode the samples against the intervals to obtain the per-entry
    * access counts that drive code assignment (§4.2 Symbol Selector output).
    */
  def hitCounts(samples: Array[Array[Byte]], iv: IntervalSet, index: DictIndex): Array[Long] = {
    val hits = new Array[Long](iv.size)
    val lens = iv.symbolLens
    samples.foreach { k =>
      var off = 0
      while (off < k.length) {
        val e = index.lookup(k, off)
        hits(e) += 1
        off += lens(e)
      }
    }
    hits
  }
}

/** Code Assigner module (§4.2). */
object CodeAssign {

  /** Monotone fixed-length codes: i encoded in ⌈log₂N⌉ bits. */
  def fixedLength(n: Int): Array[HuTucker.Code] = {
    val w = math.max(1, 32 - Integer.numberOfLeadingZeros(n - 1))
    Array.tabulate(n)(i => HuTucker.Code(i.toLong, w))
  }

  /** Optimal order-preserving prefix codes from access counts. Unseen
    * intervals get a small additive weight so they stay encodable (dictionary
    * completeness) at bounded depth; the total smoothing mass is capped at
    * ~5% of the observed mass so large dictionaries built from small samples
    * (e.g. Double-Char's 65 792 entries) don't drown the real statistics.
    */
  def huTucker(hits: Array[Long]): Array[HuTucker.Code] = {
    val total = hits.foldLeft(0L)(_ + _).toDouble
    val delta = if (total <= 0) 1.0 else math.max(1e-6, 0.05 * total / hits.length)
    HuTucker.assign(hits.map(_.toDouble + delta))
  }
}
