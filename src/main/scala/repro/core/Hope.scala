package repro.core

import repro.art.ArtDictIndex

/** Build-phase timing breakdown (Figure 9): milliseconds spent in each module. */
final case class BuildStats(symbolSelectMs: Double, codeAssignMs: Double,
                            dictBuildMs: Double, entries: Int) extends Serializable

/** A built HOPE compressor: interval dictionary + codes + hot-path encoder.
  * Serializable so Spark can broadcast it to executors for per-partition
  * encoding (the build phase runs once; the encode phase is stateless).
  */
final class BuiltHope(
    val scheme: Scheme,
    val intervals: IntervalSet,
    val index: DictIndex,
    val codes: Array[Long],
    val codeLens: Array[Int],
    val stats: BuildStats,
) extends Serializable {

  private val symbolLens: Array[Int] = intervals.symbolLens

  /** Dictionary memory (structure + code/len arrays) for Figure 8 row 3 and
    * the tree-evaluation memory accounting (HOPE size included, §7.2).
    */
  def dictMemoryBytes: Long =
    index.memoryBytes +
      (if (index.storesCodes) 0L else codes.length.toLong * (4 + 1 + 1))

  def entries: Int = intervals.size

  /** Encode an arbitrary byte string (completeness guarantees progress). */
  def encode(key: Array[Byte]): Encoded =
    encodeCore(key, 0, null, 0, -1, null)

  /** Unified hot path shared by plain, seeded, and checkpoint-recording
    * encodes (a single JIT-compiled loop for all of them). Encodes
    * `key[startOff..)` on top of `seedBits` bits of `seedWords`; when
    * `recordLimit ≥ 0`, stores the last step boundary with charOffset ≤
    * recordLimit into `record = [charOff, bitPos]`.
    */
  private def encodeCore(key: Array[Byte], startOff: Int, seedWords: Array[Long],
                         seedBits: Int, recordLimit: Int, record: Array[Int]): Encoded = {
    var words =
      if (seedWords == null) new Array[Long](math.max(2, key.length / 2))
      else java.util.Arrays.copyOf(seedWords, math.max(seedWords.length + 2, (seedBits >>> 6) + 2 + key.length / 4))
    var bitPos = seedBits
    var off = startOff
    while (off < key.length) {
      if (off > startOff && off <= recordLimit) { record(0) = off; record(1) = bitPos }
      val e = index.lookup(key, off)
      val len = codeLens(e)
      if (((bitPos + len) >>> 6) + 1 > words.length)
        words = java.util.Arrays.copyOf(words, words.length * 2)
      appendBits(words, bitPos, codes(e), len)
      bitPos += len
      off += symbolLens(e)
    }
    pack(words, bitPos)
  }

  /** Encode `key` with a 0x00 terminator appended — the tree-integration
    * variant whose padded bytes are strictly order- and equality-faithful for
    * NUL-free keys (see [[Axis]] doc).
    */
  def encodeTerminated(key: Array[Byte]): Encoded = {
    val k = java.util.Arrays.copyOf(key, key.length + 1)
    encode(k)
  }

  /** Sorted-batch encoding (§4.2, Appendix B): each block encodes the shared
    * prefix once. A reuse point is safe only when every lookup it covers was
    * decided inside the block's common prefix — i.e. at offsets ≤ LCP −
    * maxBoundaryLen; ALM schemes (unbounded boundary length) get no benefit,
    * matching the paper.
    */
  def encodeBatchSorted(keys: Array[Array[Byte]], batchSize: Int): Array[Encoded] = {
    val out = new Array[Encoded](keys.length)
    val maxB = scheme.maxBoundaryLen
    var blockStart = 0
    while (blockStart < keys.length) {
      val blockEnd = math.min(keys.length, blockStart + batchSize)
      if (blockEnd - blockStart == 1 || maxB == Int.MaxValue) {
        var i = blockStart
        while (i < blockEnd) { out(i) = encode(keys(i)); i += 1 }
      } else {
        val lcp = Bytes.lcp(keys(blockStart), keys(blockEnd - 1))
        // encode the first key, recording the last safe step boundary
        val record = new Array[Int](2)
        out(blockStart) = encodeCore(keys(blockStart), 0, null, 0, lcp - maxB + 1, record)
        val safeOff = record(0)
        val safeBits = record(1)
        // seed = the first key's bits up to the checkpoint, zero-padded
        val seedWords = new Array[Long]((safeBits >>> 6) + 1)
        var w = 0
        val src = out(blockStart)
        while (w * 64 < safeBits) {
          var v = 0L
          var b = 0
          while (b < 8) {
            val byteIdx = w * 8 + b
            val byte = if (byteIdx < src.bytes.length) src.bytes(byteIdx) & 0xffL else 0L
            v = (v << 8) | byte
            b += 1
          }
          seedWords(w) = v
          w += 1
        }
        if ((safeBits & 63) != 0)
          seedWords(safeBits >>> 6) &= ~((1L << (64 - (safeBits & 63))) - 1)
        var i = blockStart + 1
        while (i < blockEnd) {
          out(i) = encodeCore(keys(i), safeOff, seedWords, safeBits, -1, null)
          i += 1
        }
      }
      blockStart = blockEnd
    }
    out
  }

  /** Pair-encoding for closed-range queries (Appendix D). */
  def encodePair(a: Array[Byte], b: Array[Byte]): (Encoded, Encoded) = {
    val r = encodeBatchSorted(Array(a, b), 2)
    (r(0), r(1))
  }

  @inline private def appendBits(words: Array[Long], bitPos: Int, v: Long, len: Int): Unit = {
    if (len == 0) return
    val idx = bitPos >>> 6
    val room = 64 - (bitPos & 63)
    if (len <= room) words(idx) |= (if (room == 64 && len == 64) v else v << (room - len))
    else {
      words(idx) |= v >>> (len - room)
      words(idx + 1) |= v << (64 - (len - room))
    }
  }

  private def pack(words: Array[Long], bitLen: Int): Encoded = {
    val nBytes = (bitLen + 7) >>> 3
    val out = new Array[Byte](nBytes)
    var i = 0
    while (i < nBytes) {
      out(i) = (words(i >>> 3) >>> (56 - ((i & 7) << 3))).toByte
      i += 1
    }
    Encoded(out, bitLen)
  }

  // ---------------------------------------------------------------- decoding

  /** Bit-trie over the prefix-free codes; built lazily (tests/debugging only —
    * search-tree queries never reconstruct keys, §4.1).
    */
  @transient private lazy val decodeTrie: DecodeTrie = DecodeTrie(codes, codeLens)

  /** Lossless inverse of [[encode]] (entropy coding is lossless, §2). */
  def decode(enc: Encoded): Array[Byte] = {
    val out = new scala.collection.mutable.ArrayBuilder.ofByte
    var pos = 0
    while (pos < enc.bitLen) {
      val (entry, used) = decodeTrie.next(enc, pos)
      out ++= intervals.symbols(entry)
      pos += used
    }
    out.result()
  }
}

/** Binary trie mapping prefix-free codes back to entry indices. */
private final class DecodeTrie(child0: Array[Int], child1: Array[Int], entry: Array[Int]) {
  /** Decode one code starting at bit `pos`; returns (entry, bitsConsumed). */
  def next(enc: Encoded, pos: Int): (Int, Int) = {
    var node = 0
    var p = pos
    while (entry(node) < 0) {
      require(p < enc.bitLen, "truncated code stream")
      val bit = (enc.bytes(p >>> 3) >>> (7 - (p & 7))) & 1
      node = if (bit == 0) child0(node) else child1(node)
      require(node >= 0, "invalid code stream")
      p += 1
    }
    (entry(node), p - pos)
  }
}

private object DecodeTrie {
  def apply(codes: Array[Long], codeLens: Array[Int]): DecodeTrie = {
    val c0 = scala.collection.mutable.ArrayBuffer(-1)
    val c1 = scala.collection.mutable.ArrayBuffer(-1)
    val en = scala.collection.mutable.ArrayBuffer(-1)
    var e = 0
    while (e < codes.length) {
      var node = 0
      var i = codeLens(e) - 1
      while (i >= 0) {
        val bit = (codes(e) >>> i) & 1L
        val arr = if (bit == 0) c0 else c1
        if (arr(node) < 0) {
          arr(node) = c0.length
          c0 += -1; c1 += -1; en += -1
        }
        node = arr(node)
        i -= 1
      }
      require(en(node) == -1, s"duplicate/prefix code at entry $e")
      en(node) = e
      e += 1
    }
    new DecodeTrie(c0.toArray, c1.toArray, en.toArray)
  }
}

/** HOPE build phase (§4.1 Figure 5): Symbol Selector → Code Assigner →
  * Dictionary, with per-module timing for Figure 9.
  */
object Hope {

  def build(samples: Array[Array[Byte]], scheme: Scheme): BuiltHope = {
    val t0 = System.nanoTime()
    val extras = SymbolSelect.extraBoundaries(scheme, samples)
    val iv = Axis.buildIntervals(extras)
    val tSelect = System.nanoTime()

    val index = buildIndex(scheme, iv)
    val tDict = System.nanoTime()

    val hits = SymbolSelect.hitCounts(samples, iv, index)
    val tHits = System.nanoTime()

    val codeArr =
      if (Scheme.usesHuTucker(scheme)) CodeAssign.huTucker(hits)
      else CodeAssign.fixedLength(iv.size)
    val tAssign = System.nanoTime()

    // Paper's breakdown: Symbol Selector includes statistics + interval
    // division + test-encode; Dictionary is the structure population.
    val stats = BuildStats(
      symbolSelectMs = ((tSelect - t0) + (tHits - tDict)) / 1e6,
      codeAssignMs = (tAssign - tHits) / 1e6,
      dictBuildMs = (tDict - tSelect) / 1e6,
      entries = iv.size,
    )
    new BuiltHope(scheme, iv, index, codeArr.map(_.bits), codeArr.map(_.len), stats)
  }

  /** Dictionary structure per Table 1: array / bitmap-trie / ART. */
  def buildIndex(scheme: Scheme, iv: IntervalSet): DictIndex = scheme match {
    case Scheme.SingleChar      => new SingleCharIndex
    case Scheme.DoubleChar      => new DoubleCharIndex
    case Scheme.NGrams(n, _)    => BitmapTrie(iv.boundaries, n)
    case _: Scheme.Alm          => ArtDictIndex(iv.boundaries)
    case _: Scheme.AlmImproved  => ArtDictIndex(iv.boundaries)
  }

  /** Compression rate = uncompressed bytes / compressed bytes (bit-exact
    * numerator/denominator; the paper's Figure 8 row 1 metric).
    */
  def compressionRate(hope: BuiltHope, keys: Iterator[Array[Byte]]): Double = {
    var raw = 0L
    var encBits = 0L
    keys.foreach { k => raw += k.length; encBits += hope.encode(k).bitLen }
    raw.toDouble * 8 / encBits.toDouble
  }
}
