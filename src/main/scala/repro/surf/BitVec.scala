package repro.surf

/** Append-built bit vector with O(1) rank and near-O(1) select, the building
  * block of the LOUDS-SPARSE trie. Rank uses per-word cumulative counts
  * (32 bits / 64 bits ≈ 50% overhead here; real SuRF uses sparser samples —
  * memory accounting uses the paper's ~6.25% figure, see [[memoryBits]]).
  */
final class BitVec(val nbits: Int) {
  private val words = new Array[Long](math.max(1, (nbits + 63) >>> 6))
  private var ranks: Array[Int] = _
  private var total = 0

  def set(i: Int): Unit = words(i >>> 6) |= 1L << (i & 63)

  def get(i: Int): Boolean = (words(i >>> 6) & (1L << (i & 63))) != 0

  /** Freeze and precompute rank directory. Call once after all sets. */
  def build(): Unit = {
    ranks = new Array[Int](words.length + 1)
    var i = 0
    while (i < words.length) {
      ranks(i + 1) = ranks(i) + java.lang.Long.bitCount(words(i))
      i += 1
    }
    total = ranks(words.length)
  }

  def ones: Int = total

  /** Number of set bits in [0, i). */
  def rank1(i: Int): Int = {
    val w = i >>> 6
    var r = ranks(w)
    if ((i & 63) != 0) r += java.lang.Long.bitCount(words(w) & ((1L << (i & 63)) - 1))
    r
  }

  /** Number of clear bits in [0, i). */
  def rank0(i: Int): Int = i - rank1(i)

  /** Position of the k-th set bit (k ≥ 1). */
  def select1(k: Int): Int = {
    require(k >= 1 && k <= total, s"select1($k) out of range (total=$total)")
    // binary search the word whose cumulative rank reaches k
    var lo = 0
    var hi = words.length - 1
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (ranks(mid + 1) >= k) hi = mid else lo = mid + 1
    }
    var remaining = k - ranks(lo)
    var w = words(lo)
    var pos = lo << 6
    while (true) {
      val lsb = java.lang.Long.numberOfTrailingZeros(w)
      remaining -= 1
      if (remaining == 0) return pos + lsb
      w &= w - 1
    }
    -1
  }

  /** Succinct-accounting size: n bits payload + 6.25% rank directory. */
  def memoryBits: Long = nbits.toLong + (nbits.toLong >> 4)
}
