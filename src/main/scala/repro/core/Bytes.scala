package repro.core

import java.nio.charset.StandardCharsets

/** Unsigned-lexicographic byte-string helpers used throughout the compressor
  * and the search-tree substrates. All key material is `Array[Byte]` compared
  * as unsigned bytes (the "string axis" of the paper, §3.1).
  */
object Bytes {

  /** Unsigned lexicographic comparison (shorter prefix sorts first). */
  def compare(a: Array[Byte], b: Array[Byte]): Int = {
    val n = math.min(a.length, b.length)
    var i = 0
    while (i < n) {
      val d = (a(i) & 0xff) - (b(i) & 0xff)
      if (d != 0) return d
      i += 1
    }
    a.length - b.length
  }

  /** Compare the suffix of `key` starting at `off` against `b` without
    * allocating the suffix. Equivalent to `compare(key.drop(off), b)`.
    */
  def compareSuffix(key: Array[Byte], off: Int, b: Array[Byte]): Int = {
    val n = math.min(key.length - off, b.length)
    var i = 0
    while (i < n) {
      val d = (key(off + i) & 0xff) - (b(i) & 0xff)
      if (d != 0) return d
      i += 1
    }
    (key.length - off) - b.length
  }

  /** Length of the longest common prefix of `a` and `b`. */
  def lcp(a: Array[Byte], b: Array[Byte]): Int = {
    val n = math.min(a.length, b.length)
    var i = 0
    while (i < n && a(i) == b(i)) i += 1
    i
  }

  /** Ordering instance for sorted collections of byte-string keys. */
  implicit val ordering: Ordering[Array[Byte]] = (x: Array[Byte], y: Array[Byte]) => compare(x, y)

  /** ISO-8859-1 round-trips every byte value 1:1 — used to key hash maps. */
  def str(a: Array[Byte]): String = new String(a, StandardCharsets.ISO_8859_1)

  /** Inverse of [[str]]. */
  def of(s: String): Array[Byte] = s.getBytes(StandardCharsets.ISO_8859_1)

  /** Hex rendering for debugging and error messages. */
  def hex(a: Array[Byte]): String = a.map(b => f"${b & 0xff}%02x").mkString
}

/** A bit-packed encoded key: `bytes` holds `bitLen` significant bits MSB-first,
  * zero-padded to a byte boundary. Comparison is exact bitstring order (a
  * strict bit-prefix sorts first), implemented via the padded bytes plus the
  * bit length as tiebreak — sound because padding bits are zero.
  */
final case class Encoded(bytes: Array[Byte], bitLen: Int) extends Ordered[Encoded] {
  override def compare(o: Encoded): Int = {
    val c = Bytes.compare(bytes, o.bytes)
    if (c != 0) c else bitLen - o.bitLen
  }
  override def equals(o: Any): Boolean = o match {
    case e: Encoded => bitLen == e.bitLen && java.util.Arrays.equals(bytes, e.bytes)
    case _          => false
  }
  override def hashCode(): Int = java.util.Arrays.hashCode(bytes) * 31 + bitLen
  override def toString: String = s"Encoded(${Bytes.hex(bytes)}, $bitLen bits)"
}
