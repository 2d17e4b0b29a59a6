package repro.core

import org.scalatest.funsuite.AnyFunSuite

class EncodedSpec extends AnyFunSuite {

  test("compare: differing bytes decide") {
    val a = Encoded(Array(0x80.toByte), 1)
    val b = Encoded(Array(0xc0.toByte), 2)
    assert(a.compare(b) < 0)
  }

  test("compare: bit-prefix sorts first") {
    val a = Encoded(Array(0xa0.toByte), 3) // 101
    val b = Encoded(Array(0xa0.toByte), 4) // 1010
    assert(a.compare(b) < 0 && b.compare(a) > 0)
  }

  test("equality requires identical bitLen") {
    val a = Encoded(Array(0x00.toByte), 3)
    val b = Encoded(Array(0x00.toByte), 5)
    assert(a != b)
    assert(a == Encoded(Array(0x00.toByte), 3))
  }

  test("hashCode consistent with equality") {
    assert(Encoded(Array(1.toByte, 2.toByte), 16).hashCode ==
      Encoded(Array(1.toByte, 2.toByte), 16).hashCode)
  }

  test("bit-exact packing: Single-Char encoding of known Hu-Tucker codes") {
    // two symbols dominate: 'a' and 'b' get short codes
    val sample = Array.fill(100)(Bytes.of("ab"))
    val h = Hope.build(sample, Scheme.SingleChar)
    val e = h.encode(Bytes.of("ab"))
    // decoding must reproduce and bit length equals sum of the two code lens
    val la = h.codeLens('a'.toInt); val lb = h.codeLens('b'.toInt)
    assert(e.bitLen == la + lb)
    assert(Bytes.str(h.decode(e)) == "ab")
  }

  test("encodings longer than 64 bits split across words correctly") {
    val sample = Array.fill(50)(Bytes.of("xyzw"))
    val h = Hope.build(sample, Scheme.SingleChar)
    val key = Array.fill(40)((33 + scala.util.Random.nextInt(90)).toByte)
    val e = h.encode(key)
    assert(e.bitLen > 64)
    assert(java.util.Arrays.equals(h.decode(e), key))
  }

  test("byte array length is exactly ceil(bitLen/8)") {
    val h = Hope.build(Array.fill(30)(Bytes.of("q")), Scheme.SingleChar)
    for (len <- 1 to 30) {
      val e = h.encode(Array.fill(len)('q'.toByte))
      assert(e.bytes.length == (e.bitLen + 7) / 8)
    }
  }

  test("padding bits are zero") {
    val h = Hope.build(Array.fill(30)(Bytes.of("hello world")), Scheme.DoubleChar)
    for (_ <- 0 until 100) {
      val k = Array.fill(1 + scala.util.Random.nextInt(12))((32 + scala.util.Random.nextInt(95)).toByte)
      val e = h.encode(k)
      val pad = e.bytes.length * 8 - e.bitLen
      if (pad > 0) assert((e.bytes.last & ((1 << pad) - 1)) == 0)
    }
  }
}
