package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Property battery over all six schemes: completeness, order preservation,
  * lossless decode, and padded-byte ordering of terminated keys — the §3.1
  * guarantees ("any HOPE dictionary can encode arbitrary input keys and
  * preserve the original key ordering").
  */
class SchemePropertiesSpec extends AnyFunSuite {

  private val rnd = new scala.util.Random(12345)

  /** Skewed ASCII sample resembling email-ish keys. */
  private val sample: Array[Array[Byte]] = {
    val domains = Array("com.gmail@", "com.yahoo@", "org.mail@", "net.abc@")
    Array.fill(600) {
      val d = domains(rnd.nextInt(domains.length))
      val name = Array.fill(4 + rnd.nextInt(8))(('a' + rnd.nextInt(26)).toChar).mkString
      Bytes.of(d + name + rnd.nextInt(100))
    }
  }

  private val schemes: Seq[Scheme] = Seq(
    Scheme.SingleChar,
    Scheme.DoubleChar,
    Scheme.NGrams(3, 1 << 10),
    Scheme.NGrams(4, 1 << 10),
    Scheme.Alm(1 << 9, maxSymbolLen = 8),
    Scheme.AlmImproved(1 << 9),
  )

  private val built: Map[String, BuiltHope] =
    schemes.map(s => s.name -> Hope.build(sample, s)).toMap

  private def randKey(maxLen: Int, nulFree: Boolean): Array[Byte] = {
    val n = 1 + rnd.nextInt(maxLen)
    Array.fill(n)(if (nulFree) (rnd.nextInt(255) + 1).toByte else rnd.nextInt(256).toByte)
  }

  private def asciiKey(): Array[Byte] = {
    val n = 1 + rnd.nextInt(25)
    Array.fill(n)((32 + rnd.nextInt(95)).toByte)
  }

  for (s <- schemes) {
    val h = built(s.name)

    test(s"${s.name}: dictionary is complete — arbitrary byte strings encode") {
      for (_ <- 0 until 500) {
        val k = randKey(24, nulFree = false)
        val e = h.encode(k)
        assert(e.bitLen > 0)
      }
    }

    test(s"${s.name}: encode is lossless (decode roundtrip, arbitrary bytes)") {
      for (_ <- 0 until 500) {
        val k = randKey(24, nulFree = false)
        assert(java.util.Arrays.equals(h.decode(h.encode(k)), k), Bytes.hex(k))
      }
    }

    test(s"${s.name}: bitstring order preserved on arbitrary byte strings") {
      for (_ <- 0 until 1000) {
        val a = randKey(16, nulFree = false)
        val b = randKey(16, nulFree = false)
        val cRaw = Bytes.compare(a, b)
        val cEnc = h.encode(a).compare(h.encode(b))
        assert(math.signum(cRaw) == math.signum(cEnc),
          s"order broken: ${Bytes.hex(a)} vs ${Bytes.hex(b)}")
      }
    }

    test(s"${s.name}: padded-byte order exact for terminated NUL-free keys") {
      for (_ <- 0 until 1000) {
        val a = randKey(16, nulFree = true)
        val b = randKey(16, nulFree = true)
        val cRaw = Bytes.compare(a, b)
        val cEnc = Bytes.compare(h.encodeTerminated(a).bytes, h.encodeTerminated(b).bytes)
        assert(math.signum(cRaw) == math.signum(cEnc),
          s"padded order broken: ${Bytes.hex(a)} vs ${Bytes.hex(b)}")
      }
    }

    test(s"${s.name}: terminated encodings are injective on NUL-free keys") {
      val keys = Array.fill(400)(randKey(8, nulFree = true))
      val distinctRaw = keys.map(Bytes.hex).distinct.length
      val distinctEnc = keys.map(k => Bytes.hex(h.encodeTerminated(k).bytes)).distinct.length
      assert(distinctRaw == distinctEnc)
    }

    test(s"${s.name}: sampled-distribution keys compress (CPR > 1)") {
      val cpr = Hope.compressionRate(h, sample.iterator)
      assert(cpr > 1.0, s"cpr=$cpr")
    }

    test(s"${s.name}: codes are monotone across entries") {
      val n = h.entries
      for (i <- 1 until n) {
        val m = math.min(h.codeLens(i - 1), h.codeLens(i))
        val a = h.codes(i - 1) >>> (h.codeLens(i - 1) - m)
        val b = h.codes(i) >>> (h.codeLens(i) - m)
        assert(a < b, s"entry $i")
      }
    }

    test(s"${s.name}: batch encoding equals one-at-a-time encoding") {
      val keys = Array.fill(300)(asciiKey()).sortWith(Bytes.compare(_, _) < 0)
      for (bs <- Seq(2, 8, 32)) {
        val batched = h.encodeBatchSorted(keys, bs)
        keys.indices.foreach { i =>
          assert(batched(i) == h.encode(keys(i)), s"batch=$bs i=$i key=${Bytes.str(keys(i))}")
        }
      }
    }
  }

  test("Double-Char dictionary has exactly 65792 entries (256·257)") {
    assert(built(Scheme.DoubleChar.name).entries == 65792)
  }
  test("Single-Char dictionary has exactly 256 entries") {
    assert(built(Scheme.SingleChar.name).entries == 256)
  }
  test("3-Grams dictionary respects its size limit") {
    val h = built(Scheme.NGrams(3, 1 << 10).name)
    assert(h.entries >= 256 && h.entries <= (1 << 10) + 512)
  }
  test("VIVC schemes compress better than Single-Char on the skewed sample") {
    val single = Hope.compressionRate(built(Scheme.SingleChar.name), sample.iterator)
    val g3 = Hope.compressionRate(built(Scheme.NGrams(3, 1 << 10).name), sample.iterator)
    assert(g3 > single, s"3-grams $g3 <= single-char $single")
  }
  test("Double-Char compresses better than Single-Char (first-order entropy)") {
    val single = Hope.compressionRate(built(Scheme.SingleChar.name), sample.iterator)
    val double = Hope.compressionRate(built(Scheme.DoubleChar.name), sample.iterator)
    assert(double > single)
  }
  test("ALM-Improved beats original ALM on compression (paper §6.1)") {
    val alm = Hope.compressionRate(built(Scheme.Alm(1 << 9, 8).name), sample.iterator)
    val almI = Hope.compressionRate(built(Scheme.AlmImproved(1 << 9).name), sample.iterator)
    assert(almI > alm, s"alm-improved $almI <= alm $alm")
  }
  test("empty input encodes to empty bitstring") {
    for (s <- schemes) assert(built(s.name).encode(Array.emptyByteArray).bitLen == 0)
  }
}
