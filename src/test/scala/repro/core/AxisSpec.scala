package repro.core

import org.scalatest.funsuite.AnyFunSuite

class AxisSpec extends AnyFunSuite {
  private def b(s: String) = Bytes.of(s)

  test("inc increments the last byte") {
    assert(Axis.inc(b("abc")).map(Bytes.str).contains("abd"))
  }
  test("inc strips trailing 0xff") {
    assert(Axis.inc(Array('a'.toByte, 0xff.toByte)).map(Bytes.str).contains("b"))
  }
  test("inc of all-0xff is None") {
    assert(Axis.inc(Array(0xff.toByte, 0xff.toByte)).isEmpty)
  }

  test("intervalPrefix: lo prefix of hi gives lo") {
    assert(Bytes.str(Axis.intervalPrefix(b("in"), Some(b("ing")))) == "in")
  }
  test("intervalPrefix: sibling increment extends over lo (paper inh/ion gap)") {
    // [inh, ion) common prefix is just "i" — ion is not inh's sibling-inc
    assert(Bytes.str(Axis.intervalPrefix(b("inh"), Some(b("ion")))) == "i")
  }
  test("intervalPrefix: [ab, ac) keeps the full two bytes") {
    assert(Bytes.str(Axis.intervalPrefix(b("ab"), Some(b("ac")))) == "ab")
  }
  test("intervalPrefix: 0xff run extends past the increment point") {
    val lo = Array('a'.toByte, 'b'.toByte, 0xff.toByte, 'x'.toByte)
    assert(Bytes.hex(Axis.intervalPrefix(lo, Some(b("ac")))) == "6162ff")
  }
  test("intervalPrefix at end of axis covers lo's leading 0xff run") {
    val lo = Array(0xff.toByte, 0xff.toByte, 'a'.toByte)
    assert(Bytes.hex(Axis.intervalPrefix(lo, None)) == "ffff")
  }
  test("intervalPrefix: single-char gap boundary [az, b)") {
    assert(Bytes.str(Axis.intervalPrefix(b("az"), Some(b("b")))) == "a")
  }

  test("buildIntervals with no extras = the 256 single bytes") {
    val iv = Axis.buildIntervals(Nil)
    assert(iv.size == 256)
    assert(iv.boundaries.zipWithIndex.forall { case (bd, i) => bd.length == 1 && (bd(0) & 0xff) == i })
    assert(iv.symbols.forall(_.length == 1))
  }

  test("buildIntervals is sorted, deduped, and symbols are non-empty prefixes") {
    val extras = Seq(b("ing"), b("inh"), b("ion"), b("ioo"), b("ing")) // dup on purpose
    val iv = Axis.buildIntervals(extras)
    assert(iv.size == 256 + 4)
    for (i <- 1 until iv.size)
      assert(Bytes.compare(iv.boundaries(i - 1), iv.boundaries(i)) < 0)
    for (i <- 0 until iv.size) {
      assert(iv.symbols(i).nonEmpty)
      assert(Bytes.lcp(iv.boundaries(i), iv.symbols(i)) == iv.symbols(i).length,
        "symbol must be a prefix of the left boundary")
    }
  }

  test("symbols never exceed any member string of their interval") {
    // randomized: symbol is a prefix of every string in [b_i, b_{i+1})
    val rnd = new scala.util.Random(7)
    val extras = Seq.fill(300)(Array.fill(1 + rnd.nextInt(4))((rnd.nextInt(250) + 1).toByte))
    val iv = Axis.buildIntervals(extras)
    for (_ <- 0 until 2000) {
      val s = Array.fill(1 + rnd.nextInt(6))((rnd.nextInt(255) + 1).toByte)
      // find interval via linear floor
      var idx = 0
      while (idx + 1 < iv.size && Bytes.compare(iv.boundaries(idx + 1), s) <= 0) idx += 1
      val sym = iv.symbols(idx)
      assert(s.length >= sym.length && Bytes.lcp(s, sym) == sym.length,
        s"symbol ${Bytes.hex(sym)} not a prefix of ${Bytes.hex(s)} in interval $idx")
    }
  }
}
