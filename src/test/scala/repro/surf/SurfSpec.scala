package repro.surf

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Bytes

class SurfSpec extends AnyFunSuite {

  private def sortedDistinct(keys: Seq[Array[Byte]]): Array[Array[Byte]] =
    keys.distinctBy(Bytes.hex).sortWith(Bytes.compare(_, _) < 0).toArray

  private def randKeys(n: Int, maxLen: Int, seed: Long, terminated: Boolean = true) = {
    val rnd = new scala.util.Random(seed)
    sortedDistinct(Seq.fill(n) {
      val body = Array.fill(1 + rnd.nextInt(maxLen))((rnd.nextInt(255) + 1).toByte)
      if (terminated) java.util.Arrays.copyOf(body, body.length + 1) else body
    })
  }

  test("no false negatives: every inserted key is found") {
    val keys = randKeys(5000, 10, 1)
    val surf = Surf(keys)
    keys.foreach(k => assert(surf.mayContain(k), Bytes.hex(k)))
  }

  test("no false negatives with 8 suffix bits") {
    val keys = randKeys(5000, 10, 2)
    val surf = Surf(keys, suffixBits = 8)
    keys.foreach(k => assert(surf.mayContain(k), Bytes.hex(k)))
  }

  test("prefix keys supported (terminal entries)") {
    val keys = sortedDistinct(Seq("a", "ab", "abc", "b", "ba").map(Bytes.of))
    val surf = Surf(keys)
    keys.foreach(k => assert(surf.mayContain(k), Bytes.str(k)))
  }

  test("point misses on clearly distinct keys") {
    val keys = sortedDistinct((0 until 500).map(i => Bytes.of(f"com.gmail@user$i%05d|")))
    val surf = Surf(keys, suffixBits = 8)
    // same length, totally different region of the key space
    val miss = (0 until 500).count(i => surf.mayContain(Bytes.of(f"org.other#NAME$i%05d|")))
    assert(miss < 50, s"way too many false positives: $miss/500")
  }

  test("suffix bits reduce the false positive rate (Figure 11 mechanism)") {
    val rnd = new scala.util.Random(5)
    val keys = randKeys(8000, 8, 4)
    val s0 = Surf(keys, suffixBits = 0)
    val s8 = Surf(keys, suffixBits = 8)
    val probes = Array.fill(4000)(Array.fill(1 + rnd.nextInt(8))((rnd.nextInt(255) + 1).toByte))
    val present = keys.map(Bytes.hex).toSet
    val negs = probes.filterNot(p => present(Bytes.hex(p)))
    val fp0 = negs.count(s0.mayContain)
    val fp8 = negs.count(s8.mayContain)
    assert(fp8 <= fp0, s"fp8=$fp8 fp0=$fp0")
  }

  test("range query: no false negatives on [k, k] point ranges") {
    val keys = randKeys(3000, 8, 6)
    val surf = Surf(keys)
    keys.foreach(k => assert(surf.mayContainRange(k, k), Bytes.hex(k)))
  }

  test("range query: no false negatives on wider ranges containing a key") {
    val keys = randKeys(3000, 6, 7)
    val surf = Surf(keys)
    val rnd = new scala.util.Random(8)
    keys.take(1000).foreach { k =>
      val lo = k.clone()
      if ((lo(lo.length - 1) & 0xff) > 0) lo(lo.length - 1) = (lo(lo.length - 1) - 1).toByte
      val hi = k.clone()
      if ((hi(hi.length - 1) & 0xff) < 255) hi(hi.length - 1) = (hi(hi.length - 1) + 1).toByte
      assert(surf.mayContainRange(lo, hi), s"range around ${Bytes.hex(k)}")
      assert(surf.mayContainRange(k, hi))
      assert(surf.mayContainRange(lo, k))
    }
  }

  test("range query rejects ranges far below the smallest key") {
    val keys = sortedDistinct((0 until 200).map(i => Bytes.of(s"m$i")))
    val surf = Surf(keys)
    assert(!surf.mayContainRange(Bytes.of("a"), Bytes.of("b")))
  }

  test("range query rejects ranges far above the largest key") {
    val keys = sortedDistinct((0 until 200).map(i => Bytes.of(s"m$i")))
    val surf = Surf(keys)
    assert(!surf.mayContainRange(Bytes.of("x"), Bytes.of("z")))
  }

  test("range result is exact on dense integer-like keys vs reference") {
    val keys = sortedDistinct((0 until 1000).map(i => Bytes.of(f"$i%04d")))
    val surf = Surf(keys, suffixBits = 8)
    val set = keys.map(Bytes.str).toSet
    var falsePos = 0
    for (a <- 0 until 1200 by 7; b <- Seq(a + 1, a + 3)) {
      val lo = Bytes.of(f"$a%04d"); val hi = Bytes.of(f"$b%04d")
      val truth = (a to b).exists(v => set(f"$v%04d"))
      val got = surf.mayContainRange(lo, hi)
      if (truth) assert(got, s"false negative on [$a,$b]")
      else if (got) falsePos += 1
    }
    assert(falsePos < 40, s"excessive range false positives: $falsePos")
  }

  test("memory is ~10-20 bits per trie entry (succinct accounting)") {
    val keys = randKeys(20000, 10, 9)
    val surf = Surf(keys)
    val bitsPerEntry = surf.memoryBytes * 8.0 / surf.entryCount
    assert(bitsPerEntry > 8 && bitsPerEntry < 24, s"bits/entry=$bitsPerEntry")
  }

  test("avgLeafDepth reflects shared prefixes") {
    val shared = Surf(sortedDistinct((0 until 2000).map(i => Bytes.of(f"http://www.x.com/$i%06d"))))
    val random = Surf(randKeys(2000, 8, 10))
    assert(shared.avgLeafDepth > random.avgLeafDepth)
  }

  test("single key") {
    val surf = Surf(Array(Bytes.of("only")))
    assert(surf.mayContain(Bytes.of("only")))
    assert(surf.keyCount == 1)
  }

  test("BitVec rank/select consistency") {
    val rnd = new scala.util.Random(77)
    val bv = new BitVec(10000)
    val set = scala.collection.mutable.SortedSet.empty[Int]
    for (_ <- 0 until 3000) { val i = rnd.nextInt(10000); set += i; }
    set.foreach(bv.set)
    bv.build()
    assert(bv.ones == set.size)
    var cum = 0
    for (i <- 0 until 10000) {
      assert(bv.rank1(i) == cum, s"rank1($i)")
      if (set(i)) cum += 1
    }
    set.toSeq.zipWithIndex.foreach { case (pos, k) =>
      assert(bv.select1(k + 1) == pos, s"select1(${k + 1})")
    }
  }
}
