package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.art.ArtDictIndex

/** All dictionary structures must agree with the binary-search reference on
  * the floor query, for every scheme's boundary shape.
  */
class DictIndexSpec extends AnyFunSuite {

  private val rnd = new scala.util.Random(99)

  private def randBoundaries(n: Int, maxLen: Int): Array[Array[Byte]] = {
    val extras = Seq.fill(n)(Array.fill(1 + rnd.nextInt(maxLen))(rnd.nextInt(256).toByte))
    Axis.buildIntervals(extras).boundaries
  }

  private def checkAgainstReference(boundaries: Array[Array[Byte]], idx: DictIndex,
                                    probes: Int, maxKeyLen: Int): Unit = {
    val ref = new SortedArrayIndex(boundaries)
    for (_ <- 0 until probes) {
      val key = Array.fill(1 + rnd.nextInt(maxKeyLen))(rnd.nextInt(256).toByte)
      val off = rnd.nextInt(key.length)
      assert(idx.lookup(key, off) == ref.lookup(key, off),
        s"${idx.name} disagrees on key=${Bytes.hex(key)} off=$off")
    }
  }

  test("SingleCharIndex matches binary search on the 256 singles") {
    val iv = Axis.buildIntervals(Nil)
    checkAgainstReference(iv.boundaries, new SingleCharIndex, 2000, 8)
  }

  test("DoubleCharIndex matches binary search on the 65792 boundary set") {
    val iv = Axis.buildIntervals(SymbolSelect.extraBoundaries(Scheme.DoubleChar, Array.empty))
    checkAgainstReference(iv.boundaries, new DoubleCharIndex, 5000, 8)
  }

  test("BitmapTrie(3) matches binary search on random 3-gram boundaries") {
    val b = randBoundaries(400, 3)
    checkAgainstReference(b, BitmapTrie(b, 3), 5000, 9)
  }

  test("BitmapTrie(4) matches binary search on random 4-gram boundaries") {
    val b = randBoundaries(800, 4)
    checkAgainstReference(b, BitmapTrie(b, 4), 5000, 10)
  }

  test("BitmapTrie handles the minimal 256-single-byte set") {
    val b = Axis.buildIntervals(Nil).boundaries
    checkAgainstReference(b, BitmapTrie(b, 3), 2000, 6)
  }

  test("BitmapTrie terminal + descendants: prefix boundaries coexist") {
    val extras = Seq("a", "ab", "abc", "abd", "ac", "b", "ba").map(Bytes.of)
    val b = Axis.buildIntervals(extras).boundaries
    checkAgainstReference(b, BitmapTrie(b, 3), 3000, 6)
  }

  test("ArtDictIndex matches binary search on variable-length boundaries") {
    val b = randBoundaries(500, 7)
    checkAgainstReference(b, ArtDictIndex(b), 5000, 12)
  }

  test("ArtDictIndex on ALM-like ASCII boundaries with long symbols") {
    val words = Seq("com.gmail@", "com.yahoo@", "org.", "net.", "mail", "ing", "ion", "a", "zz")
    val b = Axis.buildIntervals(words.map(Bytes.of)).boundaries
    checkAgainstReference(b, ArtDictIndex(b), 4000, 16)
  }

  test("lookup at non-zero offsets avoids suffix allocation but stays exact") {
    val b = randBoundaries(300, 3)
    val trie = BitmapTrie(b, 3)
    val ref = new SortedArrayIndex(b)
    val key = Bytes.of("com.gmail@foobar123")
    for (off <- 0 until key.length)
      assert(trie.lookup(key, off) == ref.lookup(key, off), s"off=$off")
  }

  test("memory accounting: bitmap-trie is within an order of magnitude of entries") {
    val b = randBoundaries(1000, 3)
    val trie = BitmapTrie(b, 3)
    assert(trie.memoryBytes > 0 && trie.memoryBytes < 64L * 48 * b.length)
  }

  test("bitmap-trie node count bounded by total boundary bytes") {
    val b = randBoundaries(500, 4)
    assert(BitmapTrie(b, 4).nodeCount <= b.map(_.length).sum + 1)
  }
}
