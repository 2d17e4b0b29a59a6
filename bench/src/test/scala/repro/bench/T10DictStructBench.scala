package repro.bench

import repro.core.{Axis, BitmapTrie, Scheme, SortedArrayIndex, SymbolSelect}
import repro.eval.Tables

/** T10 ⇔ §4.2 claim: the bitmap-trie dictionary is ~2.3× faster than binary
  * search over the same entries, and up to an order of magnitude smaller
  * than the ART-based dictionary.
  */
class T10DictStructBench extends BenchSuite {

  private lazy val sample = BenchBase.sample("email")
  private lazy val keys = BenchBase.keys("email")

  private def time(lookup: (Array[Byte], Int) => Int): Double = {
    var sink = 0L
    var i = 0
    while (i < keys.length) { sink += lookup(keys(i), 0); i += 1 } // warm-up
    val t0 = System.nanoTime()
    i = 0
    var n = 0L
    while (i < keys.length) {
      val k = keys(i)
      var off = 0
      while (off < k.length) { sink += lookup(k, off); off += 3; n += 1 }
      i += 1
    }
    require(sink != Long.MinValue)
    (System.nanoTime() - t0).toDouble / n
  }

  test("emit T10 (bitmap-trie vs binary search) and check the speedup direction") {
    val iv = Axis.buildIntervals(
      SymbolSelect.extraBoundaries(Scheme.NGrams(3, 1 << 16), sample))
    val trie = BitmapTrie(iv.boundaries, 3)
    val bin = new SortedArrayIndex(iv.boundaries)
    val art = repro.art.ArtDictIndex(iv.boundaries)

    val tTrie = time(trie.lookup)
    val tBin = time(bin.lookup)
    val tArt = time(art.lookup)

    Tables.emit("T10_dictstruct", Tables.render(
      s"T10 / §4.2 — dictionary structure lookup (ns), ${iv.size} entries",
      Seq("structure", "ns/lookup", "memory"),
      Seq(
        Seq("bitmap-trie", Tables.fmt(tTrie), Tables.kb(trie.memoryBytes)),
        Seq("binary-search", Tables.fmt(tBin), Tables.kb(bin.memoryBytes)),
        Seq("ART", Tables.fmt(tArt), Tables.kb(art.memoryBytes)))))

    assert(tTrie < tBin, s"bitmap-trie $tTrie !< binary search $tBin")
    assert(trie.memoryBytes < art.memoryBytes,
      s"bitmap-trie ${trie.memoryBytes} !< ART ${art.memoryBytes}")
  }
}
