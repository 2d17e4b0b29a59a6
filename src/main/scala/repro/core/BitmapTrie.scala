package repro.core

import scala.collection.mutable.ArrayBuffer

/** The bitmap-trie dictionary of §4.2/Figure 6, used by 3-Grams and 4-Grams.
  *
  * Nodes live in a BFS array; each node holds a 256-bit bitmap of its branch
  * labels, the array index of its first child (children are contiguous in BFS
  * order, addressed by `childBase + popcount(bitmap, label)`), the entry-index
  * range of the boundaries in its subtree, and an optional terminal entry
  * (a boundary that ends exactly at this node — the paper's borrowed-MSB ∅
  * marker). Floor lookup walks at most `maxDepth` levels.
  */
final class BitmapTrie private (
    bitmaps: Array[Long],      // 4 words per node
    childBase: Array[Int],
    firstEntry: Array[Int],
    lastEntry: Array[Int],
    terminal: Array[Int],      // entry index or -1
    val maxDepth: Int,
) extends DictIndex {

  @inline private def has(node: Int, b: Int): Boolean =
    (bitmaps(node * 4 + (b >>> 6)) & (1L << (b & 63))) != 0

  /** Number of set bits strictly below `b` in the node's bitmap. */
  @inline private def rankBelow(node: Int, b: Int): Int = {
    val base = node * 4
    var r = 0
    var w = 0
    val full = b >>> 6
    while (w < full) { r += java.lang.Long.bitCount(bitmaps(base + w)); w += 1 }
    if ((b & 63) != 0) r += java.lang.Long.bitCount(bitmaps(base + full) & ((1L << (b & 63)) - 1))
    r
  }

  /** Largest set bit strictly below `b`, or -1. */
  private def largestBelow(node: Int, b: Int): Int = {
    val base = node * 4
    var w = b >>> 6
    var mask = if ((b & 63) == 0) 0L else bitmaps(base + w) & ((1L << (b & 63)) - 1)
    while (true) {
      if (mask != 0) return (w << 6) + 63 - java.lang.Long.numberOfLeadingZeros(mask)
      w -= 1
      if (w < 0) return -1
      mask = bitmaps(base + w)
    }
    -1
  }

  override def lookup(key: Array[Byte], off: Int): Int = {
    var node = 0
    var depth = 0
    var best = -1
    while (true) {
      if (terminal(node) >= 0) best = terminal(node)
      if (off + depth >= key.length) return best
      val b = key(off + depth) & 0xff
      if (has(node, b)) {
        val child = childBase(node) + rankBelow(node, b)
        // every boundary ordered before the child's subtree is < the key
        if (firstEntry(child) > 0) best = firstEntry(child) - 1
        node = child
        depth += 1
      } else {
        val l = largestBelow(node, b)
        return if (l >= 0) lastEntry(childBase(node) + rankBelow(node, l)) else best
      }
    }
    best // unreachable
  }

  override def memoryBytes: Long = {
    val nodes = childBase.length.toLong
    nodes * (32 + 4 + 4 + 4 + 4) // bitmap + childBase + first/last + terminal
  }

  override def name: String = s"bitmap-trie-$maxDepth"

  def nodeCount: Int = childBase.length
}

object BitmapTrie {

  /** Build from the sorted boundary array (lengths ≤ maxDepth). */
  def apply(boundaries: Array[Array[Byte]], maxDepth: Int): BitmapTrie = {
    require(boundaries.forall(_.length <= maxDepth), s"boundary longer than $maxDepth")
    val bitmaps    = new ArrayBuffer[Long]()
    val childBase  = new ArrayBuffer[Int]()
    val firstE     = new ArrayBuffer[Int]()
    val lastE      = new ArrayBuffer[Int]()
    val term       = new ArrayBuffer[Int]()

    // BFS queue of (entry range [lo, hi), depth); each element becomes a node.
    final case class Task(lo: Int, hi: Int, depth: Int)
    val queue = scala.collection.mutable.Queue(Task(0, boundaries.length, 0))
    while (queue.nonEmpty) {
      val Task(lo, hi, depth) = queue.dequeue()
      val id = childBase.length
      bitmaps ++= Seq(0L, 0L, 0L, 0L)
      childBase += 0
      firstE += lo
      lastE += hi - 1
      var i = lo
      var t = -1
      if (i < hi && boundaries(i).length == depth) { t = i; i += 1 }
      term += t
      // group remaining boundaries by byte at `depth`
      val childTasks = new ArrayBuffer[Task]()
      while (i < hi) {
        val b = boundaries(i)(depth) & 0xff
        var j = i + 1
        while (j < hi && (boundaries(j)(depth) & 0xff) == b) j += 1
        bitmaps(id * 4 + (b >>> 6)) |= 1L << (b & 63)
        childTasks += Task(i, j, depth + 1)
        i = j
      }
      // children are appended contiguously in BFS order
      childBase(id) = childBase.length + queue.size
      childTasks.foreach(queue.enqueue(_))
    }
    new BitmapTrie(bitmaps.toArray, childBase.toArray, firstE.toArray,
      lastE.toArray, term.toArray, maxDepth)
  }
}
