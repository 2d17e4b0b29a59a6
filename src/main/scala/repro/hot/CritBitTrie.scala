package repro.hot

import repro.core.Bytes
import scala.collection.mutable.ArrayBuffer

/** HOT substitute (see DESIGN.md §3): a binary PATRICIA / crit-bit trie.
  *
  * Like HOT, the structure stores only *branching points* — each internal
  * node is a single discriminating bit index; no key bytes are kept on the
  * path — so it sits at the same extreme of the paper's Figure 7 key-storage
  * spectrum (minimum partial keys, full-key verification at the leaf). This
  * is the property that determines how much a structure benefits from HOPE.
  *
  * Bits beyond a key's end read as 0, which is exact for the zero-padded
  * encoded keys used in integration (terminated keys are never bit-prefixes
  * of each other, so a discriminating bit always exists).
  */
final class CritBitTrie {

  private sealed abstract class Node
  private final class Inner(val bitIdx: Int, var left: Node, var right: Node) extends Node
  private final class Leaf(val key: Array[Byte], var value: Long) extends Node

  private var root: Node = _
  private var count = 0
  private var innerCount = 0

  def size: Int = count

  @inline private def bit(key: Array[Byte], i: Int): Int = {
    val byteIdx = i >>> 3
    if (byteIdx >= key.length) 0 else (key(byteIdx) >>> (7 - (i & 7))) & 1
  }

  /** First bit index at which a and b differ; -1 if equal (incl. 0-padding). */
  private def firstDiffBit(a: Array[Byte], b: Array[Byte]): Int = {
    val n = math.max(a.length, b.length)
    var i = 0
    while (i < n) {
      val ab = if (i < a.length) a(i) & 0xff else 0
      val bb = if (i < b.length) b(i) & 0xff else 0
      if (ab != bb) return (i << 3) + Integer.numberOfLeadingZeros(ab ^ bb) - 24
      i += 1
    }
    -1
  }

  def insert(key: Array[Byte], value: Long): Unit = {
    if (root == null) { root = new Leaf(key, value); count += 1; return }
    // walk to the best-matching leaf
    var node = root
    while (node.isInstanceOf[Inner]) {
      val in = node.asInstanceOf[Inner]
      node = if (bit(key, in.bitIdx) == 0) in.left else in.right
    }
    val leaf = node.asInstanceOf[Leaf]
    val d = firstDiffBit(key, leaf.key)
    if (d < 0) {
      if (key.length == leaf.key.length) { leaf.value = value; return }
      // zero-pad-equal but different length: treat longer as bigger via a
      // virtual bit at the shorter key's end — disallowed for terminated
      // keys; fall back to replacing equal-bits key.
      leaf.value = value; return
    }
    val newLeaf = new Leaf(key, value)
    val goRight = bit(key, d) == 1
    // descend again, stopping where the new node belongs (bit order invariant)
    var parent: Inner = null
    var cur = root
    var fromRight = false
    while (cur.isInstanceOf[Inner] && cur.asInstanceOf[Inner].bitIdx < d) {
      val in = cur.asInstanceOf[Inner]
      parent = in
      fromRight = bit(key, in.bitIdx) == 1
      cur = if (fromRight) in.right else in.left
    }
    val branch = if (goRight) new Inner(d, cur, newLeaf) else new Inner(d, newLeaf, cur)
    innerCount += 1
    count += 1
    if (parent == null) root = branch
    else if (fromRight) parent.right = branch
    else parent.left = branch
  }

  /** Point lookup with full-key verification at the leaf; -1 when absent. */
  def get(key: Array[Byte]): Long = {
    var node = root
    if (node == null) return -1L
    while (node.isInstanceOf[Inner]) {
      val in = node.asInstanceOf[Inner]
      node = if (bit(key, in.bitIdx) == 0) in.left else in.right
    }
    val l = node.asInstanceOf[Leaf]
    if (Bytes.compare(l.key, key) == 0) l.value else -1L
  }

  /** Up to `limit` entries ≥ low, in key order. Two-phase crit-bit seek:
    * walk low's bits to a leaf, find the first discriminating bit, then
    * replay the walk collecting right-siblings above that bit.
    */
  def scan(low: Array[Byte], limit: Int): ArrayBuffer[(Array[Byte], Long)] = {
    val acc = new ArrayBuffer[(Array[Byte], Long)](limit)
    if (root == null) return acc
    var node = root
    while (node.isInstanceOf[Inner]) {
      val in = node.asInstanceOf[Inner]
      node = if (bit(low, in.bitIdx) == 0) in.left else in.right
    }
    val probe = node.asInstanceOf[Leaf]
    val d = firstDiffBit(low, probe.key)
    // replay from root; pending holds unvisited right subtrees ≥ low
    val pending = new ArrayBuffer[Node]
    var cur = root
    var include: Node = null
    while (include == null) {
      cur match {
        case l: Leaf =>
          // subtree is this single leaf; include iff ≥ low
          include = if (Bytes.compare(l.key, low) >= 0 || (d < 0 && zeroPadEq(l.key, low))) l else null
          if (include == null) include = EmptyMarker
        case in: Inner =>
          if (d >= 0 && in.bitIdx >= d) {
            // all keys in this subtree agree with probe on bits [0, d); they
            // all have probe's bit at d, low has the other value
            include = if (bit(low, d) == 0) cur else EmptyMarker
          } else {
            if (bit(low, in.bitIdx) == 0) { pending += in.right; cur = in.left }
            else cur = in.right
          }
      }
    }
    if (include ne EmptyMarker) collect(include, low, limit, acc, checkLow = true)
    var i = pending.length - 1
    while (i >= 0 && acc.size < limit) {
      collect(pending(i), low, limit, acc, checkLow = false)
      i -= 1
    }
    acc
  }

  private val EmptyMarker: Node = new Leaf(Array.emptyByteArray, -1L)

  private def zeroPadEq(a: Array[Byte], b: Array[Byte]): Boolean = firstDiffBit(a, b) < 0

  private def collect(node: Node, low: Array[Byte], limit: Int,
                      acc: ArrayBuffer[(Array[Byte], Long)], checkLow: Boolean): Unit =
    node match {
      case l: Leaf =>
        if (acc.size < limit && (!checkLow || Bytes.compare(l.key, low) >= 0))
          acc += ((l.key, l.value))
      case in: Inner =>
        if (acc.size < limit) collect(in.left, low, limit, acc, checkLow)
        if (acc.size < limit) collect(in.right, low, limit, acc, checkLow)
    }

  /** Memory: internal nodes (bit index + two pointers) + one tuple pointer
    * per leaf; key bytes live in the table (partial-key structure, §7.2).
    */
  def memoryBytes: Long = innerCount.toLong * (16 + 4 + 8 + 8) + count.toLong * (16 + 8)

  /** Average leaf depth (binary decisions per lookup). */
  def avgLeafDepth: Double = {
    var sum = 0L
    var leaves = 0L
    def walk(n: Node, depth: Int): Unit = n match {
      case null =>
      case _: Leaf => sum += depth; leaves += 1
      case in: Inner => walk(in.left, depth + 1); walk(in.right, depth + 1)
    }
    walk(root, 0)
    if (leaves == 0) 0.0 else sum.toDouble / leaves
  }
}
