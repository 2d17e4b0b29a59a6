package repro.surf

import repro.core.Bytes
import scala.collection.mutable.ArrayBuffer

/** SuRF — the Succinct Range Filter [Zhang et al., SIGMOD'18] on which the
  * paper's Figure 10/11 experiments run. This reproduction uses LOUDS-SPARSE
  * throughout (see DESIGN.md §3): the trie stores each key's minimal
  * distinguishing prefix; four level-ordered arrays encode it —
  *
  *   labels[i]   branch byte of entry i
  *   hasChild[i] 1 ⇒ entry i points to a sub-trie, 0 ⇒ leaf
  *   louds[i]    1 ⇒ entry i is the first entry of its node
  *   isTerm[i]   1 ⇒ entry i marks a key ending at this node (prefix key);
  *               terminal entries sort before real labels within a node
  *
  * Leaves optionally keep `suffixBits` real key bits (SuRF-Real) to cut the
  * false-positive rate (Figure 11). Queries: approximate membership
  * (`mayContain`) and range emptiness (`mayContainRange`) with one-sided
  * error — no false negatives, verified by tests.
  */
final class Surf private (
    labels: Array[Byte],
    hasChild: BitVec,
    louds: BitVec,
    isTerm: BitVec,
    suffixes: Array[Byte],
    val suffixBits: Int,
    val keyCount: Int,
    val avgLeafDepth: Double,
) {

  private val n = labels.length

  /** End (exclusive) of the node whose first entry is `start`. */
  private def nodeEnd(start: Int): Int = {
    var i = start + 1
    while (i < n && !louds.get(i)) i += 1
    i
  }

  /** Child node start position for entry i (requires hasChild(i)). */
  private def childStart(i: Int): Int = louds.select1(hasChild.rank1(i + 1) + 1)

  /** Suffix-store index for leaf entry i (requires !hasChild(i)). */
  private def leafIdx(i: Int): Int = hasChild.rank0(i + 1) - 1

  /** First `suffixBits` bits of `key` starting at byte `from`, zero-padded. */
  private def keySuffix(key: Array[Byte], from: Int): Int = {
    if (suffixBits == 0) return 0
    var v = 0
    var i = 0
    while (i < suffixBits) {
      val bitPos = (from << 3) + i
      val b = if ((bitPos >>> 3) < key.length) (key(bitPos >>> 3) >>> (7 - (bitPos & 7))) & 1 else 0
      v = (v << 1) | b
      i += 1
    }
    v
  }

  /** Approximate membership test — one-sided error (false positives only). */
  def mayContain(key: Array[Byte]): Boolean = {
    var pos = 0
    var depth = 0
    while (true) {
      val end = nodeEnd(pos)
      if (depth == key.length) return isTerm.get(pos) // terminal is first entry
      val b = key(depth)
      var i = pos
      var found = -1
      while (i < end && found < 0) {
        if (!isTerm.get(i) && labels(i) == b) found = i
        i += 1
      }
      if (found < 0) return false
      if (hasChild.get(found)) { pos = childStart(found); depth += 1 }
      else {
        if (suffixBits == 0) return true
        return (suffixes(leafIdx(found)) & 0xff) == keySuffix(key, depth + 1)
      }
    }
    false
  }

  /** Range emptiness test over [lo, hi] — may return true spuriously, never
    * false when a stored key is inside the range.
    */
  def mayContainRange(lo: Array[Byte], hi: Array[Byte]): Boolean =
    lowerBoundPath(lo) match {
      case None => false
      case Some(path) =>
        // path ≤ hi (prefix counts as ≤): truncated stored keys compare
        // optimistically, preserving one-sided error
        val m = math.min(path.length, hi.length)
        var i = 0
        while (i < m && path(i) == hi(i)) i += 1
        if (i < m) (path(i) & 0xff) < (hi(i) & 0xff)
        // equal up to m: a path that is a prefix of hi may be ≤ hi; a path
        // that strictly extends hi means the real key is > hi — reject
        else path.length <= hi.length
    }

  /** Smallest stored (truncated) key ≥ lo, as its label path; None if all
    * stored keys are < lo. Truncation errs low, keeping the filter sound.
    */
  private def lowerBoundPath(lo: Array[Byte]): Option[Array[Byte]] = {
    val path = new ArrayBuffer[Byte]
    // frames: (nodeStart, entryIdx) of the current descent
    val stack = new ArrayBuffer[(Int, Int)]

    def descendLeftmost(entry0: Int): Option[Array[Byte]] = {
      var i = entry0
      while (true) {
        if (isTerm.get(i)) return Some(path.toArray) // key ends at this node
        path += labels(i)
        if (!hasChild.get(i)) return Some(path.toArray)
        i = childStart(i)
      }
      None
    }

    def backtrackAdvance(): Option[Array[Byte]] = {
      while (stack.nonEmpty) {
        val (start, idx) = stack.remove(stack.length - 1)
        if (path.nonEmpty) path.remove(path.length - 1)
        val end = nodeEnd(start)
        if (idx + 1 < end) return descendLeftmost(idx + 1)
      }
      None
    }

    var pos = 0
    var depth = 0
    while (true) {
      val end = nodeEnd(pos)
      if (depth == lo.length) return descendLeftmost(pos) // whole node ≥ lo
      val b = lo(depth) & 0xff
      // skip the terminal entry (its key is a proper prefix of lo, hence < lo)
      var i = pos
      if (i < end && isTerm.get(i)) i += 1
      var eq = -1
      var gt = -1
      while (i < end && gt < 0) {
        val l = labels(i) & 0xff
        if (l == b) eq = i
        else if (l > b) gt = i
        i += 1
      }
      if (eq >= 0) {
        if (hasChild.get(eq)) {
          stack += ((pos, eq))
          path += labels(eq)
          pos = childStart(eq)
          depth += 1
        } else {
          // truncated leaf matching lo's prefix: compare suffix bits if any
          val stored = if (suffixBits == 0) 0 else suffixes(leafIdx(eq)) & 0xff
          val probe = keySuffix(lo, depth + 1)
          if (suffixBits == 0 || stored >= probe || depth + 1 >= lo.length) {
            path += labels(eq)
            return Some(path.toArray)
          }
          // stored suffix < lo: advance to the next entry
          if (gt >= 0) { path += labels(gt); return descendFrom(gt, path) }
          return backtrackAdvance()
        }
      } else if (gt >= 0) {
        path += labels(gt)
        return descendFrom(gt, path)
      } else {
        return backtrackAdvance()
      }
    }
    None
  }

  /** Leftmost completion below entry `i` whose label is already on `path`. */
  private def descendFrom(i: Int, path: ArrayBuffer[Byte]): Option[Array[Byte]] = {
    var cur = i
    while (hasChild.get(cur)) {
      cur = childStart(cur)
      if (isTerm.get(cur)) return Some(path.toArray)
      path += labels(cur)
    }
    Some(path.toArray)
  }

  /** Filter size in bytes: labels + 3 bit vectors + suffix store — the ~10
    * bits/node succinct accounting of the paper.
    */
  def memoryBytes: Long = {
    val bits = 8L * n + hasChild.memoryBits + louds.memoryBits + isTerm.memoryBits +
      suffixBits.toLong * (hasChild.rank0(n) + 0L)
    (bits + 7) / 8
  }

  def entryCount: Int = n
}

object Surf {

  /** Build from sorted, distinct keys. `suffixBits` ∈ {0, 8} supported (the
    * Figure 11 sweep uses 0…8; we store one byte and mask).
    */
  def apply(sortedKeys: Array[Array[Byte]], suffixBits: Int = 0): Surf = {
    require(suffixBits == 0 || suffixBits <= 8, "suffixBits must be ≤ 8")
    val labels = new ArrayBuffer[Byte]
    val hasChildB = new ArrayBuffer[Boolean]
    val loudsB = new ArrayBuffer[Boolean]
    val isTermB = new ArrayBuffer[Boolean]
    val sufB = new ArrayBuffer[Byte]
    var depthSum = 0L
    var leafCnt = 0L

    final case class Task(lo: Int, hi: Int, depth: Int)
    val queue = scala.collection.mutable.Queue(Task(0, sortedKeys.length, 0))

    def suffixOf(key: Array[Byte], from: Int): Byte = {
      if (suffixBits == 0) return 0
      var v = 0
      var i = 0
      while (i < suffixBits) {
        val bitPos = (from << 3) + i
        val b = if ((bitPos >>> 3) < key.length) (key(bitPos >>> 3) >>> (7 - (bitPos & 7))) & 1 else 0
        v = (v << 1) | b
        i += 1
      }
      v.toByte
    }

    while (queue.nonEmpty) {
      val Task(lo, hi, depth) = queue.dequeue()
      var first = true
      var i = lo
      // terminal: a key that ends exactly at this node
      if (i < hi && sortedKeys(i).length == depth) {
        labels += 0; hasChildB += false; loudsB += first; isTermB += true
        sufB += 0
        depthSum += depth; leafCnt += 1
        first = false
        i += 1
      }
      while (i < hi) {
        val b = sortedKeys(i)(depth)
        var j = i + 1
        while (j < hi && sortedKeys(j)(depth) == b) j += 1
        labels += b
        loudsB += first
        isTermB += false
        first = false
        if (j - i == 1) {
          hasChildB += false
          sufB += suffixOf(sortedKeys(i), depth + 1)
          depthSum += depth + 1; leafCnt += 1
        } else {
          hasChildB += true
          queue.enqueue(Task(i, j, depth + 1))
        }
        i = j
      }
      // an empty key set cannot reach here: every task has ≥ 1 key
      require(!first, "node with no entries")
    }

    val n = labels.length
    val hasChild = new BitVec(n)
    val louds = new BitVec(n)
    val isTerm = new BitVec(n)
    val suffixes = new Array[Byte](sufB.length)
    var k = 0
    var si = 0
    while (k < n) {
      if (hasChildB(k)) hasChild.set(k)
      else { suffixes(si) = sufB(si); si += 1 }
      if (loudsB(k)) louds.set(k)
      if (isTermB(k)) isTerm.set(k)
      k += 1
    }
    hasChild.build(); louds.build(); isTerm.build()
    new Surf(labels.toArray, hasChild, louds, isTerm, suffixes, suffixBits,
      sortedKeys.length, if (leafCnt == 0) 0 else depthSum.toDouble / leafCnt)
  }
}
