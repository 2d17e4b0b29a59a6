package repro.keys

/** YCSB-style Zipfian request-distribution generator [Cooper et al., SoCC'10]
  * used to draw point/range query targets over the loaded keys (§7.1:
  * "YCSB workloads C and E with a Zipf distribution").
  *
  * Standard YCSB formulation with θ = 0.99; deterministic in `seed`.
  */
final class Zipf(val n: Int, theta: Double = 0.99, seed: Long = 42) extends Serializable {
  require(n > 0)
  private val rnd = new scala.util.Random(seed)
  private val alpha = 1.0 / (1.0 - theta)
  private val zetan = {
    var s = 0.0
    var i = 1
    while (i <= n) { s += 1.0 / math.pow(i, theta); i += 1 }
    s
  }
  private val zeta2 = 1.0 + math.pow(0.5, theta)
  private val eta = (1 - math.pow(2.0 / n, 1 - theta)) / (1 - zeta2 / zetan)

  /** Next rank in [0, n): rank 0 is the hottest item. */
  def next(): Int = {
    val u = rnd.nextDouble()
    val uz = u * zetan
    if (uz < 1.0) 0
    else if (uz < 1.0 + math.pow(0.5, theta)) 1
    else (n * math.pow(eta * u - eta + 1, alpha)).toInt.min(n - 1)
  }

  /** Draw `k` ranks. */
  def draw(k: Int): Array[Int] = Array.fill(k)(next())
}

/** Fisher-Yates shuffle with a fixed seed: maps Zipf ranks onto key indices
  * so the hot set is spread over the key space (the YCSB key-remap of §7.1).
  */
object KeyShuffle {
  def permutation(n: Int, seed: Long = 9): Array[Int] = {
    val rnd = new scala.util.Random(seed)
    val p = Array.tabulate(n)(identity)
    var i = n - 1
    while (i > 0) {
      val j = rnd.nextInt(i + 1)
      val t = p(i); p(i) = p(j); p(j) = t
      i -= 1
    }
    p
  }
}
