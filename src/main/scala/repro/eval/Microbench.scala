package repro.eval

import repro.core.{BuiltHope, Hope, Scheme}

/** Figure 8 microbenchmark driver: per (scheme, dataset, dict size) measure
  * compression rate, single-threaded encoding latency per source byte, and
  * dictionary memory — the three rows of the paper's Figure 8.
  */
object Microbench {

  final case class Row(dataset: String, scheme: String, entries: Int,
                       cpr: Double, nsPerChar: Double, dictBytes: Long,
                       buildStats: repro.core.BuildStats) extends Serializable

  /** Build from `sample`, then measure over `keys` (single thread, one pass
    * warm-up + one timed pass, keys compressed one-at-a-time as in §6.1).
    */
  def run(dataset: String, keys: Array[Array[Byte]], sample: Array[Array[Byte]],
          scheme: Scheme): Row = {
    val hope = Hope.build(sample, scheme)
    measure(dataset, keys, hope)
  }

  def measure(dataset: String, keys: Array[Array[Byte]], hope: BuiltHope): Row = {
    var raw = 0L
    var bits = 0L
    var i = 0
    val warm = math.min(keys.length, 5000)
    while (i < warm) { hope.encode(keys(i)); i += 1 } // JIT warm-up
    val t0 = System.nanoTime()
    i = 0
    while (i < keys.length) {
      val k = keys(i)
      raw += k.length
      bits += hope.encode(k).bitLen
      i += 1
    }
    val ns = (System.nanoTime() - t0).toDouble
    Row(dataset, hope.scheme.name, hope.entries,
      cpr = raw * 8.0 / bits, nsPerChar = ns / raw, dictBytes = hope.dictMemoryBytes,
      buildStats = hope.stats)
  }
}

/** Plain-text table rendering for bench output and EXPERIMENTS.md. */
object Tables {
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"\n### $title" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmt(d: Double): String = if (d >= 100) f"$d%.0f" else if (d >= 10) f"$d%.1f" else f"$d%.2f"
  def kb(b: Long): String = if (b >= (1L << 20)) f"${b / 1048576.0}%.1fMB" else f"${b / 1024.0}%.1fKB"

  /** Also append the table to bench_results/ for EXPERIMENTS.md assembly. */
  def emit(name: String, table: String): Unit = {
    println(table)
    val dir = java.nio.file.Paths.get("bench_results")
    java.nio.file.Files.createDirectories(dir)
    java.nio.file.Files.write(dir.resolve(s"$name.md"),
      (table + "\n").getBytes(java.nio.charset.StandardCharsets.UTF_8))
  }
}
