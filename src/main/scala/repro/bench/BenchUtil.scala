package repro.bench

/** Timing and table-formatting helpers shared by the per-table harnesses. */
object BenchUtil {

  /** Wall-clock seconds of one execution of `f`. */
  def timeSec[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    (a, (System.nanoTime() - t0) / 1e9)
  }

  /** Best-of-`n` wall-clock seconds (after one warmup run). */
  def bestOfSec(n: Int)(f: => Unit): Double = {
    f // warmup
    var best = Double.MaxValue
    var i = 0
    while (i < n) {
      val t0 = System.nanoTime()
      f
      best = math.min(best, (System.nanoTime() - t0) / 1e9)
      i += 1
    }
    best
  }

  /** Render an aligned text table. */
  def renderTable(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmtBytes(b: Long): String =
    if (b >= (1L << 30)) f"${b / (1024.0 * 1024 * 1024)}%.2f GB"
    else if (b >= (1L << 20)) f"${b / (1024.0 * 1024)}%.2f MB"
    else if (b >= (1L << 10)) f"${b / 1024.0}%.2f KB"
    else s"$b B"

  def fmtSec(s: Double): String =
    if (s >= 100) f"$s%.0f s" else if (s >= 1) f"$s%.1f s" else f"${s * 1000}%.2f ms"

  /** Print a titled block to stdout (the benches' reporting channel). */
  def report(title: String, body: String): Unit = {
    println()
    println(s"=== $title ===")
    println(body)
    println()
  }
}
