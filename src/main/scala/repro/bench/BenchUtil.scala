package repro.bench

/** Timing and table-rendering helpers shared by the per-table benchmark
  * harnesses. Every harness prints the same rows the paper reports
  * (EXPERIMENTS.md records paper-vs-measured side by side).
  */
object BenchUtil {

  /** Milliseconds for one execution of `body` after `warmup` runs, taking
    * the best of `reps` measured runs (paper: averages over warm runs; best
    * -of is steadier at small timescales).
    */
  def timeMillis(warmup: Int = 1, reps: Int = 3)(body: => Any): Double = {
    var i = 0
    while (i < warmup) { body; i += 1 }
    var best = Double.MaxValue
    i = 0
    while (i < reps) {
      val t0 = System.nanoTime()
      body
      val ms = (System.nanoTime() - t0) / 1e6
      if (ms < best) best = ms
      i += 1
    }
    best
  }

  /** Median-of-`reps` milliseconds — robust to GC spikes for sub-100ms bodies. */
  def medianMillis(warmup: Int = 2, reps: Int = 7)(body: => Any): Double = {
    var i = 0
    while (i < warmup) { body; i += 1 }
    val times = Array.fill(reps) {
      val t0 = System.nanoTime()
      body
      (System.nanoTime() - t0) / 1e6
    }
    java.util.Arrays.sort(times)
    times(reps / 2)
  }

  final case class BenchTable(title: String, header: Seq[String], rows: Seq[Seq[String]]) {
    def render: String = {
      val all = header +: rows
      val widths = header.indices.map(i => all.map(_(i).length).max)
      def line(cells: Seq[String]): String =
        cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
      val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
      (s"\n=== $title ===" +: line(header) +: sep +: rows.map(line)).mkString("\n")
    }

    def print(): Unit = println(render)

    /** Cell accessor by (row index, header name). */
    def cell(row: Int, col: String): String = rows(row)(header.indexOf(col))
    def cellD(row: Int, col: String): Double = cell(row, col).toDouble
  }

  def fmt(ms: Double): String = f"$ms%.1f"
  def fmtX(x: Double): String = f"$x%.2fx"
  def pct(x: Double): String = f"${x * 100}%.1f%%"
}
