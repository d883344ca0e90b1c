package repro.exp

/** Timing protocol of the paper's §6: per configuration, run the algorithm
  * three times after a warm-up and report the average/median CPU time in
  * milliseconds. Long runs (> 2 s) are measured once — their variance is
  * dwarfed by their cost and the bench must stay within CI budget.
  */
object Timing {

  /** (last result, milliseconds). */
  def measure[A](body: => A): (A, Double) = {
    var result = body // warm-up (JIT)
    val t0 = System.nanoTime()
    result = body
    val first = (System.nanoTime() - t0) / 1e6
    if (first > 2000.0) (result, first)
    else {
      val times = new Array[Double](3)
      times(0) = first
      var i = 1
      while (i < 3) {
        val t = System.nanoTime()
        result = body
        times(i) = (System.nanoTime() - t) / 1e6
        i += 1
      }
      java.util.Arrays.sort(times)
      (result, times(1))
    }
  }

  /** Milliseconds only. */
  def ms[A](body: => A): Double = measure(body)._2

  def fmt(ms: Double): String =
    if (ms >= 100) f"$ms%.0f" else if (ms >= 1) f"$ms%.2f" else f"$ms%.3f"
}

/** Minimal fixed-width table rendering for bench output / EXPERIMENTS.md. */
object Tables {

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(c => all.map(_(c).length).max)
    def line(cells: Seq[String]): String =
      cells.zip(widths).map { case (s, w) => s.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"### $title" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }
}
