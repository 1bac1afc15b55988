package repro.harness

/** Plain-text table rendering for the bench harnesses: each reproduced
  * exhibit prints its measured rows next to the paper's reported numbers so
  * EXPERIMENTS.md can be diffed against a run.
  */
object TableFormat {

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(cells: Seq[String]): String =
      cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmt(d: Double): String = f"$d%.2f"

  def emit(title: String, header: Seq[String], rows: Seq[Seq[String]]): Unit = {
    // Println on purpose: bench output is the deliverable recorded in
    // bench_output.txt / EXPERIMENTS.md.
    println()
    println(render(title, header, rows))
    println()
  }
}
