package repro.exp

/** Plain-text table rendering for the reproduced figures: every bench prints
  * the same rows the corresponding paper figure plots (EXPERIMENTS.md diffs
  * them against the paper's values).
  */
object Tables {

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(cells: Seq[String]): String =
      cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def f(d: Double): String = f"$d%.3f"
  def f2(d: Double): String = f"$d%.2f"
}
