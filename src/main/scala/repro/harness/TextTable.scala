package repro.harness

/** Fixed-width text tables for EXPERIMENTS.md-style output. */
object TextTable {

  def render(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (fmt(header) +: sep +: rows.map(fmt)).mkString("\n")
  }

  def ms(ns: Long): String     = f"${ns / 1e6}%.2f"
  def sec(ns: Long): String    = f"${ns / 1e9}%.2f"
  def gib(bytes: Long): String = f"${bytes / (1024.0 * 1024 * 1024)}%.1f"
}
