package repro.exp

/** Column-aligned plain-text tables for experiment reports — every bench and
  * job prints its paper-table reproduction through this.
  */
object TextTable {

  def format(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(r => if (i < r.size) r(i).length else 0).max)
    def fmtRow(r: Seq[String]): String =
      r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (fmtRow(header) +: sep +: rows.map(fmtRow)).mkString("\n")
  }

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String =
    s"\n=== $title ===\n${format(header, rows)}\n"

  def pct(x: Double): String  = f"${x * 100}%.1f%%"
  def num(x: Double): String  = f"$x%.2f"
  def num3(x: Double): String = f"$x%.3f"
}
