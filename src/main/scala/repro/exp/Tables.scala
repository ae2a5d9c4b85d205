package repro.exp

/** Plain-text table rendering shared by jobs and benches, so the rows the
  * paper reports in Figures 2–6 / Tables II–III appear as aligned text in
  * job stdout and bench_output.txt.
  */
object Tables {

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def show(title: String, header: Seq[String], rows: Seq[Seq[String]]): Unit =
    println(render(title, header, rows) + "\n")

  def ms(v: Double): String = f"$v%.1f"
  def d2(v: Double): String = f"$v%.2f"
  def pct(v: Double): String = f"${v * 100}%.3f%%"
}
