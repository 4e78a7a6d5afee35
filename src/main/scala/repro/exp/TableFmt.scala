package repro.exp

/** Plain-text table rendering for experiment outputs (one table per
  * reproduced paper artifact; captured into bench_output.txt).
  */
object TableFmt {

  /** Render rows under a header, columns padded to their widest cell. */
  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (Seq(s"== $title", line(header), sep) ++ rows.map(line)).mkString("\n")
  }

  def fmt(d: Double, dec: Int = 2): String = s"%.${dec}f".format(d)

  def fmtSci(d: Double): String = f"$d%.2e"

  def fmtBytes(b: Long): String =
    if (b >= (1 << 20)) f"${b / 1048576.0}%.2f MB"
    else if (b >= 1024) f"${b / 1024.0}%.1f KB"
    else s"$b B"
}
