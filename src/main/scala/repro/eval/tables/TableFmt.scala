package repro.eval.tables

/** Plain-text table rendering shared by the bench suites and jobs. */
object TableFmt {

  def f2(d: Double): String = f"$d%.2f"
  def f1(d: Double): String = f"$d%.1f"

  /** Render an aligned ASCII table. */
  def render(title: String, headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = headers +: rows
    val widths = headers.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (Seq(s"== $title ==", line(headers), sep) ++ rows.map(line)).mkString("\n")
  }

  /** Write a rendered table under results/ and echo it to stdout. */
  def publish(name: String, text: String): Unit = {
    val dir = java.nio.file.Paths.get(sys.props.getOrElse("repro.results.dir", "results"))
    java.nio.file.Files.createDirectories(dir)
    java.nio.file.Files.write(dir.resolve(s"$name.txt"),
      (text + "\n").getBytes(java.nio.charset.StandardCharsets.UTF_8))
    println(text)
  }
}
