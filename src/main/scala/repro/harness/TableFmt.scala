package repro.harness

/** Aligned fixed-width table printing for the bench suites — every
  * reproduced table prints through this so the output in
  * bench_output.txt can be diffed against EXPERIMENTS.md.
  */
object TableFmt {

  def row(cells: Seq[String], widths: Seq[Int]): String =
    cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString(" | ")

  def print(title: String, header: Seq[String], rows: Seq[Seq[String]]): Unit = {
    val widths = header.indices.map { i =>
      (header(i).length +: rows.map(r => r(i).length)).max
    }
    val sep = widths.map("-" * _).mkString("-+-")
    println()
    println(s"== $title ==")
    println(row(header, widths))
    println(sep)
    rows.foreach(r => println(row(r, widths)))
    println()
  }

  def f(x: Double, dec: Int = 3): String = s"%.${dec}f".format(x)

  def secs(x: Double): String = f(x, 3) + "s"
}
