package repro.harness

import java.io.{File, PrintWriter}

/** Fixed-width table rendering + result-file persistence shared by the
  * table harnesses, the spark-submit jobs, and the bench suites.
  */
object TableFormat {

  def fmtSecs(s: Double): String =
    if (s < 0) "—"
    else if (s < 0.005) f"$s%.1e" // modeled times at laptop scale are tiny
    else if (s < 0.01) f"$s%.4f"
    else if (s < 10) f"$s%.3f"
    else if (s < 100) f"$s%.1f"
    else f"$s%.0f"

  def fmtMillisAsSecs(ms: Double): String = fmtSecs(ms / 1000.0)

  def fmtCount(x: Long): String =
    if (x >= 1000000000L) f"${x / 1e9}%.2fB"
    else if (x >= 1000000L) f"${x / 1e6}%.2fM"
    else if (x >= 10000L) f"${x / 1e3}%.1fk"
    else x.toString

  def renderTable(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => if (i < r.length) r(i).length else 0).max)
    def line(r: Seq[String]): String =
      r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("  ")
    val sep = widths.map("-" * _).mkString("  ")
    (line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def geomean(xs: Seq[Double]): Double = {
    val pos = xs.filter(_ > 0)
    if (pos.isEmpty) 0.0 else math.exp(pos.map(math.log).sum / pos.size)
  }

  /** Directory for result artifacts: -Drepro.results.dir or ./results. */
  def resultsDir: File = {
    val d = new File(sys.props.getOrElse("repro.results.dir", "results"))
    d.mkdirs()
    d
  }

  def writeResult(fileName: String, content: String): File = {
    val f = new File(resultsDir, fileName)
    val w = new PrintWriter(f, "UTF-8")
    try w.print(content) finally w.close()
    f
  }
}
