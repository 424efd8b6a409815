package repro.exp

import java.nio.charset.StandardCharsets
import java.nio.file.{Files, Paths}

/** Markdown table formatting + result persistence for the bench suites. */
object Tables {

  def fmt(x: Double): String =
    if (x.isInfinity) "inf"
    else if (x == x.toLong.toDouble && math.abs(x) < 1e7) x.toLong.toString
    else if (math.abs(x) >= 100) f"$x%.1f"
    else f"$x%.3f"

  /** Render a markdown table. */
  def markdown(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val sb = new StringBuilder
    sb ++= s"\n### $title\n\n"
    sb ++= header.mkString("| ", " | ", " |\n")
    sb ++= header.map(_ => "---").mkString("| ", " | ", " |\n")
    rows.foreach(r => sb ++= r.mkString("| ", " | ", " |\n"))
    sb.result()
  }

  /** Print to stdout and persist under bench/results/. */
  def emit(fileName: String, content: String): Unit = {
    println(content)
    val dir = Paths.get(sys.props.getOrElse("repro.results.dir", "bench/results"))
    Files.createDirectories(dir)
    Files.write(dir.resolve(fileName), content.getBytes(StandardCharsets.UTF_8))
  }
}
