package repro.exp

import java.nio.file.{Files, Paths, StandardOpenOption}
import java.nio.charset.StandardCharsets

/** Aligned-text table rendering + persistence under `results/`.
  *
  * Every table harness returns its rendered text so bench suites can both
  * assert on the underlying data and leave a human-diffable artifact next
  * to EXPERIMENTS.md.
  */
object TableIO {

  def render(title: String, headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = headers +: rows
    val widths = headers.indices.map(i => all.map(r => if (i < r.size) r(i).length else 0).max)
    def line(r: Seq[String]): String =
      r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(headers) +: sep +: rows.map(line)).mkString("\n") + "\n"
  }

  def write(name: String, content: String): Unit = {
    // Forked bench JVMs run with cwd = bench/; anchor results/ at the repo
    // root (the nearest ancestor holding build.sbt) so all harnesses agree.
    val root = Iterator.iterate(Paths.get("").toAbsolutePath)(_.getParent)
      .takeWhile(_ != null).take(4)
      .find(p => Files.exists(p.resolve("build.sbt")))
      .getOrElse(Paths.get("").toAbsolutePath)
    val dir = root.resolve("results")
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.txt"), content.getBytes(StandardCharsets.UTF_8),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }

  /** Print + persist in one go (benches and jobs share this). */
  def emit(name: String, content: String): String = {
    println(content)
    write(name, content)
    content
  }
}
