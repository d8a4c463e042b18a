package repro.bench

import java.nio.file.{Files, Path, Paths}

/** Shared benchmark plumbing: timing, table formatting, report output. */
object BenchUtil {

  /** Wall-clock milliseconds of `f`. */
  def time[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a = f
    (a, (System.nanoTime() - t0) / 1e6)
  }

  def mean(xs: Seq[Double]): Double = if (xs.isEmpty) 0.0 else xs.sum / xs.size

  /** Render rows as a fixed-width text table. */
  def table(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    (line(header) +: line(header.map(h => "-" * h.length)) +: rows.map(line)).mkString("\n")
  }

  /** The repo's results/ directory (works from the root and bench/ cwd). */
  def resultsDir: Path = {
    val cwd = Paths.get("").toAbsolutePath
    val root =
      if (Files.exists(cwd.resolve("build.sbt"))) cwd
      else if (cwd.getParent != null && Files.exists(cwd.getParent.resolve("build.sbt")))
        cwd.getParent
      else cwd
    val dir = root.resolve("results")
    Files.createDirectories(dir)
    dir
  }

  /** Print the report and persist it under results/. */
  def report(name: String, content: String): String = {
    val banner = s"\n================ $name ================\n$content\n"
    println(banner)
    Files.write(resultsDir.resolve(s"$name.txt"), content.getBytes("UTF-8"))
    banner
  }

  def pct(x: Double): String = f"${x * 100}%.1f%%"
  def ms(x: Double): String = f"$x%.0f"
  def sec(x: Double): String = f"${x / 1000}%.2f"
}
