package repro.util

import java.nio.file.{Files, Path, Paths}
import scala.jdk.CollectionConverters._

/** Counts the lines of code between `// LOC:<tag>:BEGIN` and
  * `// LOC:<tag>:END` markers in this repository's sources — the Table III
  * "LOC" metric comparing BLEND plan definitions with federated glue code.
  */
object Loc {

  private def sourceRoots: Seq[Path] =
    Seq("src/main/scala", "../src/main/scala") // root project cwd vs. bench/ cwd
      .map(Paths.get(_))
      .filter(Files.isDirectory(_))

  private lazy val sources: Seq[Path] =
    sourceRoots.flatMap { root =>
      Files.walk(root).iterator().asScala.filter(_.toString.endsWith(".scala")).toSeq
    }

  /** Non-blank, non-comment lines between the tag's markers; 0 if the tag
    * does not exist.
    */
  def count(tag: String): Int = {
    val begin = s"// LOC:$tag:BEGIN"
    val end = s"// LOC:$tag:END"
    sources.iterator.map { p =>
      val lines = Files.readAllLines(p).asScala
      val b = lines.indexWhere(_.trim == begin)
      val e = lines.indexWhere(_.trim == end)
      if (b >= 0 && e > b)
        lines.slice(b + 1, e).count { l =>
          val t = l.trim
          t.nonEmpty && !t.startsWith("//")
        }
      else 0
    }.sum
  }
}
