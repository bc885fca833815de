package repro.exp

import java.nio.file.{Files, Path, Paths}
import repro.harness.TextTable
import scala.jdk.CollectionConverters._

/** Table 1: lines of code of the NEXMark query implementations, Native vs
  * Megaphone. Counts non-blank, non-comment lines between the
  * `// QN-<kind>-begin/end` markers in the two query source files.
  */
object Table1Loc {

  /** Locate the repo root (the directory containing src/main/scala/repro). */
  def repoRoot: Path = {
    var dir = Paths.get(sys.props("user.dir")).toAbsolutePath
    while (dir != null && !Files.exists(dir.resolve("src/main/scala/repro"))) dir = dir.getParent
    require(dir != null, "could not locate repo root from " + sys.props("user.dir"))
    dir
  }

  private def sourceLines(file: String): Seq[String] =
    Files.readAllLines(repoRoot.resolve(file)).asScala.toSeq

  def count(lines: Seq[String], q: Int, kind: String): Int = {
    val begin = lines.indexWhere(_.contains(s"// Q$q-$kind-begin"))
    val end   = lines.indexWhere(_.contains(s"// Q$q-$kind-end"))
    require(begin >= 0 && end > begin, s"markers for Q$q-$kind not found")
    lines
      .slice(begin + 1, end)
      .map(_.trim)
      .count(l => l.nonEmpty && !l.startsWith("//") && !l.startsWith("*") && !l.startsWith("/*"))
  }

  final case class Row(q: Int, native: Int, megaphone: Int)

  def rows(): Seq[Row] = {
    val nat  = sourceLines("src/main/scala/repro/nexmark/NativeQueries.scala")
    val mega = sourceLines("src/main/scala/repro/nexmark/MegaphoneQueries.scala")
    (1 to 8).map(q => Row(q, count(nat, q, "native"), count(mega, q, "megaphone")))
  }

  def render(rs: Seq[Row]): String =
    TextTable.render(
      "" +: rs.map(r => s"Q${r.q}"),
      Seq(
        "Native" +: rs.map(_.native.toString),
        "Megaphone" +: rs.map(_.megaphone.toString),
      ),
    )
}
