package repro.bench

/** Minimal fixed-width table renderer for the bench reports. */
object TextTable {

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    val sep = widths.map("-" * _).mkString("  ")
    (Seq(s"== $title ==", line(header), sep) ++ rows.map(line)).mkString("\n")
  }

  def f(x: Double, digits: Int = 2): String = s"%.${digits}f".format(x)

  /** Writes a bench artifact under <repo-root>/bench/results/ for
    * EXPERIMENTS.md. The forked bench JVM runs with cwd = bench/, so walk
    * up to the directory holding build.sbt before resolving.
    */
  def write(name: String, content: String): Unit = {
    var root = java.nio.file.Paths.get(".").toAbsolutePath.normalize()
    while (root != null && !java.nio.file.Files.exists(root.resolve("build.sbt")))
      root = root.getParent
    val base = if (root == null) java.nio.file.Paths.get(".") else root
    // a nested subproject also has its own directory; prefer the outermost
    val outer = Option(base.getParent)
      .filter(p => java.nio.file.Files.exists(p.resolve("build.sbt")))
      .getOrElse(base)
    val dir = outer.resolve("bench").resolve("results")
    java.nio.file.Files.createDirectories(dir)
    java.nio.file.Files.write(dir.resolve(name),
      content.getBytes(java.nio.charset.StandardCharsets.UTF_8))
  }
}
