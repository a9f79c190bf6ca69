package repro.bench

import java.nio.file.{Files, Path, Paths}
import java.nio.charset.StandardCharsets

/** Plain-text table formatting + result persistence for the bench suites. */
object Fmt {

  /** Render rows as an aligned text table with a header. */
  def table(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(cells: Seq[String]): String =
      cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
    (line(header) +: line(widths.map("-" * _)) +: rows.map(line)).mkString("\n")
  }

  def ms(nanos: Long): String = f"${nanos / 1e6}%.1f"
  def sec(nanos: Long): String = f"${nanos / 1e9}%.2f"
  def pct(x: Double): String = f"${100 * x}%.0f%%"
  def f3(x: Double): String = f"$x%.3f"

  /** Default output directory for bench artifacts: `bench/results` under
    * the repo root. Forked subproject JVMs start in their project dir, so
    * walk up to the topmost ancestor that has a build.sbt.
    */
  def resultsDir: Path = {
    sys.env.get("BENCH_RESULTS_DIR") match {
      case Some(d) =>
        val p = Paths.get(d); Files.createDirectories(p); p
      case None =>
        var dir = Paths.get(sys.props("user.dir")).toAbsolutePath
        var root = dir
        while (dir != null) {
          if (Files.exists(dir.resolve("build.sbt"))) root = dir
          dir = dir.getParent
        }
        val p = root.resolve("bench").resolve("results")
        Files.createDirectories(p)
        p
    }
  }

  /** Print a titled report and persist it under bench/results. */
  def publish(name: String, content: String): Unit = {
    val banner = s"\n===== $name =====\n$content\n"
    println(banner)
    Files.write(resultsDir.resolve(s"$name.txt"), content.getBytes(StandardCharsets.UTF_8))
    ()
  }
}
