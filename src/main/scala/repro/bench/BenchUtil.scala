package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}
import org.apache.spark.sql.DataFrame

/** Timing and reporting helpers shared by the per-table benches. */
object BenchUtil {

  /** Wall-clock a thunk; returns (result, seconds). */
  def time[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val r = f
    (r, (System.nanoTime() - t0) / 1e9)
  }

  /** Force full evaluation of a DataFrame (count touches every row). */
  def force(df: DataFrame): Long = df.count()

  /** Render an aligned ASCII/markdown table. */
  def fmtTable(headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = headers +: rows
    val widths = headers.indices.map(i => all.map(r => r(i).length).max)
    def line(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (line(headers) +: sep +: rows.map(line)).mkString("\n")
  }

  def fmtSec(s: Double): String = f"$s%.2f"

  /** Print a report section and append it to bench_results/<name>.md so
    * EXPERIMENTS.md can be assembled from the artifacts.
    */
  def report(name: String, content: String): Unit = {
    println(content)
    val dir = Paths.get(sys.props.getOrElse("repro.bench.dir", "bench_results"))
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.md"), (content + "\n").getBytes("UTF-8"),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }
}
