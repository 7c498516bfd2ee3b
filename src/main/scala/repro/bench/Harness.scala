package repro.bench

import org.apache.spark.sql.SparkSession

import repro.kg.KG
import repro.synth.KGBench

/** Shared plumbing for the table benches and jobs: scale resolution, KG
  * construction with caching, and fixed-width table rendering so the bench
  * output reads like the paper's tables.
  */
object Harness {

  /** Bench scale: 1.0 = 1/1000 of the paper's KG sizes (DESIGN.md §2).
    * Override with REPRO_SCALE; unit tests pass smaller scales explicitly.
    */
  def defaultScale: Double = sys.env.get("REPRO_SCALE").map(_.toDouble).getOrElse(1.0)

  /** Generate and cache one benchmark KG at a scale. */
  def buildKG(spark: SparkSession, kgName: String, scale: Double): KG =
    KGBench.generate(spark, KGBench.spec(kgName), scale).cached()

  /** Render rows as a fixed-width table with a header. */
  def table(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(cells: Seq[String]) =
      cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  /** Format helpers. */
  def f1(x: Double): String = f"$x%.1f"
  def f2(x: Double): String = f"$x%.2f"
  def pct(x: Double): String = f"$x%.1f%%"
}
