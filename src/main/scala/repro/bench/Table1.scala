package repro.bench

import org.apache.spark.sql.SparkSession

import repro.kg.KGStats
import repro.synth.KGBench

/** Table I — benchmark statistics: nodes, edges (triples), node types,
  * edge types per KG, paper values vs this repo's scaled generators.
  */
object Table1 {

  /** Paper's Table I values: (nodes, edges, n-types, e-types). */
  val paper: Map[String, (Double, Double, Int, Int)] = Map(
    "MAG-42M"      -> (42.4e6, 166e6, 58, 62),
    "YAGO-30M"     -> (30.7e6, 400e6, 104, 98),
    "DBLP-15M"     -> (15.6e6, 252e6, 42, 48),
    "ogbl-wikikg2" -> (2.5e6, 17e6, 9300, 535),
    "YAGO3-10"     -> (123e3, 1.1e6, 23, 37),
  )

  /** Scale divisor per KG (YAGO3-10 is generated at 1/100, the rest 1/1000). */
  def divisor(kgName: String): Double = if (kgName == "YAGO3-10") 100.0 else 1000.0

  final case class Row(kg: String, measured: KGStats, expected: (Double, Double, Int, Int))

  /** Generate every benchmark KG at ``scale`` and measure its statistics. */
  def run(spark: SparkSession, scale: Double): Seq[Row] =
    KGBench.all.map { spec =>
      val kg = Harness.buildKG(spark, spec.name, scale)
      val st = kg.stats
      kg.uncache()
      Row(spec.name, st, paper(spec.name))
    }

  /** Render measured-vs-paper rows. */
  def render(rows: Seq[Row], scale: Double): String = {
    val header = Seq("KG-Dataset", "#nodes", "#edges", "#n-type", "#e-type",
      "paper #nodes", "paper #edges", "paper #n-type", "paper #e-type")
    val body = rows.map { r =>
      Seq(r.kg, r.measured.nodes.toString, r.measured.edges.toString,
        r.measured.nTypes.toString, r.measured.eTypes.toString,
        f"${r.expected._1 / 1e6}%.1fM", f"${r.expected._2 / 1e6}%.1fM",
        r.expected._3.toString, r.expected._4.toString)
    }
    Harness.table(s"Table I (scale=$scale, sizes are paper/${"{"}1000,100${"}"})", header, body)
  }
}
