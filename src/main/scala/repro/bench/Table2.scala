package repro.bench

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._

import repro.kg.KG
import repro.synth.{KGBench, LPTask, NCTask, RandomSplit, Tasks, TimeSplit}

/** Table II — the nine benchmark tasks with their split schema and the
  * *measured* train/valid/test ratios of the generated data.
  */
object Table2 {

  final case class Row(tt: String, name: String, kg: String, split: String,
                       declared: (Double, Double, Double),
                       measured: (Double, Double, Double),
                       metric: String)

  private def ratios(df: org.apache.spark.sql.DataFrame): (Double, Double, Double) = {
    val counts = df.groupBy(col("fold")).count().collect()
      .map(r => r.getInt(0) -> r.getLong(1)).toMap
    val total = math.max(1L, counts.values.sum)
    (100.0 * counts.getOrElse(0, 0L) / total,
     100.0 * counts.getOrElse(1, 0L) / total,
     100.0 * counts.getOrElse(2, 0L) / total)
  }

  private def splitName(s: repro.synth.SplitKind): String = s match {
    case TimeSplit   => "Time"
    case RandomSplit => "Random"
  }

  /** Measure split ratios for every task over freshly generated KGs. */
  def run(spark: SparkSession, scale: Double): Seq[Row] = {
    val kgNames = (Tasks.ncTasks.map(_.kgName) ++ Tasks.lpTasks.map(_.kgName)).distinct
    // one scale knob for all KGs; the per-KG divisor lives in the specs
    val kgs: Map[String, KG] = kgNames.map(n => n -> Harness.buildKG(spark, n, scale)).toMap

    val nc = Tasks.ncTasks.map { t: NCTask =>
      val m = ratios(Tasks.labeledSplit(kgs(t.kgName), t))
      Row("NC", t.name, t.kgName, splitName(t.split),
        (t.ratios._1 * 100, t.ratios._2 * 100, t.ratios._3 * 100), m, "Accuracy")
    }
    val lp = Tasks.lpTasks.map { t: LPTask =>
      val m = ratios(Tasks.lpSplit(kgs(t.kgName), t))
      Row("LP", t.name, t.kgName, splitName(t.split),
        (t.ratios._1 * 100, t.ratios._2 * 100, t.ratios._3 * 100), m, "Hits@10")
    }
    kgs.values.foreach(_.uncache())
    nc ++ lp
  }

  def render(rows: Seq[Row]): String = {
    val header = Seq("TT", "Name", "KG", "Split", "declared tr/va/te", "measured tr/va/te", "Metric")
    val body = rows.map { r =>
      Seq(r.tt, r.name, r.kg, r.split,
        f"${r.declared._1}%.1f/${r.declared._2}%.1f/${r.declared._3}%.1f",
        f"${r.measured._1}%.1f/${r.measured._2}%.1f/${r.measured._3}%.1f",
        r.metric)
    }
    Harness.table("Table II (tasks + measured split ratios)", header, body)
  }
}
