package repro.bench

import org.apache.spark.sql.SparkSession

import repro.core.{Extraction, GraphPattern, KGTOSA}
import repro.gnn.{TrainParams, Trainers}
import repro.kg.KG
import repro.metrics.{Quality, SubgraphQuality}
import repro.rdf.{Endpoint, TripleStore}
import repro.sampling.RandomWalk
import repro.synth.{NCTask, Tasks}

/** Table III — quality of extracted subgraphs: URW (GraphSAINT's default)
  * vs BRW vs IBS vs KG-TOSA_d1h1 on four task/KG pairs. All methods extract
  * around the same number of roots (the paper uses 20k of multi-million
  * target sets; we use ``bs`` of thousands-scale targets), walk length
  * h = 3 for the samplers, and report data-sufficiency, topology, and the
  * accuracy of GraphSAINT trained on each subgraph.
  */
object Table3 {

  val tasks: Seq[(String, NCTask)] = Seq(
    "CG/YAGO" -> Tasks.CG_YAGO,
    "PC/YAGO" -> Tasks.PC_YAGO,
    "PV/DBLP" -> Tasks.PV_DBLP,
    "PV/MAG"  -> Tasks.PV_MAG,
  )

  /** Paper values per (task, method): (V_T%, avg dist, entropy, accuracy). */
  val paper: Map[(String, String), (Double, Double, Double, Double)] = Map(
    ("CG/YAGO", "URW") -> (1.1, 7.1, 1.27, 15.25),  ("CG/YAGO", "BRW") -> (61.2, 4.23, 2.68, 36.73),
    ("CG/YAGO", "IBS") -> (82.4, 4.7, 3.02, 42.0),  ("CG/YAGO", "KG-TOSA_d1h1") -> (35.7, 4.18, 2.34, 36.72),
    ("PC/YAGO", "URW") -> (11.4, 7.46, 1.27, 79.28), ("PC/YAGO", "BRW") -> (55.3, 4.12, 2.67, 96.1),
    ("PC/YAGO", "IBS") -> (74.6, 5.2, 2.96, 97.2),  ("PC/YAGO", "KG-TOSA_d1h1") -> (35.0, 4.62, 2.40, 89.52),
    ("PV/DBLP", "URW") -> (29.9, 4.23, 1.77, 81.79), ("PV/DBLP", "BRW") -> (65.4, 3.71, 2.75, 80.53),
    ("PV/DBLP", "IBS") -> (19.4, 3.95, 1.64, 85.4), ("PV/DBLP", "KG-TOSA_d1h1") -> (40.2, 3.1, 2.18, 89.52),
    ("PV/MAG", "URW") -> (4.9, 3.1, 1.49, 73.79),   ("PV/MAG", "BRW") -> (78.0, 2.9, 4.44, 75.33),
    ("PV/MAG", "IBS") -> (26.5, 3.2, 2.36, 75.4),   ("PV/MAG", "KG-TOSA_d1h1") -> (36.2, 3.0, 3.18, 81.08),
  )

  final case class Row(task: String, method: String, quality: Quality,
                       accuracy: Double, extractSeconds: Double)

  /** Extract with all four methods and measure quality + accuracy. */
  def run(spark: SparkSession, scale: Double, bs: Int = 500, h: Int = 3,
          trainParams: TrainParams = TrainParams(batches = 6, rootsPerBatch = 150, epochs = 150)): Seq[Row] = {
    val kgNames = tasks.map(_._2.kgName).distinct
    val out = Seq.newBuilder[Row]
    for (kgName <- kgNames) {
      val kg = Harness.buildKG(spark, kgName, scale)
      val store = new TripleStore(kg).warm()
      val endpoint = new Endpoint(store, parallelism = 8)
      for ((label, task) <- tasks.filter(_._2.kgName == kgName)) {
        val targets = Tasks.targets(kg, task).cache()
        targets.count()
        val sample = RandomWalk.sampleIds(targets, bs, seed = 99).cache()
        sample.count()
        val extractions: Seq[Extraction] = Seq(
          KGTOSA.urwExtract(kg, bs, h, seed = 17),
          KGTOSA.brwExtract(kg, task, bs, h, seed = 17),
          KGTOSA.ibsExtract(kg, task, bs, k = 16, alpha = 0.25, seed = 17),
          KGTOSA.sparqlExtract(endpoint, task, GraphPattern(1, 1), bs = 500000, targetSample = Some(sample)),
        )
        for (ex <- extractions) {
          val q = SubgraphQuality.measure(ex.subgraph, targets)
          // paper protocol: train on the extracted subgraph, score on the
          // full task test set (URW's row then matches Table IV's FG run)
          val acc = Trainers.train("GraphSAINT", ex.subgraph, task, trainParams,
            evalGraph = Some(kg)).accuracy
          out += Row(label, ex.method, q, acc * 100, ex.extractSeconds)
          ex.subgraph.uncache()
        }
        targets.unpersist(); sample.unpersist()
      }
      store.close()
      kg.uncache()
    }
    out.result()
  }

  def render(rows: Seq[Row]): String = {
    val header = Seq("Task", "Method", "|KG'|", "V_T(%)", "|C'|", "|R'|",
      "Discon(%)", "AvgDist", "Entropy", "Acc(%)", "Extract(s)",
      "paper V_T(%)", "paper Dist", "paper H", "paper Acc")
    val body = rows.map { r =>
      val p = paper.get((r.task, r.method))
      Seq(r.task, r.method, r.quality.nodes.toString, Harness.f1(r.quality.targetPct),
        r.quality.cPrime.toString, r.quality.rPrime.toString,
        Harness.f1(r.quality.targetDisconPct), Harness.f2(r.quality.avgDistToTarget),
        Harness.f2(r.quality.avgEntropy), Harness.f1(r.accuracy), Harness.f1(r.extractSeconds),
        p.map(v => Harness.f1(v._1)).getOrElse("-"), p.map(v => Harness.f2(v._2)).getOrElse("-"),
        p.map(v => Harness.f2(v._3)).getOrElse("-"), p.map(v => Harness.f1(v._4)).getOrElse("-"))
    }
    Harness.table("Table III (subgraph quality: URW vs BRW vs IBS vs KG-TOSA_d1h1)", header, body)
  }
}
