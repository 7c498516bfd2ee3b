package repro.bench

import org.apache.spark.sql.SparkSession

import repro.core.{GraphPattern, KGTOSA, Transform}
import repro.gnn.{MemoryModel, TrainParams, Trainers}
import repro.rdf.{Endpoint, TripleStore}
import repro.synth.{NCTask, Tasks}

/** Table IV — cost breakdown of training a GNN task with the traditional
  * pipeline (FG) vs KG-TOSA_d1h1 (KG'): extraction time, transformation
  * time, training time, total, accuracy, model size, inference time, and
  * training memory, for all six NC tasks, using the GraphSAINT trainer.
  */
object Table4 {

  val tasks: Seq[(String, NCTask)] = Seq(
    "PV/MAG-42M"  -> Tasks.PV_MAG,
    "PD/MAG-42M"  -> Tasks.PD_MAG,
    "PV/DBLP-15M" -> Tasks.PV_DBLP,
    "AC/DBLP-15M" -> Tasks.AC_DBLP,
    "PC/YAGO-30M" -> Tasks.PC_YAGO,
    "CG/YAGO-30M" -> Tasks.CG_YAGO,
  )

  /** Paper values per task: FG and KG' rows of
    * (extract min, transform min, train min, total min, accuracy %,
    *  params M, inference s, memory GB).
    */
  final case class PaperCost(extractMin: Double, transformMin: Double, trainMin: Double,
                             totalMin: Double, acc: Double, paramsM: Double,
                             inferSec: Double, memGB: Double)
  val paper: Map[(String, String), PaperCost] = Map(
    ("PV/MAG-42M", "FG")   -> PaperCost(0, 46, 274, 320, 74, 5349, 89, 155),
    ("PV/MAG-42M", "KG'")  -> PaperCost(18, 22, 135, 175, 81, 1415, 52, 57),
    ("PD/MAG-42M", "FG")   -> PaperCost(0, 41, 290, 331, 67, 5348, 87, 139),
    ("PD/MAG-42M", "KG'")  -> PaperCost(16, 19, 129, 164, 74, 1408, 52, 57),
    ("PV/DBLP-15M", "FG")  -> PaperCost(0, 30, 112, 142, 82, 3301, 678, 47),
    ("PV/DBLP-15M", "KG'") -> PaperCost(19, 11, 85, 115, 90, 1477, 454, 36),
    ("AC/DBLP-15M", "FG")  -> PaperCost(0, 9, 170, 179, 81, 3306, 1003, 80),
    ("AC/DBLP-15M", "KG'") -> PaperCost(1, 1, 13, 15, 79, 96, 28, 3),
    ("PC/YAGO-30M", "FG")  -> PaperCost(0, 52, 439, 491, 79, 3656, 1265, 130),
    ("PC/YAGO-30M", "KG'") -> PaperCost(22, 10, 105, 137, 90, 1085, 368, 30),
    ("CG/YAGO-30M", "FG")  -> PaperCost(0, 60, 292, 352, 15, 3933, 1283, 90),
    ("CG/YAGO-30M", "KG'") -> PaperCost(3, 3, 23, 29, 37, 1038, 1038, 3),
  )

  final case class Row(task: String, graph: String,
                       extractSec: Double, transformSec: Double, trainSec: Double,
                       totalSec: Double, acc: Double, paramsM: Double,
                       inferSec: Double, memGB: Double,
                       nodes: Long, edges: Long, rels: Long)

  /** Run the FG and KG' pipelines for all six NC tasks. */
  def run(spark: SparkSession, scale: Double, pagBs: Long = 20000,
          trainParams: TrainParams = TrainParams()): Seq[Row] = {
    val out = Seq.newBuilder[Row]
    val kgNames = tasks.map(_._2.kgName).distinct
    for (kgName <- kgNames) {
      val kg = Harness.buildKG(spark, kgName, scale)
      val store = new TripleStore(kg).warm()
      val endpoint = new Endpoint(store, parallelism = 8)
      for ((label, task) <- tasks.filter(_._2.kgName == kgName)) {
        // ---- traditional pipeline: transform FG + train --------------------
        val tFg = Transform.toAdjacency(kg)
        val rFg = Trainers.train("GraphSAINT", kg, task, trainParams)
        out += Row(label, "FG", 0.0, tFg.seconds, rFg.trainSeconds,
          tFg.seconds + rFg.trainSeconds, rFg.accuracy * 100, rFg.params / 1e6,
          rFg.inferSeconds, MemoryModel.gb(rFg.memoryBytes),
          rFg.graphNodes, rFg.graphEdges, rFg.graphRels)
        tFg.nodes.unpersist(); tFg.edges.unpersist()

        // ---- KG-TOSA pipeline: extract + transform KG' + train -------------
        val ex = KGTOSA.sparqlExtract(endpoint, task, GraphPattern(1, 1), pagBs)
        val tKgp = Transform.toAdjacency(ex.subgraph)
        val rKgp = Trainers.train("GraphSAINT", ex.subgraph, task, trainParams)
        out += Row(label, "KG'", ex.extractSeconds, tKgp.seconds, rKgp.trainSeconds,
          ex.extractSeconds + tKgp.seconds + rKgp.trainSeconds, rKgp.accuracy * 100,
          rKgp.params / 1e6, rKgp.inferSeconds, MemoryModel.gb(rKgp.memoryBytes),
          rKgp.graphNodes, rKgp.graphEdges, rKgp.graphRels)
        tKgp.nodes.unpersist(); tKgp.edges.unpersist()
        ex.subgraph.uncache()
      }
      store.close()
      kg.uncache()
    }
    out.result()
  }

  def render(rows: Seq[Row]): String = {
    val header = Seq("Task", "Graph", "Extract(s)", "Transform(s)", "Train(s)", "Total(s)",
      "Acc(%)", "Params(M)", "Infer(s)", "Mem(GB)", "|V|", "|E|", "|R|",
      "paper total(min)", "paper acc", "paper params(M)", "paper mem(GB)")
    val body = rows.map { r =>
      val p = paper((r.task, r.graph))
      Seq(r.task, r.graph, Harness.f1(r.extractSec), Harness.f1(r.transformSec),
        Harness.f1(r.trainSec), Harness.f1(r.totalSec), Harness.f1(r.acc),
        Harness.f1(r.paramsM), Harness.f2(r.inferSec), Harness.f2(r.memGB),
        r.nodes.toString, r.edges.toString, r.rels.toString,
        Harness.f1(p.totalMin), Harness.f1(p.acc), Harness.f1(p.paramsM), Harness.f1(p.memGB))
    }
    Harness.table("Table IV (cost breakdown FG vs KG-TOSA_d1h1, GraphSAINT trainer)", header, body)
  }
}
