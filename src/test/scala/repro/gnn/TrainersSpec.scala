package repro.gnn

import repro.{SparkSpec, TestKGs}
import repro.synth.Tasks

class TrainersSpec extends SparkSpec {

  private val fast = TrainParams(epochs = 25, batches = 3, rootsPerBatch = 120)

  test("SeHGNN on DBLP-lite PV beats the majority-class baseline clearly") {
    val r = Trainers.train("SeHGNN", TestKGs.dblp, Tasks.PV_DBLP, fast)
    val chance = 1.0 / Tasks.PV_DBLP.numLabels
    assert(r.accuracy > chance * 3, s"accuracy ${r.accuracy} vs chance $chance")
  }

  test("GraphSAINT returns sane bookkeeping") {
    val r = Trainers.train("GraphSAINT", TestKGs.yago3, repro.synth.NCTask(
      "CC", "YAGO3-10", "Person", 5, repro.synth.RandomSplit, (0.8, 0.1, 0.1)), fast)
    assert(r.trainSeconds > 0 && r.inferSeconds > 0)
    assert(r.trainExamples > 0)
    assert(r.graphNodes == TestKGs.yago3.nodeTypes.count())
    assert(r.params == MemoryModel.params(r.graphNodes, r.graphRels, 5, fast.l))
  }

  test("RGCN (full-batch) is charged more memory than GraphSAINT (mini-batch)") {
    val rgcn = Trainers.train("RGCN", TestKGs.yago3, repro.synth.NCTask(
      "CC", "YAGO3-10", "Person", 5, repro.synth.RandomSplit, (0.8, 0.1, 0.1)), fast)
    val saint = Trainers.train("GraphSAINT", TestKGs.yago3, repro.synth.NCTask(
      "CC", "YAGO3-10", "Person", 5, repro.synth.RandomSplit, (0.8, 0.1, 0.1)), fast)
    assert(rgcn.memoryBytes > saint.memoryBytes)
  }

  test("ShaDowSAINT trains with a fanout cap") {
    val r = Trainers.train("ShaDowSAINT", TestKGs.yago3, repro.synth.NCTask(
      "CC", "YAGO3-10", "Person", 5, repro.synth.RandomSplit, (0.8, 0.1, 0.1)), fast)
    assert(r.accuracy >= 0.0 && r.accuracy <= 1.0)
  }

  test("unknown methods are rejected") {
    intercept[IllegalArgumentException](
      Trainers.train("GAT", TestKGs.yago3, Tasks.PV_DBLP.copy(kgName = "YAGO3-10", targetType = "Person"), fast))
  }

  test("training on the d1h1 KG' is at least as accurate as on FG (shape claim)") {
    val task = Tasks.AC_DBLP
    val store = new repro.rdf.TripleStore(TestKGs.dblp).warm()
    val endpoint = new repro.rdf.Endpoint(store, 4)
    val ex = repro.core.KGTOSA.sparqlExtract(endpoint, task, repro.core.GraphPattern(1, 1), 100000)
    val fg = Trainers.train("GraphSAINT", TestKGs.dblp, task, fast)
    val kgp = Trainers.train("GraphSAINT", ex.subgraph, task, fast)
    assert(kgp.accuracy >= fg.accuracy - 0.10,
      s"KG' ${kgp.accuracy} vs FG ${fg.accuracy}")
    assert(kgp.memoryBytes < fg.memoryBytes)
    assert(kgp.params < fg.params)
    ex.subgraph.uncache(); store.close()
  }
}
