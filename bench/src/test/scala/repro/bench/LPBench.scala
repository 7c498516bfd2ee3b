package repro.bench

import repro.SparkSpec

/** Supplementary LP bench (Figure 7 content, Table II tasks): FG vs
  * KG-TOSA_d2h1 with the MorsE stand-in. Shape claims: KG' trains on fewer
  * triples with less memory at comparable-or-better Hits@10.
  */
class LPBench extends SparkSpec {

  private lazy val rows = LPExperiment.run(spark, Harness.defaultScale, methods = Seq("MorsE"))

  test("render and persist the LP experiment") {
    BenchOut.save("lp", LPExperiment.render(rows))
    assert(rows.size == 6) // 3 tasks × {FG, KG'}
  }

  test("KG' trains on fewer triples than FG for every LP task") {
    for (task <- rows.map(_.task).distinct) {
      val m = rows.filter(_.task == task).map(r => r.graph -> r).toMap
      assert(m("KG'").r.trainTriples < m("FG").r.trainTriples, task)
      assert(m("KG'").r.memoryBytes < m("FG").r.memoryBytes, task)
    }
  }

  test("KG' Hits@10 stays within noise of FG or improves") {
    for (task <- rows.map(_.task).distinct) {
      val m = rows.filter(_.task == task).map(r => r.graph -> r).toMap
      assert(m("KG'").r.hits10 >= m("FG").r.hits10 - 0.15,
        s"$task KG' ${m("KG'").r.hits10} vs FG ${m("FG").r.hits10}")
    }
  }
}
