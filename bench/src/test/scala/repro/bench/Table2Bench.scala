package repro.bench

import repro.SparkSpec

/** Bench for Table II: the nine tasks exist with the paper's split kinds
  * and the measured fold ratios track the declared ones.
  */
class Table2Bench extends SparkSpec {

  private lazy val rows = Table2.run(spark, Harness.defaultScale)

  test("render and persist Table II") {
    BenchOut.save("table2", Table2.render(rows))
    assert(rows.size == 9)
    assert(rows.count(_.tt == "NC") == 6)
    assert(rows.count(_.tt == "LP") == 3)
  }

  test("measured split ratios stay within 5 points of the declared ratios") {
    for (r <- rows) {
      assert(math.abs(r.measured._1 - r.declared._1) < 5.0, s"${r.name}/${r.kg} train")
      assert(math.abs(r.measured._3 - r.declared._3) < 5.0, s"${r.name}/${r.kg} test")
    }
  }

  test("metrics follow task type (Accuracy for NC, Hits@10 for LP)") {
    assert(rows.filter(_.tt == "NC").forall(_.metric == "Accuracy"))
    assert(rows.filter(_.tt == "LP").forall(_.metric == "Hits@10"))
  }
}
