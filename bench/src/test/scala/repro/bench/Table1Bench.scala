package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}

import repro.SparkSpec

/** Shared helper: persist rendered tables for EXPERIMENTS.md assembly. */
object BenchOut {
  def save(name: String, text: String): Unit = {
    // the forked bench JVM may run with cwd = <repo>/bench; normalise so
    // results always land in <repo>/bench_results
    val cwd = Paths.get("").toAbsolutePath
    val base = if (cwd.getFileName != null && cwd.getFileName.toString == "bench") cwd.getParent else cwd
    val dir = base.resolve("bench_results")
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.txt"), (text + "\n").getBytes,
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
    println(text)
  }
}

/** Bench for Table I: generate all five KGs at bench scale and check the
  * statistics reproduce the paper's shape (type counts exact, sizes within
  * generator tolerance of the scaled-down targets).
  */
class Table1Bench extends SparkSpec {

  private lazy val scale = Harness.defaultScale
  private lazy val rows = Table1.run(spark, scale)

  test("render and persist Table I") {
    BenchOut.save("table1", Table1.render(rows, scale))
    assert(rows.size == 5)
  }

  test("node/edge type counts match the paper exactly (except wikikg2 substitution)") {
    for (r <- rows) {
      if (r.kg == "ogbl-wikikg2") {
        assert(r.measured.nTypes == 125) // documented substitution
        assert(r.measured.eTypes == 60)
      } else {
        assert(r.measured.nTypes == r.expected._3.toLong, r.kg)
        assert(r.measured.eTypes == r.expected._4.toLong, r.kg)
      }
    }
  }

  test("node and edge counts land near the scaled paper sizes") {
    for (r <- rows) {
      val div = Table1.divisor(r.kg) / scale
      val expNodes = r.expected._1 / div
      val expEdges = r.expected._2 / div
      assert(r.measured.nodes > expNodes * 0.6 && r.measured.nodes < expNodes * 1.4,
        s"${r.kg} nodes ${r.measured.nodes} vs ~$expNodes")
      assert(r.measured.edges > expEdges * 0.6 && r.measured.edges < expEdges * 1.4,
        s"${r.kg} edges ${r.measured.edges} vs ~$expEdges")
    }
  }

  test("size ordering matches the paper (YAGO densest, YAGO3 smallest)") {
    val byName = rows.map(r => r.kg -> r.measured).toMap
    assert(byName("YAGO-30M").edges > byName("MAG-42M").edges)
    assert(byName("MAG-42M").nodes > byName("DBLP-15M").nodes)
    assert(byName("YAGO3-10").edges < byName("ogbl-wikikg2").edges * 2)
  }
}
