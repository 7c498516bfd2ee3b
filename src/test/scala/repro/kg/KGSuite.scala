package repro.kg

import org.apache.spark.sql.functions._

import repro.{SparkSpec, TestKGs}

class KGSuite extends SparkSpec {

  private lazy val kg = TestKGs.mag

  test("stats counts nodes, edges and distinct types from the data") {
    val st = kg.stats
    assert(st.nodes == kg.schema.totalNodes)
    assert(st.edges == kg.triples.count())
    assert(st.nTypes == kg.schema.nodeTypes.size)
    assert(st.eTypes <= kg.schema.edgeTypes.size)
    assert(st.eTypes > 0)
  }

  test("undirected view doubles the edge count") {
    assert(kg.undirected.count() == 2 * kg.triples.count())
  }

  test("undirected view contains both directions of a triple") {
    val t = kg.triples.limit(1).collect().head
    val (s, o) = (t.getLong(0), t.getLong(2))
    val und = kg.undirected
    assert(und.filter(col("u") === s && col("v") === o).count() >= 1)
    assert(und.filter(col("u") === o && col("v") === s).count() >= 1)
  }

  test("nodesOfType returns exactly the type's range") {
    val t = kg.schema.nodeType("Venue")
    val ids = kg.nodesOfType("Venue").collect().map(_.getLong(0)).sorted
    assert(ids.length == t.count)
    assert(ids.head == t.offset && ids.last == t.offset + t.count - 1)
  }

  test("nodesOfType rejects unknown type names") {
    intercept[NoSuchElementException](kg.nodesOfType("NotAType"))
  }

  test("hashRand is deterministic and in (0, 1)") {
    val df = spark.range(1000).select(KG.hashRand(7, col("id")) as "u")
    val vals = df.collect().map(_.getDouble(0))
    assert(vals.forall(v => v > 0.0 && v < 1.0))
    val again = spark.range(1000).select(KG.hashRand(7, col("id")) as "u").collect().map(_.getDouble(0))
    assert(vals.sameElements(again))
  }

  test("hashRand varies with salt") {
    val a = spark.range(100).select(KG.hashRand(1, col("id")) as "u").collect().map(_.getDouble(0))
    val b = spark.range(100).select(KG.hashRand(2, col("id")) as "u").collect().map(_.getDouble(0))
    assert(!a.sameElements(b))
  }

  test("hashRand is roughly uniform") {
    val mean = spark.range(20000).select(avg(KG.hashRand(3, col("id")))).head().getDouble(0)
    assert(math.abs(mean - 0.5) < 0.02)
  }
}
