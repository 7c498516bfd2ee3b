package repro.gnn

import org.apache.spark.sql.functions._

import repro.{SparkSpec, TestKGs}
import repro.kg.KG

class FeaturesAggSpec extends SparkSpec {

  import spark.implicits._

  test("feature width equals the community count") {
    val f = Features.nodeFeatures(TestKGs.mag)
    assert(f.columns.count(_.startsWith("f")) == TestKGs.mag.schema.communities)
  }

  test("every node gets a feature row") {
    val f = Features.nodeFeatures(TestKGs.yago3)
    assert(f.count() == TestKGs.yago3.nodeTypes.count())
  }

  test("signal types carry a community indicator, noise types do not") {
    val kg = TestKGs.mag
    val f = Features.nodeFeatures(kg)
    val authors = kg.schema.nodeType("Author")
    // authors of community 0: f0 should average ≈ 1, f1 ≈ 0
    val authorsC0 = f.filter(col("id") >= authors.offset && col("id") < authors.offset + authors.count)
      .filter(pmod(col("id") - authors.offset, lit(kg.schema.communities.toLong)) === 0)
    val m = authorsC0.agg(avg("f0"), avg("f1")).head()
    assert(m.getDouble(0) > 0.8, s"signal mean ${m.getDouble(0)}")
    assert(math.abs(m.getDouble(1)) < 0.2)
    // papers (target type) are pure noise
    val papers = kg.schema.nodeType("Paper")
    val papersC0 = f.filter(col("id") >= papers.offset && col("id") < papers.offset + papers.count)
      .filter(pmod(col("id") - papers.offset, lit(kg.schema.communities.toLong)) === 0)
    assert(math.abs(papersC0.agg(avg("f0")).head().getDouble(0)) < 0.2)
  }

  test("features are deterministic") {
    val a = Features.nodeFeatures(TestKGs.yago3).agg(sum("f0")).head().getDouble(0)
    val b = Features.nodeFeatures(TestKGs.yago3).agg(sum("f0")).head().getDouble(0)
    assert(a == b)
  }

  test("signal type lists reject unknown KGs") {
    intercept[NoSuchElementException](Features.signalTypesFor("nope"))
  }

  test("1-hop aggregation computes the exact neighbour mean on a hand graph") {
    // 0 -> 1, 0 -> 2 ; features f0: node1 = 1.0, node2 = 3.0, node0 = 0.0
    val schema = TestKGs.yago3.schema
    val g = KG(schema,
      Seq((0L, 0, 1L), (0L, 0, 2L)).toDF("s", "p", "o"),
      Seq((0L, 0), (1L, 0), (2L, 0)).toDF("id", "ntype"))
    val feats = Seq((0L, 0.0), (1L, 1.0), (2L, 3.0)).toDF("id", "f0")
    val agg = Aggregation.aggregate(g, feats, l = 1)
    val row0 = agg.filter(col("id") === 0L).head()
    assert(math.abs(row0.getAs[Double]("h1_f0") - 2.0) < 1e-9) // mean(1, 3)
    val row1 = agg.filter(col("id") === 1L).head()
    assert(math.abs(row1.getAs[Double]("h1_f0") - 0.0) < 1e-9) // undirected: sees node 0
  }

  test("2-hop aggregation is the mean of hop-1 aggregates") {
    // chain 0-1-2; f0 = id value
    val schema = TestKGs.yago3.schema
    val g = KG(schema,
      Seq((0L, 0, 1L), (1L, 0, 2L)).toDF("s", "p", "o"),
      Seq((0L, 0), (1L, 0), (2L, 0)).toDF("id", "ntype"))
    val feats = Seq((0L, 0.0), (1L, 1.0), (2L, 2.0)).toDF("id", "f0")
    val agg = Aggregation.aggregate(g, feats, l = 2)
    // h1(0)=1, h1(1)=mean(0,2)=1, h1(2)=1 ⇒ h2(0)=h1(1)=1
    val row0 = agg.filter(col("id") === 0L).head()
    assert(math.abs(row0.getAs[Double]("h2_f0") - 1.0) < 1e-9)
  }

  test("isolated nodes aggregate to zero-filled hop features") {
    val schema = TestKGs.yago3.schema
    val g = KG(schema,
      Seq((0L, 0, 1L)).toDF("s", "p", "o"),
      Seq((0L, 0), (1L, 0), (9L, 0)).toDF("id", "ntype"))
    val feats = Seq((0L, 1.0), (1L, 1.0), (9L, 1.0)).toDF("id", "f0")
    val agg = Aggregation.aggregate(g, feats, l = 1)
    assert(agg.filter(col("id") === 9L).head().getAs[Double]("h1_f0") == 0.0)
  }

  test("fanout cap bounds the neighbours used") {
    val kg = TestKGs.yago3
    val feats = Features.nodeFeatures(kg)
    val capped = Aggregation.aggregate(kg, feats, l = 1, fanoutCap = Some(2))
    val full = Aggregation.aggregate(kg, feats, l = 1)
    assert(capped.count() == full.count())
  }
}
