package repro.sampling

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.kg.KG

/** Induced-subgraph extraction — ``extractSubgraph(V_s, KG)`` of
  * Algorithm 1 line 7 / Algorithm 2 line 5: keep every KG edge whose both
  * endpoints are in the sampled node set.
  */
object Induce {

  /** Induce the subgraph of ``kg`` on node set ``vs`` (single column ``id``).
    * Node-type rows are kept for all of ``vs`` (isolated sampled nodes stay,
    * so disconnection statistics see them).
    */
  def extractSubgraph(kg: KG, vs: DataFrame): KG = {
    val v = vs.select(col("id")).distinct()
    val triples = kg.triples
      .join(v.withColumnRenamed("id", "s"), "s")
      .join(v.withColumnRenamed("id", "o"), "o")
      .select(col("s"), col("p"), col("o"))
    val nodeTypes = kg.nodeTypes.join(v, "id")
    KG(kg.schema, triples, nodeTypes)
  }
}
