package repro.gnn

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.kg.KG

/** Spark-side message passing: L rounds of mean aggregation of neighbour
  * features over the undirected view. This is the computation whose cost
  * scales with |V|+|E| in every HGNN method; the trainers decouple it from
  * the classifier head exactly as SeHGNN does (aggregate once, then train).
  */
object Aggregation {

  /** Aggregate ``feats`` (``id, f0..f{F-1}``) over ``g`` for ``L`` hops.
    * Returns ``(id, f*, h1_*, .., hL_*)`` for every node of ``g``; nodes
    * with no neighbours get zero-filled hop columns.
    *
    * @param fanoutCap if set, each node aggregates from at most this many
    *                  (hash-chosen) neighbours — ShaDow-GNN's bounded-scope
    *                  ego-graph approximation
    */
  def aggregate(g: KG, feats: DataFrame, l: Int,
                fanoutCap: Option[Int] = None, seed: Int = 11): DataFrame = {
    val featCols = feats.columns.filter(_ != "id").toSeq
    val adjAll = g.undirected
    val adj = fanoutCap match {
      case Some(c) =>
        val w = Window.partitionBy(col("u")).orderBy(KG.hashRand(seed, col("u"), col("v")), col("v"))
        adjAll.withColumn("rk", row_number().over(w)).filter(col("rk") <= c).select(col("u"), col("v"))
      case None => adjAll
    }

    var result = feats
    var cur = feats
    var hop = 0
    while (hop < l) {
      hop += 1
      val curCols = cur.columns.filter(_ != "id").toSeq
      val nb = adj
        .join(cur.withColumnRenamed("id", "v"), "v")
        .groupBy(col("u"))
        .agg(curCols.zip(featCols).map { case (c, base) => avg(col(c)) as s"h${hop}_$base" }.head,
             curCols.zip(featCols).tail.map { case (c, base) => avg(col(c)) as s"h${hop}_$base" }: _*)
        .withColumnRenamed("u", "id")
      result = result.join(nb, Seq("id"), "left")
      cur = nb
    }
    result.na.fill(0.0)
  }
}
