package repro.sampling

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.kg.KG

/** Personalized PageRank via power iteration on the undirected,
  * degree-normalised adjacency, with teleport mass spread uniformly over a
  * seed set (the task's target vertices). Stands in for the
  * push-based approximate PPR of Andersen et al. used by IBS — the scores
  * it induces over h-hop neighbourhoods rank nodes identically in the
  * large-iteration limit.
  */
object PPR {

  /** PPR scores ``(id, score)`` personalised to ``seeds``.
    *
    * @param alpha teleport probability (paper uses 0.1–0.25)
    * @param iters power iterations (each costs one join+aggregate job)
    */
  def scores(kg: KG, seeds: DataFrame, alpha: Double = 0.25, iters: Int = 8): DataFrame = {
    val adj = kg.undirected.cache()
    val deg = adj.groupBy(col("u")).agg(count(lit(1)) as "deg").cache()
    val nSeeds = math.max(1L, seeds.count())
    val teleport = seeds.select(col("id"), lit(1.0 / nSeeds) as "t").cache()
    teleport.count()

    // a fixed small iteration count keeps the lazy plan linear; the whole
    // chain evaluates in one job when the caller first acts on the result
    var pi = teleport.select(col("id"), col("t") as "score")
    var it = 0
    while (it < iters) {
      it += 1
      val spread = pi
        .join(deg, pi("id") === deg("u"))
        .select(col("u"), (col("score") / col("deg")) as "w")
      val pushed = adj
        .join(spread, "u")
        .groupBy(col("v"))
        .agg(sum(col("w")) as "inw")
        .select(col("v") as "id", (col("inw") * (1.0 - alpha)) as "walkMass")
      pi = pushed
        .join(teleport, Seq("id"), "full_outer")
        .select(
          col("id"),
          (coalesce(col("walkMass"), lit(0.0)) + lit(alpha) * coalesce(col("t"), lit(0.0))) as "score",
        )
      // lazy checkpoint per iteration: keeps every downstream analysis flat
      // without spending a Spark job until the final materialisation
      pi = pi.localCheckpoint(false)
    }
    val out = pi.localCheckpoint(true) // materialise + flatten for callers
    adj.unpersist(); deg.unpersist(); teleport.unpersist()
    out
  }
}
