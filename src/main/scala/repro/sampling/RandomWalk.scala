package repro.sampling

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.kg.KG

/** DataFrame random-walk engine shared by the URW baseline and BRW.
  *
  * Each root spawns one walker; every step each live walker moves to one
  * uniformly-chosen neighbour on the undirected view (GraphSAINT's walk
  * semantics). All randomness is hash-based, so a walk is a pure function
  * of (graph, roots, h, seed).
  */
object RandomWalk {

  /** Deterministically sample ``n`` rows from a single-column ``id`` DF by
    * hash order (stands in for uniform-without-replacement sampling).
    */
  def sampleIds(ids: DataFrame, n: Int, seed: Int): DataFrame =
    ids.orderBy(KG.hashRand(seed, col("id")), col("id")).limit(n)

  /** Nodes visited by walkers rooted at ``roots`` performing ``h`` uniform
    * steps over undirected adjacency ``adj`` (columns ``u``, ``v``).
    * Returns a distinct single-column ``id`` DF including the roots.
    */
  def visited(adj: DataFrame, roots: DataFrame, h: Int, seed: Int): DataFrame = {
    var frontier = roots.select(col("id") as "walker", col("id") as "cur")
    var acc = roots.select(col("id"))
    var step = 0
    while (step < h) {
      step += 1
      val cand = frontier
        .join(adj, frontier("cur") === adj("u"))
        .select(col("walker"), col("v"),
                KG.hashRand(seed * 1000 + step, col("walker"), col("v")) as "r")
      // one uniform neighbour per walker: lexicographic min over (r, v)
      val next = cand
        .groupBy(col("walker"))
        .agg(min(struct(col("r"), col("v"))) as "m")
        .select(col("walker"), col("m.v") as "cur")
        // lazy checkpoint: flattens the plan (each step references the
        // previous twice — via the union and the next join — so an
        // uncheckpointed chain analyses in exponential time) while deferring
        // materialisation to the caller's first action
        .localCheckpoint(false)
      acc = acc.union(next.select(col("cur") as "id"))
      frontier = next
    }
    acc.distinct()
  }
}
