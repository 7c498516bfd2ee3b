package repro.metrics

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.kg.KG

/** The Table III quality indicators of an extracted subgraph. */
final case class Quality(
    nodes: Long,            // |KG'| node count
    targetPct: Double,      // data sufficiency: % of nodes that are targets
    cPrime: Long,           // |C'| node types present
    rPrime: Long,           // |R'| edge types present
    targetDisconPct: Double,// % of non-target nodes unreachable from V_T
    avgDistToTarget: Double,// mean BFS distance of reachable non-targets
    avgEntropy: Double,     // Shannon entropy of neighbour-type-count dist (Eq. 2)
)

/** Computes the paper's data-sufficiency and graph-topology indicators
  * (Section III-A / Table III) for a subgraph.
  */
object SubgraphQuality {

  /** BFS levels from ``sources`` over undirected edges of ``g``; returns
    * ``(id, dist)`` for every reached node, capped at ``maxHops``.
    */
  def bfsDistances(g: KG, sources: DataFrame, maxHops: Int = 10): DataFrame = {
    val adj = g.undirected.cache()
    var dist = sources.select(col("id"), lit(0) as "dist").cache()
    var frontier = dist
    var hop = 0
    var frontierSize = frontier.count() // also materialises the cache
    while (hop < maxHops && frontierSize > 0) {
      hop += 1
      // lazy localCheckpoint flattens the logical plan immediately (cache()
      // would not — analysis of dist ∪ next would grow exponentially with
      // depth) and the count() below materialises it
      val next = frontier
        .join(adj, frontier("id") === adj("u"))
        .select(col("v") as "id")
        .distinct()
        .join(dist.select(col("id") as "seen"), col("id") === col("seen"), "left_anti")
        .select(col("id"), lit(hop) as "dist")
        .localCheckpoint(false)
      frontierSize = next.count()
      dist = dist.union(next)
      frontier = next
    }
    adj.unpersist()
    dist
  }

  /** Shannon entropy (Eq. 2) of the distribution of per-node neighbour-type
    * counts: higher = more diverse neighbourhood structure.
    */
  def neighbourTypeEntropy(g: KG): Double = {
    val typed = g.undirected
      .join(g.nodeTypes.select(col("id") as "v", col("ntype")), Seq("v"))
    val perNode = typed.groupBy(col("u")).agg(countDistinct(col("ntype")) as "cnt")
    val hist = perNode.groupBy(col("cnt")).agg(count(lit(1)).cast("double") as "freq")
    val rows = hist.collect()
    val total = rows.map(_.getDouble(1)).sum
    if (total == 0) 0.0
    else rows.map { r =>
      val p = r.getDouble(1) / total
      -p * math.log(p) / math.log(2.0)
    }.sum
  }

  /** All Table III indicators for subgraph ``g`` w.r.t. target set
    * ``targets`` (ids from the full KG; intersected with ``g``'s nodes).
    */
  def measure(g: KG, targets: DataFrame, maxHops: Int = 10): Quality = {
    val nodes = g.nodeTypes.cache()
    val nNodes = nodes.count()
    val targetsIn = nodes.select(col("id")).join(targets.select(col("id")), "id").cache()
    val nTargets = targetsIn.count()
    val nNonTargets = nNodes - nTargets

    val cPrime = nodes.select(col("ntype")).distinct().count()
    val rPrime = g.triples.select(col("p")).distinct().count()

    val dist = bfsDistances(g, targetsIn, maxHops)
      .join(targets.select(col("id") as "tid"), col("id") === col("tid"), "left_anti")
      .cache()
    val reached = dist.count()
    val avgDist = if (reached == 0) 0.0 else dist.agg(avg(col("dist"))).head().getDouble(0)
    val disconPct =
      if (nNonTargets == 0) 0.0
      else 100.0 * (nNonTargets - reached).toDouble / nNonTargets

    val entropy = neighbourTypeEntropy(g)
    dist.unpersist(); targetsIn.unpersist()

    Quality(
      nodes = nNodes,
      targetPct = if (nNodes == 0) 0.0 else 100.0 * nTargets.toDouble / nNodes,
      cPrime = cPrime,
      rPrime = rPrime,
      targetDisconPct = disconPct,
      avgDistToTarget = avgDist,
      avgEntropy = entropy,
    )
  }
}
