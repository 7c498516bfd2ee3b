package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.kg.KG
import repro.rdf.Endpoint
import repro.sampling.{BRW, IBS, URW}
import repro.synth.{LPTask, NCTask, Tasks}

/** One TOSG extraction: the subgraph, its wall-clock extraction cost, and
  * bookkeeping for the benches.
  */
final case class Extraction(
    subgraph: KG,
    extractSeconds: Double,
    method: String,
    batches: Int = 0,
    sparqlQueries: Seq[String] = Nil,
)

/** KG-TOSA: task-oriented subgraph extraction (Section IV). The default
  * method is SPARQL-based (Algorithm 3); BRW and IBS are the developed
  * sampling baselines; URW is GraphSAINT's type-blind baseline sampler.
  */
object KGTOSA {

  private def timed[T](body: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r = body
    (r, (System.nanoTime() - t0) / 1e9)
  }

  /** Materialise a subgraph so the measured extraction time includes doing
    * the work, then return it with flat lineage (eager local checkpoint) so
    * downstream training/metrics plans stay small.
    */
  private def force(sub: KG): KG =
    KG(sub.schema, sub.triples.localCheckpoint(true), sub.nodeTypes.localCheckpoint(true))

  /** Assemble a KG' from extracted triples: node set = endpoints of the
    * triples plus all targets (targets with no matched edge must stay —
    * they carry labels), types joined back from the full KG.
    */
  private def fromTriples(kg: KG, triples: DataFrame, targets: DataFrame): KG = {
    val nodes = triples.select(col("s") as "id")
      .union(triples.select(col("o") as "id"))
      .union(targets.select(col("id")))
      .distinct()
    KG(kg.schema, triples, kg.nodeTypes.join(nodes, "id"))
  }

  /** SPARQL-based TOSG extraction (Algorithm 3) for an NC task: one
    * paginated subquery per pattern layer, merged, deduplicated.
    *
    * @param targetSample if set (h = 1 only), restrict the TOSG to this
    *                     subset of targets — Table III's protocol, where all
    *                     methods extract around the same number of roots
    */
  def sparqlExtract(endpoint: Endpoint, task: NCTask, pattern: GraphPattern, bs: Long,
                    targetSample: Option[DataFrame] = None): Extraction = {
    val kg = endpoint.store.kg
    require(targetSample.isEmpty || pattern.h == 1, "target sampling only supported for h = 1 patterns")
    val queries = pattern.queries(task.targetType)
    val targets = targetSample.getOrElse(Tasks.targets(kg, task))
    val ((sub, nBatches), secs) = timed {
      val results = queries.map(q => endpoint.paginated(q, bs))
      var triples = results.map(_._1).reduce(_ union _)
        .dropDuplicates()
        .select(col("s"), col("p").cast("int") as "p", col("o"))
      targetSample.foreach { ts =>
        // h = 1: every extracted triple touches a target at s (d ≥ 1) or o (d = 2)
        val t = ts.select(col("id")).distinct()
        val onS = triples.join(t.withColumnRenamed("id", "s"), "s").select("s", "p", "o")
        triples =
          if (pattern.d == 2)
            onS.union(triples.join(t.withColumnRenamed("id", "o"), "o").select("s", "p", "o")).dropDuplicates()
          else onS
      }
      (force(fromTriples(kg, triples, targets)), results.map(_._2).sum)
    }
    Extraction(sub, secs, s"KG-TOSA_d${pattern.d}h${pattern.h}", nBatches,
      queries.map(repro.rdf.Sparql.render))
  }

  /** SPARQL-based TOSG extraction for an LP task (d2h1 default): per-type
    * subgraphs of the predicate's subject and object types plus the bridge
    * pattern.
    */
  def sparqlExtractLP(endpoint: Endpoint, task: LPTask, pattern: GraphPattern, bs: Long): Extraction = {
    val kg = endpoint.store.kg
    val et = kg.schema.edgeType(task.predicate)
    val ti = kg.schema.nodeTypes(et.srcType).name
    val tj = kg.schema.nodeTypes(et.dstType).name
    val queries = pattern.lpQueries(ti, tj, task.predicate)
    val targets = kg.nodesOfType(ti).union(kg.nodesOfType(tj)).distinct()
    val ((sub, nBatches), secs) = timed {
      val results = queries.map(q => endpoint.paginated(q, bs))
      val triples = results.map(_._1).reduce(_ union _)
        .dropDuplicates()
        .select(col("s"), col("p").cast("int") as "p", col("o"))
      (force(fromTriples(kg, triples, targets)), results.map(_._2).sum)
    }
    Extraction(sub, secs, s"KG-TOSA_d${pattern.d}h${pattern.h}", nBatches,
      queries.map(repro.rdf.Sparql.render))
  }

  /** BRW baseline extraction (Algorithm 1). */
  def brwExtract(kg: KG, task: NCTask, bs: Int, h: Int, seed: Int): Extraction = {
    val (sub, secs) = timed(force(BRW.sample(kg, Tasks.targets(kg, task), bs, h, seed)))
    Extraction(sub, secs, "BRW")
  }

  /** IBS baseline extraction (Algorithm 2). */
  def ibsExtract(kg: KG, task: NCTask, bs: Int, k: Int, alpha: Double, seed: Int): Extraction = {
    val (sub, secs) = timed(force(IBS.sample(kg, Tasks.targets(kg, task), bs, k, alpha, seed)))
    Extraction(sub, secs, "IBS")
  }

  /** URW baseline (GraphSAINT's type-blind sampler) — the paper's Table III
    * "RW" column.
    */
  def urwExtract(kg: KG, bs: Int, h: Int, seed: Int): Extraction = {
    val (sub, secs) = timed(force(URW.sample(kg, bs, h, seed)))
    Extraction(sub, secs, "URW")
  }
}
