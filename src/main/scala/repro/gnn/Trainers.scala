package repro.gnn

import breeze.linalg.{argmax, DenseMatrix, DenseVector}

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.kg.KG
import repro.sampling.{Induce, URW}
import repro.synth.{NCTask, Tasks}

/** Hyper-parameters shared by the trainer variants. */
final case class TrainParams(
    l: Int = 2,
    epochs: Int = 200,
    lr: Double = 0.5,
    batches: Int = 6,
    rootsPerBatch: Int = 150,
    walkLen: Int = 2,
    fanoutCap: Int = 12,
    seed: Int = 7,
)

/** Outcome of one training run (feeds Tables III and IV). */
final case class TrainResult(
    method: String,
    accuracy: Double,
    trainSeconds: Double,
    inferSeconds: Double,
    params: Long,
    memoryBytes: Long,
    trainExamples: Long,
    graphNodes: Long,
    graphEdges: Long,
    graphRels: Long,
)

/** HGNN trainer variants over a (sub)graph. All share the decoupled design
  * (Spark message passing → Breeze softmax head, DESIGN.md §5.5); they
  * differ in *what* gets aggregated, mirroring each method's sampling:
  *
  *  - ``RGCN``        — full-batch aggregation over the whole graph
  *  - ``SeHGNN``      — full aggregation precomputed once (its stated
  *                      optimisation), mini-batch head
  *  - ``GraphSAINT``  — URW-sampled subgraphs per batch, within-batch
  *                      aggregation (types ignored by the sampler)
  *  - ``ShaDowSAINT`` — bounded-fanout (ego-scope) aggregation
  */
object Trainers {

  val methods: Seq[String] = Seq("RGCN", "SeHGNN", "GraphSAINT", "ShaDowSAINT")

  private def timed[T](body: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r = body
    (r, (System.nanoTime() - t0) / 1e9)
  }

  /** Collect (features, labels) for rows of ``df`` whose fold matches. */
  private def collectXY(df: DataFrame, featCols: Seq[String], fold: Int): (DenseMatrix[Double], Array[Int]) = {
    val rows = df.filter(col("fold") === fold)
      .select((featCols.map(col) :+ col("label")): _*)
      .collect()
    val n = rows.length
    val d = featCols.size
    val x = DenseMatrix.zeros[Double](n, d + 1)
    val y = new Array[Int](n)
    var i = 0
    while (i < n) {
      var j = 0
      while (j < d) { x(i, j) = rows(i).getDouble(j); j += 1 }
      x(i, d) = 1.0 // bias
      y(i) = rows(i).getInt(d)
      i += 1
    }
    (x, y)
  }

  /** Softmax model: weights plus the train-set feature standardisation
    * (applied identically at inference; the bias column stays untouched).
    */
  private final case class Head(w: DenseMatrix[Double], mu: DenseVector[Double], sd: DenseVector[Double]) {
    /** Standardise a feature matrix in place (bias column excluded). */
    def standardise(x: DenseMatrix[Double]): DenseMatrix[Double] = {
      val out = x.copy
      var i = 0
      while (i < out.rows) {
        var j = 0
        while (j < out.cols - 1) { out(i, j) = (out(i, j) - mu(j)) / sd(j); j += 1 }
        i += 1
      }
      out
    }
  }

  /** Column means/stds over all training batches (bias column excluded). */
  private def fitStandardiser(batches: Seq[(DenseMatrix[Double], Array[Int])], d: Int): (DenseVector[Double], DenseVector[Double]) = {
    val mu = DenseVector.zeros[Double](d - 1)
    val sq = DenseVector.zeros[Double](d - 1)
    var n = 0L
    for ((x, _) <- batches; i <- 0 until x.rows) {
      var j = 0
      while (j < d - 1) { mu(j) += x(i, j); sq(j) += x(i, j) * x(i, j); j += 1 }
      n += 1
    }
    if (n == 0) return (mu, DenseVector.fill(d - 1)(1.0))
    mu :/= n.toDouble
    val sd = DenseVector.tabulate(d - 1) { j =>
      val v = sq(j) / n - mu(j) * mu(j)
      if (v > 1e-12) math.sqrt(v) else 1.0
    }
    (mu, sd)
  }

  /** Multinomial softmax head trained with full-batch gradient steps over
    * the provided example batches (one pass per epoch), on standardised
    * features so the step size is scale-free.
    */
  private def sgdSoftmax(batches: Seq[(DenseMatrix[Double], Array[Int])],
                         k: Int, epochs: Int, lr: Double): Head = {
    val nonEmpty = batches.filter(_._2.nonEmpty)
    if (nonEmpty.isEmpty) {
      // a sampler can produce batches with no labeled targets (exactly the
      // data-insufficiency failure mode of URW): train nothing, predict the
      // first class — accuracy degrades instead of the run aborting
      val d0 = batches.headOption.map(_._1.cols).getOrElse(1)
      return Head(DenseMatrix.zeros[Double](d0, k),
        DenseVector.zeros[Double](math.max(0, d0 - 1)),
        DenseVector.fill(math.max(0, d0 - 1))(1.0))
    }
    val d = nonEmpty.head._1.cols
    val (mu, sd) = fitStandardiser(nonEmpty, d)
    val pre = Head(null, mu, sd)
    val live = nonEmpty.map { case (x, y) => (pre.standardise(x), y) }
    val w = DenseMatrix.zeros[Double](d, k)
    for (e <- 0 until epochs; (x, y) <- live) {
      val n = x.rows
      val logits = x * w // n × k
      // row-wise softmax
      val p = DenseMatrix.zeros[Double](n, k)
      var i = 0
      while (i < n) {
        var mx = Double.MinValue
        var j = 0
        while (j < k) { if (logits(i, j) > mx) mx = logits(i, j); j += 1 }
        var sum = 0.0
        j = 0
        while (j < k) { val v = math.exp(logits(i, j) - mx); p(i, j) = v; sum += v; j += 1 }
        j = 0
        while (j < k) { p(i, j) /= sum; j += 1 }
        p(i, y(i)) -= 1.0
        i += 1
      }
      val grad = (x.t * p) /:/ n.toDouble
      val step = lr / math.sqrt(1.0 + e)
      w :-= grad * step
    }
    Head(w, mu, sd)
  }

  private def accuracyOf(head: Head, xRaw: DenseMatrix[Double], y: Array[Int]): Double = {
    if (y.isEmpty) return 0.0
    val x = head.standardise(xRaw)
    val logits = x * head.w
    var hit = 0
    var i = 0
    while (i < y.length) {
      val row: DenseVector[Double] = logits(i, ::).t
      if (argmax(row) == y(i)) hit += 1
      i += 1
    }
    hit.toDouble / y.length
  }

  /** Train ``method`` for ``task`` on graph ``g`` (FG or a KG').
    *
    * @param evalGraph if set, inference runs over this graph's aggregation
    *                  and test fold instead of ``g``'s — Table III's
    *                  protocol, where models trained on sampled subgraphs
    *                  are scored on the full task test set
    */
  def train(method: String, g: KG, task: NCTask, p: TrainParams = TrainParams(),
            evalGraph: Option[KG] = None): TrainResult = {
    require(methods.contains(method), s"unknown method $method")
    val feats = Features.nodeFeatures(g).cache()
    val labeled = Tasks.labeledSplit(g, task).cache()
    val f = Features.dim(g)
    val featCols = (feats.columns.filter(_ != "id") ++
      (1 to p.l).flatMap(hp => (0 until f).map(j => s"h${hp}_f$j"))).toSeq

    // --- gather training batches (Spark message passing) -------------------
    val (trainBatches, prepSecs) = timed {
      method match {
        case "GraphSAINT" =>
          (0 until p.batches).map { b =>
            val vs = URW.visitedSet(g, p.rootsPerBatch, p.walkLen, p.seed * 100 + b)
            val sub = Induce.extractSubgraph(g, vs)
            val subFeats = feats.join(sub.nodeTypes.select("id"), "id")
            val agg = Aggregation.aggregate(sub, subFeats, p.l, seed = p.seed)
            collectXY(agg.join(labeled, "id"), featCols, fold = 0)
          }
        case "ShaDowSAINT" =>
          val agg = Aggregation.aggregate(g, feats, p.l, fanoutCap = Some(p.fanoutCap), seed = p.seed)
          Seq(collectXY(agg.join(labeled, "id"), featCols, fold = 0))
        case _ => // RGCN, SeHGNN: full aggregation
          val agg = Aggregation.aggregate(g, feats, p.l, seed = p.seed)
          Seq(collectXY(agg.join(labeled, "id"), featCols, fold = 0))
      }
    }

    val (head, sgdSecs) = timed(sgdSoftmax(trainBatches, task.numLabels, p.epochs, p.lr))

    // --- inference: full-graph aggregation + test prediction ---------------
    val ((testX, testY), inferSecs) = timed {
      val cap = if (method == "ShaDowSAINT") Some(p.fanoutCap) else None
      val (eg, egFeats, egLabeled) = evalGraph match {
        case Some(e) => (e, Features.nodeFeatures(e), Tasks.labeledSplit(e, task))
        case None    => (g, feats, labeled)
      }
      val agg = Aggregation.aggregate(eg, egFeats, p.l, fanoutCap = cap, seed = p.seed)
      collectXY(agg.join(egLabeled, "id"), featCols, fold = 2)
    }
    val acc = accuracyOf(head, testX, testY)

    val n = g.nodeTypes.count()
    val m = g.triples.count()
    val r = g.triples.select(col("p")).distinct().count()
    val batchNodes = (p.rootsPerBatch.toLong * (p.walkLen + 1)).min(n)
    feats.unpersist(); labeled.unpersist()

    TrainResult(
      method = method,
      accuracy = acc,
      trainSeconds = prepSecs + sgdSecs,
      inferSeconds = inferSecs,
      params = MemoryModel.params(n, r, task.numLabels.toLong, p.l),
      memoryBytes = MemoryModel.trainingBytes(method, n, m, r, task.numLabels.toLong, p.l, batchNodes),
      trainExamples = trainBatches.map(_._2.length.toLong).sum,
      graphNodes = n,
      graphEdges = m,
      graphRels = r,
    )
  }
}
