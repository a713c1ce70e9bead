package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core.QueryPipeline
import repro.eval.BatchEvaluator
import repro.fra.NraToFra
import repro.graph._
import repro.ivm.{IncrementalEngine, Rel}

/** Benchmark machinery for the constructed evaluation tables (DESIGN.md §3).
  *
  * All latencies are wall-clock and include forcing the result (a `count()`
  * on the view delta for IVM, a `count()` on the recomputed result for the
  * baseline). The update itself (GraphStore delta building + snapshot apply)
  * is shared infrastructure and reported separately.
  */
object Harness {

  def timeMs[T](f: => T): (T, Double) = {
    val t0 = System.nanoTime()
    val r = f
    (r, (System.nanoTime() - t0) / 1e6)
  }

  /** Drop every checkpointed RDD left over from previous configurations —
    * dead engines' states otherwise linger in executor storage and skew
    * later measurements.
    */
  def clearCaches(spark: SparkSession): Unit = {
    spark.catalog.clearCache()
    spark.sparkContext.getPersistentRDDs.values.foreach(_.unpersist(blocking = false))
    System.gc()
  }

  final case class BatchPoint(applyMs: Double, ivmMs: Double, recomputeMs: Double,
      deltaRows: Long, viewRows: Long)

  final case class RunResult(label: String, initMs: Double, initRows: Long,
      points: Seq[BatchPoint], consistent: Boolean) {
    def meanIvm: Double = mean(points.map(_.ivmMs))
    def meanRec: Double = mean(points.map(_.recomputeMs))
    def speedup: Double = meanRec / meanIvm
  }

  def mean(xs: Seq[Double]): Double = if (xs.isEmpty) 0 else xs.sum / xs.size

  /** Maintain `cypher` over a SocialGraph(sf) under `batches` update batches
    * of `batchSize` mixed ops each, measuring IVM vs full recomputation per
    * batch. `warmup` unmeasured batches run first (JIT/code-gen noise).
    */
  def ivmVsBatch(spark: SparkSession, label: String, cypher: String, sf: Double,
      batches: Int, batchSize: Int, seed: Long = 7, warmup: Int = 1,
      opsFactory: Option[UpdateStream => Seq[UpdateOp]] = None,
      verifyEvery: Boolean = false): RunResult = {
    clearCaches(spark)
    val store = new GraphStore(spark, SocialGraph.generate(spark, sf))
    val stream = new UpdateStream(sf, seed)
    val flat = QueryPipeline.compile(cypher)
    val (engine, initMs) = timeMs(IncrementalEngine(flat, store.current))
    val initRows = Rel.normalize(engine.view).count()

    def ops(): Seq[UpdateOp] =
      opsFactory.map(_(stream)).getOrElse(stream.nextBatch(batchSize))

    (1 to warmup).foreach { _ =>
      val before = store.current
      val delta = store.applyOps(ops())
      engine.applyDelta(delta, store.current).count()
      BatchEvaluator.eval(flat, store.current).count()
      val _ = before
    }

    var consistent = true
    val points = (1 to batches).map { _ =>
      val batch = ops()
      val (delta, applyMs) = timeMs(store.applyOps(batch))
      val (deltaRows, ivmMs) = timeMs(engine.applyDelta(delta, store.current).count())
      val (viewRows, recomputeMs) = timeMs(BatchEvaluator.eval(flat, store.current).count())
      if (verifyEvery)
        consistent &&= Rel.sameBag(Rel.normalize(engine.view), BatchEvaluator.eval(flat, store.current))
      BatchPoint(applyMs, ivmMs, recomputeMs, deltaRows, viewRows)
    }
    // always verify at the end: a fast benchmark of a wrong answer is useless
    consistent &&= Rel.sameBag(Rel.normalize(engine.view), BatchEvaluator.eval(flat, store.current))
    RunResult(label, initMs, initRows, points, consistent)
  }

  /** Table 4: the same logical property flips expressed fine-grained
    * (SetVertexProp) vs coarse-grained (vertex delete + full re-insert).
    */
  final case class FgnResult(fine: RunResult, coarse: RunResult)

  def fgn(spark: SparkSession, cypher: String, sf: Double, batches: Int,
      flipsPerBatch: Int, seed: Long = 7): FgnResult = {
    val flat = QueryPipeline.compile(cypher)

    def run(label: String, coarse: Boolean): RunResult = {
      clearCaches(spark)
      val store = new GraphStore(spark, SocialGraph.generate(spark, sf))
      val stream = new UpdateStream(sf, seed)
      val (engine, initMs) = timeMs(IncrementalEngine(flat, store.current))
      val initRows = Rel.normalize(engine.view).count()
      val points = (1 to batches).map { _ =>
        val flips = stream.langFlipBatch(flipsPerBatch)
        val ops: Seq[UpdateOp] =
          if (!coarse) flips
          else flips.flatMap { f =>
            val props = store.vertexProps(f.id) + (f.key -> f.value)
            val vLabel = store.vertexLabel(f.id).getOrElse("Comm")
            val edges = store.incidentEdges(f.id)
            Seq(RemoveVertex(f.id), AddVertex(f.id, vLabel, props)) ++
              edges.map { case (id, s, t, ty, ps) => AddEdge(id, s, t, ty, ps) }
          }
        val (delta, applyMs) = timeMs(store.applyOps(ops))
        val (deltaRows, ivmMs) = timeMs(engine.applyDelta(delta, store.current).count())
        BatchPoint(applyMs, ivmMs, 0, deltaRows, 0)
      }
      val consistent = Rel.sameBag(Rel.normalize(engine.view), BatchEvaluator.eval(flat, store.current))
      RunResult(label, initMs, initRows, points, consistent)
    }

    FgnResult(run("fine-grained", coarse = false), run("coarse-grained", coarse = true))
  }

  /** Table 6: operator-state footprint, inferred minimal schema vs naive
    * all-properties leaves.
    */
  final case class SchemaPoint(query: String, mode: String, initMs: Double,
      stateRows: Long, stateCells: Long)

  def schemaFootprint(spark: SparkSession, queries: Seq[(String, String)], sf: Double): Seq[SchemaPoint] = {
    clearCaches(spark)
    val g = SocialGraph.generate(spark, sf).checkpointed()
    queries.flatMap { case (name, cypher) =>
      Seq(NraToFra.Inferred -> "inferred", NraToFra.AllProperties -> "all-props").map {
        case (mode, modeName) =>
          val flat = QueryPipeline.compile(cypher, mode)
          val (engine, initMs) = timeMs(IncrementalEngine(flat, g))
          SchemaPoint(name, modeName, initMs, engine.stateRows, engine.stateCells)
      }
    }
  }

  // ---- table formatting --------------------------------------------------

  def header(title: String, cols: String): String =
    s"\n== $title ==\n$cols"

  def fmtRun(r: RunResult, extra: String = ""): String = {
    f"${r.label}%-34s ${r.initMs}%9.0f ${r.initRows}%9d ${mean(r.points.map(_.applyMs))}%9.0f " +
      f"${r.meanIvm}%9.0f ${r.meanRec}%9.0f ${r.speedup}%8.2fx " +
      f"${mean(r.points.map(_.deltaRows.toDouble))}%8.1f ${if (r.consistent) "OK" else "MISMATCH"}%s$extra"
  }

  val runCols: String =
    f"${"config"}%-34s ${"init ms"}%9s ${"view rows"}%9s ${"apply ms"}%9s " +
      f"${"ivm ms"}%9s ${"rec ms"}%9s ${"speedup"}%9s ${"Δ rows"}%8s check"
}
