package repro.bench

import org.apache.spark.scheduler.{SparkListener, SparkListenerJobStart}
import repro.SparkSpec
import repro.core.{Queries, QueryPipeline}
import repro.eval.BatchEvaluator
import repro.graph.{GraphStore, SocialGraph, UpdateStream}
import repro.ivm.IncrementalEngine

/** Diagnostic (not a table): counts Spark jobs and wall time per
  * maintenance batch to attribute the IVM latency floor. Kept in the bench
  * project so it never runs in `sbt test`; prints are informational.
  */
class ProfileScratchSpec extends SparkSpec {

  private final class JobCounter extends SparkListener {
    @volatile var jobs = 0
    override def onJobStart(j: SparkListenerJobStart): Unit = jobs += 1
  }

  test("profile: Q1 maintenance job counts at SF=0.08") {
    Harness.clearCaches(spark)
    val store = new GraphStore(spark, SocialGraph.generate(spark, 0.08))
    val stream = new UpdateStream(0.08)
    val flat = QueryPipeline.compile(Queries.q1Cypher)
    val engine = IncrementalEngine(flat, store.current)
    val counter = new JobCounter
    spark.sparkContext.addSparkListener(counter)
    println(f"${"batch"}%-6s ${"applyJobs"}%9s ${"applyMs"}%8s ${"ivmJobs"}%8s ${"ivmMs"}%7s ${"recJobs"}%8s ${"recMs"}%7s")
    (1 to 6).foreach { i =>
      val ops = stream.nextBatch(10)
      val j0 = counter.jobs
      val (delta, applyMs) = Harness.timeMs(store.applyOps(ops))
      val j1 = counter.jobs
      val (_, ivmMs) = Harness.timeMs(engine.applyDelta(delta, store.current).count())
      val j2 = counter.jobs
      val (_, recMs) = Harness.timeMs(BatchEvaluator.eval(flat, store.current).count())
      val j3 = counter.jobs
      println(f"$i%-6d ${j1 - j0}%9d $applyMs%8.0f ${j2 - j1}%8d $ivmMs%7.0f ${j3 - j2}%8d $recMs%7.0f")
    }
    spark.sparkContext.removeSparkListener(counter)
  }
}
