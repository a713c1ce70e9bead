package repro.bench

import repro.SparkSpec
import repro.core.Queries

/** Table 3 — batch-size sweep: IVM wins at small deltas; as the batch
  * approaches the graph size, recomputation catches up (the classic IVM
  * crossover).
  */
class Table3BatchSizeBench extends SparkSpec {

  test("Table 3: Q1 batch-size sweep at SF=0.05") {
    println(Harness.header("Table 3: Q1 batch-size sweep (SF=0.05, 3 batches each)", Harness.runCols))
    val results = Seq(1, 10, 100, 1000).map { bs =>
      val r = Harness.ivmVsBatch(spark, f"Q1 batch=$bs%-4d", Queries.q1Cypher,
        sf = 0.05, batches = 3, batchSize = bs)
      println(Harness.fmtRun(r))
      (bs, r)
    }
    println("paper: no published numbers (claim: per-op maintenance cost amortises; crossover at large Δ)")
    results.foreach { case (bs, r) => assert(r.consistent, s"batch=$bs diverged") }
    // speedup must decay as batches grow (monotone trend between extremes)
    assert(results.head._2.speedup > results.last._2.speedup,
      "speedup should shrink as the batch size approaches the graph size")
  }
}
