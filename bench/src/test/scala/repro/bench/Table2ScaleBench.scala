package repro.bench

import repro.SparkSpec
import repro.core.Queries

/** Table 2 — scalability in graph size: the IVM advantage must grow with
  * |G|/|Δ| (fixed batch size, growing graph).
  */
class Table2ScaleBench extends SparkSpec {

  test("Table 2: Q1 across scale factors, fixed batch size") {
    println(Harness.header("Table 2: Q1 scalability (4 batches x 10 ops)", Harness.runCols))
    val results = Seq(0.01, 0.03, 0.1).map { sf =>
      val r = Harness.ivmVsBatch(spark, f"Q1 @ SF=$sf%.2f", Queries.q1Cypher,
        sf = sf, batches = 4, batchSize = 10)
      println(Harness.fmtRun(r))
      (sf, r)
    }
    println("paper: no published numbers (claim: incremental latency ~ |Δ|, recompute ~ |G|)")
    results.foreach { case (sf, r) => assert(r.consistent, s"SF=$sf diverged") }
    // recompute cost must grow with SF markedly faster than IVM cost
    val smallest = results.head._2
    val largest = results.last._2
    val recGrowth = largest.meanRec / smallest.meanRec
    val ivmGrowth = largest.meanIvm / smallest.meanIvm
    assert(recGrowth > ivmGrowth,
      f"recompute growth $recGrowth%.2f should exceed ivm growth $ivmGrowth%.2f")
  }
}
