package repro.bench

import repro.SparkSpec
import repro.core.Queries

/** Table 4 — FGN: the same logical property flips, expressed fine-grained
  * (single property-bag cells) vs coarse-grained (vertex delete +
  * re-insert, as an engine without FGN must). Fine-grained updates take the
  * closure fast path and touch only σ/◯ rows; coarse-grained ones force
  * path-state churn.
  */
class Table4FgnBench extends SparkSpec {

  test("Table 4: fine-grained vs coarse-grained property updates on Q1") {
    println(Harness.header("Table 4: FGN on Q1 (SF=0.05, 4 batches x 20 lang flips)", Harness.runCols))
    val r = Harness.fgn(spark, Queries.q1Cypher, sf = 0.05, batches = 4, flipsPerBatch = 20)
    println(Harness.fmtRun(r.fine))
    println(Harness.fmtRun(r.coarse))
    val ratio = r.coarse.meanIvm / r.fine.meanIvm
    println(f"fine-grained advantage: $ratio%.2fx")
    println("paper: no published numbers (claim: FGN updates on nested property bags are cheap)")
    assert(r.fine.consistent && r.coarse.consistent)
    assert(ratio > 1.0, f"coarse ($ratio%.2fx) should be slower than fine-grained")
  }
}
