package repro.bench

import repro.SparkSpec
import repro.core.Queries

/** Table 1 — IVM vs full recomputation across the four benchmark queries
  * (EXPERIMENTS.md Table 1). SocialGraph SF=0.08, batches of 10 mixed ops.
  *
  * Expected shape (paper): maintenance beats re-evaluation. On a scan-based
  * substrate without indexes (Spark), the advantage concentrates on views
  * whose re-evaluation is iterative — the `REPLY*` closures Q1/Q4, exactly
  * the feature the paper motivates — while single-scan flat joins (Q2/Q3)
  * are recompute-cheap at this scale; see EXPERIMENTS.md for the discussion
  * and Table 3 for the crossover.
  */
class Table1IvmVsBatchBench extends SparkSpec {

  test("Table 1: IVM vs recomputation, 4 queries, SF=0.08") {
    println(Harness.header("Table 1: IVM vs full recomputation (SF=0.08, 5 batches x 10 ops)", Harness.runCols))
    val results = Queries.all.map { case (name, cypher, _) =>
      val r = Harness.ivmVsBatch(spark, name, cypher, sf = 0.08, batches = 5, batchSize = 10)
      println(Harness.fmtRun(r))
      r
    }
    println("paper: no published numbers (qualitative claim: maintenance beats re-evaluation;")
    println("       the advantage concentrates on transitive views — the paper's motivating case)")
    results.foreach(r => assert(r.consistent, s"${r.label}: view diverged from recomputation"))
    // closure-heavy views (the paper's motivating fragment) must win
    val Seq(q1, _, _, q4) = results
    assert(q1.speedup > 1.0, s"Q1 speedup ${q1.speedup}")
    assert(q4.speedup > 1.0, s"Q4 speedup ${q4.speedup}")
  }
}
