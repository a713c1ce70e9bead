package repro.bench

import repro.SparkSpec

/** Table 5 — ORD: maintenance of a path-returning view under REPLY churn.
  * Paths are atomic: edge churn deletes/creates whole thread rows, and the
  * maintained path view still beats re-enumeration of all threads.
  */
class Table5PathBench extends SparkSpec {

  private val pathQuery = "MATCH t = (p:Post)<-[:REPLY*]-(c:Comm) RETURN p, t"

  test("Table 5: atomic path maintenance under reply churn") {
    println(Harness.header("Table 5: path view under churn (SF=0.05, 5 batches x 10 churn ops)", Harness.runCols))
    val r = Harness.ivmVsBatch(spark, "Q-path reply churn", pathQuery,
      sf = 0.05, batches = 5, batchSize = 10,
      opsFactory = Some(s => s.replyChurnBatch(10)))
    println(Harness.fmtRun(r))
    println("paper: no published numbers (claim: atomic paths are insert/delete-maintainable)")
    assert(r.consistent, "path view diverged from recomputation")
    assert(r.speedup > 1.0, f"path maintenance speedup ${r.speedup}%.2f")
    // every batch must actually have touched paths (churn hits threads)
    assert(r.points.forall(_.deltaRows > 0), "churn batches should touch the path view")
  }
}
