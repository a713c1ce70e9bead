package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.eval.BatchEvaluator
import repro.fra._
import repro.graph._
import repro.ivm.{IncrementalEngine, Rel}

/** End-to-end pipeline checks on the synthetic social graph, plus the
  * paper's three desiderata (IVM, FGN, ORD) asserted at the engine level.
  */
class PipelineSpec extends SparkSpec {

  private lazy val social = SocialGraph.generate(spark, sf = 0.001).checkpointed()

  test("all four benchmark queries compile to FRA") {
    for ((name, cypher, _) <- Queries.all) {
      val f = QueryPipeline.compile(cypher)
      assert(f.op.isInstanceOf[FProjection], s"$name should end in a projection")
    }
  }

  test("benchmark queries: incremental == batch on the social graph under a mixed stream") {
    val stream = new UpdateStream(0.001)
    val batches = (1 to 3).map(_ => stream.nextBatch(4))
    for ((name, cypher, _) <- Queries.all) {
      val store = new GraphStore(spark, social)
      val flat = QueryPipeline.compile(cypher)
      val engine = IncrementalEngine(flat, store.current)
      // replay the same batches from a fresh stream state per query
      batches.foreach { b =>
        engine.applyOps(store, b)
        TestGraphs.assertCountedEqualsPlain(engine.view, BatchEvaluator.eval(flat, store.current))
      }
    }
  }

  test("IVM+FGN: a fine-grained property write produces a delta proportional to its support") {
    val store = new GraphStore(spark, social)
    val engine = QueryPipeline.incremental(Queries.q3Cypher, store.current)
    // flip one person's country: only that person's KNOWS rows may move
    val pid = SocialGraph.PersonBase + 1
    val before = store.current
    val delta = store.applyOps(Seq(SetVertexProp(pid, "country", "ZZ")))
    val d = engine.applyDelta(delta, store.current)
    val touched = d.count()
    val total = Rel.normalize(engine.view).count()
    assert(touched <= 64, s"fine-grained update touched $touched view rows")
    assert(total > 0)
  }

  test("FGN: coarse-grained re-insertion of the same logical change yields the same view") {
    val storeA = new GraphStore(spark, social)
    val storeB = new GraphStore(spark, social)
    val engineA = QueryPipeline.incremental(Queries.q3Cypher, storeA.current)
    val engineB = QueryPipeline.incremental(Queries.q3Cypher, storeB.current)
    val pid = SocialGraph.PersonBase + 2
    // fine-grained on A
    engineA.applyDelta(storeA.applyOps(Seq(SetVertexProp(pid, "country", "ZZ"))), storeA.current)
    // coarse-grained on B: delete the vertex and re-insert with the new bag + edges
    val props = storeB.vertexProps(pid) + ("country" -> "ZZ")
    val edges = storeB.incidentEdges(pid)
    val coarse = Seq(RemoveVertex(pid), AddVertex(pid, "Person", props)) ++
      edges.map { case (id, s, t, ty, ps) => AddEdge(id, s, t, ty, ps) }
    engineB.applyDelta(storeB.applyOps(coarse), storeB.current)
    repro.ivm.IvmTestKit.assertSameCounted(engineA.view, engineB.view)
  }

  test("ORD: paths are atomic — breaking an edge deletes whole threads from the view") {
    val store = new GraphStore(spark, TestGraphs.example(spark))
    val engine = QueryPipeline.incremental(
      "MATCH t = (p:Post)<-[:REPLY*]-(c:Comm) RETURN p, t", store.current)
    assert(Rel.normalize(engine.view).count() == 5)
    val before = store.current
    val d = engine.applyDelta(store.applyOps(Seq(RemoveEdge(302L))), store.current)
    // trails 1→11→12 and 1→11→12→13 die as whole units; nothing is spliced
    val removedPaths = d.filter(d(Rel.Cnt) < 0).collect().map(_.getString(1)).toSet
    assert(removedPaths == Set("1→11→12", "1→11→12→13"))
    assert(d.filter(d(Rel.Cnt) > 0).isEmpty)
  }

  test("ORD: unwound paths lose ordering (bag of vertices)") {
    val store = new GraphStore(spark, TestGraphs.example(spark))
    val engine = QueryPipeline.incremental(Queries.q4Cypher, store.current)
    val bag = Rel.expand(engine.view).collect().map(r => (r.getLong(0), r.getLong(1)))
    // thread 1→11→12→13 contributes p=1 with each of 1,11,12,13 once
    assert(Set((1L, 1L), (1L, 11L), (1L, 12L), (1L, 13L)).subsetOf(bag.toSet))
  }

  test("schema inference strictly reduces leaf schemas vs naive mode (Table 6 claim)") {
    val inferred = QueryPipeline.compile(Queries.q1Cypher)
    val naive = QueryPipeline.compile(Queries.q1Cypher, NraToFra.AllProperties)
    val store = new GraphStore(spark, social)
    val ei = IncrementalEngine(inferred, store.current)
    val en = IncrementalEngine(naive, store.current)
    assert(en.stateCells > ei.stateCells)
  }

  test("evaluate() convenience equals compile+BatchEvaluator") {
    val a = QueryPipeline.evaluate(Queries.q2Cypher, social)
    val b = BatchEvaluator.eval(QueryPipeline.compile(Queries.q2Cypher), social)
    TestGraphs.assertSameBag(a, b)
  }
}
