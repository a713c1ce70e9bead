package repro.ivm

import org.apache.spark.sql.functions.col
import repro.{SparkSpec, TestGraphs}
import repro.core.{Queries, QueryPipeline}
import repro.eval.{BatchEvaluator, GraphOracle}
import repro.fra.NraToFra
import repro.graph._

/** Full pipeline: Cypher → FRA → maintenance network, driven by update
  * batches; the maintained view must equal full recomputation after every
  * batch, and equal the hand-written DuckDB reference SQL at checkpoints.
  */
class EngineEndToEndSpec extends SparkSpec {

  private def freshStore() = new GraphStore(spark, TestGraphs.example(spark))

  /** Maintained view == recomputation after every batch; oracle at the end. */
  private def drive(cypher: String, sql: Option[String], batches: Seq[Seq[UpdateOp]],
      mode: NraToFra.SchemaMode = NraToFra.Inferred): Unit = {
    val store = freshStore()
    val flat = QueryPipeline.compile(cypher, mode)
    val engine = IncrementalEngine(flat, store.current)
    TestGraphs.assertCountedEqualsPlain(engine.view, BatchEvaluator.eval(flat, store.current))
    batches.zipWithIndex.foreach { case (b, i) =>
      engine.applyOps(store, b)
      val expected = BatchEvaluator.eval(flat, store.current)
      try {
        TestGraphs.assertCountedEqualsPlain(engine.view, expected)
        TestGraphs.assertValidState(engine.view)
      } catch {
        case e: AssertionError => throw new AssertionError(s"after batch $i ($b): ${e.getMessage}", e)
      }
    }
    sql.foreach(s => GraphOracle.checkCounted(engine.view, s, store.current))
  }

  private val mixedBatches = Seq(
    Seq(AddVertex(60L, "Comm", Map("lang" -> "en")), AddEdge(900L, 60L, 13L, "REPLY", Map.empty)),
    Seq(SetVertexProp(1L, "lang", "de")),
    Seq(RemoveVertex(12L)),
    Seq(AddEdge(901L, 13L, 11L, "REPLY", Map.empty), SetVertexProp(13L, "lang", "de")),
    Seq(RemoveVertex(2L)),
  )

  test("Q1 running example maintained under mixed updates, oracle-checked") {
    drive(Queries.q1Cypher, Some(Queries.q1Sql), mixedBatches)
  }

  test("Q2 two-hop maintained under KNOWS churn, oracle-checked") {
    drive(Queries.q2Cypher, Some(Queries.q2Sql), Seq(
      Seq(AddEdge(910L, 102L, 100L, "KNOWS", Map.empty)),
      Seq(SetVertexProp(100L, "country", "FR")),
      Seq(RemoveVertex(101L)),
      Seq(AddVertex(103L, "Person", Map("country" -> "US")),
        AddEdge(911L, 102L, 103L, "KNOWS", Map.empty)),
    ))
  }

  test("Q3 same-country pairs maintained, oracle-checked") {
    drive(Queries.q3Cypher, Some(Queries.q3Sql), Seq(
      Seq(SetVertexProp(102L, "country", "US")),
      Seq(RemoveVertexProp(100L, "country")),
      Seq(AddEdge(912L, 101L, 100L, "KNOWS", Map.empty)),
    ))
  }

  test("Q4 path unwinding maintained, oracle-checked") {
    drive(Queries.q4Cypher, Some(Queries.q4Sql), mixedBatches)
  }

  test("DISTINCT view over a closure is maintained") {
    drive("MATCH (p:Post)<-[:REPLY*]-(c:Comm) RETURN DISTINCT p", None, mixedBatches)
  }

  test("edge-property predicate view is maintained") {
    drive("MATCH (a:Person)-[e:KNOWS]->(b:Person) WHERE e.since > 2012 RETURN a, b", None, Seq(
      Seq(SetEdgeProp(501L, "since", "2024")),
      Seq(RemoveEdgeProp(503L, "since")),
      Seq(AddEdge(913L, 102L, 101L, "KNOWS", Map("since" -> "2030"))),
    ))
  }

  test("numeric range query over properties is maintained") {
    drive("MATCH (p:Post) WHERE p.day >= 15 RETURN p", None, Seq(
      Seq(SetVertexProp(1L, "day", "20")),
      Seq(SetVertexProp(1L, "day", "3")),
      Seq(AddVertex(61L, "Post", Map("day" -> "16"))),
    ))
  }

  test("all four benchmark queries maintained in naive all-props mode") {
    for ((_, cypher, _) <- Queries.all)
      drive(cypher, None, mixedBatches.take(3), NraToFra.AllProperties)
  }

  test("view delta stream: applying deltas to the initial view replays the final view") {
    val store = freshStore()
    val flat = QueryPipeline.compile(Queries.q1Cypher)
    val engine = IncrementalEngine(flat, store.current)
    var replayed = engine.view
    mixedBatches.foreach { b =>
      val d = engine.applyOps(store, b)
      replayed = Rel.add(replayed, d).localCheckpoint(true)
    }
    IvmTestKit.assertSameCounted(replayed, engine.view)
  }

  test("engine state sizes are reported for Table 6 accounting") {
    val store = freshStore()
    val engine = QueryPipeline.incremental(Queries.q1Cypher, store.current)
    assert(engine.stateRows > 0 && engine.stateCells >= engine.stateRows)
    val naive = QueryPipeline.incremental(Queries.q1Cypher, store.current, NraToFra.AllProperties)
    assert(naive.stateCells > engine.stateCells,
      s"naive=${naive.stateCells} inferred=${engine.stateCells}")
  }
}
