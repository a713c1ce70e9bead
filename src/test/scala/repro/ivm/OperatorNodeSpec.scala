package repro.ivm

import repro.{SparkSpec, TestGraphs}
import repro.algebra._
import repro.fra._
import repro.graph._

/** Join / distinct / stateless operator maintenance over small graphs. */
class OperatorNodeSpec extends SparkSpec {

  private def store() = new GraphStore(spark, TestGraphs.example(spark))

  private val gvComm = FGetVertices("c", Some("Comm"), Map("lang" -> "c__lang"))
  private val gvPost = FGetVertices("p", Some("Post"), Map("lang" -> "p__lang"))
  private val geReply = FGetEdges("c", "e", "p", Some("REPLY"), Some("Comm"), Some("Post"),
    reversed = false, Map.empty, Map.empty, Map.empty)
  /** (c:Comm)-[:REPLY]->(p:Post) with both langs. */
  private val joinOp = FJoin(FJoin(gvComm, geReply), gvPost)

  test("join: edge insert propagates through both joins") {
    IvmTestKit.drive(joinOp, store(), Seq(Seq(AddEdge(900L, 13L, 2L, "REPLY", Map.empty))))
  }

  test("join: vertex delete cascades through the join") {
    IvmTestKit.drive(joinOp, store(), Seq(Seq(RemoveVertex(11L))))
  }

  test("join: property update on one side only touches affected rows") {
    val s = store()
    val node = IvmPlanner.plan(joinOp)
    node.init(s.current)
    val before = s.current
    val delta = s.applyOps(Seq(SetVertexProp(1L, "lang", "fr")))
    val d = node.apply(DeltaCtx(before, s.current, delta))
    // post 1 has exactly one direct reply (11): one -row and one +row
    assert(d.count() == 2)
    IvmTestKit.assertSameCounted(Rel.add(node.statePrev, d), node.stateNew)
  }

  test("join: mixed multi-op batches stay consistent") {
    IvmTestKit.drive(joinOp, store(), Seq(
      Seq(AddVertex(60L, "Comm", Map("lang" -> "en")), AddEdge(901L, 60L, 1L, "REPLY", Map.empty)),
      Seq(SetVertexProp(60L, "lang", "de"), RemoveVertex(21L)),
      Seq(RemoveEdge(901L), AddEdge(902L, 60L, 2L, "REPLY", Map.empty)),
    ))
  }

  test("selection: predicate filters deltas exactly") {
    val op = FSelection(joinOp, Cmp("=", ColRef("c__lang"), ColRef("p__lang")))
    IvmTestKit.drive(op, store(), Seq(
      Seq(SetVertexProp(11L, "lang", "de")), // 11 stops matching post 1 (en)
      Seq(SetVertexProp(11L, "lang", "en")), // and matches again
      Seq(AddEdge(903L, 13L, 2L, "REPLY", Map.empty)),
    ))
  }

  test("projection: bag semantics keep duplicate multiplicities") {
    val op = FProjection(joinOp, Seq((PCol("p"), "p")))
    val s = store()
    val node = IvmTestKit.drive(op, s, Seq(Seq(AddEdge(904L, 13L, 1L, "REPLY", Map.empty))))
    // post 1 now has replies from 11 and 13 → multiplicity 2 (stateless π
    // exposes an unmerged view; normalise to read total multiplicities)
    val counts = Rel.normalize(node.stateNew).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toMap
    assert(counts == Map(1L -> 2L, 2L -> 1L))
  }

  test("distinct: support counting emits transitions only") {
    val op = FDistinct(FProjection(joinOp, Seq((PCol("p"), "p"))))
    val s = store()
    val node = IvmPlanner.plan(op)
    node.init(s.current)
    // add a second direct reply to post 1: support 1→2, no output delta
    var before = s.current
    var delta = s.applyOps(Seq(AddEdge(905L, 13L, 1L, "REPLY", Map.empty)))
    assert(node.apply(DeltaCtx(before, s.current, delta)).isEmpty)
    // remove one of them: support 2→1, still no delta
    before = s.current
    delta = s.applyOps(Seq(RemoveEdge(905L)))
    assert(node.apply(DeltaCtx(before, s.current, delta)).isEmpty)
    // remove the last: support 1→0 → -1 delta
    before = s.current
    delta = s.applyOps(Seq(RemoveEdge(301L)))
    val d = node.apply(DeltaCtx(before, s.current, delta))
    assert(d.collect().map(r => (r.getLong(0), r.getLong(1))).toSeq == Seq((1L, -1L)))
  }

  test("distinct: drive keeps it consistent across mixed batches") {
    val op = FDistinct(FProjection(joinOp, Seq((PCol("p"), "p"))))
    IvmTestKit.drive(op, store(), Seq(
      Seq(AddEdge(906L, 13L, 1L, "REPLY", Map.empty)),
      Seq(RemoveVertex(11L)),
      Seq(RemoveVertex(13L)),
    ))
  }

  test("path construct: atomic flat paths appear and disappear whole") {
    val op = FPathConstruct(FJoin(gvComm, geReply), "t", "c", "e", "p")
    IvmTestKit.drive(op, store(), Seq(
      Seq(AddEdge(907L, 13L, 1L, "REPLY", Map.empty)),
      Seq(RemoveEdge(907L)),
    ))
  }

  test("cross join (no shared columns) maintains the product") {
    val op = FJoin(FGetVertices("p", Some("Post"), Map.empty),
      FGetVertices("a", Some("Person"), Map.empty))
    IvmTestKit.drive(op, store(), Seq(
      Seq(AddVertex(70L, "Post", Map.empty)),
      Seq(RemoveVertex(100L)),
    ))
  }

  test("join of joins: deep tree stays consistent") {
    // (c)-[:REPLY]->(p) joined with (c)-[:HAS_CREATOR]->(a)
    val geCreator = FGetEdges("c", "e2", "a", Some("HAS_CREATOR"), Some("Comm"), Some("Person"),
      reversed = false, Map.empty, Map.empty, Map.empty)
    val op = FJoin(joinOp, geCreator)
    IvmTestKit.drive(op, store(), Seq(
      Seq(AddVertex(80L, "Comm", Map("lang" -> "en")),
        AddEdge(908L, 80L, 1L, "REPLY", Map.empty),
        AddEdge(909L, 80L, 100L, "HAS_CREATOR", Map.empty)),
      Seq(RemoveVertex(80L)),
    ))
  }
}
