package repro.ivm

import repro.{SparkSpec, TestGraphs}
import repro.fra.FTransitiveEdges
import repro.graph._

/** Incremental transitive closure with atomic paths (DESIGN.md §2.3). */
class TransitiveNodeSpec extends SparkSpec {

  private def store() = new GraphStore(spark, TestGraphs.example(spark))

  /** Reply threads from Posts, reversed traversal, paths named t. */
  private val tc = FTransitiveEdges("p", "c", Some("REPLY"), Some("Post"),
    reversed = true, minHops = 1, maxHops = 8, pathName = "t")

  test("init enumerates all trails from labelled sources") {
    val s = store()
    val node = IvmPlanner.plan(tc)
    node.init(s.current)
    // threads: 1→11, 1→11→12, 1→11→12→13, 2→21, 2→21→22
    assert(node.stateNew.count() == 5)
  }

  test("edge insert extends existing threads (suffix side)") {
    // new comment replying under the deepest comment of thread 1
    IvmTestKit.drive(tc, store(), Seq(Seq(
      AddVertex(60L, "Comm", Map.empty),
      AddEdge(900L, 60L, 13L, "REPLY", Map.empty))))
  }

  test("edge insert in the middle links prefix and suffix") {
    val s = store()
    // detach 12 from 11, then re-attach 12 under 21: paths must re-route
    IvmTestKit.drive(tc, s, Seq(
      Seq(RemoveEdge(302L)),
      Seq(AddEdge(901L, 12L, 21L, "REPLY", Map.empty)),
    ))
  }

  test("edge delete kills all trails through it atomically") {
    val s = store()
    val node = IvmPlanner.plan(tc)
    node.init(s.current)
    val before = s.current
    val delta = s.applyOps(Seq(RemoveEdge(301L))) // 11→1: kills 3 thread-1 trails
    val d = node.apply(DeltaCtx(before, s.current, delta))
    assert(d.count() == 3)
    assert(d.collect().forall(_.getLong(d.columns.indexOf(Rel.Cnt)) == -1L))
    assert(node.stateNew.count() == 2)
  }

  test("source removal deletes its trails") {
    IvmTestKit.drive(tc, store(), Seq(Seq(RemoveVertex(1L))))
  }

  test("new source over existing edges (part B)") {
    val s = store()
    // make comment 21 a Post: trails from 21 over old edges must appear
    IvmTestKit.drive(tc, s, Seq(
      Seq(RemoveVertex(21L),
        AddVertex(21L, "Post", Map.empty),
        AddEdge(902L, 22L, 21L, "REPLY", Map.empty)), // re-attach 22 (cascade removed it)
    ))
  }

  test("batch inserting a chain of edges (multi-new-edge paths, part A fixpoint)") {
    IvmTestKit.drive(tc, store(), Seq(Seq(
      AddVertex(61L, "Comm", Map.empty),
      AddVertex(62L, "Comm", Map.empty),
      AddVertex(63L, "Comm", Map.empty),
      AddEdge(903L, 61L, 13L, "REPLY", Map.empty),
      AddEdge(904L, 62L, 61L, "REPLY", Map.empty),
      AddEdge(905L, 63L, 62L, "REPLY", Map.empty))))
  }

  test("insert and delete interleaved across batches") {
    IvmTestKit.drive(tc, store(), Seq(
      Seq(AddEdge(906L, 22L, 13L, "REPLY", Map.empty)), // 22 also replies under thread 1
      Seq(RemoveEdge(305L)),
      Seq(RemoveVertex(11L)),
      Seq(AddVertex(64L, "Comm", Map.empty), AddEdge(907L, 64L, 12L, "REPLY", Map.empty)),
    ))
  }

  test("edge replaced in one batch (delete + insert same id)") {
    val s = store()
    IvmTestKit.drive(tc, s, Seq(
      Seq(RemoveEdge(302L), AddEdge(302L, 12L, 1L, "REPLY", Map.empty)),
    ))
  }

  test("maxHops bounds the closure") {
    val shallow = tc.copy(maxHops = 2)
    val s = store()
    val node = IvmPlanner.plan(shallow)
    node.init(s.current)
    assert(node.stateNew.count() == 4) // the length-3 trail 1→11→12→13 is cut
    IvmTestKit.drive(shallow, store(), Seq(
      Seq(AddVertex(65L, "Comm", Map.empty), AddEdge(908L, 65L, 12L, "REPLY", Map.empty))))
  }

  test("minHops filters the exposed state but keeps prefixes internally") {
    val deep = tc.copy(minHops = 3)
    val s = store()
    val node = IvmPlanner.plan(deep)
    node.init(s.current)
    assert(node.stateNew.count() == 1) // only 1→11→12→13
    // extending thread 2 to depth 3 must surface exactly one new trail
    val before = s.current
    val delta = s.applyOps(Seq(
      AddVertex(66L, "Comm", Map.empty), AddEdge(909L, 66L, 22L, "REPLY", Map.empty)))
    val d = node.apply(DeltaCtx(before, s.current, delta))
    assert(d.count() == 1)
    assert(node.stateNew.count() == 2)
  }

  test("pure property updates take the fast path (empty delta, no state change)") {
    val s = store()
    val node = IvmPlanner.plan(tc)
    node.init(s.current)
    val rowsBefore = node.stateNew.count()
    val before = s.current
    val delta = s.applyOps(Seq(SetVertexProp(11L, "lang", "fr"), SetEdgeProp(501L, "since", "1990")))
    assert(node.apply(DeltaCtx(before, s.current, delta)).isEmpty)
    assert(node.stateNew.count() == rowsBefore)
  }

  test("forward (non-reversed) closure works symmetrically") {
    val fwd = FTransitiveEdges("c", "p", Some("REPLY"), Some("Comm"),
      reversed = false, minHops = 1, maxHops = 8, pathName = "u")
    IvmTestKit.drive(fwd, store(), Seq(
      Seq(AddEdge(910L, 13L, 2L, "REPLY", Map.empty)),
      Seq(RemoveVertex(12L)),
    ))
  }

  test("cycle: trail semantics terminates and maintains correctly") {
    // build a small cyclic REPLY ring among posts so trails wrap but stop
    val g = PropertyGraph.fromElements(spark,
      vertices = Seq(
        (1L, "Post", Map.empty[String, String]),
        (2L, "Post", Map.empty[String, String]),
        (3L, "Post", Map.empty[String, String])),
      edges = Seq(
        (10L, 1L, 2L, "REPLY", Map.empty[String, String]),
        (11L, 2L, 3L, "REPLY", Map.empty[String, String])))
    val s = new GraphStore(spark, g)
    val cyc = FTransitiveEdges("a", "b", Some("REPLY"), Some("Post"),
      reversed = false, minHops = 1, maxHops = 6, pathName = "w")
    IvmTestKit.drive(cyc, s, Seq(
      Seq(AddEdge(12L, 3L, 1L, "REPLY", Map.empty)), // closes the cycle
      Seq(RemoveEdge(10L)),                           // breaks it again
    ))
  }

  test("parallel edges are distinct trails") {
    val s = store()
    val node = IvmTestKit.drive(tc, s, Seq(
      Seq(AddEdge(911L, 11L, 1L, "REPLY", Map.empty)))) // second 11→1 edge
    // thread-1 trails double: 2×(1→11, 1→11→12, 1→11→12→13) + thread 2 (2)
    assert(node.stateNew.count() == 8)
  }
}
