package repro.ivm

import repro.{SparkSpec, TestGraphs}
import repro.fra.{FGetEdges, FGetVertices}
import repro.graph._

class LeafNodeSpec extends SparkSpec {

  private def store() = new GraphStore(spark, TestGraphs.example(spark))

  private val gvPost = FGetVertices("p", Some("Post"), Map("lang" -> "p__lang"))
  private val geReply = FGetEdges("c", "e", "p", Some("REPLY"), Some("Comm"), Some("Post"),
    reversed = false, Map.empty, Map.empty, Map.empty)

  test("vertex leaf: insert of matching label") {
    IvmTestKit.drive(gvPost, store(), Seq(Seq(AddVertex(50L, "Post", Map("lang" -> "hu")))))
  }

  test("vertex leaf: insert of non-matching label is invisible") {
    val n = IvmTestKit.drive(gvPost, store(), Seq(Seq(AddVertex(50L, "Person", Map.empty))))
    assert(n.stateNew.count() == 2)
  }

  test("vertex leaf: delete") {
    IvmTestKit.drive(gvPost, store(), Seq(Seq(RemoveVertex(1L))))
  }

  test("vertex leaf: fine-grained property update changes one row") {
    val s = store()
    val node = IvmPlanner.plan(gvPost)
    node.init(s.current)
    val before = s.current
    val delta = s.applyOps(Seq(SetVertexProp(1L, "lang", "fr")))
    val d = node.apply(DeltaCtx(before, s.current, delta))
    val rows = d.collect().map(r => (r.getLong(0), r.getString(1), r.getLong(2))).toSet
    assert(rows == Set((1L, "en", -1L), (1L, "fr", 1L)))
  }

  test("vertex leaf: property update on untracked key is a no-op delta") {
    val s = store()
    val node = IvmPlanner.plan(gvPost)
    node.init(s.current)
    val before = s.current
    val delta = s.applyOps(Seq(SetVertexProp(1L, "day", "99")))
    assert(node.apply(DeltaCtx(before, s.current, delta)).isEmpty)
  }

  test("vertex leaf: property removal yields null column") {
    IvmTestKit.drive(gvPost, store(), Seq(Seq(RemoveVertexProp(1L, "lang"))))
  }

  test("vertex leaf: property set on a vertex that lacked it") {
    IvmTestKit.drive(
      FGetVertices("c", Some("Comm"), Map("day" -> "c__day")),
      store(), Seq(Seq(SetVertexProp(11L, "day", "7"))))
  }

  test("vertex leaf: mixed batch") {
    IvmTestKit.drive(gvPost, store(), Seq(
      Seq(AddVertex(50L, "Post", Map("lang" -> "hu")), RemoveVertex(2L), SetVertexProp(1L, "lang", "de")),
      Seq(RemoveVertex(50L), AddVertex(51L, "Post", Map.empty)),
    ))
  }

  test("edge leaf: edge insert and delete") {
    IvmTestKit.drive(geReply, store(), Seq(
      Seq(AddEdge(900L, 13L, 1L, "REPLY", Map.empty)),
      Seq(RemoveEdge(900L)),
    ))
  }

  test("edge leaf: vertex deletion cascades out of the hop") {
    IvmTestKit.drive(geReply, store(), Seq(Seq(RemoveVertex(11L))))
  }

  test("edge leaf: label change at endpoint via replace") {
    // replacing Post 1 with a Person removes it from the (…)->(p:Post) hop
    IvmTestKit.drive(geReply, store(), Seq(
      Seq(RemoveVertex(1L), AddVertex(1L, "Person", Map.empty))))
  }

  test("edge leaf: wrong-typed edge is invisible") {
    val n = IvmTestKit.drive(geReply, store(), Seq(Seq(AddEdge(901L, 13L, 1L, "LIKES", Map.empty))))
    assert(n.stateNew.count() == 2) // 301 (11->1) and 304 (21->2)
  }

  test("edge leaf with endpoint properties") {
    val leaf = FGetEdges("c", "e", "p", Some("REPLY"), Some("Comm"), Some("Post"),
      reversed = false, Map("lang" -> "c__lang"), Map.empty, Map("lang" -> "p__lang"))
    IvmTestKit.drive(leaf, store(), Seq(
      Seq(SetVertexProp(11L, "lang", "zz")),
      Seq(AddEdge(902L, 22L, 2L, "REPLY", Map.empty)),
      Seq(RemoveVertexProp(2L, "lang")),
    ))
  }

  test("edge leaf with edge properties (fine-grained edge prop update)") {
    val leaf = FGetEdges("a", "e", "b", Some("KNOWS"), None, None,
      reversed = false, Map.empty, Map("since" -> "e__since"), Map.empty)
    IvmTestKit.drive(leaf, store(), Seq(
      Seq(SetEdgeProp(501L, "since", "1999")),
      Seq(RemoveEdgeProp(502L, "since")),
    ))
  }

  test("reversed edge leaf maintains the transposed orientation") {
    val leaf = FGetEdges("p", "e", "c", Some("REPLY"), Some("Post"), Some("Comm"),
      reversed = true, Map.empty, Map.empty, Map.empty)
    IvmTestKit.drive(leaf, store(), Seq(
      Seq(AddEdge(903L, 13L, 1L, "REPLY", Map.empty)),
      Seq(RemoveVertex(13L)),
    ))
  }

  test("vertex leaf in naive all-props mode tracks every key") {
    val leaf = FGetVertices("p", Some("Post"), Map.empty, allProps = true)
    IvmTestKit.drive(leaf, store(), Seq(
      Seq(SetVertexProp(1L, "day", "42")),
      Seq(SetVertexProp(2L, "name", "x")), // 'name' exists in data (persons) so it is tracked
    ))
  }
}
