package repro.graph

import repro.{SparkSpec, TestGraphs}

class GraphStoreSpec extends SparkSpec {

  private def freshStore() = new GraphStore(spark, TestGraphs.example(spark))

  test("AddVertex with properties") {
    val s = freshStore()
    s.applyOps(Seq(AddVertex(50L, "Post", Map("lang" -> "hu"))))
    assert(s.vertexLabel(50L) == Some("Post"))
    assert(s.vertexProps(50L) == Map("lang" -> "hu"))
  }

  test("RemoveVertex cascades properties and incident edges") {
    val s = freshStore()
    val d = s.buildDelta(Seq(RemoveVertex(12L)))
    // 12 has REPLY out (302), REPLY in from 13 (303), HAS_CREATOR out (404)
    assert(d.delEdges.collect().map(_.getLong(0)).toSet == Set(302L, 303L, 404L))
    assert(d.delVertices.collect().map(_.getLong(0)).toSeq == Seq(12L))
    assert(d.delVProps.collect().map(r => (r.getLong(0), r.getString(1))).toSet == Set((12L, "lang")))
    s.applyDelta(d)
    assert(s.vertexLabel(12L).isEmpty)
    assert(s.current.edges.filter("src = 12 or dst = 12").isEmpty)
  }

  test("SetVertexProp emits fine-grained delete+insert") {
    val s = freshStore()
    val d = s.buildDelta(Seq(SetVertexProp(11L, "lang", "hu")))
    assert(d.delVProps.collect().map(r => (r.getLong(0), r.getString(1), r.getString(2))).toSeq ==
      Seq((11L, "lang", "en")))
    assert(d.insVProps.collect().map(r => (r.getLong(0), r.getString(1), r.getString(2))).toSeq ==
      Seq((11L, "lang", "hu")))
    assert(d.insVertices.isEmpty && d.delVertices.isEmpty && d.insEdges.isEmpty && d.delEdges.isEmpty)
  }

  test("SetVertexProp on a previously absent key emits insert only") {
    val s = freshStore()
    val d = s.buildDelta(Seq(SetVertexProp(11L, "score", "5")))
    assert(d.delVProps.isEmpty)
    assert(d.insVProps.count() == 1)
  }

  test("RemoveVertexProp deletes the old value") {
    val s = freshStore()
    val d = s.buildDelta(Seq(RemoveVertexProp(1L, "day")))
    assert(d.delVProps.collect().map(r => (r.getString(1), r.getString(2))).toSeq == Seq(("day", "10")))
    assert(d.insVProps.isEmpty)
  }

  test("SetEdgeProp is fine-grained on edge property bags") {
    val s = freshStore()
    val d = s.buildDelta(Seq(SetEdgeProp(501L, "since", "2011")))
    assert(d.delEProps.collect().map(_.getString(2)).toSeq == Seq("2010"))
    assert(d.insEProps.collect().map(_.getString(2)).toSeq == Seq("2011"))
  }

  test("add then remove within one batch nets out") {
    val s = freshStore()
    val d = s.buildDelta(Seq(
      AddVertex(60L, "Comm", Map("lang" -> "en")),
      AddEdge(900L, 60L, 1L, "REPLY", Map.empty),
      RemoveVertex(60L)))
    assert(d.insVertices.isEmpty && d.delVertices.isEmpty)
    assert(d.insEdges.isEmpty && d.delEdges.isEmpty)
    assert(d.insVProps.isEmpty && d.delVProps.isEmpty)
  }

  test("remove then re-add same id is a replacement") {
    val s = freshStore()
    val d = s.buildDelta(Seq(
      RemoveVertex(11L),
      AddVertex(11L, "Comm", Map("lang" -> "fr"))))
    assert(d.delVertices.count() == 1 && d.insVertices.count() == 1)
    s.applyDelta(d)
    assert(s.vertexProps(11L) == Map("lang" -> "fr"))
    // incident edges were cascaded away by the remove
    assert(s.current.edges.filter("src = 11 or dst = 11").isEmpty)
  }

  test("setting the same property twice keeps only the last value") {
    val s = freshStore()
    val d = s.buildDelta(Seq(
      SetVertexProp(11L, "lang", "fr"),
      SetVertexProp(11L, "lang", "pt")))
    assert(d.insVProps.collect().map(_.getString(2)).toSeq == Seq("pt"))
    assert(d.delVProps.collect().map(_.getString(2)).toSeq == Seq("en"))
  }

  test("RemoveEdge cascades edge properties") {
    val s = freshStore()
    val d = s.buildDelta(Seq(RemoveEdge(501L)))
    assert(d.delEdges.collect().map(_.getLong(0)).toSeq == Seq(501L))
    assert(d.delEProps.collect().map(r => (r.getString(1), r.getString(2))).toSeq == Seq(("since", "2010")))
  }

  test("applying the delta matches buildDelta + PropertyGraph.apply") {
    val s = freshStore()
    val before = s.current
    val ops = Seq(
      AddVertex(70L, "Comm", Map("lang" -> "en")),
      AddEdge(901L, 70L, 1L, "REPLY", Map.empty),
      SetVertexProp(1L, "lang", "fr"),
      RemoveVertex(22L))
    val d = s.buildDelta(ops)
    s.applyDelta(d)
    val manual = before.apply(d)
    TestGraphs.assertSameBag(s.current.vertices, manual.vertices)
    TestGraphs.assertSameBag(s.current.vprops, manual.vprops)
    TestGraphs.assertSameBag(s.current.edges, manual.edges)
    TestGraphs.assertSameBag(s.current.eprops, manual.eprops)
  }

  test("previous snapshot is retained across applyOps") {
    val s = freshStore()
    val before = s.current
    s.applyOps(Seq(SetVertexProp(1L, "lang", "fr")))
    assert(s.previous eq before)
    assert(s.previous.vprops.filter("id = 1 and key = 'lang' and value = 'en'").count() == 1)
    assert(s.current.vprops.filter("id = 1 and key = 'lang' and value = 'fr'").count() == 1)
  }
}
