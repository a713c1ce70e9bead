package repro.graph

import repro.{SparkSpec, TestGraphs}

class PropertyGraphSpec extends SparkSpec {

  test("fromElements splits vertices, properties, edges") {
    val g = TestGraphs.example(spark)
    assert(g.vertices.count() == 10)
    assert(g.edges.count() == 18)
    assert(g.vprops.count() == 2 * 2 + 5 * 1 + 3 * 2) // posts(lang,day) comms(lang) persons(name,country)
    assert(g.eprops.count() == 3) // KNOWS.since on 501, 502, 503
  }

  test("empty graph has the canonical schemas") {
    val g = PropertyGraph.empty(spark)
    assert(g.vertices.columns.toSeq == Seq("id", "label"))
    assert(g.vprops.columns.toSeq == Seq("id", "key", "value"))
    assert(g.edges.columns.toSeq == Seq("id", "src", "dst", "typ"))
    assert(g.vertices.isEmpty)
  }

  test("apply inserts vertices and properties") {
    val g = PropertyGraph.empty(spark)
    val d = GraphDelta.fromElements(spark, insV = Seq((1L, "Post", Map("lang" -> "en"))))
    val g2 = g.apply(d)
    assert(g2.vertices.count() == 1)
    assert(g2.vprops.collect().map(r => (r.getLong(0), r.getString(1), r.getString(2))).toSeq ==
      Seq((1L, "lang", "en")))
  }

  test("apply deletes vertices by id and properties by full row") {
    val g = TestGraphs.example(spark)
    val d = GraphDelta.fromElements(spark,
      delV = Seq((13L, "Comm", Map("lang" -> "en"))),
      delE = Seq((303L, 13L, 12L, "REPLY", Map.empty)))
    val g2 = g.apply(d)
    assert(g2.vertices.filter("id = 13").isEmpty)
    assert(g2.vprops.filter("id = 13").isEmpty)
    assert(g2.edges.filter("id = 303").isEmpty)
  }

  test("apply replaces a property value fine-grained") {
    val g = TestGraphs.example(spark)
    val d = GraphDelta.fromElements(spark,
      delVP = Seq((11L, "lang", "en")), insVP = Seq((11L, "lang", "de")))
    val g2 = g.apply(d)
    val langs = g2.vprops.filter("id = 11 and key = 'lang'").collect().map(_.getString(2)).toSeq
    assert(langs == Seq("de"))
  }

  test("checkpointed preserves contents") {
    val g = TestGraphs.example(spark).checkpointed()
    assert(g.counts == (10L, 15L, 18L, 3L))
  }
}
