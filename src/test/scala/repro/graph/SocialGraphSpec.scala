package repro.graph

import org.apache.spark.sql.functions._
import repro.SparkSpec

class SocialGraphSpec extends SparkSpec {

  private lazy val g = SocialGraph.generate(spark, sf = 0.002).checkpointed()
  private lazy val s = SocialGraph.sizes(0.002)

  test("element counts match the scale factor") {
    assert(g.vertices.filter("label = 'Person'").count() == s.persons)
    assert(g.vertices.filter("label = 'Post'").count() == s.posts)
    assert(g.vertices.filter("label = 'Comm'").count() == s.comments)
  }

  test("id spaces are disjoint and within their bases") {
    val bad = g.vertices.filter(
      (col("label") === "Person" && (col("id") < SocialGraph.PersonBase || col("id") >= SocialGraph.PostBase)) ||
      (col("label") === "Post" && (col("id") < SocialGraph.PostBase || col("id") >= SocialGraph.CommBase)) ||
      (col("label") === "Comm" && col("id") < SocialGraph.CommBase))
    assert(bad.isEmpty)
  }

  test("every comment has exactly one REPLY edge to a post or earlier comment") {
    val replies = g.edges.filter("typ = 'REPLY'")
    assert(replies.count() == s.comments)
    val badParent = replies.filter(col("dst") < SocialGraph.PostBase)
    assert(badParent.isEmpty)
    val selfOrForward = replies.filter(col("dst") >= col("src"))
    assert(selfOrForward.isEmpty, "a comment must reply to an earlier element")
  }

  test("REPLY edges are dangling-free") {
    val dangling = g.edges.filter("typ = 'REPLY'")
      .join(g.vertices.select(col("id").as("dst")), Seq("dst"), "left_anti")
    assert(dangling.isEmpty)
  }

  test("every post and comment has lang and day properties") {
    val content = g.vertices.filter("label != 'Person'").count()
    val langs = g.vprops.filter("key = 'lang'").count()
    val days = g.vprops.filter("key = 'day'").count()
    assert(langs == content && days == content)
  }

  test("languages are drawn from the documented domain, skewed") {
    val counts = g.vprops.filter("key = 'lang'").groupBy("value").count()
      .collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(counts.keySet.subsetOf(SocialGraph.Languages.toSet))
    // skew: the most common language dominates the least common
    assert(counts.values.max > counts.values.min * 2)
  }

  test("reply forests reach depth >= 3 (exercises the closure)") {
    val e = g.edges.filter("typ = 'REPLY'").select(col("src"), col("dst"))
    val d2 = e.as("a").join(e.as("b"), col("a.dst") === col("b.src"))
      .select(col("a.src").as("src"), col("b.dst").as("dst"))
    val d3 = d2.as("x").join(e.as("c"), col("x.dst") === col("c.src"))
    assert(d3.count() > 0)
  }

  test("generation is deterministic in (sf, seed)") {
    val g2 = SocialGraph.generate(spark, sf = 0.002)
    assert(g2.vertices.exceptAll(g.vertices).isEmpty)
    assert(g2.edges.exceptAll(g.edges).isEmpty)
    assert(g2.vprops.exceptAll(g.vprops).isEmpty)
  }

  test("update stream ops apply cleanly on the generated graph") {
    val store = new GraphStore(spark, g)
    val stream = new UpdateStream(0.002)
    val d = store.applyOps(stream.nextBatch(20))
    assert(!d.isEmpty)
    // no dangling REPLY edges after the batch either
    val dangling = store.current.edges
      .join(store.current.vertices.select(col("id").as("src")), Seq("src"), "left_anti")
    assert(dangling.isEmpty)
  }

  test("langFlipBatch produces only fine-grained property ops on live comments") {
    val stream = new UpdateStream(0.002)
    val flips = stream.langFlipBatch(10)
    assert(flips.size == 10)
    assert(flips.forall(f => f.key == "lang" && f.id >= SocialGraph.CommBase))
  }

  test("replyChurnBatch removes and adds comments") {
    val stream = new UpdateStream(0.002)
    val ops = stream.replyChurnBatch(5)
    assert(ops.count(_.isInstanceOf[RemoveVertex]) == 5)
    assert(ops.count(_.isInstanceOf[AddVertex]) == 5)
  }
}
