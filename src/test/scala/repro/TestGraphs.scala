package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.graph.PropertyGraph
import repro.ivm.Rel

/** Shared fixtures: the paper's running example and helpers. */
object TestGraphs {

  /** The paper §2 running example, slightly enlarged: two Post threads with
    * transitive Comm replies in mixed languages, plus Person vertices.
    *
    * REPLY edges are stored child → parent (comment replies to its parent),
    * so thread navigation from a Post traverses them reversed.
    *
    * Thread 1 (Post 1, en): 11(en) → 1, 12(de) → 11, 13(en) → 12
    * Thread 2 (Post 2, de): 21(de) → 2, 22(de) → 21
    */
  def example(spark: SparkSession): PropertyGraph = PropertyGraph.fromElements(
    spark,
    vertices = Seq(
      (1L, "Post", Map("lang" -> "en", "day" -> "10")),
      (2L, "Post", Map("lang" -> "de", "day" -> "20")),
      (11L, "Comm", Map("lang" -> "en")),
      (12L, "Comm", Map("lang" -> "de")),
      (13L, "Comm", Map("lang" -> "en")),
      (21L, "Comm", Map("lang" -> "de")),
      (22L, "Comm", Map("lang" -> "de")),
      (100L, "Person", Map("name" -> "alice", "country" -> "US")),
      (101L, "Person", Map("name" -> "bob", "country" -> "US")),
      (102L, "Person", Map("name" -> "carol", "country" -> "DE")),
    ),
    edges = Seq(
      (301L, 11L, 1L, "REPLY", Map.empty[String, String]),
      (302L, 12L, 11L, "REPLY", Map.empty[String, String]),
      (303L, 13L, 12L, "REPLY", Map.empty[String, String]),
      (304L, 21L, 2L, "REPLY", Map.empty[String, String]),
      (305L, 22L, 21L, "REPLY", Map.empty[String, String]),
      (401L, 1L, 100L, "HAS_CREATOR", Map.empty[String, String]),
      (402L, 2L, 102L, "HAS_CREATOR", Map.empty[String, String]),
      (403L, 11L, 101L, "HAS_CREATOR", Map.empty[String, String]),
      (404L, 12L, 102L, "HAS_CREATOR", Map.empty[String, String]),
      (405L, 13L, 100L, "HAS_CREATOR", Map.empty[String, String]),
      (406L, 21L, 101L, "HAS_CREATOR", Map.empty[String, String]),
      (407L, 22L, 102L, "HAS_CREATOR", Map.empty[String, String]),
      (501L, 100L, 101L, "KNOWS", Map("since" -> "2010")),
      (502L, 101L, 102L, "KNOWS", Map("since" -> "2015")),
      (503L, 100L, 102L, "KNOWS", Map("since" -> "2020")),
      (601L, 100L, 1L, "LIKES", Map.empty[String, String]),
      (602L, 101L, 1L, "LIKES", Map.empty[String, String]),
      (603L, 102L, 2L, "LIKES", Map.empty[String, String]),
    ),
  )

  /** The paper's running-example query (§2): posts p with the threads t of
    * transitive reply comments c written in the post's language.
    */
  val Q1: String =
    "MATCH t = (p:Post)<-[:REPLY*]-(c:Comm) WHERE c.lang = p.lang RETURN p, c, t"

  /** Bag equality between two plain DataFrames (multiset of rows). */
  def assertSameBag(actual: DataFrame, expected: DataFrame): Unit = {
    val a = Rel.normalize(Rel.withCount(actual))
    val e = Rel.normalize(Rel.withCount(expected)).select(a.columns.map(org.apache.spark.sql.functions.col): _*)
    val extra = a.exceptAll(e).collect()
    val missing = e.exceptAll(a).collect()
    assert(extra.isEmpty && missing.isEmpty,
      s"bags differ:\n  extra rows:   ${extra.take(5).mkString("; ")}\n" +
      s"  missing rows: ${missing.take(5).mkString("; ")}")
  }

  /** Bag equality between a counted (IVM) relation and a plain relation. */
  def assertCountedEqualsPlain(counted: DataFrame, plain: DataFrame): Unit =
    assertSameBag(Rel.expand(counted), plain)

  /** Asserts an IVM state invariant: the state *normalises to* a strictly
    * positive bag (states fold lazily, so raw rows may contain cancelling
    * +/− pairs — see StatefulNode).
    */
  def assertValidState(state: DataFrame): Unit = {
    val bad = Rel.normalize(state)
      .filter(org.apache.spark.sql.functions.col(Rel.Cnt) <= 0).count()
    assert(bad == 0L, s"state normalises to $bad non-positive-count rows")
  }
}
