package repro.eval

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestGraphs}
import repro.core.{Queries, QueryPipeline}
import repro.fra.NraToFra

/** Snapshot evaluation, checked row-for-row against DuckDB (the oracle SQL
  * is hand-written, independent of the compiler under test).
  */
class BatchEvaluatorSpec extends SparkSpec {

  private lazy val g = TestGraphs.example(spark)

  test("oracle smoke: DuckDB list functions used by the trail CTE exist") {
    val conn = java.sql.DriverManager.getConnection("jdbc:duckdb:")
    try {
      val rs = conn.createStatement().executeQuery(
        "SELECT array_to_string(list_append(['a','b'], 'c'), '→') AS s, " +
          "list_contains(['x'], 'x') AS c, len(['x','y']) AS l")
      rs.next()
      assert(rs.getString(1) == "a→b→c")
      assert(rs.getBoolean(2))
      assert(rs.getLong(3) == 2L)
    } finally conn.close()
  }

  test("get-vertices with label") {
    val df = QueryPipeline.evaluate("MATCH (p:Post) RETURN p", g)
    GraphOracle.check(df, "SELECT id AS p FROM vertices WHERE label = 'Post'", g)
  }

  test("get-vertices without label") {
    val df = QueryPipeline.evaluate("MATCH (n) RETURN n", g)
    GraphOracle.check(df, "SELECT id AS n FROM vertices", g)
  }

  test("property selection") {
    val df = QueryPipeline.evaluate("MATCH (p:Post) WHERE p.lang = 'en' RETURN p", g)
    GraphOracle.check(df,
      """SELECT v.id AS p FROM vertices v JOIN vprops pr ON pr.id = v.id
        |WHERE v.label = 'Post' AND pr.key = 'lang' AND pr.value = 'en'""".stripMargin, g)
  }

  test("missing property compares to nothing (null semantics)") {
    // Comm vertices have no 'day' property — they must not satisfy day = '10'
    val df = QueryPipeline.evaluate("MATCH (n) WHERE n.day = '10' RETURN n", g)
    GraphOracle.check(df,
      "SELECT id AS n FROM vprops WHERE key = 'day' AND value = '10'", g)
  }

  test("property projection with alias") {
    val df = QueryPipeline.evaluate("MATCH (p:Post) RETURN p, p.lang AS l", g)
    GraphOracle.check(df,
      """SELECT v.id AS p, pr.value AS l FROM vertices v
        |LEFT JOIN vprops pr ON pr.id = v.id AND pr.key = 'lang'
        |WHERE v.label = 'Post'""".stripMargin, g)
  }

  test("single hop with labels and type") {
    val df = QueryPipeline.evaluate("MATCH (c:Comm)-[:REPLY]->(p:Post) RETURN c, p", g)
    GraphOracle.check(df,
      """SELECT c.id AS c, p.id AS p FROM edges e
        |JOIN vertices c ON c.id = e.src AND c.label = 'Comm'
        |JOIN vertices p ON p.id = e.dst AND p.label = 'Post'
        |WHERE e.typ = 'REPLY'""".stripMargin, g)
  }

  test("incoming hop is the transpose of the outgoing one") {
    val out = QueryPipeline.evaluate("MATCH (c:Comm)-[:REPLY]->(p:Post) RETURN c, p", g)
    val in = QueryPipeline.evaluate("MATCH (p:Post)<-[:REPLY]-(c:Comm) RETURN c, p", g)
    TestGraphs.assertSameBag(in.select("c", "p"), out)
  }

  test("edge property access") {
    val df = QueryPipeline.evaluate(
      "MATCH (a:Person)-[e:KNOWS]->(b:Person) WHERE e.since > 2012 RETURN a, b", g)
    GraphOracle.check(df,
      """SELECT e.src AS a, e.dst AS b FROM edges e
        |JOIN eprops ep ON ep.id = e.id AND ep.key = 'since'
        |WHERE e.typ = 'KNOWS' AND CAST(ep.value AS DOUBLE) > 2012""".stripMargin, g)
  }

  test("two-hop chain enforces relationship uniqueness") {
    val df = QueryPipeline.evaluate(Queries.q2Cypher, g)
    GraphOracle.check(df, Queries.q2Sql, g)
  }

  test("same-country KNOWS pairs") {
    val df = QueryPipeline.evaluate(Queries.q3Cypher, g)
    GraphOracle.check(df, Queries.q3Sql, g)
  }

  test("variable-length closure: the running example Q1") {
    val df = QueryPipeline.evaluate(Queries.q1Cypher, g)
    GraphOracle.check(df, Queries.q1Sql, g)
  }

  test("Q1 expected rows on the example graph") {
    val rows = QueryPipeline.evaluate(Queries.q1Cypher, g)
      .collect().map(r => (r.getLong(0), r.getLong(1), r.getString(2))).toSet
    assert(rows == Set(
      (1L, 11L, "1→11"),
      (1L, 13L, "1→11→12→13"),
      (2L, 21L, "2→21"),
      (2L, 22L, "2→21→22"),
    ))
  }

  test("bounded variable length *1..1 equals single hop") {
    val one = QueryPipeline.evaluate("MATCH (p:Post)<-[:REPLY*1..1]-(c:Comm) RETURN p, c", g)
    val hop = QueryPipeline.evaluate("MATCH (p:Post)<-[:REPLY]-(c:Comm) RETURN p, c", g)
    TestGraphs.assertSameBag(one, hop)
  }

  test("bounded variable length *2..2 returns exactly depth-2 comments") {
    val df = QueryPipeline.evaluate("MATCH (p:Post)<-[:REPLY*2..2]-(c:Comm) RETURN p, c", g)
    val rows = df.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(rows == Set((1L, 12L), (2L, 22L)))
  }

  test("path unwinding Q4 (bag semantics)") {
    val df = QueryPipeline.evaluate(Queries.q4Cypher, g)
    GraphOracle.check(df, Queries.q4Sql, g)
  }

  test("RETURN DISTINCT deduplicates") {
    val df = QueryPipeline.evaluate(
      "MATCH (p:Post)<-[:REPLY*]-(c:Comm) RETURN DISTINCT p", g)
    GraphOracle.check(df,
      """SELECT DISTINCT e.dst AS p FROM edges e
        |JOIN vertices p ON p.id = e.dst AND p.label = 'Post'
        |WHERE e.typ = 'REPLY'""".stripMargin, g)
  }

  test("cross pattern join on shared variable") {
    val df = QueryPipeline.evaluate(
      "MATCH (c:Comm)-[:REPLY]->(p:Post), (c)-[:HAS_CREATOR]->(a:Person) RETURN c, p, a", g)
    GraphOracle.check(df,
      """SELECT c.id AS c, r.dst AS p, h.dst AS a FROM vertices c
        |JOIN edges r ON r.src = c.id AND r.typ = 'REPLY'
        |JOIN vertices p ON p.id = r.dst AND p.label = 'Post'
        |JOIN edges h ON h.src = c.id AND h.typ = 'HAS_CREATOR'
        |JOIN vertices a ON a.id = h.dst AND a.label = 'Person'
        |WHERE c.label = 'Comm'""".stripMargin, g)
  }

  test("naive all-properties mode returns the same results as inferred mode") {
    for ((_, cypher, _) <- repro.core.Queries.all) {
      val inf = BatchEvaluator.eval(QueryPipeline.compile(cypher), g)
      val naive = BatchEvaluator.eval(
        QueryPipeline.compile(cypher, NraToFra.AllProperties), g)
      TestGraphs.assertSameBag(naive.select(inf.columns.map(col): _*), inf)
    }
  }

  test("named flat path constructs a two-vertex path string") {
    val df = QueryPipeline.evaluate("MATCH t = (c:Comm)-[:REPLY]->(p:Post) RETURN t", g)
    // only REPLY edges whose parent is a Post match the (p:Post) endpoint
    val got = df.collect().map(_.getString(0)).toSet
    assert(got == Set("11→1", "21→2"))
  }
}
