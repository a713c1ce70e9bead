package repro.core

import repro.cypher.CypherParser
import repro.eval.ReferenceSql

/** The benchmark query set (DESIGN.md §3) with the paired hand-written
  * DuckDB reference SQL.
  */
object Queries {

  /** Q1 — the paper's running example: posts with same-language transitive
    * reply comments, thread returned as an atomic path.
    */
  val q1Cypher: String =
    "MATCH t = (p:Post)<-[:REPLY*]-(c:Comm) WHERE c.lang = p.lang RETURN p, c, t"
  def q1Sql: String = ReferenceSql.q1(CypherParser.DefaultMaxHops)

  /** Q2 — flat two-hop: persons two KNOWS steps away from someone in the US. */
  val q2Cypher: String =
    "MATCH (a:Person)-[e1:KNOWS]->(b:Person)-[e2:KNOWS]->(c:Person) " +
      "WHERE c.country = 'US' RETURN a, c"
  val q2Sql: String = ReferenceSql.q2

  /** Q3 — same-country KNOWS pairs (two property accesses on one σ). */
  val q3Cypher: String =
    "MATCH (a:Person)-[e:KNOWS]->(b:Person) WHERE a.country = b.country RETURN a, b"
  val q3Sql: String = ReferenceSql.q3

  /** Q4 — path unwinding: every vertex of every reply thread, as a bag. */
  val q4Cypher: String =
    "MATCH t = (p:Post)<-[:REPLY*]-(c:Comm) UNWIND NODES(t) AS x RETURN p, x"
  def q4Sql: String = ReferenceSql.q4(CypherParser.DefaultMaxHops)

  val all: Seq[(String, String, () => String)] = Seq(
    ("Q1 reply-thread (TC + σ + path)", q1Cypher, () => q1Sql),
    ("Q2 two-hop KNOWS", q2Cypher, () => q2Sql),
    ("Q3 same-country KNOWS", q3Cypher, () => q3Sql),
    ("Q4 thread unwind", q4Cypher, () => q4Sql),
  )
}
