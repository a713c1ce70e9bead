package repro.eval

import org.apache.spark.sql.DataFrame
import repro.Oracle
import repro.graph.PropertyGraph
import repro.ivm.Rel

/** DuckDB reference checking for property-graph queries.
  *
  * Encodes the graph as four flat tables (`vertices`, `vprops`, `edges`,
  * `eprops`) and delegates to [[repro.Oracle.assertEquivalent]]. Reference
  * SQL is hand-written per query (so the oracle is independent of this
  * repo's compiler); `*`-patterns use DuckDB `WITH RECURSIVE` trail
  * enumeration — [[ReferenceSql.replyTrailCte]] builds the shared CTE.
  */
object GraphOracle {

  def tables(g: PropertyGraph): Seq[(String, DataFrame)] = Seq(
    "vertices" -> g.vertices,
    "vprops" -> g.vprops,
    "edges" -> g.edges,
    "eprops" -> g.eprops,
  )

  /** Check a plain (uncounted) result against reference SQL. */
  def check(result: DataFrame, sql: String, g: PropertyGraph): Unit =
    Oracle.assertEquivalent(result, sql, tables(g): _*)

  /** Check a counted (IVM view) result: multiplicities expand to rows. */
  def checkCounted(view: DataFrame, sql: String, g: PropertyGraph): Unit =
    check(Rel.expand(view), sql, g)
}

/** Hand-written DuckDB reference SQL shared by tests and benches. */
object ReferenceSql {

  /** Recursive CTE enumerating trails (edge-unique, openCypher semantics)
    * of `typ` edges, traversed `reversed` or not, from sources of
    * `srcLabel`, up to `maxHops`. Produces `trail(src, dst, vs, es)` where
    * `vs` is the vertex-id list in traversal order.
    */
  def trailCte(typ: String, srcLabel: String, reversed: Boolean, maxHops: Int): String = {
    val (from, to) = if (reversed) ("dst", "src") else ("src", "dst")
    s"""WITH RECURSIVE trail(src, dst, vs, es) AS (
       |    SELECT e.$from, e.$to, [e.$from, e.$to], [e.id]
       |    FROM edges e JOIN vertices v ON v.id = e.$from AND v.label = '$srcLabel'
       |    WHERE e.typ = '$typ'
       |  UNION ALL
       |    SELECT t.src, e.$to, list_append(t.vs, e.$to), list_append(t.es, e.id)
       |    FROM trail t
       |    JOIN edges e ON e.typ = '$typ' AND e.$from = t.dst
       |      AND NOT list_contains(t.es, e.id)
       |    WHERE len(t.es) < $maxHops
       |)""".stripMargin
  }

  /** The running example Q1 (paper §2): posts with same-language transitive
    * reply comments and the thread path.
    */
  def q1(maxHops: Int): String =
    trailCte("REPLY", "Post", reversed = true, maxHops) +
      s"""
         |SELECT t.src AS p, t.dst AS c, array_to_string(t.vs, '→') AS t
         |FROM trail t
         |JOIN vertices c ON c.id = t.dst AND c.label = 'Comm'
         |JOIN vprops pl ON pl.id = t.src AND pl.key = 'lang'
         |JOIN vprops cl ON cl.id = t.dst AND cl.key = 'lang'
         |WHERE cl.value = pl.value""".stripMargin

  /** Q2: two-hop flat pattern — who knows someone who knows someone from a
    * given country.
    */
  val q2: String =
    """SELECT a.id AS a, c.id AS c
      |FROM vertices a
      |JOIN edges e1 ON e1.typ = 'KNOWS' AND e1.src = a.id
      |JOIN vertices b ON b.id = e1.dst AND b.label = 'Person'
      |JOIN edges e2 ON e2.typ = 'KNOWS' AND e2.src = b.id
      |JOIN vertices c ON c.id = e2.dst AND c.label = 'Person'
      |JOIN vprops cc ON cc.id = c.id AND cc.key = 'country'
      |WHERE a.label = 'Person' AND e1.id <> e2.id AND cc.value = 'US'""".stripMargin

  /** Q3: same-country KNOWS pairs. */
  val q3: String =
    """SELECT a.id AS a, b.id AS b
      |FROM vertices a
      |JOIN edges e ON e.typ = 'KNOWS' AND e.src = a.id
      |JOIN vertices b ON b.id = e.dst AND b.label = 'Person'
      |JOIN vprops ac ON ac.id = a.id AND ac.key = 'country'
      |JOIN vprops bc ON bc.id = b.id AND bc.key = 'country'
      |WHERE a.label = 'Person' AND ac.value = bc.value""".stripMargin

  /** Q4: thread unwinding — every vertex on every reply thread (bag). */
  def q4(maxHops: Int): String =
    trailCte("REPLY", "Post", reversed = true, maxHops) +
      s"""
         |SELECT t.src AS p, unnest(t.vs) AS x
         |FROM trail t
         |JOIN vertices c ON c.id = t.dst AND c.label = 'Comm'""".stripMargin
}
