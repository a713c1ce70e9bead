package repro.bench

import repro.SparkSpec
import repro.core.Queries

/** Table 6 — minimal schema inference: operator-state footprint with the
  * paper's μ-pushdown (each leaf materialises only the properties the query
  * needs) vs naive all-properties leaves.
  */
class Table6SchemaBench extends SparkSpec {

  test("Table 6: inferred minimal schema vs all-properties state footprint") {
    val queries = Seq(
      ("Q1 reply-thread", Queries.q1Cypher),
      ("Q2 two-hop KNOWS", Queries.q2Cypher),
      ("Q3 same-country", Queries.q3Cypher))
    println(Harness.header("Table 6: schema inference (SF=0.02)",
      f"${"query"}%-18s ${"mode"}%-10s ${"init ms"}%9s ${"state rows"}%11s ${"state cells"}%12s"))
    val points = Harness.schemaFootprint(spark, queries, sf = 0.02)
    points.foreach(p =>
      println(f"${p.query}%-18s ${p.mode}%-10s ${p.initMs}%9.0f ${p.stateRows}%11d ${p.stateCells}%12d"))
    points.grouped(2).foreach { case Seq(inf, nai) =>
      val ratio = nai.stateCells.toDouble / inf.stateCells
      println(f"${inf.query}%-18s cell reduction: ${ratio}%.2fx")
      assert(nai.stateCells > inf.stateCells,
        s"${inf.query}: naive (${nai.stateCells}) should exceed inferred (${inf.stateCells})")
    }
    println("paper: no published numbers (claim: query-driven minimal schema, no a-priori data schema)")
  }
}
