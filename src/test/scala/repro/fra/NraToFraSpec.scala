package repro.fra

import org.scalatest.funsuite.AnyFunSuite
import repro.algebra._
import repro.core.QueryPipeline
import repro.gra.CompileException

class NraToFraSpec extends AnyFunSuite {

  private def flatten(s: String): FraOp = QueryPipeline.compile(s).op
  private def flattenNaive(s: String): FraOp =
    QueryPipeline.compile(s, NraToFra.AllProperties).op

  test("μ over get-vertices is pushed into the leaf (minimal schema)") {
    flatten("MATCH (p:Post) WHERE p.lang = 'en' RETURN p") match {
      case FProjection(FSelection(FGetVertices("p", Some("Post"), props, false), _), _) =>
        assert(props == Map("lang" -> "p__lang"))
      case other => fail(other.pretty)
    }
  }

  test("μ over an edge source is pushed into the ⇑ leaf") {
    flatten("MATCH (a:Person)-[e:KNOWS]->(b) WHERE a.country = 'US' RETURN b") match {
      case FProjection(FSelection(FJoin(gv: FGetVertices, ge: FGetEdges), _), _) =>
        // a is bound first by ◯(a), which wins the pushdown
        assert(gv.props == Map("country" -> "a__country") || ge.srcProps == Map("country" -> "a__country"))
      case other => fail(other.pretty)
    }
  }

  test("μ over an edge variable lands in edgeProps") {
    flatten("MATCH (a)-[e:KNOWS]->(b) WHERE e.since = '2010' RETURN b") match {
      case FProjection(FSelection(FJoin(_, ge: FGetEdges), _), _) =>
        assert(ge.edgeProps == Map("since" -> "e__since"))
      case other => fail(other.pretty)
    }
  }

  test("μ over a hop target lands in dstProps when the target has no ◯ leaf") {
    flatten("MATCH (a:Person)-[:KNOWS]->(b) WHERE b.country = 'US' RETURN a") match {
      case FProjection(FSelection(FJoin(_, ge: FGetEdges), _), _) =>
        assert(ge.dstProps == Map("country" -> "b__country"))
      case other => fail(other.pretty)
    }
  }

  test("μ over a transitive target synthesises a ◯ join (paths stay property-free)") {
    val op = flatten(repro.TestGraphs.Q1)
    def leaves(o: FraOp): Seq[FraOp] = o match {
      case j: FJoin => j.children.flatMap(leaves)
      case l @ (_: FGetVertices | _: FGetEdges | _: FTransitiveEdges) => Seq(l)
      case other => other.children.flatMap(leaves)
    }
    val ls = leaves(op)
    val gvC = ls.collectFirst { case g @ FGetVertices("c", _, _, _) => g }.get
    assert(gvC.props == Map("lang" -> "c__lang"))
    assert(gvC.label == Some("Comm"))
    val gvP = ls.collectFirst { case g @ FGetVertices("p", _, _, _) => g }.get
    assert(gvP.props == Map("lang" -> "p__lang"))
    val tc = ls.collectFirst { case t: FTransitiveEdges => t }.get
    assert(tc.srcLabel == Some("Post") && tc.reversed && tc.pathName == "t")
  }

  test("μ over an UNWIND alias synthesises a ◯ join above the unwind") {
    flatten("MATCH t = (p:Post)<-[:REPLY*]-(c:Comm) UNWIND NODES(t) AS x RETURN x.lang AS l") match {
      case FProjection(FJoin(FUnwindPath(_, "t", "x"), gv: FGetVertices), _) =>
        assert(gv.v == "x" && gv.props == Map("lang" -> "x__lang") && gv.label.isEmpty)
      case other => fail(other.pretty)
    }
  }

  test("RETURN of a path projects its display string") {
    flatten("MATCH t = (p:Post)<-[:REPLY*]-(c:Comm) RETURN t") match {
      case FProjection(_, items) => assert(items == Seq((PPath("t"), "t")))
      case other => fail(other.pretty)
    }
  }

  test("selection predicates are fully flat after the rewrite") {
    val op = flatten(repro.TestGraphs.Q1)
    def preds(o: FraOp): Seq[Expr] = o match {
      case FSelection(c, p) => p +: preds(c)
      case other => other.children.flatMap(preds)
    }
    assert(preds(op).flatMap(_.propRefs).isEmpty)
  }

  test("schema of the running example") {
    val op = flatten(repro.TestGraphs.Q1)
    assert(op.schema == Seq("p", "c", "t"))
  }

  test("leafProps reports the inferred minimal schema") {
    val op = flatten(repro.TestGraphs.Q1)
    val byVar = NraToFra.leafProps(op).filter(_._2.nonEmpty).toMap
    assert(byVar == Map("p" -> Map("lang" -> "p__lang"), "c" -> Map("lang" -> "c__lang")))
  }

  test("naive mode flips leaves to all-properties") {
    flattenNaive("MATCH (p:Post) WHERE p.lang = 'en' RETURN p") match {
      case FProjection(FSelection(gv: FGetVertices, _), _) => assert(gv.allProps)
      case other => fail(other.pretty)
    }
  }

  test("naive mode synthesises ◯ leaves for vars bound only by ⇑") {
    val op = flattenNaive("MATCH (a:Person)-[:KNOWS]->(b) RETURN a, b")
    def gvs(o: FraOp): Seq[FGetVertices] = o match {
      case g: FGetVertices => Seq(g)
      case other => other.children.flatMap(gvs)
    }
    assert(gvs(op).map(_.v).toSet == Set("a", "b"))
    assert(gvs(op).forall(_.allProps))
  }

  test("projection of edge variables works") {
    flatten("MATCH (a)-[e:KNOWS]->(b) RETURN e") match {
      case FProjection(_, items) => assert(items == Seq((PCol("e"), "e")))
      case other => fail(other.pretty)
    }
  }

  test("literal RETURN items are rejected with a clear error") {
    assertThrows[CompileException](flatten("MATCH (a) RETURN 1 AS one"))
  }
}
