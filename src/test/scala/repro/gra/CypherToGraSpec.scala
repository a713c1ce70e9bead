package repro.gra

import org.scalatest.funsuite.AnyFunSuite
import repro.algebra._
import repro.cypher._

class CypherToGraSpec extends AnyFunSuite {

  private def compile(s: String) = CypherToGra.compile(s)

  test("single labelled node compiles to get-vertices") {
    val c = compile("MATCH (p:Post) RETURN p")
    c.op match {
      case GProjection(GGetVertices("p", Some("Post")), items) =>
        assert(items == Seq((ColRef("p"), "p")))
      case other => fail(other.pretty)
    }
  }

  test("single hop compiles to expand-out over get-vertices") {
    val c = compile("MATCH (a:Person)-[e:KNOWS]->(b:Person) RETURN b")
    c.op match {
      case GProjection(ex: GExpand, _) =>
        assert(ex.from == "a" && ex.to == "b" && ex.edge == "e")
        assert(ex.typ == Some("KNOWS") && ex.dir == Out && ex.varLength.isEmpty)
        assert(ex.fromLabel == Some("Person") && ex.toLabel == Some("Person"))
        assert(ex.child == GGetVertices("a", Some("Person")))
      case other => fail(other.pretty)
    }
  }

  test("incoming hop keeps In direction") {
    val c = compile("MATCH (a)<-[:REPLY]-(b) RETURN a")
    c.op match {
      case GProjection(ex: GExpand, _) => assert(ex.dir == In)
      case other => fail(other.pretty)
    }
  }

  test("chained hops nest expands") {
    val c = compile("MATCH (a)-[:KNOWS]->(b)-[:KNOWS]->(d) RETURN d")
    c.op match {
      case GProjection(GSelection(e2: GExpand, _), _) =>
        // trail-uniqueness σ between the two KNOWS edges sits above the chain
        assert(e2.from == "b" && e2.to == "d")
        assert(e2.child.isInstanceOf[GExpand])
      case other => fail(other.pretty)
    }
  }

  test("edge-uniqueness predicates are injected for same-typed flat edges") {
    val c = compile("MATCH (a)-[e1:KNOWS]->(b)-[e2:KNOWS]->(d) RETURN d")
    c.op match {
      case GProjection(GSelection(_, pred), _) =>
        assert(pred == Cmp("<>", ColRef("e1"), ColRef("e2")))
      case other => fail(other.pretty)
    }
  }

  test("flat edge vs path edge-array uniqueness uses NotInArray") {
    val c = compile("MATCH t = (a)-[:REPLY*]->(b), (a)-[e:REPLY]->(x) RETURN b")
    var found = false
    def walk(op: GraOp): Unit = op match {
      case GSelection(ch, pred) =>
        if (pred.toString.contains("NotInArray")) found = true
        walk(ch)
      case GProjection(ch, _) => walk(ch)
      case GNaturalJoin(l, r) => walk(l); walk(r)
      case e: GExpand => walk(e.child)
      case _ =>
    }
    walk(c.op)
    assert(found, c.op.pretty)
  }

  test("two var-length patterns get ArraysDisjoint uniqueness") {
    val c = compile("MATCH (a)-[:R*]->(b), (a)-[:R*]->(d) RETURN b, d")
    var found = false
    def walk(op: GraOp): Unit = op match {
      case GSelection(ch, pred) =>
        if (pred.toString.contains("ArraysDisjoint")) found = true; walk(ch)
      case GProjection(ch, _) => walk(ch)
      case GNaturalJoin(l, r) => walk(l); walk(r)
      case e: GExpand => walk(e.child)
      case _ =>
    }
    walk(c.op)
    assert(found, c.op.pretty)
  }

  test("multiple pattern parts natural-join") {
    val c = compile("MATCH (a:Person), (b:Post) RETURN a, b")
    c.op match {
      case GProjection(GNaturalJoin(GGetVertices("a", _), GGetVertices("b", _)), _) => ()
      case other => fail(other.pretty)
    }
  }

  test("WHERE becomes selection") {
    val c = compile("MATCH (p:Post) WHERE p.lang = 'en' RETURN p")
    c.op match {
      case GProjection(GSelection(GGetVertices("p", _), Cmp("=", PropRef("p", "lang"), Lit("en"))), _) => ()
      case other => fail(other.pretty)
    }
  }

  test("DISTINCT becomes dedup on top") {
    val c = compile("MATCH (p:Post) RETURN DISTINCT p")
    assert(c.op.isInstanceOf[GDistinct])
  }

  test("UNWIND becomes unwind-path below projection") {
    val c = compile("MATCH t = (p:Post)<-[:REPLY*]-(c) UNWIND NODES(t) AS x RETURN x")
    c.op match {
      case GProjection(GUnwindPath(_, "t", "x"), _) => ()
      case other => fail(other.pretty)
    }
  }

  test("UNWIND of a non-path variable is rejected") {
    assertThrows[CompileException](
      compile("MATCH (p:Post) UNWIND NODES(p) AS x RETURN x"))
  }

  test("named multi-hop paths are rejected (documented restriction)") {
    assertThrows[CompileException](
      compile("MATCH t = (a)-[:R]->(b)-[:R]->(d) RETURN t"))
  }

  test("conflicting labels for one variable are rejected") {
    assertThrows[CompileException](
      compile("MATCH (a:Post), (a:Comm) RETURN a"))
  }

  test("RETURN of unknown variable is rejected") {
    assertThrows[CompileException](compile("MATCH (a) RETURN b"))
  }

  test("running example: transitive expand with path, labels recorded") {
    val c = compile(repro.TestGraphs.Q1)
    assert(c.labelOf == Map("p" -> "Post", "c" -> "Comm"))
    assert(c.pathNames == Set("t"))
    var expand: Option[GExpand] = None
    def walk(op: GraOp): Unit = op match {
      case e: GExpand => expand = Some(e); walk(e.child)
      case GSelection(ch, _) => walk(ch)
      case GProjection(ch, _) => walk(ch)
      case GNaturalJoin(l, r) => walk(l); walk(r)
      case _ =>
    }
    walk(c.op)
    val e = expand.get
    assert(e.varLength == Some((1, repro.cypher.CypherParser.DefaultMaxHops)))
    assert(e.pathVar == Some("t") && e.dir == In)
    assert(e.fromLabel == Some("Post") && e.toLabel == Some("Comm"))
  }

  test("variable reuse across parts produces shared-variable join") {
    val c = compile("MATCH (a)-[:KNOWS]->(b), (b)-[:KNOWS]->(d) RETURN a, d")
    assert(c.vertexVars == Set("a", "b", "d"))
  }
}
