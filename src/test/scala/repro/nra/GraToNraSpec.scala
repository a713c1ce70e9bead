package repro.nra

import org.scalatest.funsuite.AnyFunSuite
import repro.algebra._
import repro.gra.CypherToGra

class GraToNraSpec extends AnyFunSuite {

  private def rewrite(s: String): NraOp = GraToNra.rewrite(CypherToGra.compile(s)).op

  test("get-vertices passes through") {
    rewrite("MATCH (p:Post) RETURN p") match {
      case NProjection(NGetVertices("p", Some("Post")), _) => ()
      case other => fail(other.pretty)
    }
  }

  test("expand-out becomes join with get-edges (paper step 2)") {
    rewrite("MATCH (a:Person)-[e:KNOWS]->(b:Person) RETURN b") match {
      case NProjection(NJoin(NGetVertices("a", _), ge: NGetEdges), _) =>
        assert(ge == NGetEdges("a", "e", "b", Some("KNOWS"), Some("Person"), Some("Person"), reversed = false))
      case other => fail(other.pretty)
    }
  }

  test("incoming expand sets reversed orientation") {
    rewrite("MATCH (a)<-[e:REPLY]-(b) RETURN a") match {
      case NProjection(NJoin(_, ge: NGetEdges), _) => assert(ge.reversed)
      case other => fail(other.pretty)
    }
  }

  test("transitive expand becomes transitive join plus target-label get-vertices") {
    rewrite("MATCH (p:Post)<-[:REPLY*]-(c:Comm) RETURN p") match {
      case NProjection(NJoin(NJoin(NGetVertices("p", _), t: NTransitiveEdges), NGetVertices("c", Some("Comm"))), _) =>
        assert(t.src == "p" && t.dst == "c" && t.typ == Some("REPLY"))
        assert(t.srcLabel == Some("Post") && t.reversed)
      case other => fail(other.pretty)
    }
  }

  test("transitive expand without target label needs no extra join") {
    rewrite("MATCH (p:Post)-[:REPLY*]->(c) RETURN p") match {
      case NProjection(NJoin(NGetVertices("p", _), _: NTransitiveEdges), _) => ()
      case other => fail(other.pretty)
    }
  }

  test("property access in WHERE becomes unnest μ (paper step 2)") {
    rewrite("MATCH (p:Post) WHERE p.lang = 'en' RETURN p") match {
      case NProjection(NSelection(NUnnest(NGetVertices("p", _), PropRef("p", "lang"), "p__lang"), pred), _) =>
        assert(pred == Cmp("=", ColRef("p__lang"), Lit("en")))
      case other => fail(other.pretty)
    }
  }

  test("each distinct property access is unnested once") {
    val op = rewrite("MATCH (p:Post) WHERE p.lang = 'en' AND p.lang = 'de' RETURN p.lang")
    def countUnnests(o: NraOp): Int = o match {
      case NUnnest(c, _, _) => 1 + countUnnests(c)
      case NJoin(l, r) => countUnnests(l) + countUnnests(r)
      case NSelection(c, _) => countUnnests(c)
      case NProjection(c, _) => countUnnests(c)
      case NDistinct(c) => countUnnests(c)
      case NUnwindPath(c, _, _) => countUnnests(c)
      case NPathConstruct(c, _, _, _, _) => countUnnests(c)
      case _ => 0
    }
    assert(countUnnests(op) == 1, op.pretty)
  }

  test("RETURN property accesses are unnested and flattened") {
    rewrite("MATCH (p:Post) RETURN p.lang AS l") match {
      case NProjection(NUnnest(_, PropRef("p", "lang"), "p__lang"), items) =>
        assert(items == Seq((ColRef("p__lang"), "l")))
      case other => fail(other.pretty)
    }
  }

  test("named flat path becomes path-construct") {
    rewrite("MATCH t = (a)-[e:KNOWS]->(b) RETURN t") match {
      case NProjection(NPathConstruct(NJoin(_, _), "t", "a", "e", "b"), _) => ()
      case other => fail(other.pretty)
    }
  }

  test("running example matches the paper's NRA shape") {
    val op = rewrite(repro.TestGraphs.Q1)
    // π σ μμ (◯(p:Post) ⋈* ⇑(REPLY) ⋈ ◯(c:Comm)) with σ over flat cols
    op match {
      case NProjection(NSelection(NUnnest(NUnnest(join, _, _), _, _), pred), _) =>
        assert(pred == Cmp("=", ColRef("c__lang"), ColRef("p__lang")))
        assert(join.isInstanceOf[NJoin])
      case other => fail(other.pretty)
    }
  }

  test("UNWIND passes through with the path name") {
    rewrite("MATCH t = (p:Post)<-[:REPLY*]-(c) UNWIND NODES(t) AS x RETURN x") match {
      case NProjection(NUnwindPath(_, "t", "x"), _) => ()
      case other => fail(other.pretty)
    }
  }
}
