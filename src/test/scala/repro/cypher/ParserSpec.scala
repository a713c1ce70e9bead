package repro.cypher

import org.scalatest.funsuite.AnyFunSuite
import repro.algebra._

class ParserSpec extends AnyFunSuite {

  private def parse(s: String): CypherQuery = CypherParser.parse(s)

  test("minimal query") {
    val q = parse("MATCH (n) RETURN n")
    assert(q.patterns.size == 1)
    assert(q.patterns.head.start == NodePat("n", None))
    assert(q.items == Seq(ReturnItem(ColRef("n"), "n")))
    assert(!q.distinct && q.where.isEmpty && q.unwind.isEmpty)
  }

  test("node label") {
    val q = parse("MATCH (p:Post) RETURN p")
    assert(q.patterns.head.start == NodePat("p", Some("Post")))
  }

  test("anonymous node gets a fresh variable") {
    val q = parse("MATCH (a)-[:KNOWS]->() RETURN a")
    val (_, end) = q.patterns.head.hops.head
    assert(end.variable.startsWith("__v"))
  }

  test("outgoing relationship with type") {
    val q = parse("MATCH (a)-[e:KNOWS]->(b) RETURN a")
    val (rel, node) = q.patterns.head.hops.head
    assert(rel == RelPat(Some("e"), Some("KNOWS"), Out, None))
    assert(node == NodePat("b", None))
  }

  test("incoming relationship") {
    val q = parse("MATCH (a)<-[:REPLY]-(b) RETURN a")
    val (rel, _) = q.patterns.head.hops.head
    assert(rel.dir == In && rel.typ == Some("REPLY"))
  }

  test("anonymous relationship gets a fresh variable") {
    val q = parse("MATCH (a)-[]->(b) RETURN a")
    assert(q.patterns.head.hops.head._1.variable.exists(_.startsWith("__e")))
  }

  test("bare star is 1..default") {
    val q = parse("MATCH (a)-[:REPLY*]->(b) RETURN a")
    assert(q.patterns.head.hops.head._1.varLength == Some((1, CypherParser.DefaultMaxHops)))
  }

  test("star with exact bound") {
    val q = parse("MATCH (a)-[:REPLY*2]->(b) RETURN a")
    assert(q.patterns.head.hops.head._1.varLength == Some((2, 2)))
  }

  test("star with exact bound 1") {
    val q = parse("MATCH (a)-[:REPLY*1]->(b) RETURN a")
    assert(q.patterns.head.hops.head._1.varLength == Some((1, 1)))
  }

  test("star with range") {
    val q = parse("MATCH (a)-[:REPLY*2..5]->(b) RETURN a")
    assert(q.patterns.head.hops.head._1.varLength == Some((2, 5)))
  }

  test("star with open upper bound") {
    val q = parse("MATCH (a)-[:REPLY*2..]->(b) RETURN a")
    assert(q.patterns.head.hops.head._1.varLength == Some((2, CypherParser.DefaultMaxHops)))
  }

  test("star with open lower bound") {
    val q = parse("MATCH (a)-[:REPLY*..5]->(b) RETURN a")
    assert(q.patterns.head.hops.head._1.varLength == Some((1, 5)))
  }

  test("invalid var-length bounds are rejected") {
    assertThrows[ParseException](parse("MATCH (a)-[:R*3..2]->(b) RETURN a"))
  }

  test("zero-length patterns are rejected (paper fragment: min >= 1)") {
    assertThrows[ParseException](parse("MATCH (a)-[:R*0..2]->(b) RETURN a"))
  }

  test("named path") {
    val q = parse("MATCH t = (p:Post)<-[:REPLY*]-(c:Comm) RETURN t")
    assert(q.patterns.head.pathVar == Some("t"))
  }

  test("multiple pattern parts") {
    val q = parse("MATCH (a)-[:KNOWS]->(b), (b)-[:KNOWS]->(c) RETURN a, c")
    assert(q.patterns.size == 2)
  }

  test("chained hops in one part") {
    val q = parse("MATCH (a)-[:KNOWS]->(b)-[:KNOWS]->(c) RETURN a")
    assert(q.patterns.head.hops.size == 2)
  }

  test("WHERE with property equality") {
    val q = parse("MATCH (p:Post) WHERE p.lang = 'en' RETURN p")
    assert(q.where == Some(Cmp("=", PropRef("p", "lang"), Lit("en"))))
  }

  test("WHERE comparing two properties") {
    val q = parse(repro.TestGraphs.Q1)
    assert(q.where == Some(Cmp("=", PropRef("c", "lang"), PropRef("p", "lang"))))
  }

  test("WHERE with AND/OR/NOT precedence") {
    val q = parse("MATCH (n) WHERE NOT n.a = 1 AND n.b = 2 OR n.c = 3 RETURN n")
    q.where.get match {
      case Or(And(Not(_), _), _) => ()
      case other => fail(s"unexpected tree $other")
    }
  }

  test("WHERE with parentheses") {
    val q = parse("MATCH (n) WHERE n.a = 1 AND (n.b = 2 OR n.c = 3) RETURN n")
    q.where.get match {
      case And(_, Or(_, _)) => ()
      case other => fail(s"unexpected tree $other")
    }
  }

  test("numeric comparisons") {
    val q = parse("MATCH (n) WHERE n.age >= 30 RETURN n")
    assert(q.where == Some(Cmp(">=", PropRef("n", "age"), Lit(30L))))
  }

  test("decimal literals") {
    val q = parse("MATCH (n) WHERE n.score < 2.5 RETURN n")
    assert(q.where == Some(Cmp("<", PropRef("n", "score"), Lit(2.5))))
  }

  test("RETURN DISTINCT") {
    assert(parse("MATCH (n) RETURN DISTINCT n").distinct)
  }

  test("RETURN with alias") {
    val q = parse("MATCH (n) RETURN n.lang AS l")
    assert(q.items == Seq(ReturnItem(PropRef("n", "lang"), "l")))
  }

  test("RETURN property without alias uses canonical flat name") {
    val q = parse("MATCH (n) RETURN n.lang")
    assert(q.items == Seq(ReturnItem(PropRef("n", "lang"), "n__lang")))
  }

  test("UNWIND nodes(path)") {
    val q = parse("MATCH t = (p:Post)<-[:REPLY*]-(c) UNWIND NODES(t) AS x RETURN x")
    assert(q.unwind == Some(("t", "x")))
  }

  test("trailing garbage is rejected") {
    assertThrows[ParseException](parse("MATCH (n) RETURN n n"))
  }

  test("missing RETURN is rejected") {
    assertThrows[ParseException](parse("MATCH (n)"))
  }

  test("running example round-trips") {
    val q = parse(repro.TestGraphs.Q1)
    assert(q.patterns.head.pathVar == Some("t"))
    val (rel, end) = q.patterns.head.hops.head
    assert(rel.dir == In && rel.varLength.isDefined && rel.typ == Some("REPLY"))
    assert(end == NodePat("c", Some("Comm")))
    assert(q.items.map(_.alias) == Seq("p", "c", "t"))
  }
}
