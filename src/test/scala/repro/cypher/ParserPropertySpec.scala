package repro.cypher

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite
import repro.gra.CypherToGra

/** Property-based coverage (raw ScalaCheck — the scalatest bridge artifact
  * is not in the offline cache): every query the generator produces must
  * lex, parse and compile through the whole GRA→NRA→FRA pipeline, and the
  * parse must be deterministic.
  */
class ParserPropertySpec extends AnyFunSuite {

  private def check(name: String, prop: Prop, n: Int = 100): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(n), prop)
    assert(res.passed, s"$name: $res")
  }

  private val ident: Gen[String] =
    for {
      h <- Gen.alphaLowerChar
      t <- Gen.listOfN(3, Gen.alphaNumChar)
    } yield (h :: t).mkString

  private val label: Gen[String] = Gen.oneOf("Post", "Comm", "Person")
  private val etype: Gen[String] = Gen.oneOf("REPLY", "KNOWS", "LIKES")

  private val nodePat: Gen[(String, String)] =
    for {
      v <- ident
      l <- Gen.option(label)
    } yield (v, s"(x$v${l.fold("")(":" + _)})")

  private val relPat: Gen[String] =
    for {
      t <- etype
      dir <- Gen.oneOf(true, false)
      star <- Gen.oneOf("", "*", "*1..3", "*2")
    } yield if (dir) s"-[:$t$star]->" else s"<-[:$t$star]-"

  private val query: Gen[String] =
    for {
      (v1, n1) <- nodePat
      r <- relPat
      (v2, n2) <- nodePat.suchThat(_._1 != v1)
      p <- ident
    } yield s"MATCH p$p = $n1$r$n2 RETURN p$p, x$v1"

  test("generated single-relationship queries parse and compile end to end") {
    check("parse+compile", Prop.forAll(query) { q =>
      val parsed = CypherParser.parse(q)
      val c = CypherToGra.compile(parsed)
      val flat = repro.fra.NraToFra.flatten(repro.nra.GraToNra.rewrite(c))
      parsed.patterns.size == 1 && flat.op.schema.size == 2
    })
  }

  test("parsing is deterministic") {
    check("deterministic", Prop.forAll(query)(q => CypherParser.parse(q) == CypherParser.parse(q)))
  }

  test("random printable garbage only ever raises LexException from the lexer") {
    check("lexer-total", Prop.forAll(Gen.asciiPrintableStr) { s =>
      try { CypherLexer.tokenize(s); true }
      catch { case _: LexException => true }
    })
  }

  test("random token soup only ever raises Parse/Lex exceptions from the parser") {
    val soup = Gen.listOf(Gen.oneOf(
      "MATCH", "RETURN", "(", ")", "[", "]", "-", "->", "<-", ":",
      "a", "b", "*", "1", ",", "WHERE", "=", ".", "'s'"))
    check("parser-total", Prop.forAll(soup) { toks =>
      try { CypherParser.parse(toks.mkString(" ")); true }
      catch { case _: ParseException | _: LexException => true }
    })
  }

  test("var-length bounds parse to the exact (min,max) pair") {
    val bounds = for {
      min <- Gen.choose(1, 5)
      max <- Gen.choose(min, 8)
    } yield (min, max)
    check("bounds", Prop.forAll(bounds) { case (mn, mx) =>
      val q = CypherParser.parse(s"MATCH (a)-[:R*$mn..$mx]->(b) RETURN a")
      q.patterns.head.hops.head._1.varLength.contains((mn, mx))
    })
  }
}
