package repro.cypher

import org.scalatest.funsuite.AnyFunSuite

class LexerSpec extends AnyFunSuite {

  private def lex(s: String): Vector[Token] = CypherLexer.tokenize(s)

  test("keywords are case-insensitive") {
    assert(lex("match MATCH Match") == Vector(Keyword("MATCH"), Keyword("MATCH"), Keyword("MATCH"), Eof))
  }

  test("identifiers are case-sensitive and may contain underscores/digits") {
    assert(lex("foo_1 Bar") == Vector(Ident("foo_1"), Ident("Bar"), Eof))
  }

  test("integers") { assert(lex("42") == Vector(NumLit("42"), Eof)) }

  test("decimals") { assert(lex("3.14") == Vector(NumLit("3.14"), Eof)) }

  test("integer followed by range operator is not a decimal") {
    assert(lex("1..3") == Vector(NumLit("1"), Punct(".."), NumLit("3"), Eof))
  }

  test("single-quoted strings") { assert(lex("'en'") == Vector(StrLit("en"), Eof)) }

  test("double-quoted strings") { assert(lex("\"de at\"") == Vector(StrLit("de at"), Eof)) }

  test("string escapes") { assert(lex("'a\\'b'") == Vector(StrLit("a'b"), Eof)) }

  test("unterminated string fails") {
    assertThrows[LexException](lex("'oops"))
  }

  test("arrows and comparison operators") {
    assert(lex("-> <- <> <= >= < > =") == Vector(
      Punct("->"), Punct("<-"), Punct("<>"), Punct("<="), Punct(">="),
      Punct("<"), Punct(">"), Punct("="), Eof))
  }

  test("pattern punctuation") {
    assert(lex("()[]:,.*-") == Vector(
      Punct("("), Punct(")"), Punct("["), Punct("]"), Punct(":"),
      Punct(","), Punct("."), Punct("*"), Punct("-"), Eof))
  }

  test("property access tokens") {
    assert(lex("p.lang") == Vector(Ident("p"), Punct("."), Ident("lang"), Eof))
  }

  test("full pattern tokenises") {
    val ts = lex("MATCH (p:Post)<-[:REPLY*]-(c:Comm) RETURN p")
    assert(ts.head == Keyword("MATCH"))
    assert(ts.contains(Punct("<-")))
    assert(ts.contains(Punct("*")))
    assert(ts.last == Eof)
  }

  test("unexpected character fails") {
    assertThrows[LexException](lex("a ! b"))
  }

  test("whitespace including newlines is skipped") {
    assert(lex("a\n\tb") == Vector(Ident("a"), Ident("b"), Eof))
  }

  test("NODES is a keyword") {
    assert(lex("nodes") == Vector(Keyword("NODES"), Eof))
  }
}
