package repro.cypher

import repro.algebra._

final case class ParseException(msg: String) extends RuntimeException(msg)

/** Recursive-descent parser for the mini-openCypher fragment (grammar in
  * [[CypherAst]]). Anonymous nodes/relationships get fresh `__vN` / `__eN`
  * variables so every element is addressable by later compilation stages.
  */
object CypherParser {

  /** The default upper bound for unbounded `*` patterns. openCypher's `*` is
    * 1..∞; we bound the closure (DESIGN.md §2.3) and use the same bound in
    * the batch evaluator, the IVM engine and the DuckDB oracle.
    */
  val DefaultMaxHops = 12

  def parse(input: String): CypherQuery = new P(CypherLexer.tokenize(input)).query()

  private final class P(tokens: Vector[Token]) {
    private var pos = 0
    private var fresh = 0

    private def cur: Token = tokens(pos)
    private def advance(): Token = { val t = cur; pos += 1; t }
    private def err(msg: String): Nothing =
      throw ParseException(s"$msg (at token #$pos: $cur)")
    private def expectPunct(p: String): Unit = cur match {
      case Punct(`p`) => pos += 1
      case _ => err(s"expected '$p'")
    }
    private def expectKeyword(k: String): Unit = cur match {
      case Keyword(`k`) => pos += 1
      case _ => err(s"expected $k")
    }
    private def isPunct(p: String): Boolean = cur == Punct(p)
    private def isKeyword(k: String): Boolean = cur == Keyword(k)
    private def ident(): String = cur match {
      case Ident(n) => pos += 1; n
      case _ => err("expected identifier")
    }
    private def freshVar(prefix: String): String = { fresh += 1; s"__$prefix$fresh" }

    def query(): CypherQuery = {
      expectKeyword("MATCH")
      val parts = Vector.newBuilder[PatternPart]
      parts += patternPart()
      while (isPunct(",")) { advance(); parts += patternPart() }
      val where = if (isKeyword("WHERE")) { advance(); Some(expr()) } else None
      val unwind =
        if (isKeyword("UNWIND")) {
          advance(); expectKeyword("NODES"); expectPunct("(")
          val pv = ident(); expectPunct(")")
          expectKeyword("AS"); val a = ident()
          Some((pv, a))
        } else None
      expectKeyword("RETURN")
      val distinct = if (isKeyword("DISTINCT")) { advance(); true } else false
      val items = Vector.newBuilder[ReturnItem]
      items += returnItem()
      while (isPunct(",")) { advance(); items += returnItem() }
      if (cur != Eof) err("trailing input after RETURN clause")
      CypherQuery(parts.result(), where, unwind, distinct, items.result())
    }

    private def patternPart(): PatternPart = {
      // `t = (...)...` — path variable binding
      val next = if (pos + 1 < tokens.length) tokens(pos + 1) else Eof
      val pathVar = (cur, next) match {
        case (Ident(n), Punct("=")) => pos += 2; Some(n)
        case _ => None
      }
      val start = nodePat()
      val hops = Vector.newBuilder[(RelPat, NodePat)]
      while (isPunct("-") || isPunct("<-")) {
        val rel = relPat()
        val node = nodePat()
        hops += ((rel, node))
      }
      PatternPart(pathVar, start, hops.result())
    }

    private def nodePat(): NodePat = {
      expectPunct("(")
      val v = cur match {
        case Ident(n) => pos += 1; n
        case _ => freshVar("v")
      }
      val label = if (isPunct(":")) { advance(); Some(ident()) } else None
      expectPunct(")")
      NodePat(v, label)
    }

    private def relPat(): RelPat = {
      val leftIn = isPunct("<-") // `<-[...]-`
      advance() // '-' or '<-'
      var variable: Option[String] = None
      var typ: Option[String] = None
      var varLength: Option[(Int, Int)] = None
      if (isPunct("[")) {
        advance()
        cur match {
          case Ident(n) => pos += 1; variable = Some(n)
          case _ =>
        }
        if (isPunct(":")) { advance(); typ = Some(ident()) }
        if (isPunct("*")) {
          advance()
          // `*` bare: 1..default. `*n`: exactly n. `*a..b`: range.
          // `*a..`: a..default. `*..b`: 1..b.
          var min = 1
          var max = DefaultMaxHops
          var sawMin = false
          cur match {
            case NumLit(t) => pos += 1; min = t.toInt; sawMin = true
            case _ =>
          }
          if (isPunct("..")) {
            advance()
            cur match {
              case NumLit(t) => pos += 1; max = t.toInt
              case _ => max = DefaultMaxHops
            }
          } else if (sawMin) max = min
          varLength = Some((min, max))
        }
        expectPunct("]")
      }
      val dir =
        if (leftIn) { expectPunct("-"); In }
        else if (isPunct("->")) { advance(); Out }
        else err("expected '->' or '-' to close relationship pattern")
      if (varLength.exists { case (mn, mx) => mn < 1 || mx < mn })
        err("variable-length bounds must satisfy 1 <= min <= max")
      RelPat(variable.orElse(Some(freshVar("e"))), typ, dir, varLength)
    }

    // expr := orExpr
    private def expr(): Expr = orExpr()
    private def orExpr(): Expr = {
      var e = andExpr()
      while (isKeyword("OR")) { advance(); e = Or(e, andExpr()) }
      e
    }
    private def andExpr(): Expr = {
      var e = notExpr()
      while (isKeyword("AND")) { advance(); e = And(e, notExpr()) }
      e
    }
    private def notExpr(): Expr =
      if (isKeyword("NOT")) { advance(); Not(notExpr()) } else comparison()

    private def comparison(): Expr = {
      val l = atom()
      cur match {
        case Punct(op @ ("=" | "<>" | "<" | "<=" | ">" | ">=")) =>
          advance(); Cmp(op, l, atom())
        case _ => l
      }
    }

    private def atom(): Expr = cur match {
      case Punct("(") => advance(); val e = expr(); expectPunct(")"); e
      case StrLit(s) => advance(); Lit(s)
      case NumLit(t) =>
        advance()
        if (t.contains('.')) Lit(t.toDouble) else Lit(t.toLong)
      case Ident(n) =>
        advance()
        if (isPunct(".")) { advance(); PropRef(n, ident()) } else ColRef(n)
      case other => err(s"expected expression atom, got $other")
    }

    private def returnItem(): ReturnItem = {
      val e = atom() // return items are variables or property accesses
      val alias =
        if (isKeyword("AS")) { advance(); ident() }
        else e match {
          case ColRef(n) => n
          case p: PropRef => p.flatName
          case _ => err("complex RETURN item needs an AS alias")
        }
      ReturnItem(e, alias)
    }
  }
}
