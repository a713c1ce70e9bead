package repro.cypher

import repro.algebra.Expr

/** AST for the mini-openCypher fragment the paper identifies as
  * incrementally maintainable (see DESIGN.md §1 "openCypher grammar").
  *
  * Grammar (informal):
  * {{{
  *   query     := MATCH patternPart (',' patternPart)*
  *                [WHERE expr]
  *                [UNWIND NODES '(' ident ')' AS ident]
  *                RETURN [DISTINCT] item (',' item)*
  *   patternPart := [ident '='] nodePat (relPat nodePat)*
  *   nodePat   := '(' [ident] [':' ident] ')'
  *   relPat    := '-' ['[' [ident] [':' ident] ['*' [int] ['..' [int]]] ']'] '->'
  *              | '<-' ['[' ... ']'] '-'
  *   item      := expr [AS ident] | ident
  * }}}
  */
final case class NodePat(variable: String, label: Option[String])

sealed trait Direction
case object Out extends Direction
case object In extends Direction

/** `varLength = None` is a single hop; `Some((min, max))` is a `*min..max`
  * variable-length pattern with openCypher trail semantics.
  */
final case class RelPat(
    variable: Option[String],
    typ: Option[String],
    dir: Direction,
    varLength: Option[(Int, Int)],
)

final case class PatternPart(
    pathVar: Option[String],
    start: NodePat,
    hops: Seq[(RelPat, NodePat)],
)

final case class ReturnItem(expr: Expr, alias: String)

final case class CypherQuery(
    patterns: Seq[PatternPart],
    where: Option[Expr],
    unwind: Option[(String, String)], // (path variable, alias for unwound vertex)
    distinct: Boolean,
    items: Seq[ReturnItem],
)
