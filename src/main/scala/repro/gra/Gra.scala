package repro.gra

import repro.algebra.Expr
import repro.cypher.Direction

/** Graph relational algebra (paper §2, ref [20]): the target of the
  * openCypher compiler. Two graph-specific operators — the nullary
  * get-vertices `◯` and the unary expand-out `↑` (optionally transitive
  * `↑*`) — plus σ/π/δ and a natural join for multi-pattern MATCH clauses.
  *
  * Property accesses in predicates/projections are still *nested* here
  * ([[repro.algebra.PropRef]]); they become explicit μ unnest operators in
  * the GRA→NRA step.
  */
sealed trait GraOp {
  /** Pretty printer used in tests to pin the compiled shape. */
  def pretty: String = GraOp.pretty(this, 0)
}

/** `◯(v:V)` — all vertices v (optionally with label). */
final case class GGetVertices(v: String, label: Option[String]) extends GraOp

/** `↑(from)^(to:toLabel)[edge:typ]` — navigate one edge (or, with
  * `varLength`, a trail of `min..max` edges) from `from` to `to`.
  * `pathVar` names the traversed path when the enclosing pattern part was
  * bound with `t = ...` (or when trail-uniqueness needs an internal name).
  */
final case class GExpand(
    child: GraOp,
    from: String,
    edge: String,
    to: String,
    typ: Option[String],
    fromLabel: Option[String],
    toLabel: Option[String],
    dir: Direction,
    varLength: Option[(Int, Int)],
    pathVar: Option[String],
) extends GraOp

final case class GNaturalJoin(left: GraOp, right: GraOp) extends GraOp
final case class GSelection(child: GraOp, pred: Expr) extends GraOp
final case class GProjection(child: GraOp, items: Seq[(Expr, String)]) extends GraOp
final case class GDistinct(child: GraOp) extends GraOp
/** UNWIND nodes(path) AS out — bag of the path's vertices (ordering lost,
  * per the paper's atomic-path proposal).
  */
final case class GUnwindPath(child: GraOp, pathVar: String, out: String) extends GraOp

object GraOp {
  def pretty(op: GraOp, indent: Int): String = {
    val pad = "  " * indent
    op match {
      case GGetVertices(v, l) => s"$pad◯($v${l.fold("")(":" + _)})"
      case e: GExpand =>
        val star = e.varLength.fold("")(b => s"*${b._1}..${b._2}")
        val arrow = e.dir match { case repro.cypher.Out => "→"; case repro.cypher.In => "←" }
        s"$pad↑$arrow(${e.from})(${e.to}${e.toLabel.fold("")(":" + _)})[${e.edge}${e.typ.fold("")(":" + _)}$star]${e.pathVar.fold("")(p => s" path=$p")}\n" +
          pretty(e.child, indent + 1)
      case GNaturalJoin(l, r) => s"$pad⋈\n${pretty(l, indent + 1)}\n${pretty(r, indent + 1)}"
      case GSelection(c, p) => s"${pad}σ[$p]\n${pretty(c, indent + 1)}"
      case GProjection(c, items) =>
        s"${pad}π[${items.map { case (e, a) => s"$e→$a" }.mkString(", ")}]\n${pretty(c, indent + 1)}"
      case GDistinct(c) => s"${pad}δ\n${pretty(c, indent + 1)}"
      case GUnwindPath(c, p, o) => s"${pad}unwind-nodes($p→$o)\n${pretty(c, indent + 1)}"
    }
  }
}
