package repro.nra

import repro.algebra.{Expr, PropRef}

/** Nested relational algebra (paper §2, refs [7, 14]): the intermediate
  * representation in which incremental maintenance becomes possible.
  *
  * Differences from GRA (paper workflow step 2):
  *  - expand-out is replaced by a natural join with the nullary
  *    **get-edges** operator `⇑` (so every operator is join-maintainable);
  *  - transitive expand-out is replaced by a **transitive join** with a
  *    transitive get-edges leaf;
  *  - property accesses are explicit **unnest** `μ_{x.key → col}` operators
  *    over the schema-free nested vertex/edge relations.
  */
sealed trait NraOp {
  def pretty: String = NraOp.pretty(this, 0)
}

/** `◯(v:V)` over the nested vertex relation α. */
final case class NGetVertices(v: String, label: Option[String]) extends NraOp

/** `⇑(src:srcLabel)^(dst:dstLabel)[edge:typ]` over the nested edge relation
  * β (already joined with α at both ends, per the paper's definition).
  * `src`/`dst` are in *traversal* orientation; `reversed` records that the
  * pattern traverses the stored edge dst→src.
  */
final case class NGetEdges(
    src: String,
    edge: String,
    dst: String,
    typ: Option[String],
    srcLabel: Option[String],
    dstLabel: Option[String],
    reversed: Boolean,
) extends NraOp

/** Transitive get-edges: all trails of `typ` edges of length min..max from a
  * `srcLabel` vertex, with the path materialised (atomic list — paper §4).
  * The destination label is *not* checked here; the rewriter joins a
  * `◯(dst:Label)` next to it, which keeps path state property- and
  * label-free on the target side.
  */
final case class NTransitiveEdges(
    src: String,
    dst: String,
    typ: Option[String],
    srcLabel: Option[String],
    reversed: Boolean,
    minHops: Int,
    maxHops: Int,
    pathName: String,
) extends NraOp

final case class NJoin(left: NraOp, right: NraOp) extends NraOp
/** μ_{ref → as}: unnests one property of a vertex/edge variable. */
final case class NUnnest(child: NraOp, ref: PropRef, as: String) extends NraOp
final case class NSelection(child: NraOp, pred: Expr) extends NraOp
final case class NProjection(child: NraOp, items: Seq[(Expr, String)]) extends NraOp
final case class NDistinct(child: NraOp) extends NraOp
final case class NUnwindPath(child: NraOp, pathName: String, out: String) extends NraOp
/** Materialises a named path over a single flat relationship as an atomic
  * list value (vertex/edge id arrays).
  */
final case class NPathConstruct(child: NraOp, pathName: String,
    startV: String, edge: String, endV: String) extends NraOp

object NraOp {
  def pretty(op: NraOp, indent: Int): String = {
    val pad = "  " * indent
    op match {
      case NGetVertices(v, l) => s"$pad◯($v${l.fold("")(":" + _)})"
      case e: NGetEdges =>
        val rev = if (e.reversed) " rev" else ""
        s"$pad⇑(${e.src}${e.srcLabel.fold("")(":" + _)})(${e.dst}${e.dstLabel.fold("")(":" + _)})[${e.edge}${e.typ.fold("")(":" + _)}]$rev"
      case t: NTransitiveEdges =>
        val rev = if (t.reversed) " rev" else ""
        s"$pad⇑*(${t.src}${t.srcLabel.fold("")(":" + _)})(${t.dst})[${t.typ.getOrElse("")}*${t.minHops}..${t.maxHops}]$rev path=${t.pathName}"
      case NJoin(l, r) => s"$pad⋈\n${pretty(l, indent + 1)}\n${pretty(r, indent + 1)}"
      case NUnnest(c, ref, as) => s"${pad}μ[${ref.variable}.${ref.key}→$as]\n${pretty(c, indent + 1)}"
      case NSelection(c, p) => s"${pad}σ[$p]\n${pretty(c, indent + 1)}"
      case NProjection(c, items) =>
        s"${pad}π[${items.map { case (e, a) => s"$e→$a" }.mkString(", ")}]\n${pretty(c, indent + 1)}"
      case NDistinct(c) => s"${pad}δ\n${pretty(c, indent + 1)}"
      case NUnwindPath(c, p, o) => s"${pad}unwind-nodes($p→$o)\n${pretty(c, indent + 1)}"
      case NPathConstruct(c, p, s, e, t) => s"${pad}path[$p=($s)-[$e]->($t)]\n${pretty(c, indent + 1)}"
    }
  }
}
