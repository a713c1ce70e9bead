package repro.fra

import repro.algebra.Expr

/** Flat relational algebra (paper workflow step 3, refs [7, 25]).
  *
  * All nesting is gone: μ unnest operators have been pushed into the leaves
  * as `props` maps — each leaf declares exactly the properties the query
  * needs (*minimal schema inference*; the property graph is schema-free so
  * this cannot be read off a catalog). Paths remain as atomic array-valued
  * columns `<name>__vs` / `<name>__es` (the paper's ORD concession).
  *
  * Every operator here is (a) evaluable one-shot on a snapshot
  * ([[repro.eval.BatchEvaluator]]) and (b) incrementally maintainable
  * ([[repro.ivm.IvmPlanner]]).
  */
sealed trait FraOp {
  /** Output columns (multiplicities excluded). */
  def schema: Seq[String] = this match {
    case FGetVertices(v, _, props, _) => v +: props.values.toSeq
    case g: FGetEdges =>
      Seq(g.src, g.edge, g.dst) ++ g.srcProps.values ++ g.edgeProps.values ++ g.dstProps.values
    case t: FTransitiveEdges => Seq(t.src, t.dst, s"${t.pathName}__vs", s"${t.pathName}__es")
    case FJoin(l, r) => (l.schema ++ r.schema).distinct
    case FSelection(c, _) => c.schema
    case FProjection(_, items) => items.map(_._2)
    case FDistinct(c) => c.schema
    case FUnwindPath(c, _, out) => c.schema :+ out
    case p: FPathConstruct => p.child.schema ++ Seq(s"${p.pathName}__vs", s"${p.pathName}__es")
  }

  def pretty: String = FraOp.pretty(this, 0)

  def children: Seq[FraOp] = this match {
    case FJoin(l, r) => Seq(l, r)
    case FSelection(c, _) => Seq(c)
    case FProjection(c, _) => Seq(c)
    case FDistinct(c) => Seq(c)
    case FUnwindPath(c, _, _) => Seq(c)
    case FPathConstruct(c, _, _, _, _) => Seq(c)
    case _ => Seq.empty
  }
}

/** Leaf: vertices with label filter and the pushed-down properties
  * `key → output column`. `allProps = true` is the naive (no schema
  * inference) baseline: the leaf additionally materialises *every* property
  * key present in the data as `<v>__<key>` (Table 6).
  */
final case class FGetVertices(v: String, label: Option[String], props: Map[String, String],
    allProps: Boolean = false) extends FraOp

/** Leaf: one edge hop in traversal orientation with pushed-down properties
  * for the endpoints and the edge itself. `allProps = true` materialises
  * every edge-property key as `<edge>__<key>` (naive baseline).
  */
final case class FGetEdges(
    src: String,
    edge: String,
    dst: String,
    typ: Option[String],
    srcLabel: Option[String],
    dstLabel: Option[String],
    reversed: Boolean,
    srcProps: Map[String, String],
    edgeProps: Map[String, String],
    dstProps: Map[String, String],
    allProps: Boolean = false,
) extends FraOp

/** Leaf: trails of length min..max (openCypher edge-uniqueness) over `typ`
  * edges from a `srcLabel` source, path materialised as id arrays.
  */
final case class FTransitiveEdges(
    src: String,
    dst: String,
    typ: Option[String],
    srcLabel: Option[String],
    reversed: Boolean,
    minHops: Int,
    maxHops: Int,
    pathName: String,
) extends FraOp

/** Natural join on the shared columns of the two schemas. */
final case class FJoin(left: FraOp, right: FraOp) extends FraOp
final case class FSelection(child: FraOp, pred: Expr) extends FraOp

/** Bag projection. Items are (expression, alias); [[PPath]] renders a path
  * column to its canonical display string.
  */
final case class FProjection(child: FraOp, items: Seq[(ProjExpr, String)]) extends FraOp
sealed trait ProjExpr
final case class PCol(name: String) extends ProjExpr
/** Formats path `<name>__vs` as "v1→v2→…" (vertex ids in traversal order). */
final case class PPath(pathName: String) extends ProjExpr

final case class FDistinct(child: FraOp) extends FraOp
final case class FUnwindPath(child: FraOp, pathName: String, out: String) extends FraOp
/** Stateless: adds `<path>__vs = [startV, endV]`, `<path>__es = [edge]`. */
final case class FPathConstruct(child: FraOp, pathName: String,
    startV: String, edge: String, endV: String) extends FraOp

object FraOp {
  def pretty(op: FraOp, indent: Int): String = {
    val pad = "  " * indent
    def props(m: Map[String, String]): String =
      if (m.isEmpty) "" else m.map { case (k, c) => s"$k→$c" }.mkString("{", ",", "}")
    op match {
      case FGetVertices(v, l, p, all) =>
        s"$pad◯($v${l.fold("")(":" + _)}${props(p)}${if (all) "{*}" else ""})"
      case g: FGetEdges =>
        val rev = if (g.reversed) " rev" else ""
        s"$pad⇑(${g.src}${g.srcLabel.fold("")(":" + _)}${props(g.srcProps)})(${g.dst}${g.dstLabel.fold("")(":" + _)}${props(g.dstProps)})[${g.edge}${g.typ.fold("")(":" + _)}${props(g.edgeProps)}]$rev"
      case t: FTransitiveEdges =>
        val rev = if (t.reversed) " rev" else ""
        s"$pad⇑*(${t.src}${t.srcLabel.fold("")(":" + _)})(${t.dst})[${t.typ.getOrElse("")}*${t.minHops}..${t.maxHops}]$rev path=${t.pathName}"
      case FJoin(l, r) => s"$pad⋈\n${pretty(l, indent + 1)}\n${pretty(r, indent + 1)}"
      case FSelection(c, p) => s"${pad}σ[$p]\n${pretty(c, indent + 1)}"
      case FProjection(c, items) =>
        val its = items.map {
          case (PCol(n), a) => if (n == a) n else s"$n→$a"
          case (PPath(p), a) => s"path($p)→$a"
        }.mkString(", ")
        s"${pad}π[$its]\n${pretty(c, indent + 1)}"
      case FDistinct(c) => s"${pad}δ\n${pretty(c, indent + 1)}"
      case FUnwindPath(c, p, o) => s"${pad}unwind-nodes($p→$o)\n${pretty(c, indent + 1)}"
      case FPathConstruct(c, p, s, e, t) => s"${pad}path[$p=($s)-[$e]->($t)]\n${pretty(c, indent + 1)}"
    }
  }
}
