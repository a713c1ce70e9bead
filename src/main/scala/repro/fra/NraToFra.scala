package repro.fra

import repro.algebra._
import repro.gra.{CompileException, CypherToGra}
import repro.nra._

/** NRA → FRA flattening (paper workflow step 3): pushes every μ unnest down
  * into the `◯`/`⇑` leaf that binds its variable, inferring the *minimal
  * schema* each leaf must produce. A μ whose variable is bound only by a
  * transitive-join target or an UNWIND alias is realised as a natural join
  * with a synthesised `◯(x{key→col})` leaf (semantically the paper's
  * pushed-into-⇑ form; keeps path state property-free — DESIGN.md §2.4).
  *
  * `SchemaMode.AllProperties` is the *naive baseline* for Table 6: leaves
  * materialise every property key present in the data instead of the
  * inferred minimal set.
  */
object NraToFra {

  sealed trait SchemaMode
  case object Inferred extends SchemaMode
  case object AllProperties extends SchemaMode

  final case class Flattened(op: FraOp, compiled: CypherToGra.Compiled, mode: SchemaMode)

  def flatten(r: GraToNra.Result, mode: SchemaMode = Inferred): Flattened = {
    val converted = convert(r.op, r.compiled, mode)
    val finalOp = mode match {
      case Inferred => converted
      case AllProperties => naive(converted, r.compiled)
    }
    Flattened(finalOp, r.compiled, mode)
  }

  /** Naive baseline: flip every ◯/⇑ leaf to all-properties mode, and ensure
    * every vertex variable has a ◯ leaf (so closure targets and middle nodes
    * also carry their full property bags, like an engine without schema
    * inference would).
    */
  private def naive(op: FraOp, c: CypherToGra.Compiled): FraOp = {
    // vertex-prop requirements move from ⇑ leaves to the (all-props) ◯
    // leaves, so auto-generated <v>__<key> columns never collide with a
    // declared pushdown column on the other join side
    val strippedProps = scala.collection.mutable.Map.empty[String, Map[String, String]]
    def collect(o: FraOp): Unit = o match {
      case g: FGetEdges =>
        if (g.srcProps.nonEmpty)
          strippedProps(g.src) = strippedProps.getOrElse(g.src, Map.empty) ++ g.srcProps
        if (g.dstProps.nonEmpty)
          strippedProps(g.dst) = strippedProps.getOrElse(g.dst, Map.empty) ++ g.dstProps
      case other => other.children.foreach(collect)
    }
    collect(op)
    def flip(o: FraOp): FraOp = o match {
      case l: FGetVertices =>
        l.copy(allProps = true, props = l.props ++ strippedProps.getOrElse(l.v, Map.empty))
      case g: FGetEdges =>
        g.copy(allProps = true, srcProps = Map.empty, dstProps = Map.empty)
      case FJoin(a, b) => FJoin(flip(a), flip(b))
      case FSelection(ch, p) => FSelection(flip(ch), p)
      case FProjection(ch, i) => FProjection(flip(ch), i)
      case FDistinct(ch) => FDistinct(flip(ch))
      case FUnwindPath(ch, p, o2) => FUnwindPath(flip(ch), p, o2)
      case FPathConstruct(ch, p, s, e, d) => FPathConstruct(flip(ch), p, s, e, d)
      case leaf => leaf
    }
    def gvVars(o: FraOp): Set[String] = o match {
      case FGetVertices(v, _, _, _) => Set(v)
      case other => other.children.foldLeft(Set.empty[String])(_ ++ gvVars(_))
    }
    def unwindVars(o: FraOp): Set[String] = o match {
      case FUnwindPath(ch, _, out) => unwindVars(ch) + out
      case other => other.children.foldLeft(Set.empty[String])(_ ++ unwindVars(_))
    }
    val flipped = flip(op)
    // vertex vars with no ◯ leaf (bound only by ⇑ or closures); UNWIND
    // aliases are excluded — they surface below the unwind operator.
    val missing = (c.vertexVars -- gvVars(flipped) -- unwindVars(flipped)).toSeq.sorted
    // sink the synthesised ◯ joins below every unary operator (σ may
    // reference their property columns) onto the top of the join tree
    def inject(o: FraOp): FraOp = o match {
      case FProjection(ch, i) => FProjection(inject(ch), i)
      case FDistinct(ch) => FDistinct(inject(ch))
      case FUnwindPath(ch, p, o2) => FUnwindPath(inject(ch), p, o2)
      case FSelection(ch, p) => FSelection(inject(ch), p)
      case FPathConstruct(ch, p, s, e, d) => FPathConstruct(inject(ch), p, s, e, d)
      case body =>
        missing.foldLeft(body)((acc, v) =>
          FJoin(acc, FGetVertices(v, c.labelOf.get(v),
            strippedProps.getOrElse(v, Map.empty), allProps = true)))
    }
    inject(flipped)
  }

  private def convert(op: NraOp, c: CypherToGra.Compiled, mode: SchemaMode): FraOp = op match {
    case NGetVertices(v, l) => FGetVertices(v, l, Map.empty)
    case NGetEdges(s, e, d, t, sl, dl, rev) =>
      FGetEdges(s, e, d, t, sl, dl, rev, Map.empty, Map.empty, Map.empty)
    case NTransitiveEdges(s, d, t, sl, rev, mn, mx, p) =>
      FTransitiveEdges(s, d, t, sl, rev, mn, mx, p)
    case NJoin(l, r) => FJoin(convert(l, c, mode), convert(r, c, mode))
    case NUnnest(child, ref, as) =>
      val converted = convert(child, c, mode)
      pushProp(converted, ref, as) match {
        case Some(updated) => updated
        case None =>
          // bound by a transitive target or an UNWIND alias: synthesise a
          // get-vertices leaf carrying just this property
          if (c.edgeVars.contains(ref.variable))
            throw CompileException(
              s"property ${ref.variable}.${ref.key}: edge variable has no binding ⇑ leaf")
          FJoin(converted, FGetVertices(ref.variable, c.labelOf.get(ref.variable), Map(ref.key -> as)))
      }
    case NSelection(child, pred) => FSelection(convert(child, c, mode), pred)
    case NProjection(child, items) =>
      FProjection(convert(child, c, mode), items.map {
        case (ColRef(n), a) if c.pathNames.contains(n) => (PPath(n): ProjExpr, a)
        case (ColRef(n), a) => (PCol(n): ProjExpr, a)
        case (other, _) =>
          throw CompileException(s"unsupported RETURN item $other (flattening should have produced a column)")
      })
    case NDistinct(child) => FDistinct(convert(child, c, mode))
    case NUnwindPath(child, p, out) => FUnwindPath(convert(child, c, mode), p, out)
    case NPathConstruct(child, p, s, e, d) => FPathConstruct(convert(child, c, mode), p, s, e, d)
  }

  /** Try to merge `ref.key → as` into a leaf binding `ref.variable`.
    * Transparent operators are traversed; the μ may safely sink below a σ or
    * π-free operator because the new column is fresh.
    */
  private def pushProp(op: FraOp, ref: PropRef, as: String): Option[FraOp] = op match {
    case l @ FGetVertices(v, _, props, _) if v == ref.variable =>
      Some(l.copy(props = props + (ref.key -> as)))
    case g: FGetEdges if g.src == ref.variable =>
      Some(g.copy(srcProps = g.srcProps + (ref.key -> as)))
    case g: FGetEdges if g.dst == ref.variable =>
      Some(g.copy(dstProps = g.dstProps + (ref.key -> as)))
    case g: FGetEdges if g.edge == ref.variable =>
      Some(g.copy(edgeProps = g.edgeProps + (ref.key -> as)))
    case FJoin(l, r) =>
      pushProp(l, ref, as).map(FJoin(_, r))
        .orElse(pushProp(r, ref, as).map(FJoin(l, _)))
    case FSelection(ch, p) => pushProp(ch, ref, as).map(FSelection(_, p))
    case FDistinct(ch) => pushProp(ch, ref, as).map(FDistinct(_))
    case FUnwindPath(ch, p, o) =>
      if (o == ref.variable) None else pushProp(ch, ref, as).map(FUnwindPath(_, p, o))
    case FPathConstruct(ch, p, s, e, d) => pushProp(ch, ref, as).map(FPathConstruct(_, p, s, e, d))
    case _ => None
  }

  /** All (variable, key → column) property requirements per leaf — used by
    * tests to assert minimal-schema inference and by Table 6 to size state.
    */
  def leafProps(op: FraOp): Seq[(String, Map[String, String])] = op match {
    case FGetVertices(v, _, props, _) => Seq((v, props))
    case g: FGetEdges =>
      Seq((g.src, g.srcProps), (g.edge, g.edgeProps), (g.dst, g.dstProps))
    case other => other.children.flatMap(leafProps)
  }
}
