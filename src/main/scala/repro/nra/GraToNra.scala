package repro.nra

import repro.algebra._
import repro.cypher.{In, Out}
import repro.gra._

/** GRA → NRA (paper workflow step 2).
  *
  * Rewrites:
  *  - `↑(v)^(w:W)[:E](r)        ≡ r ⋈ ⇑(v:V)^(w:W)[:E]`
  *  - `↑(v)^(w:W)[:E*](r)       ≡ r ⋈* ⇑(v:V)^(:E)[w]  (⋈ ◯(w:W) for the target label)`
  *  - every property access `x.key` used in σ/π becomes an explicit unnest
  *    `μ_{x.key → x__key}` stacked above the pattern join tree, and the
  *    expressions are rewritten to reference the unnested flat columns.
  */
object GraToNra {

  final case class Result(op: NraOp, compiled: CypherToGra.Compiled)

  def rewrite(c: CypherToGra.Compiled): Result = Result(rewriteOp(c.op), c)

  private def rewriteOp(op: GraOp): NraOp = op match {
    case GGetVertices(v, l) => NGetVertices(v, l)

    case e: GExpand =>
      val child = rewriteOp(e.child)
      val reversed = e.dir == In
      e.varLength match {
        case None =>
          var joined: NraOp = NJoin(child,
            NGetEdges(e.from, e.edge, e.to, e.typ, e.fromLabel, e.toLabel, reversed))
          e.pathVar.foreach { p =>
            joined = NPathConstruct(joined, p, e.from, e.edge, e.to)
          }
          joined
        case Some((min, max)) =>
          val path = e.pathVar.getOrElse(
            throw new IllegalStateException("transitive expand must carry a path name"))
          var joined: NraOp = NJoin(child,
            NTransitiveEdges(e.from, e.to, e.typ, e.fromLabel, reversed, min, max, path))
          // the target label check is a join with ◯(to:Label)
          e.toLabel.foreach { l => joined = NJoin(joined, NGetVertices(e.to, Some(l))) }
          joined
      }

    case GNaturalJoin(l, r) => NJoin(rewriteOp(l), rewriteOp(r))

    case GSelection(child, pred) =>
      val c = rewriteOp(child)
      NSelection(unnestAll(c, pred.propRefs), pred.flatten(_.flatName))

    case GProjection(child, items) =>
      val c = rewriteOp(child)
      val refs = items.flatMap(_._1.propRefs)
      NProjection(unnestAll(c, refs), items.map { case (e, a) => (e.flatten(_.flatName), a) })

    case GDistinct(child) => NDistinct(rewriteOp(child))

    case GUnwindPath(child, p, out) => NUnwindPath(rewriteOp(child), p, out)
  }

  /** Stack μ operators for each distinct property access (idempotent per
    * flat name: a ref already unnested lower in the tree is skipped).
    */
  private def unnestAll(op: NraOp, refs: Seq[PropRef]): NraOp = {
    val existing = collectUnnests(op)
    refs.distinct.foldLeft(op) { (acc, ref) =>
      if (existing.contains(ref.flatName)) acc else NUnnest(acc, ref, ref.flatName)
    }
  }

  private def collectUnnests(op: NraOp): Set[String] = op match {
    case NUnnest(c, _, as) => collectUnnests(c) + as
    case NJoin(l, r) => collectUnnests(l) ++ collectUnnests(r)
    case NSelection(c, _) => collectUnnests(c)
    case NProjection(c, _) => collectUnnests(c)
    case NDistinct(c) => collectUnnests(c)
    case NUnwindPath(c, _, _) => collectUnnests(c)
    case NPathConstruct(c, _, _, _, _) => collectUnnests(c)
    case _ => Set.empty
  }
}
