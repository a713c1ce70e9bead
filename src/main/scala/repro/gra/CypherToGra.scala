package repro.gra

import repro.algebra._
import repro.cypher._

final case class CompileException(msg: String) extends RuntimeException(msg)

/** openCypher → GRA (paper workflow step 1; mapping from [20]).
  *
  * Each pattern part compiles to a left-deep chain of `◯` + `↑`; multiple
  * parts are natural-joined (shared variables become join columns, which
  * also covers cyclic patterns). openCypher's relationship-uniqueness (trail)
  * semantics across the whole MATCH is made explicit as injected σ
  * predicates over edge variables / path edge arrays.
  *
  * Restrictions (documented in DESIGN.md): a named path (`t = ...`) must be
  * a single-relationship pattern part; a variable-length relationship cannot
  * be user-named (its path gets an internal name used for uniqueness).
  */
object CypherToGra {

  /** Compilation result: the GRA tree plus name tables needed downstream. */
  final case class Compiled(
      op: GraOp,
      labelOf: Map[String, String],      // vertex variable → label (when stated)
      pathNames: Set[String],            // all path variables (user or internal)
      vertexVars: Set[String],
      edgeVars: Set[String],             // single-hop edge variables
      unwoundVars: Set[String],          // UNWIND aliases
  )

  def compile(q: CypherQuery): Compiled = {
    var labelOf = Map.empty[String, String]
    var vertexVars = Set.empty[String]
    var edgeVars = Set.empty[String]
    var pathNames = Set.empty[String]
    var internalPathCounter = 0

    def noteNode(n: NodePat): Unit = {
      vertexVars += n.variable
      n.label.foreach { l =>
        labelOf.get(n.variable).foreach { prev =>
          if (prev != l)
            throw CompileException(s"variable ${n.variable} bound with labels $prev and $l")
        }
        labelOf += n.variable -> l
      }
    }

    // (edgeVar) for flat rels and (pathName) for var-length rels, in MATCH order
    var flatEdgeList = List.empty[String]
    var pathList = List.empty[String]

    def compilePart(part: PatternPart): GraOp = {
      noteNode(part.start)
      if (part.pathVar.isDefined && part.hops.size != 1)
        throw CompileException("a named path must bind a single-relationship pattern part")
      var prev = part.start
      var op: GraOp = GGetVertices(part.start.variable, part.start.label)
      part.hops.foreach { case (rel, node) =>
        noteNode(node)
        val pathVar: Option[String] = rel.varLength match {
          case Some(_) =>
            val name = part.pathVar.getOrElse { internalPathCounter += 1; s"__path$internalPathCounter" }
            pathNames += name
            pathList ::= name
            Some(name)
          case None =>
            val ev = rel.variable.get
            edgeVars += ev
            flatEdgeList ::= ev
            part.pathVar.map { name => pathNames += name; pathList = pathList; name }
        }
        if (rel.varLength.isDefined && rel.variable.exists(!_.startsWith("__e")))
          throw CompileException("variable-length relationships cannot be named; name the path instead")
        op = GExpand(
          child = op,
          from = prev.variable,
          edge = rel.variable.get,
          to = node.variable,
          typ = rel.typ,
          fromLabel = labelOf.get(prev.variable),
          toLabel = node.label,
          dir = rel.dir,
          varLength = rel.varLength,
          pathVar = pathVar,
        )
        prev = node
      }
      op
    }

    val parts = q.patterns.map(compilePart)
    var tree: GraOp = parts.reduceLeft(GNaturalJoin.apply)

    // openCypher relationship-uniqueness across the MATCH clause.
    val flatEdges = flatEdgeList.reverse
    val paths = pathList.reverse.distinct
    val uniq = scala.collection.mutable.ArrayBuffer.empty[Expr]
    for {
      (e1, i) <- flatEdges.zipWithIndex
      e2 <- flatEdges.drop(i + 1)
    } uniq += Cmp("<>", ColRef(e1), ColRef(e2))
    for {
      e <- flatEdges
      p <- paths
    } uniq += NotInArray(s"${p}__es", e)
    for {
      (p1, i) <- paths.zipWithIndex
      p2 <- paths.drop(i + 1)
    } uniq += ArraysDisjoint(s"${p1}__es", s"${p2}__es")
    Expr.conj(uniq.toSeq).foreach(pred => tree = GSelection(tree, pred))

    q.where.foreach(pred => tree = GSelection(tree, pred))

    var unwound = Set.empty[String]
    q.unwind.foreach { case (pv, out) =>
      if (!pathNames.contains(pv))
        throw CompileException(s"UNWIND nodes($pv): $pv is not a path variable")
      unwound += out
      tree = GUnwindPath(tree, pv, out)
    }

    val items = q.items.map(i => (i.expr, i.alias))
    // validate return items reference known names
    items.foreach {
      case (ColRef(n), _) =>
        if (!vertexVars.contains(n) && !edgeVars.contains(n) &&
            !pathNames.contains(n) && !unwound.contains(n))
          throw CompileException(s"RETURN references unknown variable $n")
      case (PropRef(v, _), _) =>
        if (!vertexVars.contains(v) && !edgeVars.contains(v) && !unwound.contains(v))
          throw CompileException(s"RETURN references property of unknown variable $v")
      case _ =>
    }
    tree = GProjection(tree, items)
    if (q.distinct) tree = GDistinct(tree)

    Compiled(tree, labelOf, pathNames, vertexVars, edgeVars, unwound)
  }

  /** Convenience: parse + compile. */
  def compile(cypher: String): Compiled = compile(CypherParser.parse(cypher))
}
