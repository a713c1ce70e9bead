package repro.algebra

import org.apache.spark.sql.Column
import org.apache.spark.sql.functions._

/** Expression AST shared by all three IRs (GRA, NRA, FRA).
  *
  * At the GRA/NRA levels expressions may contain [[PropRef]]s (nested
  * property accesses like `p.lang`); the NRA→FRA flattening rewrites every
  * [[PropRef]] to a flat [[ColRef]] fed by a μ-unnest pushed into a leaf
  * (minimal schema inference). FRA expressions are therefore flat and can be
  * compiled directly to Catalyst [[Column]]s.
  */
sealed trait Expr {
  /** All property accesses appearing in this expression. */
  def propRefs: Seq[PropRef] = this match {
    case p: PropRef => Seq(p)
    case Cmp(_, l, r) => l.propRefs ++ r.propRefs
    case And(l, r) => l.propRefs ++ r.propRefs
    case Or(l, r) => l.propRefs ++ r.propRefs
    case Not(e) => e.propRefs
    case _ => Seq.empty
  }

  /** Rewrite property accesses to flat columns (used by NRA→FRA). */
  def flatten(rename: PropRef => String): Expr = this match {
    case p: PropRef => ColRef(rename(p))
    case Cmp(op, l, r) => Cmp(op, l.flatten(rename), r.flatten(rename))
    case And(l, r) => And(l.flatten(rename), r.flatten(rename))
    case Or(l, r) => Or(l.flatten(rename), r.flatten(rename))
    case Not(e) => Not(e.flatten(rename))
    case other => other
  }
}

/** A flat column (a variable binding or an already-unnested property). */
final case class ColRef(name: String) extends Expr
/** A nested property access `variable.key` (GRA/NRA only). */
final case class PropRef(variable: String, key: String) extends Expr {
  /** Canonical flat column name produced by μ-pushdown. */
  def flatName: String = s"${variable}__$key"
}
/** A literal. `value` is String, Long, Double or Boolean. */
final case class Lit(value: Any) extends Expr
/** Comparison; op ∈ {=, <>, <, <=, >, >=}. Ordering ops compare numerically
  * (property values are stored as strings — see PropertyGraph).
  */
final case class Cmp(op: String, l: Expr, r: Expr) extends Expr
final case class And(l: Expr, r: Expr) extends Expr
final case class Or(l: Expr, r: Expr) extends Expr
final case class Not(e: Expr) extends Expr
/** Edge-uniqueness predicates injected by the compiler (openCypher trail
  * semantics across a MATCH): `edgeCol` must not occur in the path's edge
  * array `pathEdgesCol`.
  */
final case class NotInArray(pathEdgesCol: String, edgeCol: String) extends Expr
/** Two path edge arrays must be disjoint. */
final case class ArraysDisjoint(leftPathEdges: String, rightPathEdges: String) extends Expr

object Expr {

  /** Compile a *flat* expression to a Catalyst Column. Throws on PropRef —
    * those must have been flattened by the NRA→FRA step.
    */
  def toColumn(e: Expr): Column = e match {
    case ColRef(n) => col(n)
    case p: PropRef =>
      throw new IllegalStateException(s"unflattened property access ${p.variable}.${p.key}")
    case Lit(v: String) => lit(v)
    case Lit(v: Long) => lit(v)
    case Lit(v: Int) => lit(v.toLong)
    case Lit(v: Double) => lit(v)
    case Lit(v: Boolean) => lit(v)
    case Lit(v) => throw new IllegalArgumentException(s"unsupported literal $v")
    case Cmp(op, l, r) =>
      val (lc, rc) = coerce(l, r)
      op match {
        case "=" => lc === rc
        case "<>" => lc =!= rc
        case "<" => lc < rc
        case "<=" => lc <= rc
        case ">" => lc > rc
        case ">=" => lc >= rc
        case other => throw new IllegalArgumentException(s"unknown comparison $other")
      }
    case And(l, r) => toColumn(l) && toColumn(r)
    case Or(l, r) => toColumn(l) || toColumn(r)
    case Not(x) => !toColumn(x)
    case NotInArray(path, edge) => !array_contains(col(path), col(edge))
    case ArraysDisjoint(a, b) => !arrays_overlap(col(a), col(b))
  }

  /** Numeric coercion: if either side is a numeric literal, cast both to
    * double (property values live in string columns).
    */
  private def coerce(l: Expr, r: Expr): (Column, Column) = {
    def isNum(e: Expr): Boolean = e match {
      case Lit(_: Long) | Lit(_: Int) | Lit(_: Double) => true
      case _ => false
    }
    val lc = toColumn(l); val rc = toColumn(r)
    if (isNum(l) || isNum(r)) (lc.cast("double"), rc.cast("double")) else (lc, rc)
  }

  /** Conjunction helper; None for an empty list. */
  def conj(es: Seq[Expr]): Option[Expr] = es.reduceOption(And.apply)
}
