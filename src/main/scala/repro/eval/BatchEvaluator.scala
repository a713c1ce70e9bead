package repro.eval

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.algebra.Expr
import repro.fra._
import repro.graph.PropertyGraph

/** Non-incremental evaluation of an FRA expression on a graph snapshot —
  * the *full recomputation baseline* of the benchmarks, and the semantic
  * reference the IVM engine is tested against (which is in turn tested
  * against the DuckDB oracle).
  */
object BatchEvaluator {

  def eval(f: NraToFra.Flattened, g: PropertyGraph): DataFrame = evalOp(f.op, g)

  /** Evaluate a bare FRA (sub)tree on a snapshot. */
  def evalOp(root: FraOp, g: PropertyGraph): DataFrame = {
    lazy val keys = FraEval.propKeys(g)

    def go(op: FraOp): DataFrame = op match {
      case l: FGetVertices =>
        FraEval.getVertices(g, l.v, l.label, FraEval.effectiveVertexProps(l, keys))

      case ge: FGetEdges =>
        FraEval.getEdges(g, ge, FraEval.effectiveEdgeProps(ge, keys))

      case t: FTransitiveEdges =>
        val sources = g.vertices
          .filter(t.srcLabel.map(col("label") === _).getOrElse(lit(true)))
          .select(col("id").as(t.src))
        FraEval.trails(t, sources, FraEval.orientedEdges(g, t.typ, t.reversed))
          .filter(FraEval.hopFilter(t))

      case FJoin(l, r) =>
        val (ld, rd) = (go(l), go(r))
        val keyCols = FraEval.joinKeys(l.schema, r.schema)
        val overlap = ld.columns.toSet.intersect(rd.columns.toSet) -- keyCols
        require(overlap.isEmpty, s"ambiguous non-key columns in natural join: $overlap")
        if (keyCols.isEmpty) ld.crossJoin(rd) else ld.join(rd, keyCols)

      case FSelection(c, p) => go(c).filter(Expr.toColumn(p))

      case FProjection(c, items) => go(c).select(items.map(FraEval.projItem): _*)

      case FDistinct(c) => go(c).distinct()

      case FUnwindPath(c, p, out) =>
        go(c).withColumn(out, explode(col(s"${p}__vs")))

      case FPathConstruct(c, p, s, e, d) =>
        go(c)
          .withColumn(s"${p}__vs", array(col(s), col(d)))
          .withColumn(s"${p}__es", array(col(e)))
    }

    go(root)
  }
}
