package repro.ivm

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.algebra.Expr
import repro.eval.FraEval
import repro.fra.ProjExpr
import repro.graph.PropertyGraph

/** Base for operators whose delta rule is exact on the delta alone
  * (`Δout = f(Δin)`): σ, bag-π, path construction, path unwinding. They
  * materialise nothing — `stateNew`/`statePrev` are views over the child's
  * retained states, so the network's memory is paid only by stateful nodes.
  */
abstract class StatelessNode(child: IvmNode) extends IvmNode {
  protected def f(df: DataFrame): DataFrame

  override def stateNew: DataFrame = f(child.stateNew)
  override def statePrev: DataFrame = f(child.statePrev)
  override def children: Seq[IvmNode] = Seq(child)
  override def init(g: PropertyGraph): Unit = child.init(g)

  /** Deltas stay lazy: each is consumed exactly once by the parent (or the
    * engine caller), so materialising here would only add a Spark job.
    */
  override def apply(ctx: DeltaCtx): DataFrame = {
    val d = child.apply(ctx)
    lastDeltaEmpty = child.lastDeltaEmpty
    f(d)
  }
  override def stateRows: Long = 0L
  override def stateCells: Long = 0L
}

/** σ: filters pass through deltas unchanged in sign. */
final class SelectNode(child: IvmNode, pred: Expr) extends StatelessNode(child) {
  override def schema: Seq[String] = child.schema
  protected def f(df: DataFrame): DataFrame = df.filter(Expr.toColumn(pred))
}

/** Bag π: projection preserves signed multiplicities (duplicates merge at
  * normalisation).
  */
final class ProjectNode(child: IvmNode, items: Seq[(ProjExpr, String)]) extends StatelessNode(child) {
  override def schema: Seq[String] = items.map(_._2)
  protected def f(df: DataFrame): DataFrame =
    df.select(items.map(FraEval.projItem) :+ col(Rel.Cnt): _*)
}

/** Adds the atomic path value of a single flat relationship. */
final class PathConstructNode(child: IvmNode, pathName: String,
    startV: String, edge: String, endV: String) extends StatelessNode(child) {
  override def schema: Seq[String] = child.schema ++ Seq(s"${pathName}__vs", s"${pathName}__es")
  protected def f(df: DataFrame): DataFrame =
    df.withColumn(s"${pathName}__vs", array(col(startV), col(endV)))
      .withColumn(s"${pathName}__es", array(col(edge)))
}

/** UNWIND nodes(path): the path's vertex list explodes into a bag — the
  * ordering is lost exactly as the paper prescribes for unnested paths.
  * Exact on deltas: a path insertion/deletion contributes each of its
  * vertices with the path's sign.
  */
final class UnwindPathNode(child: IvmNode, pathName: String, out: String) extends StatelessNode(child) {
  override def schema: Seq[String] = child.schema :+ out
  protected def f(df: DataFrame): DataFrame =
    df.withColumn(out, explode(col(s"${pathName}__vs")))
}
