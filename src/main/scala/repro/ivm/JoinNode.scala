package repro.ivm

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.graph.PropertyGraph

/** Natural-join maintenance with bag multiplicities:
  * `Δ(L ⋈ R) = ΔL ⋈ R_old + L_new ⋈ ΔR` (counts multiply), the standard
  * delta-join identity [10, 11].
  */
final class JoinNode(left: IvmNode, right: IvmNode) extends StatefulNode {

  private val keyCols = left.schema.intersect(right.schema)

  override val schema: Seq[String] = (left.schema ++ right.schema).distinct
  override def children: Seq[IvmNode] = Seq(left, right)

  private def joined(l: DataFrame, r: DataFrame): DataFrame = {
    val lr = l.withColumnRenamed(Rel.Cnt, "__cl")
    val rr = r.withColumnRenamed(Rel.Cnt, "__cr")
    val overlap = lr.columns.toSet.intersect(rr.columns.toSet) -- keyCols
    require(overlap.isEmpty, s"ambiguous non-key columns in natural join: $overlap")
    val j = if (keyCols.isEmpty) lr.crossJoin(rr) else lr.join(rr, keyCols)
    j.withColumn(Rel.Cnt, col("__cl") * col("__cr")).drop("__cl", "__cr")
  }

  override def init(g: PropertyGraph): Unit = {
    left.init(g)
    right.init(g)
    setInitial(joined(left.stateNew, right.stateNew))
  }

  override def apply(ctx: DeltaCtx): DataFrame = {
    val dl = left.apply(ctx)
    val dr = right.apply(ctx)
    (left.lastDeltaEmpty, right.lastDeltaEmpty) match {
      case (true, true) => emptyDelta()
      case (false, true) => advance(joined(dl, right.statePrev))
      case (true, false) => advance(joined(left.stateNew, dr))
      case (false, false) =>
        advance(joined(dl, right.statePrev).unionByName(joined(left.stateNew, dr)))
    }
  }
}

/** DISTINCT maintenance with support counts: the internal state tracks each
  * tuple's derivation count; the output flips between 0 and 1 only on
  * support transitions across zero.
  */
final class DistinctNode(child: IvmNode) extends StatefulNode {

  /** support(tuple) — positive counts of the child's bag. */
  private var support: DataFrame = _

  override def schema: Seq[String] = child.schema
  override def children: Seq[IvmNode] = Seq(child)

  override def init(g: PropertyGraph): Unit = {
    child.init(g)
    support = Rel.materialize(Rel.normalize(child.stateNew))
    setInitial(support.withColumn(Rel.Cnt, lit(1L)))
  }

  override def apply(ctx: DeltaCtx): DataFrame = {
    val d = child.apply(ctx)
    if (child.lastDeltaEmpty) return emptyDelta()
    val cols = schema
    val newSupport = Rel.materialize(Rel.add(support, d))
    val before = support.withColumnRenamed(Rel.Cnt, "__sb")
    val after = newSupport.withColumnRenamed(Rel.Cnt, "__sa")
    val merged = before.join(after, cols, "full_outer")
      .withColumn("__sb", coalesce(col("__sb"), lit(0L)))
      .withColumn("__sa", coalesce(col("__sa"), lit(0L)))
    val delta = merged
      .withColumn(Rel.Cnt,
        when(col("__sb") <= 0 && col("__sa") > 0, 1L)
          .when(col("__sb") > 0 && col("__sa") <= 0, -1L)
          .otherwise(0L))
      .filter(col(Rel.Cnt) =!= 0L)
      .select((cols :+ Rel.Cnt).map(col): _*)
    support = newSupport
    advance(delta)
  }

  override def stateRows: Long =
    super.stateRows + (if (support == null) 0L else support.count())
}
