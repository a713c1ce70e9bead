package repro.ivm

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.eval.FraEval
import repro.fra.{FGetEdges, FGetVertices}
import repro.graph.PropertyGraph

/** `◯` leaf: maintains `getVertices(v, label, props)` by re-deriving only
  * the touched vertex ids on the before/after snapshots and diffing
  * (DESIGN.md §2.2). A fine-grained property write therefore costs
  * O(|touched ids|) regardless of graph size — this is FGN.
  */
final class VertexLeafNode(val leaf: FGetVertices) extends StatefulNode {

  private var props: Map[String, String] = leaf.props

  override def schema: Seq[String] = leaf.v +: props.values.toSeq
  override def children: Seq[IvmNode] = Seq.empty

  override def init(g: PropertyGraph): Unit = {
    if (leaf.allProps) props = FraEval.effectiveVertexProps(leaf, FraEval.propKeys(g))
    setInitial(Rel.withCount(eval(g)))
  }

  private def eval(g: PropertyGraph): DataFrame =
    FraEval.getVertices(g, leaf.v, leaf.label, props)

  override def apply(ctx: DeltaCtx): DataFrame = {
    // discrimination: the batch must touch this leaf's label or one of its
    // tracked property keys to be relevant at all
    val relevant = ctx.delta.stats.forall { s =>
      s.touchesVertexLabel(leaf.label) || s.touchesVertexProps(props.keys)
    }
    if (!relevant) return emptyDelta()
    val touched = ctx.delta.touchedVertexIds.withColumnRenamed("id", leaf.v)
    def restricted(g: PropertyGraph): DataFrame =
      eval(g.copy(vertices = g.vertices.join(
        touched.withColumnRenamed(leaf.v, "id"), Seq("id"), "left_semi")))
    // deltas are batch-sized: normalising here is cheap and stops spurious
    // +/− pairs from fanning out through the join tree
    val delta = Rel.normalize(Rel.withCount(restricted(ctx.after), 1L)
      .unionByName(Rel.withCount(restricted(ctx.before), -1L)))
    advance(delta)
  }
}

/** `⇑` leaf: maintains one typed, oriented, label-checked hop with its
  * pushed-down properties. Affected rows are edges whose own row/properties
  * changed plus edges incident to a touched vertex (label or property
  * change at an endpoint).
  */
final class EdgeLeafNode(val leaf: FGetEdges) extends StatefulNode {

  private var edgeProps: Map[String, String] = leaf.edgeProps

  override def schema: Seq[String] =
    Seq(leaf.src, leaf.edge, leaf.dst) ++
      leaf.srcProps.values ++ edgeProps.values ++ leaf.dstProps.values
  override def children: Seq[IvmNode] = Seq.empty

  override def init(g: PropertyGraph): Unit = {
    if (leaf.allProps) edgeProps = FraEval.effectiveEdgeProps(leaf, FraEval.propKeys(g))
    setInitial(Rel.withCount(FraEval.getEdges(g, leaf, edgeProps)))
  }

  override def apply(ctx: DeltaCtx): DataFrame = {
    // discrimination: relevant iff the batch touches this hop's edge type,
    // an endpoint label (labels gate rows), a tracked endpoint property, or
    // a tracked edge property
    val relevant = ctx.delta.stats.forall { s =>
      s.touchesEdgeType(leaf.typ) ||
        s.touchesVertexLabel(leaf.srcLabel) || s.touchesVertexLabel(leaf.dstLabel) ||
        s.touchesVertexProps(leaf.srcProps.keys ++ leaf.dstProps.keys) ||
        s.touchesEdgeProps(edgeProps.keys)
    }
    if (!relevant) return emptyDelta()
    val tv = ctx.delta.touchedVertexIds.select(col("id").as("__vid"))
    val te = ctx.delta.touchedEdgeIds
    // an affected after-edge is either pre-existing (incident on the before
    // snapshot) or freshly inserted (already in the touched edge ids), so
    // one incident scan suffices
    def incident(g: PropertyGraph): DataFrame =
      g.edges
        .join(tv, g.edges("src") === col("__vid") || g.edges("dst") === col("__vid"))
        .select(g.edges("id"))
    val affected = te
      .unionByName(incident(ctx.before))
      .distinct()
      .localCheckpoint(true)
    def restricted(g: PropertyGraph): DataFrame =
      FraEval.getEdges(
        g.copy(edges = g.edges.join(affected, Seq("id"), "left_semi")), leaf, edgeProps)
    val delta = Rel.normalize(Rel.withCount(restricted(ctx.after), 1L)
      .unionByName(Rel.withCount(restricted(ctx.before), -1L)))
    advance(delta)
  }
}
