package repro.ivm

import org.apache.spark.sql.DataFrame
import repro.fra._
import repro.graph.{GraphDelta, GraphStore, PropertyGraph, UpdateOp}

/** FRA → maintenance network (paper workflow step 4). Every FRA operator
  * maps 1:1 onto an [[IvmNode]]; the mapping is total for the paper's
  * maintainable fragment.
  */
object IvmPlanner {
  def plan(op: FraOp): IvmNode = op match {
    case l: FGetVertices => new VertexLeafNode(l)
    case g: FGetEdges => new EdgeLeafNode(g)
    case t: FTransitiveEdges => new TransitiveNode(t)
    case FJoin(l, r) => new JoinNode(plan(l), plan(r))
    case FSelection(c, p) => new SelectNode(plan(c), p)
    case FProjection(c, items) => new ProjectNode(plan(c), items)
    case FDistinct(c) => new DistinctNode(plan(c))
    case FUnwindPath(c, p, out) => new UnwindPathNode(plan(c), p, out)
    case FPathConstruct(c, p, s, e, d) => new PathConstructNode(plan(c), p, s, e, d)
  }
}

/** The incremental view: owns the maintenance network for one query and the
  * graph snapshots it has seen.
  *
  * Usage:
  * {{{
  *   val engine = IncrementalEngine(flattened, store.current)
  *   val d1 = engine.applyDelta(store.applyOps(batch))   // view delta
  *   engine.view                                         // maintained result
  * }}}
  *
  * The engine does not own the [[GraphStore]] — callers apply updates to the
  * store and feed the resulting deltas (plus before/after snapshots) here,
  * so several engines (and the recomputation baseline) can share one store.
  */
final class IncrementalEngine private (val root: IvmNode, private var graph: PropertyGraph) {

  /** Current maintained view (columns + positive __cnt multiplicities).
    * States fold lazily (IvmNode.scala), so the bag is normalised on read.
    */
  def view: DataFrame = Rel.normalize(root.stateNew)

  /** The root's raw (possibly unnormalised) state — no Spark work. */
  def rawView: DataFrame = root.stateNew

  /** Propagate one update batch; returns the view's delta. */
  def applyDelta(delta: GraphDelta, after: PropertyGraph): DataFrame = {
    val ctx = DeltaCtx(graph, after, delta)
    val d = root.apply(ctx)
    graph = after
    d
  }

  /** Convenience: apply ops through the store and maintain. */
  def applyOps(store: GraphStore, ops: Seq[UpdateOp]): DataFrame = {
    val before = store.current
    val delta = store.applyOps(ops)
    require(before eq store.previous, "engine and store snapshots diverged")
    applyDelta(delta, store.current)
  }

  def stateRows: Long = root.subtreeStateRows
  def stateCells: Long = root.subtreeStateCells
}

object IncrementalEngine {
  def apply(f: NraToFra.Flattened, initial: PropertyGraph): IncrementalEngine = {
    val root = IvmPlanner.plan(f.op)
    root.init(initial)
    new IncrementalEngine(root, initial)
  }
}
