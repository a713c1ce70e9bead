package repro.ivm

import org.apache.spark.sql.DataFrame
import repro.graph.{GraphDelta, PropertyGraph}

/** Everything a maintenance step may consult: the snapshot before the
  * update, the snapshot after, and the fine-grained change set itself.
  */
final case class DeltaCtx(before: PropertyGraph, after: PropertyGraph, delta: GraphDelta)

/** One operator of the maintenance network compiled from an FRA expression.
  *
  * Protocol per batch: the engine calls `apply(ctx)` on the root; every node
  * first applies its children (the network is a tree, so each node is
  * applied exactly once), then computes its own output delta. After `apply`
  * returns, `stateNew` is the post-batch output and `statePrev` the
  * pre-batch output — parents are free to use either side of the standard
  * delta-join identity.
  */
trait IvmNode {
  /** Logical output columns (multiplicity column excluded). */
  def schema: Seq[String]

  /** True iff the delta returned by the most recent `apply` was provably
    * empty — lets parents skip whole maintenance steps without Spark jobs.
    */
  var lastDeltaEmpty: Boolean = false

  /** Output relation after the most recent init/apply (cols + __cnt ≥ 1). */
  def stateNew: DataFrame

  /** Output relation before the most recent apply. */
  def statePrev: DataFrame

  /** Full evaluation on the initial snapshot. */
  def init(g: PropertyGraph): Unit

  /** Propagate one update batch; returns this node's output delta
    * (cols + signed __cnt), already normalised and materialised.
    */
  def apply(ctx: DeltaCtx): DataFrame

  /** Rows currently materialised by this node and its subtree (for Table 6
    * state-size accounting). Stateless nodes report 0 for themselves.
    */
  def stateRows: Long

  /** (rows × data-columns) summed over this subtree — a proxy for state
    * footprint that is robust to JVM memory estimation noise.
    */
  def stateCells: Long

  def children: Seq[IvmNode]

  def subtreeStateRows: Long = stateRows + children.map(_.subtreeStateRows).sum
  def subtreeStateCells: Long = stateCells + children.map(_.subtreeStateCells).sum
}

/** Base for nodes that materialise their own output.
  *
  * State folding is *lazy*: a delta is appended (narrow union + checkpoint)
  * rather than merged with a full-relation groupBy, so per-batch cost is
  * O(|state| scan) instead of O(|state| shuffle) — and zero when the delta
  * is provably empty. Cancelled (+1/−1) row pairs therefore linger in the
  * state; every operator is linear in its inputs so this is semantically
  * invisible, and a periodic compaction (every [[StatefulNode.CompactEvery]]
  * folds) re-normalises to bound growth. Readers that need the proper bag
  * (the engine's `view`, tests, Table 6 accounting) normalise on read.
  */
abstract class StatefulNode extends IvmNode {
  protected var cur: DataFrame = _
  protected var prevDf: DataFrame = _
  private var folds = 0

  override def stateNew: DataFrame = cur
  override def statePrev: DataFrame = prevDf

  /** Install the initial state (normalises + materialises). */
  protected def setInitial(df: DataFrame): Unit = {
    cur = Rel.materialize(Rel.normalize(df))
    prevDf = cur.limit(0)
  }

  /** Fold a delta into the state; returns the materialised delta.
    * Checkpointing is deferred: between checkpoints the state is a shallow
    * union tree over materialised frames (cheap to recompute), so a fold
    * usually costs one Spark job (the delta) instead of two.
    */
  protected def advance(delta: DataFrame): DataFrame = {
    val d = Rel.materialize(delta)
    lastDeltaEmpty = d.isEmpty
    prevDf = cur
    if (!lastDeltaEmpty) {
      folds += 1
      val appended = cur.unionByName(d.select(cur.columns.map(
        org.apache.spark.sql.functions.col): _*))
      cur =
        if (folds % StatefulNode.CompactEvery == 0) Rel.materialize(Rel.normalize(appended))
        else if (folds % StatefulNode.CheckpointEvery == 0) Rel.materialize(appended)
        else appended
    }
    d
  }

  /** Fast path: the batch provably cannot affect this node. */
  protected def emptyDelta(): DataFrame = {
    prevDf = cur
    lastDeltaEmpty = true
    cur.limit(0)
  }

  override def stateRows: Long = if (cur == null) 0L else Rel.normalize(cur).count()
  override def stateCells: Long = stateRows * schema.size
}

object StatefulNode {
  /** Full re-normalisation period for lazy state folding. */
  val CompactEvery = 16
  /** Lineage-truncation period between compactions. */
  val CheckpointEvery = 4
}
