package repro.ivm

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import repro.TestGraphs
import repro.eval.BatchEvaluator
import repro.fra.FraOp
import repro.graph.{GraphStore, UpdateOp}

/** Shared machinery for IVM node tests: after every batch, a maintained
  * node must (1) have a state bag-equal to recomputing its FRA subtree on
  * the updated snapshot, (2) hold a valid (positive, normalised) state, and
  * (3) have emitted a delta with statePrev + Δ = stateNew.
  */
object IvmTestKit {

  def assertSameCounted(a: DataFrame, b: DataFrame): Unit = {
    val an = Rel.normalize(a)
    val bn = Rel.normalize(b).select(an.columns.map(col): _*)
    val extra = an.exceptAll(bn).collect()
    val missing = bn.exceptAll(an).collect()
    assert(extra.isEmpty && missing.isEmpty,
      s"counted relations differ:\n  extra: ${extra.take(5).mkString("; ")}\n" +
      s"  missing: ${missing.take(5).mkString("; ")}")
  }

  /** Drive `node` (planned from `op`) through `batches`, checking the three
    * invariants after every batch. Returns the node for further poking.
    */
  def drive(op: FraOp, store: GraphStore, batches: Seq[Seq[UpdateOp]]): IvmNode = {
    val node = IvmPlanner.plan(op)
    node.init(store.current)
    TestGraphs.assertCountedEqualsPlain(node.stateNew, BatchEvaluator.evalOp(op, store.current))
    TestGraphs.assertValidState(node.stateNew)
    batches.zipWithIndex.foreach { case (batch, i) =>
      val before = store.current
      val delta = store.applyOps(batch)
      val prevState = node.stateNew
      val d = node.apply(DeltaCtx(before, store.current, delta))
      val expected = BatchEvaluator.evalOp(op, store.current)
      withClue(s"after batch $i ($batch): ") {
        TestGraphs.assertCountedEqualsPlain(node.stateNew, expected)
        TestGraphs.assertValidState(node.stateNew)
        assertSameCounted(Rel.add(prevState, d), node.stateNew)
        assertSameCounted(node.statePrev, prevState)
      }
    }
    node
  }

  private def withClue(msg: String)(body: => Unit): Unit =
    try body
    catch {
      case e: AssertionError => throw new AssertionError(msg + e.getMessage, e)
    }

  private def assert(cond: Boolean, msg: => String = "assertion failed"): Unit =
    if (!cond) throw new AssertionError(msg)
}
